"""LOVO system configuration."""
from __future__ import annotations

from dataclasses import dataclass

from repro.vocab.encoders import CostModel


@dataclass(frozen=True)
class LOVOConfig:
    """Knobs for the full pipeline (paper defaults in parentheses).

    ``dim`` is the reduced class-embedding dimension D' (§IV-C); the
    paper uses ViT-B/32 projections, we use a smaller simulated space.
    ``n_subspaces``/``k_coarse``/``k_residual`` parameterise IVF-PQ
    (§V-B), ``top_a`` is Algorithm 1's "number of clusters queried" A,
    ``k`` the fast-search retrieval count, ``n`` the reranked output
    frame count (Algorithm 2). ``cost_scale`` rescales the calibrated
    compute burned by simulated models (0 ⇒ no burning, for unit tests).
    """

    # embedding space
    dim: int = 64
    visual_noise: float = 0.35  # per-frame perturbation norm
    track_noise: float = 0.40  # persistent per-track appearance offset (norm)
    bbox_noise: float = 0.05
    token_noise: float = 0.45  # rerank token per-instance noise (norm)
    token_track_noise: float = 0.50  # rerank token persistent per-track noise
    attr_dropout: float = 0.08  # per-track chance perception misses an attribute
    rel_dropout: float = 0.35  # per-track chance perception misses a relation
    vocab_seed: int = 7

    # key-frame extraction (§IV-A)
    use_keyframes: bool = True
    kf_threshold: float = 0.25
    kf_interval: int = 8

    # index (§V-B)
    n_subspaces: int = 8
    k_coarse: int = 32
    k_residual: int = 32
    train_sample: int = 4096
    seed: int = 0

    # query strategy (§VI)
    top_a: int = 8
    k: int = 50
    n: int = 50

    # HNSW variant (Table V)
    hnsw_shards: int = 8
    hnsw_m: int = 8
    hnsw_ef: int = 64

    # compute-cost simulation
    cost_scale: float = 0.0

    def cost(self) -> CostModel:
        return CostModel(scale=self.cost_scale)

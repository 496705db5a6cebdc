"""Product quantisation with per-subspace residual refinement (§V-B).

The D'-dimensional class-embedding space is split into P subspaces of
dimension m (D' = P·m). Each subspace is quantised twice, following the
paper's IVF-PQ description:

* a *coarse* codebook of ``k_coarse`` centroids — its cells are the
  inverted lists of the multi-index (the Cartesian product
  C = C_1 × … × C_P of §V-B);
* a *residual* codebook of ``k_residual`` centroids over the residuals
  ``r = x_p − coarse(x_p)`` — the "residual … precomputed and stored in
  a distance lookup-table" of §V-C, giving the refined approximate score
  ``s(q_p, x_p) ≈ q_p·c_coarse + q_p·c_residual``.

Codebooks are trained with Lloyd's iteration [32] on a sample; empty
clusters are re-seeded from the farthest points (standard fix).
All numpy, driver-side; assignment at scale happens in Spark
(`repro.index.ivf`).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


def _lloyd(X: np.ndarray, k: int, iters: int, rng: np.random.Generator) -> np.ndarray:
    """K-means centroids of X (n, d) via Lloyd's iteration, k-means++-lite init."""
    n = len(X)
    k = min(k, n)
    centroids = X[rng.choice(n, size=k, replace=False)].copy()
    for _ in range(iters):
        # squared-distance assignment: ||x||² − 2x·c + ||c||²; ||x||² constant
        d2 = -2 * X @ centroids.T + (centroids**2).sum(axis=1)
        assign = d2.argmin(axis=1)
        for j in range(k):
            members = X[assign == j]
            if len(members):
                centroids[j] = members.mean(axis=0)
            else:  # empty cluster: re-seed at the point farthest from its centroid
                far = d2.min(axis=1).argmax()
                centroids[j] = X[far]
    return centroids


def _assign(Xp: np.ndarray, centroids: np.ndarray) -> np.ndarray:
    """Nearest-centroid index per row of ``Xp`` (Euclidean)."""
    d2 = -2 * Xp @ centroids.T + (centroids**2).sum(axis=1)
    return d2.argmin(axis=1).astype(np.int32)


@dataclass(frozen=True)
class PQQuantizer:
    """Trained two-level product quantizer.

    ``coarse`` has shape (P, k_coarse, m), ``residual`` (P, k_residual, m).
    """

    coarse: np.ndarray
    residual: np.ndarray

    @property
    def n_subspaces(self) -> int:
        return self.coarse.shape[0]

    @property
    def sub_dim(self) -> int:
        return self.coarse.shape[2]

    @property
    def dim(self) -> int:
        return self.n_subspaces * self.sub_dim

    def split(self, X: np.ndarray) -> np.ndarray:
        """Reshape (n, D') → (P, n, m) subspace views."""
        n = X.shape[0]
        return X.reshape(n, self.n_subspaces, self.sub_dim).transpose(1, 0, 2)

    def encode(self, X: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        """Quantise rows of X → (clusters, rcodes), each shape (n, P)."""
        parts = self.split(np.asarray(X, dtype=np.float64))
        clusters = np.empty((X.shape[0], self.n_subspaces), dtype=np.int32)
        rcodes = np.empty_like(clusters)
        for p in range(self.n_subspaces):
            c = _assign(parts[p], self.coarse[p])
            res = parts[p] - self.coarse[p][c]
            clusters[:, p] = c
            rcodes[:, p] = _assign(res, self.residual[p])
        return clusters, rcodes

    def decode(self, clusters: np.ndarray, rcodes: np.ndarray) -> np.ndarray:
        """Approximate reconstruction x̂ = coarse + residual centroid."""
        n = clusters.shape[0]
        out = np.empty((n, self.dim))
        for p in range(self.n_subspaces):
            sub = self.coarse[p][clusters[:, p]] + self.residual[p][rcodes[:, p]]
            out[:, p * self.sub_dim : (p + 1) * self.sub_dim] = sub
        return out

    def coarse_lut(self, q: np.ndarray) -> np.ndarray:
        """Centroid scores s(q_p, c_{m,p}) = q_p·c — shape (P, k_coarse)."""
        qs = q.reshape(self.n_subspaces, self.sub_dim)
        return np.einsum("pm,pkm->pk", qs, self.coarse)

    def residual_lut(self, q: np.ndarray) -> np.ndarray:
        """Residual scores q_p·r_centroid — shape (P, k_residual)."""
        qs = q.reshape(self.n_subspaces, self.sub_dim)
        return np.einsum("pm,pkm->pk", qs, self.residual)


def train_quantizer(
    X: np.ndarray,
    *,
    n_subspaces: int = 8,
    k_coarse: int = 32,
    k_residual: int = 32,
    iters: int = 12,
    seed: int = 0,
) -> PQQuantizer:
    """Train coarse + residual codebooks on a sample X (n, D')."""
    X = np.asarray(X, dtype=np.float64)
    n, d = X.shape
    if d % n_subspaces:
        raise ValueError(f"dim {d} not divisible by P={n_subspaces}")
    m = d // n_subspaces
    rng = np.random.default_rng(seed)
    parts = X.reshape(n, n_subspaces, m).transpose(1, 0, 2)
    coarse = np.stack([_lloyd(parts[p], k_coarse, iters, rng) for p in range(n_subspaces)])
    residual = []
    for p in range(n_subspaces):
        c = _assign(parts[p], coarse[p])
        res = parts[p] - coarse[p][c]
        residual.append(_lloyd(res, k_residual, iters, rng))
    return PQQuantizer(coarse=coarse, residual=np.stack(residual))

"""Shared baseline scaffolding."""
from __future__ import annotations

import time
from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession

from repro.core.config import LOVOConfig
from repro.core.metrics import RankedResult
from repro.vocab.encoders import CostModel
from repro.vocab.vocabulary import Vocabulary


@dataclass
class BaselineResult:
    """Ranked detections + phase latency for one baseline query."""

    qid: str
    results: list[RankedResult]
    search_time: float


class Baseline:
    """Interface all baselines implement.

    ``process`` is the offline/ingest phase (may be a no-op for pure
    QD-search systems) and returns its wall-clock seconds; ``query``
    answers one workload query. Baselines reuse LOVOConfig's noise
    parameters so every system perceives the same synthetic world, and
    its ``cost_scale`` so measured times are comparable.
    """

    name: str = "base"

    def __init__(self, spark: SparkSession, cfg: LOVOConfig | None = None):
        self.spark = spark
        self.cfg = cfg or LOVOConfig()
        self.vocab = Vocabulary(dim=self.cfg.dim, seed=self.cfg.vocab_seed)
        self.cost: CostModel = self.cfg.cost()
        self.processing_time: float = 0.0

    def process(self, patches: DataFrame) -> float:
        """Offline phase; default no-op (QD-search baselines)."""
        self.patches = patches
        return 0.0

    def query(self, query, *, k: int = 50) -> BaselineResult:
        raise NotImplementedError

    # -- helpers ----------------------------------------------------------
    @staticmethod
    def timed(fn):
        """Run ``fn()`` and return (result, seconds)."""
        t0 = time.perf_counter()
        out = fn()
        return out, time.perf_counter() - t0

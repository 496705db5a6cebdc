"""Vector-database storage layout (§V-B).

Three tables, mirroring the paper's split between the vector database
and the relational metadata store linked by the shared patch id:

* ``components`` — the inverted multi-index in long form: one row per
  (patch, subspace) with its coarse cluster and residual code. Filtering
  on ``(p, cluster)`` is the inverted-list lookup.
* ``vectors``    — original embeddings (centroid + residual recovers the
  original, so keeping the vector is the paper's stored-residual
  equivalent); used for the exact rescore step and brute-force search.
* ``meta``       — the "relational database": key-frame identity, tags
  (the rerank stage's token source) and the predicted bounding box.

All three are Spark DataFrames; ``save``/``load`` round-trip through
Parquet so the index is a persistent on-disk artefact, as in Milvus.
"""
from __future__ import annotations

import os
from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession


@dataclass
class VectorStore:
    """Handle to the three index tables."""

    components: DataFrame
    vectors: DataFrame
    meta: DataFrame

    def cache(self) -> "VectorStore":
        """Materialise all tables in executor memory (index is reused per query)."""
        for df in (self.components, self.vectors, self.meta):
            df.persist()
        # force materialisation so query latency measures search, not build
        self.components.count(), self.vectors.count(), self.meta.count()
        return self

    def unpersist(self) -> None:
        for df in (self.components, self.vectors, self.meta):
            df.unpersist()

    def n_vectors(self) -> int:
        return self.vectors.count()

    def save(self, path: str) -> None:
        """Write the index to Parquet; components partitioned by subspace."""
        self.components.write.mode("overwrite").partitionBy("p").parquet(
            os.path.join(path, "components")
        )
        self.vectors.write.mode("overwrite").parquet(os.path.join(path, "vectors"))
        self.meta.write.mode("overwrite").parquet(os.path.join(path, "meta"))

    @classmethod
    def load(cls, spark: SparkSession, path: str) -> "VectorStore":
        return cls(
            components=spark.read.parquet(os.path.join(path, "components")),
            vectors=spark.read.parquet(os.path.join(path, "vectors")),
            meta=spark.read.parquet(os.path.join(path, "meta")),
        )

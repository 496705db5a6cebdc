"""Graph-based ANN variant for Table V: shard-parallel HNSW.

A compact HNSW (hierarchical navigable small world) implementation in
numpy: geometric level assignment, greedy descent through upper layers,
beam search (``ef``) at each layer, simple nearest-M neighbour
selection with degree pruning. Unit-norm vectors, cosine distance
``1 − q·x``.

Distributed deployment follows the standard sharded pattern (a single
global graph cannot be built data-parallel): vectors are hash-
partitioned into shards, one graph is built per shard inside a Spark
task, serialised, and every query searches all shard graphs in parallel
before a global top-k merge. This preserves HNSW's cost/recall profile
while fitting the Spark execution model.
"""
from __future__ import annotations

import heapq
import math
import pickle

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T


class HNSWGraph:
    """In-memory HNSW over unit vectors (cosine distance)."""

    def __init__(self, *, m: int = 8, ef_construction: int = 64, seed: int = 0):
        self.m = m
        self.m_max0 = 2 * m
        self.mult = 1.0 / math.log(m)
        self.ef_construction = ef_construction
        self.rng = np.random.default_rng(seed)
        self.vecs: list[np.ndarray] = []
        self.ids: list[int] = []
        self.levels: list[int] = []
        self.neighbors: list[list[list[int]]] = []  # node → level → neighbour nodes
        self.entry = -1
        self.max_level = -1

    # -- internals --------------------------------------------------------
    def _dist(self, q: np.ndarray, node: int) -> float:
        return 1.0 - float(q @ self.vecs[node])

    def _search_layer(
        self, q: np.ndarray, entries: list[int], ef: int, level: int
    ) -> list[tuple[float, int]]:
        """Beam search one layer; returns up to ``ef`` (dist, node) sorted asc."""
        visited = set(entries)
        cand = [(self._dist(q, e), e) for e in entries]
        heapq.heapify(cand)  # min-heap on distance (expand closest first)
        best = [(-d, e) for d, e in cand]  # max-heap of current ef best
        heapq.heapify(best)
        while cand:
            d, node = heapq.heappop(cand)
            if best and d > -best[0][0] and len(best) >= ef:
                break
            for nb in self.neighbors[node][level]:
                if nb in visited:
                    continue
                visited.add(nb)
                dn = self._dist(q, nb)
                if len(best) < ef or dn < -best[0][0]:
                    heapq.heappush(cand, (dn, nb))
                    heapq.heappush(best, (-dn, nb))
                    if len(best) > ef:
                        heapq.heappop(best)
        return sorted((-nd, e) for nd, e in best)

    def _select(self, cands: list[tuple[float, int]], m: int) -> list[int]:
        return [e for _, e in cands[:m]]

    # -- public API -------------------------------------------------------
    def add(self, ext_id: int, vec: np.ndarray) -> None:
        """Insert one vector with its external id."""
        node = len(self.vecs)
        level = int(-math.log(max(self.rng.random(), 1e-12)) * self.mult)
        self.vecs.append(np.asarray(vec, dtype=np.float64))
        self.ids.append(int(ext_id))
        self.levels.append(level)
        self.neighbors.append([[] for _ in range(level + 1)])
        if self.entry < 0:
            self.entry = node
            self.max_level = level
            return
        ep = [self.entry]
        for lv in range(self.max_level, level, -1):
            ep = [self._search_layer(vec, ep, 1, lv)[0][1]]
        for lv in range(min(level, self.max_level), -1, -1):
            cands = self._search_layer(vec, ep, self.ef_construction, lv)
            m_max = self.m_max0 if lv == 0 else self.m
            chosen = self._select(cands, self.m)
            self.neighbors[node][lv] = list(chosen)
            for nb in chosen:
                lst = self.neighbors[nb][lv]
                lst.append(node)
                if len(lst) > m_max:  # prune to the m_max nearest
                    lst.sort(key=lambda o: 1.0 - float(self.vecs[nb] @ self.vecs[o]))
                    del lst[m_max:]
            ep = [e for _, e in cands]
        if level > self.max_level:
            self.max_level = level
            self.entry = node

    def search(self, q: np.ndarray, k: int, *, ef: int = 64) -> list[tuple[int, float]]:
        """Top-k (external_id, similarity) by beam search."""
        if self.entry < 0:
            return []
        q = np.asarray(q, dtype=np.float64)
        ep = [self.entry]
        for lv in range(self.max_level, 0, -1):
            ep = [self._search_layer(q, ep, 1, lv)[0][1]]
        found = self._search_layer(q, ep, max(ef, k), 0)
        return [(self.ids[e], 1.0 - d) for d, e in found[:k]]


def build_graph(ids: np.ndarray, X: np.ndarray, *, m: int = 8,
                ef_construction: int = 64, seed: int = 0) -> HNSWGraph:
    """Build one shard graph from id/vector arrays."""
    g = HNSWGraph(m=m, ef_construction=ef_construction, seed=seed)
    for i, v in zip(ids, X):
        g.add(int(i), v)
    return g


_SHARD_SCHEMA = T.StructType(
    [T.StructField("shard", T.IntegerType()), T.StructField("blob", T.BinaryType())]
)
_HIT_SCHEMA = T.StructType(
    [T.StructField("patch_id", T.LongType()), T.StructField("score", T.DoubleType())]
)


def build_hnsw_shards(
    vectors: DataFrame, *, n_shards: int = 8, m: int = 8,
    ef_construction: int = 64, seed: int = 0,
) -> DataFrame:
    """One HNSW graph per hash shard, serialised into a small DataFrame."""

    def _build(key, pdf):
        ids = pdf["patch_id"].to_numpy()
        X = np.stack(pdf["embedding"].to_numpy())
        g = build_graph(ids, X, m=m, ef_construction=ef_construction,
                        seed=seed + int(key[0]))
        return pd.DataFrame({"shard": [int(key[0])], "blob": [pickle.dumps(g)]})

    sharded = vectors.withColumn(
        "shard", (F.pmod(F.col("patch_id"), F.lit(n_shards))).cast("int")
    )
    return sharded.groupBy("shard").applyInPandas(_build, schema=_SHARD_SCHEMA)


def search_hnsw(
    shards: DataFrame, meta: DataFrame, q: np.ndarray, *, k: int = 50, ef: int = 64
) -> DataFrame:
    """Search every shard graph in parallel, merge, attach metadata."""
    spark = shards.sparkSession
    bq = spark.sparkContext.broadcast(np.asarray(q, dtype=np.float64))

    def _search(batches):
        for pdf in batches:
            for blob in pdf["blob"]:
                g: HNSWGraph = pickle.loads(bytes(blob))
                hits = g.search(bq.value, k, ef=ef)
                if hits:
                    yield pd.DataFrame(
                        {"patch_id": [h[0] for h in hits],
                         "score": [h[1] for h in hits]}
                    )

    merged = (
        shards.mapInPandas(_search, schema=_HIT_SCHEMA)
        .orderBy(F.desc("score"), F.asc("patch_id"))
        .limit(k)
    )
    return merged.join(meta, "patch_id").orderBy(F.desc("score"), F.asc("patch_id"))

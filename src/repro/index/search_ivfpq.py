"""Algorithm 1 — Approximate Nearest Neighbor Search over the multi-index.

Maps the paper's pseudocode onto Catalyst operations:

  lines 1–7   (centroid scoring, Top-A clusters per subspace) — driver
              numpy over the broadcast codebooks; the selected
              ``(p, cluster)`` pairs with their scores form a tiny
              DataFrame that is broadcast-joined against the inverted
              lists (the "cluster queried" step);
  lines 8–11  (residual-refined approximate scores) — a second broadcast
              join against the residual lookup table, giving
              ``s ≈ s(q_p, c_coarse) + q_p·r``;
  line 12     (per-subspace top-k) — a window rank over subspaces;
  line 16     (patch-id majority vote across subspace components) — a
              groupBy counting in how many subspaces each patch
              survived; candidates are ranked by (votes, approx score);
  lines 13–15, 17 (exact rescore + final sort) — join the k survivors
              back to the stored vectors and compute q·x exactly.

The two lookup tables are O(P·A) and O(P·k_r) rows, so broadcasting
them is the distributed analogue of the paper's in-memory LUT; the
postings scan itself stays a shuffle-side join over the inverted lists.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.index.pq import PQQuantizer
from repro.index.search_bf import score_vectors
from repro.index.store import VectorStore


def _lut_frames(quant: PQQuantizer, q: np.ndarray, top_a: int):
    """Driver-side LUTs: Top-A coarse clusters and the full residual table."""
    clut = quant.coarse_lut(q)  # (P, k_coarse)
    rlut = quant.residual_lut(q)  # (P, k_residual)
    P, kc = clut.shape
    a = min(top_a, kc)
    rows = []
    for p in range(P):
        top = np.argsort(-clut[p])[:a]
        rows += [(p, int(c), float(clut[p, c])) for c in top]
    top_a_pdf = pd.DataFrame(rows, columns=["p", "cluster", "cscore"])
    kr = rlut.shape[1]
    rl = pd.DataFrame(
        {
            "p": np.repeat(np.arange(P), kr).astype(int),
            "rcode": np.tile(np.arange(kr), P).astype(int),
            "rscore": rlut.reshape(-1),
        }
    )
    return top_a_pdf, rl


def search_ivfpq(
    store: VectorStore,
    quant: PQQuantizer,
    q: np.ndarray,
    *,
    top_a: int = 8,
    k: int = 50,
    per_subspace_k: int | None = None,
    rescore_factor: int = 4,
    cost=None,
) -> DataFrame:
    """Top-k hits (with metadata) via the inverted multi-index.

    ``per_subspace_k`` bounds how many components survive line 12 per
    subspace; defaults to ``8·k`` so the union across P subspaces keeps
    enough distinct patch ids to fill the final top-k.
    ``rescore_factor`` oversamples the vote-ranked shortlist before the
    exact rescore (lines 13–15), so approximation error in the ADC
    scores cannot evict true top-k members — the standard IVF-PQ
    candidate-oversampling refinement.
    """
    spark = store.components.sparkSession
    q = np.asarray(q, dtype=np.float64)
    kp = per_subspace_k or 8 * k
    top_a_pdf, rlut_pdf = _lut_frames(quant, q, top_a)

    cand = (
        store.components.join(F.broadcast(spark.createDataFrame(top_a_pdf)), ["p", "cluster"])
        .join(F.broadcast(spark.createDataFrame(rlut_pdf)), ["p", "rcode"])
        .withColumn("approx", F.col("cscore") + F.col("rscore"))
    )
    if cost is not None:
        # ADC table lookups are cheap but not free: burn per candidate
        # *component* (1/P of a vector), so scan cost grows with the
        # inverted lists actually visited — a doubled index (w/o key
        # frames, Table IV) doubles it, while staying far below the
        # full-scan cost of search_bf.
        P = quant.n_subspaces

        def _burn_rows(batches):
            for pdf in batches:
                if len(pdf):
                    cost.burn("ann_scan_vector", len(pdf) / P)
                yield pdf

        cand = cand.mapInPandas(_burn_rows, schema=cand.schema)
    w = Window.partitionBy("p").orderBy(F.desc("approx"), F.asc("patch_id"))
    survivors = cand.withColumn("rank", F.row_number().over(w)).filter(
        F.col("rank") <= kp
    )
    voted = survivors.groupBy("patch_id").agg(
        F.count("*").alias("votes"), F.sum("approx").alias("approx_sum")
    )
    shortlist = voted.orderBy(
        F.desc("votes"), F.desc("approx_sum"), F.asc("patch_id")
    ).limit(k * rescore_factor)

    # exact rescore touches only the shortlist, so the per-vector scan
    # cost (see score_vectors) stays O(k·rescore_factor), not O(N)
    exact = score_vectors(
        store.vectors.join(shortlist.select("patch_id", "votes"), "patch_id"), q, cost
    )
    return (
        exact.join(shortlist.select("patch_id", "votes"), "patch_id")
        .join(store.meta, "patch_id")
        .orderBy(F.desc("score"), F.asc("patch_id"))
        .limit(k)
    )

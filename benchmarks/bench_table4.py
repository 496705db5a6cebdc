"""Benchmarks behind Table IV: the ablation latency components.

Fast search with the inverted multi-index vs the brute-force scan
(w/o ANNS), and the cross-modality rerank stage on its own.
"""
from repro.queries.workload import query_by_id

Q = "Q2.1"


def test_fast_search_ivfpq(benchmark, bench_lovo):
    system, _ = bench_lovo
    q = query_by_id(Q)
    rows = benchmark.pedantic(
        lambda: system.fast_search(q, variant="ivfpq", k=60).collect(),
        rounds=3, iterations=1,
    )
    assert rows


def test_fast_search_bruteforce(benchmark, bench_lovo):
    """The w/o-ANNS ablation: full scan of the vector table."""
    system, _ = bench_lovo
    q = query_by_id(Q)
    rows = benchmark.pedantic(
        lambda: system.fast_search(q, variant="bf", k=60).collect(),
        rounds=3, iterations=1,
    )
    assert rows


def test_rerank_stage(benchmark, bench_lovo):
    system, _ = bench_lovo
    q = query_by_id(Q)
    res = benchmark.pedantic(
        lambda: system.query(q, use_rerank=True, k=60), rounds=3, iterations=1
    )
    assert res.rerank_time > 0


def test_index_build_no_keyframes_costlier(benchmark, spark, bench_patches):
    """w/o key frames: the index ingests every frame (larger build)."""
    import dataclasses

    from repro.core import LOVO
    from benchmarks.conftest import BENCH_CFG

    cfg = dataclasses.replace(BENCH_CFG, use_keyframes=False)

    def build():
        system = LOVO(spark, cfg)
        rep = system.build(bench_patches)
        system.close()
        return rep

    rep = benchmark.pedantic(build, rounds=1, iterations=1)
    assert rep.n_keyframes == rep.n_frames

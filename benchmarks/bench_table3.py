"""Benchmarks behind Table III: search latency of ZELDA / UMT / VISA / LOVO.

These isolate the *dataflow* cost of each method's query path
(cost_scale=0: no model-compute burns): ZELDA scans a frame-level
table, LOVO runs the indexed search plus a rerank stage over candidate
frames, UMT/VISA funnel the corpus through a single-partition pass.
The paper's full latency ordering (VISA ≫ UMT > LOVO > ZELDA) emerges
when the calibrated model costs are added — `jobs/table3.py`.
"""
import pytest

from repro.queries.workload import query_by_id

Q = "Q2.1"


def test_lovo_query(benchmark, bench_lovo):
    system, _ = bench_lovo
    q = query_by_id(Q)
    res = benchmark.pedantic(lambda: system.query(q, k=60), rounds=3, iterations=1)
    assert res.results


@pytest.mark.parametrize("name", ["zelda", "umt", "visa"])
def test_baseline_query(benchmark, bench_baselines, name):
    q = query_by_id(Q)
    b = bench_baselines[name]
    res = benchmark.pedantic(lambda: b.query(q, k=60), rounds=3, iterations=1)
    assert res.results

"""Benchmarks behind Table V: fast-search latency per ANN variant."""
import pytest

from repro.queries.workload import query_by_id

Q = "Q2.1"


@pytest.mark.parametrize("variant", ["bf", "ivfpq", "hnsw"])
def test_variant_search(benchmark, bench_lovo, variant):
    system, _ = bench_lovo
    q = query_by_id(Q)
    rows = benchmark.pedantic(
        lambda: system.fast_search(q, variant=variant, k=60).collect(),
        rounds=3, iterations=1,
    )
    assert rows

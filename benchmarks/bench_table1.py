"""Benchmarks behind Table I: query-time cost of each method family.

QA-index answers from its prebuilt index (fast); QD-search rescans the
video per query (slow) — the execution-time contrast of Fig. 2(a).
"""
import pytest

from repro.baselines import Miris, Vocal
from repro.queries.workload import query_by_id

from benchmarks.conftest import BENCH_CFG


@pytest.fixture(scope="module")
def vocal(spark, bench_patches):
    b = Vocal(spark, BENCH_CFG)
    b.process(bench_patches)
    return b


@pytest.fixture(scope="module")
def miris(spark, bench_patches):
    b = Miris(spark, BENCH_CFG)
    b.process(bench_patches)
    return b


def test_qa_index_lookup(benchmark, vocal):
    """Predefined-class lookup against the static index."""
    q = query_by_id("Q2.3")
    res = benchmark.pedantic(lambda: vocal.query(q, k=40), rounds=3, iterations=1)
    assert res.results


def test_qd_search_scan(benchmark, miris):
    """Per-query full-video detector scan (QD-search)."""
    q = query_by_id("Q2.4")
    res = benchmark.pedantic(lambda: miris.query(q, k=40), rounds=3, iterations=1)
    assert res.results

"""Benchmarks behind Table VII: LOVO build + query on ActivityNet-QA."""
import pytest

from repro.core import LOVO
from repro.queries.workload import query_by_id
from repro.video.generator import generate_dataset
from repro.video.scenes import profile

from benchmarks.conftest import BENCH_CFG


@pytest.fixture(scope="module")
def activitynet(spark):
    df = generate_dataset(spark, profile("activitynet", 0.3)).persist()
    df.count()
    system = LOVO(spark, BENCH_CFG)
    system.build(df)
    yield system
    system.close()
    df.unpersist()


def test_index_build(benchmark, spark):
    df = generate_dataset(spark, profile("activitynet", 0.3)).persist()
    df.count()

    def build():
        system = LOVO(spark, BENCH_CFG)
        rep = system.build(df)
        system.close()
        return rep

    rep = benchmark.pedantic(build, rounds=1, iterations=1)
    df.unpersist()
    assert rep.n_vectors > 0


@pytest.mark.parametrize("qid", ["EQ1", "EQ2", "EQ3", "EQ4"])
def test_extension_query(benchmark, activitynet, qid):
    q = query_by_id(qid)
    res = benchmark.pedantic(lambda: activitynet.query(q, k=60), rounds=2, iterations=1)
    assert res.results

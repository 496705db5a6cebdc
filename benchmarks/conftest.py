"""Benchmark fixtures: one built LOVO system per benchmarked dataset."""
from __future__ import annotations

import pytest

from repro.baselines import Umt, Visa, Zelda
from repro.core import LOVO, LOVOConfig
from repro.video.generator import generate_dataset
from repro.video.scenes import profile

#: Benchmark-scale config (SF≈0.1-equivalent corpus, no compute burns so
#: the numbers isolate the dataflow cost of each stage).
BENCH_CFG = LOVOConfig(k=60, n=0, cost_scale=0.0)
BENCH_SF = 0.35


@pytest.fixture(scope="session")
def bench_patches(spark):
    df = generate_dataset(spark, profile("bellevue", BENCH_SF)).persist()
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def bench_lovo(spark, bench_patches):
    system = LOVO(spark, BENCH_CFG)
    report = system.build(bench_patches)
    system.hnsw_shards()
    yield system, report
    system.close()


@pytest.fixture(scope="session")
def bench_baselines(spark, bench_patches):
    out = {}
    for name, b in (
        ("zelda", Zelda(spark, BENCH_CFG)),
        ("umt", Umt(spark, BENCH_CFG, daily_life=False)),
        ("visa", Visa(spark, BENCH_CFG, daily_life=False)),
    ):
        b.process(bench_patches)
        out[name] = b
    return out

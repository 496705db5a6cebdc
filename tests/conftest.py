"""Shared fixtures: tiny built datasets + LOVO instances, session-scoped.

The expensive artefacts (generated dataset, built index) are built once
per session and shared across test modules; individual tests only run
queries or inspect tables against them.
"""
from __future__ import annotations

import pytest

from repro.core import LOVO, LOVOConfig
from repro.video.generator import generate_dataset
from repro.video.scenes import profile

#: Test-scale LOVO config: small embedding space, no cost burning.
TEST_CFG = LOVOConfig(
    dim=32,
    n_subspaces=4,
    k_coarse=16,
    k_residual=16,
    train_sample=2048,
    k=40,
    n=0,
    hnsw_shards=4,
    cost_scale=0.0,
)


@pytest.fixture(scope="session")
def bellevue_profile():
    return profile("bellevue", 0.25)


@pytest.fixture(scope="session")
def bellevue_patches(spark, bellevue_profile):
    df = generate_dataset(spark, bellevue_profile).persist()
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def lovo_built(spark, bellevue_patches):
    """A LOVO system with its index built over the tiny Bellevue set."""
    system = LOVO(spark, TEST_CFG)
    report = system.build(bellevue_patches)
    yield system, report
    system.close()


@pytest.fixture(scope="session")
def qvh_patches(spark):
    df = generate_dataset(spark, profile("qvhighlights", 0.15)).persist()
    df.count()
    yield df
    df.unpersist()

"""Sanity checks: the provided TPC-H-lite generators + DuckDB oracle.

Keeps the shipped correctness harness honest — a broken oracle would
silently void every oracle-backed test in this suite.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.005).persist()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.005).persist()


def test_groupby_aggregate(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("qty"), F.count("*").alias("n")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, sum(l_quantity) AS qty, count(*) AS n "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_join_shuffle_path(spark, li, orders):
    """Broadcast is disabled session-wide: this exercises a shuffle join."""
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.round(F.sum("l_extendedprice"), 2).alias("rev"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, round(sum(l_extendedprice), 2) AS rev "
        "FROM li JOIN orders ON l_orderkey = o_orderkey "
        "GROUP BY o_orderpriority",
        li=li,
        orders=orders,
    )


def test_filter_projection(spark, li):
    got = li.filter("l_discount > 0.05").select(
        "l_orderkey", "l_linenumber", "l_discount"
    )
    assert_equivalent(
        got,
        "SELECT l_orderkey, l_linenumber, l_discount FROM li WHERE l_discount > 0.05",
        li=li,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20000, n_keys=100, alpha=1.2)
    top = df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]
    assert top["k"] == 1  # rank-1 key dominates under Zipf
    assert top["count"] > 20000 / 100  # far above uniform share


def test_uniform_keys_flat(spark):
    df = synth_data.uniform_keys(spark, n=20000, n_keys=100)
    counts = [r["count"] for r in df.groupBy("k").count().collect()]
    assert max(counts) < 3 * min(counts)

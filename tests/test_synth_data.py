"""The provided TPC-H-lite substrate (repro.synth_data) stays healthy: the
graph-analytics reproduction doesn't consume lineitem/orders directly, but
the generators and the DuckDB oracle path are part of this repo's contract,
so exercise them end to end with real aggregation queries."""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).persist()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001, seed=1).persist()


def test_lineitem_q1_like_aggregate(spark, li):
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").cast("long").alias("n"),
        )
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS n "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_lineitem_orders_join(spark, li, orders):
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").cast("long").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, COUNT(*) AS n FROM li "
        "JOIN o ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
        li=li,
        o=orders,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.3, seed=3)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()
    assert top["k"] == 1  # rank-1 key dominates under zipf
    assert top["count"] > 5000 / 100 * 3


def test_uniform_keys_range(spark):
    df = synth_data.uniform_keys(spark, n=2000, n_keys=50, seed=4)
    row = df.agg(F.min("k"), F.max("k")).collect()[0]
    assert row[0] >= 1 and row[1] <= 50


def test_generators_deterministic(spark):
    a = synth_data.customer(spark, sf=0.001, seed=2).collect()
    b = synth_data.customer(spark, sf=0.001, seed=2).collect()
    assert a == b

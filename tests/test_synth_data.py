"""Tests for the provided TPC-H-lite generators (oracle-checked joins).

These exercise the shipped ``repro.synth_data`` module with the DuckDB
oracle — the warehouse tables double as join-workload fodder and the
oracle path itself needs coverage.
"""
from __future__ import annotations

import pytest
import pyspark.sql.functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0)


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001, seed=1)


def test_lineitem_shape(li):
    assert li.count() == 6000
    assert "l_orderkey" in li.columns


def test_orders_unique_keys(orders):
    assert orders.select("o_orderkey").distinct().count() == orders.count()


def test_lineitem_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
    b = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
    assert a.equals(b)


def test_join_counts_match_oracle(spark, li, orders):
    """Shuffle-join aggregation result equals DuckDB's (guards the
    session's disabled-broadcast join path end to end)."""
    got = (
        li.join(orders, li["l_orderkey"] == orders["o_orderkey"])
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, count(*) AS n FROM li "
        "JOIN orders ON l_orderkey = o_orderkey GROUP BY 1",
        li=li,
        orders=orders,
    )


def test_revenue_aggregate_matches_oracle(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.round(F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))), 2).alias(
            "revenue"
        )
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, round(sum(l_extendedprice * (1 - l_discount)), 2) "
        "AS revenue FROM li GROUP BY 1",
        li=li,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.3, seed=3)
    top = (
        df.groupBy("k").agg(F.count("*").alias("n")).orderBy(F.desc("n")).first()
    )
    assert top["n"] > 5000 / 100 * 3  # head key far above uniform share


def test_uniform_keys_cover(spark):
    df = synth_data.uniform_keys(spark, n=2000, n_keys=50, seed=4)
    assert df.select("k").distinct().count() == 50


def test_customer_part(spark):
    c = synth_data.customer(spark, sf=0.001)
    p = synth_data.part(spark, sf=0.001)
    assert c.count() == 150 and p.count() == 200

"""Tests for the provided TPC-H-lite generators + the DuckDB oracle.

These exercise the provided scaffolding end-to-end: Spark aggregations
over the synthetic OLAP tables are checked for result-equality against
DuckDB running the same SQL — the pattern every relational check in this
repo follows.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001, seed=1).cache()


def test_lineitem_rowcount(spark, li):
    assert li.count() == 6000


def test_pricing_summary_oracle(spark, li):
    out = (
        li.groupBy("l_returnflag")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.round(F.sum("l_extendedprice"), 2).alias("sum_price"),
            F.count(F.lit(1)).alias("cnt"),
        )
    )
    assert_equivalent(
        out,
        """
        SELECT l_returnflag,
               SUM(l_quantity) AS sum_qty,
               ROUND(SUM(l_extendedprice), 2) AS sum_price,
               COUNT(*) AS cnt
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_join_oracle(spark, li, orders):
    out = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("cnt"))
    )
    assert_equivalent(
        out,
        """
        SELECT o_orderpriority, COUNT(*) AS cnt
        FROM li JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        orders=orders,
    )


def test_generators_deterministic(spark):
    a = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
    b = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
    assert a.equals(b)


def test_zipf_keys_are_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 5 * counts.iloc[-1]


def test_uniform_keys_cover_domain(spark):
    df = synth_data.uniform_keys(spark, n=2000, n_keys=10).toPandas()
    assert set(df["k"]) == set(range(1, 11))


def test_oracle_catches_wrong_result(spark, li):
    wrong = li.groupBy("l_returnflag").agg(
        (F.count(F.lit(1)) + 1).alias("cnt")  # off-by-one: must be caught
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )

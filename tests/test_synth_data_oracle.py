"""Smoke tests for the provided TPC-H-lite generators + DuckDB oracle.

The PDX paper is not an OLAP paper, but the scaffold's oracle discipline
is reused by every Spark search test; these tests prove the harness
(SparkSession fixture, Arrow path, DuckDB round-trip) works end-to-end.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001).cache()


@pytest.fixture(scope="module")
def orders_df(spark):
    return synth_data.orders(spark, sf=0.001).cache()


def test_lineitem_rowcount(li):
    assert li.count() == 6000


def test_pricing_aggregate_matches_duckdb(li):
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("sum_qty"),
        F.count(F.lit(1)).alias("cnt"),
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS cnt "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_join_matches_duckdb(li, orders_df):
    got = (
        li.join(orders_df, li.l_orderkey == orders_df.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("cnt"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, COUNT(*) AS cnt FROM li "
        "JOIN o ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
        li=li,
        o=orders_df,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()
    assert top["k"] == 1  # rank-1 key dominates under zipf

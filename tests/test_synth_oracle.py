"""Oracle-checked Spark SQL over the provided TPC-H-lite generators.

These exercise the DuckDB result-equality oracle on classic aggregation
and shuffle-join shapes (broadcast joins are disabled session-wide), so
a broken join or aggregation in the Spark config would be caught here
independently of the OpenBG pipelines.
"""
import pyspark.sql.functions as F
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent

SF = 0.005


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def orders_df(spark):
    return synth_data.orders(spark, sf=SF).cache()


def test_pricing_summary_aggregate(spark, li):
    """TPC-H Q1-style grouped aggregate."""
    got = (
        li.groupBy("l_returnflag", "l_linestatus")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.sum("l_extendedprice").alias("sum_price"),
            F.count("*").alias("cnt"),
        )
    )
    sql = """
        SELECT l_returnflag, l_linestatus,
               SUM(l_quantity) AS sum_qty,
               SUM(l_extendedprice) AS sum_price,
               COUNT(*) AS cnt
        FROM li GROUP BY 1, 2
    """
    assert_equivalent(got, sql, li=li)


def test_join_aggregate(spark, li, orders_df):
    """Shuffle join lineitem ⋈ orders + aggregate per priority."""
    got = (
        li.join(orders_df, li.l_orderkey == orders_df.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"), F.sum("l_quantity").alias("qty"))
    )
    sql = """
        SELECT o_orderpriority, COUNT(*) AS n, SUM(l_quantity) AS qty
        FROM li JOIN orders_df ON l_orderkey = o_orderkey
        GROUP BY 1
    """
    assert_equivalent(got, sql, li=li, orders_df=orders_df)


def test_filter_and_distinct(spark, orders_df):
    got = (
        orders_df.filter(F.col("o_totalprice") > 250_000)
        .select("o_orderstatus")
        .distinct()
    )
    sql = """
        SELECT DISTINCT o_orderstatus FROM orders_df
        WHERE o_totalprice > 250000
    """
    assert_equivalent(got, sql, orders_df=orders_df)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20_000, n_keys=500)
    counts = df.groupBy("k").agg(F.count("*").alias("n")).toPandas()
    top = counts["n"].max()
    med = counts["n"].median()
    assert top > 10 * med  # the skew KGE/benchmarks rely on


def test_uniform_keys_flat(spark):
    df = synth_data.uniform_keys(spark, n=20_000, n_keys=100)
    counts = df.groupBy("k").agg(F.count("*").alias("n")).toPandas()
    assert counts["n"].max() < 3 * counts["n"].median()

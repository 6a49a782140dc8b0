"""Sanity for the provided TPC-H-lite generators + DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent

SF = 0.002


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=SF).cache()


def test_lineitem_aggregate(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("sum_qty"),
        F.count("*").alias("cnt"),
    )
    assert_equivalent(
        got,
        """SELECT l_returnflag, SUM(l_quantity) AS sum_qty,
                  COUNT(*) AS cnt
           FROM lineitem GROUP BY l_returnflag""",
        lineitem=li,
    )


def test_join_lineitem_orders(spark, li, orders):
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        got,
        """SELECT o_orderpriority, COUNT(*) AS cnt
           FROM lineitem JOIN orders ON l_orderkey = o_orderkey
           GROUP BY o_orderpriority""",
        lineitem=li,
        orders=orders,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
    counts = df.groupBy("k").count().toPandas().sort_values("k")
    assert counts.iloc[0]["count"] > counts["count"].mean() * 3

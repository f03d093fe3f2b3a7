"""Sanity for the provided TPC-H-lite generators + DuckDB oracle.

This paper's own relation is VR (video objects), but the shipped
``synth_data`` / ``oracle`` plumbing is exercised here end to end so
the correctness harness itself is under test: Spark aggregations and
joins over the generated tables must match DuckDB on the same input.
"""
from __future__ import annotations

from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent

SF = 0.002


def test_lineitem_pricing_summary(spark):
    li = synth_data.lineitem(spark, sf=SF)
    got = (
        li.groupBy("l_returnflag", "l_linestatus")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("n_rows"),
        )
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, l_linestatus,
               SUM(l_quantity) AS sum_qty, COUNT(*) AS n_rows
        FROM lineitem GROUP BY l_returnflag, l_linestatus
        """,
        lineitem=li,
    )


def test_orders_customer_join(spark):
    o = synth_data.orders(spark, sf=SF)
    c = synth_data.customer(spark, sf=SF)
    got = (
        o.join(c, o.o_custkey == c.c_custkey)
        .groupBy("c_mktsegment")
        .agg(F.count("*").alias("n_orders"))
    )
    assert_equivalent(
        got,
        """
        SELECT c_mktsegment, COUNT(*) AS n_orders
        FROM orders JOIN customer ON o_custkey = c_custkey
        GROUP BY c_mktsegment
        """,
        orders=o,
        customer=c,
    )


def test_zipf_keys_are_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2)
    counts = df.groupBy("k").count().orderBy(F.desc("count")).toPandas()
    assert counts.iloc[0]["count"] > 5 * counts.iloc[-1]["count"]

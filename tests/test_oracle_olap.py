"""Keep the provided OLAP substrate (synth_data + DuckDB oracle) honest.

The reproduction's own data is graph-shaped, but the repo ships TPC-H-lite
generators and the result-equality oracle; exercise them end-to-end once
so regressions in the shared plumbing are caught.
"""
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_aggregate_matches_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("sum_qty"),
        F.count("*").alias("cnt"),
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS cnt
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_orders_join_matches_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, COUNT(*) AS cnt
        FROM li JOIN o ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        o=o,
    )

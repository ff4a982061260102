"""Provided TPC-H-lite substrate + DuckDB oracle stay intact."""
import pyspark.sql.functions as F

from repro.oracle import assert_equivalent
from repro.synth_data import lineitem, orders


def test_lineitem_aggregate_oracle(spark):
    li = lineitem(spark, sf=0.001).cache()
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.sum("l_quantity").alias("qty"),
            F.count("*").alias("n"),
        )
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, sum(l_quantity) AS qty, count(*) AS n "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_join_oracle(spark):
    li = lineitem(spark, sf=0.001).cache()
    o = orders(spark, sf=0.001).cache()
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, count(*) AS n FROM li "
        "JOIN o ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
        li=li,
        o=o,
    )

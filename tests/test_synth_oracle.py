"""Smoke tests for the provided TPC-H-lite generators + DuckDB oracle.

These exercise the provided substrate end-to-end (a real aggregation and a
shuffle join checked against DuckDB) so regressions in the oracle plumbing
are caught independently of the MultiEM code.
"""
import pyspark.sql.functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_aggregate_oracle(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.count("*").alias("cnt"),
            F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
        )
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, count(*) AS cnt,
               round(sum(l_quantity), 2) AS sum_qty
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_orders_customer_join_oracle(spark):
    o = synth_data.orders(spark, sf=0.001)
    c = synth_data.customer(spark, sf=0.001)
    got = (
        o.join(c, o["o_custkey"] == c["c_custkey"])
        .groupBy("c_mktsegment")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        """
        SELECT c_mktsegment, count(*) AS n
        FROM o JOIN c ON o.o_custkey = c.c_custkey
        GROUP BY c_mktsegment
        """,
        o=o,
        c=c,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()
    assert top["k"] <= 3  # zipf head dominates

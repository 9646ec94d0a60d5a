"""Self-tests of the DuckDB oracle plus oracle-checked Spark queries
over the synthetic TPC-H-lite tables (provided substrate)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_oracle_accepts_equivalent(spark):
    df = spark.createDataFrame([(1, "a"), (2, "b")], ["k", "v"])
    assert_equivalent(df, "SELECT k, v FROM t", t=pd.DataFrame({"k": [2, 1], "v": ["b", "a"]}))


def test_oracle_rejects_wrong_rows(spark):
    df = spark.createDataFrame([(1, "a")], ["k", "v"])
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, v FROM t", t=pd.DataFrame({"k": [1], "v": ["b"]}))


def test_oracle_rejects_column_mismatch(spark):
    df = spark.createDataFrame([(1,)], ["k"])
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT 1 AS other", )


def test_lineitem_aggregate_vs_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.count("*").alias("n"),
            F.round(F.sum("l_quantity"), 6).alias("sum_qty"),
        )
    )
    assert_equivalent(
        got,
        """SELECT l_returnflag, COUNT(*) AS n,
                  ROUND(SUM(l_quantity), 6) AS sum_qty
           FROM lineitem GROUP BY l_returnflag""",
        lineitem=li,
    )


def test_orders_join_vs_duckdb(spark):
    o = synth_data.orders(spark, sf=0.001)
    c = synth_data.customer(spark, sf=0.001)
    got = (
        o.join(c, o.o_custkey == c.c_custkey)
        .groupBy("c_mktsegment")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        """SELECT c_mktsegment, COUNT(*) AS n
           FROM orders JOIN customer ON o_custkey = c_custkey
           GROUP BY c_mktsegment""",
        orders=o,
        customer=c,
    )

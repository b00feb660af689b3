"""Sanity tests for the provided oracle + TPC-H-lite generators (infrastructure)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_aggregation_matches_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    got = li.groupBy("l_returnflag").agg(
        F.count("*").alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty")
    )
    assert_equivalent(
        got,
        """SELECT l_returnflag, count(*) AS n, round(sum(l_quantity), 2) AS qty
           FROM li GROUP BY l_returnflag""",
        li=li,
    )


def test_orders_join_matches_duckdb(spark):
    o = synth_data.orders(spark, sf=0.001, seed=1)
    c = synth_data.customer(spark, sf=0.001, seed=2)
    got = (
        o.join(c, o["o_custkey"] == c["c_custkey"])
        .groupBy("c_mktsegment")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        """SELECT c_mktsegment, count(*) AS n FROM o
           JOIN c ON o.o_custkey = c.c_custkey GROUP BY c_mktsegment""",
        o=o, c=c,
    )


def test_oracle_catches_wrong_result(spark):
    df = spark.createDataFrame(pd.DataFrame({"x": [1, 2, 3]}))
    wrong = df.agg((F.sum("x") + 1).alias("s"))
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT sum(x) AS s FROM t", t=df)


def test_oracle_catches_column_mismatch(spark):
    df = spark.createDataFrame(pd.DataFrame({"x": [1]}))
    got = df.agg(F.sum("x").alias("total"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(got, "SELECT sum(x) AS other FROM t", t=df)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2, seed=3)
    counts = df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()
    assert counts[0]["count"] > 5000 / 100 * 5  # head key ≫ uniform share

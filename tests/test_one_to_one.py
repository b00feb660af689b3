"""Tests for greedy symmetric-best one-to-one assignment."""
import pandas as pd
from pyspark.sql import functions as F

from repro.linkage.one_to_one import one_to_one


def _matches(spark, rows):
    return spark.createDataFrame(
        pd.DataFrame(rows, columns=["rec_id_a", "rec_id_b", "sim"])
    )


def _pairs(df):
    return {(r["rec_id_a"], r["rec_id_b"]) for r in df.collect()}


def test_simple_unambiguous(spark):
    m = _matches(spark, [("a1", "b1", 0.9), ("a2", "b2", 0.8)])
    assert _pairs(one_to_one(m, "sim")) == {("a1", "b1"), ("a2", "b2")}


def test_conflict_resolved_by_similarity(spark):
    # a1 prefers b1 (0.9); a2 also wants b1 (0.85) but must fall back to b2.
    m = _matches(
        spark,
        [("a1", "b1", 0.9), ("a2", "b1", 0.85), ("a2", "b2", 0.7)],
    )
    assert _pairs(one_to_one(m, "sim")) == {("a1", "b1"), ("a2", "b2")}


def test_output_is_one_to_one(spark):
    rows = [
        (f"a{i}", f"b{j}", 0.5 + 0.01 * ((i * 7 + j * 3) % 40))
        for i in range(12) for j in range(12)
    ]
    out = one_to_one(_matches(spark, rows), "sim")
    pdf = out.toPandas()
    assert pdf["rec_id_a"].is_unique
    assert pdf["rec_id_b"].is_unique


def test_greedy_takes_global_best_first(spark):
    # Global best (a1,b2)=0.95 must win over (a1,b1)=0.9 even though b1 then unmatched.
    m = _matches(spark, [("a1", "b1", 0.9), ("a1", "b2", 0.95)])
    assert _pairs(one_to_one(m, "sim")) == {("a1", "b2")}


def test_deterministic_tiebreak(spark):
    m = _matches(spark, [("a1", "b1", 0.9), ("a1", "b2", 0.9)])
    out1 = _pairs(one_to_one(m, "sim"))
    out2 = _pairs(one_to_one(m, "sim"))
    assert out1 == out2 == {("a1", "b1")}  # ties broken by rec_id_b ascending


def test_empty_input(spark):
    m = spark.createDataFrame([], "rec_id_a string, rec_id_b string, sim double")
    assert one_to_one(m, "sim").count() == 0


def test_chain_conflict(spark):
    # a1-b1 (0.9), a2-b1 (0.95), a2-b2 (0.6): a2 wins b1, a1 left unmatched
    # (a1's only candidate is taken).
    m = _matches(spark, [("a1", "b1", 0.9), ("a2", "b1", 0.95), ("a2", "b2", 0.6)])
    assert _pairs(one_to_one(m, "sim")) == {("a2", "b1")}


def test_preserves_similarity_column(spark):
    m = _matches(spark, [("a1", "b1", 0.77)])
    row = one_to_one(m, "sim").collect()[0]
    assert abs(row["sim"] - 0.77) < 1e-12

"""Tests for linkage-quality evaluation (overall and by subgroup)."""
import pandas as pd
import pytest

from repro.evaluation.quality import LinkageQuality, evaluate_matches, evaluate_matches_by_group
from repro.oracle import assert_equivalent


def _pairs(spark, pairs):
    if not pairs:
        return spark.createDataFrame([], "rec_id_a string, rec_id_b string")
    return spark.createDataFrame(pd.DataFrame(pairs, columns=["rec_id_a", "rec_id_b"]))


def test_linkage_quality_math():
    q = LinkageQuality(tp=8, fp=2, fn=4)
    assert q.precision == 0.8
    assert abs(q.recall - 8 / 12) < 1e-12
    assert abs(q.f1 - 2 * 0.8 * (8 / 12) / (0.8 + 8 / 12)) < 1e-12


def test_linkage_quality_degenerate():
    q = LinkageQuality(tp=0, fp=0, fn=0)
    assert q.precision == 0.0 and q.recall == 0.0 and q.f1 == 0.0


def test_evaluate_matches_confusion(spark):
    matches = _pairs(spark, [("a1", "b1"), ("a2", "b2"), ("a3", "b9")])
    truth = _pairs(spark, [("a1", "b1"), ("a2", "b2"), ("a4", "b4")])
    q = evaluate_matches(matches, truth)
    assert (q.tp, q.fp, q.fn) == (2, 1, 1)


def test_evaluate_matches_duplicates_counted_once(spark):
    matches = _pairs(spark, [("a1", "b1"), ("a1", "b1")])
    truth = _pairs(spark, [("a1", "b1")])
    q = evaluate_matches(matches, truth)
    assert (q.tp, q.fp, q.fn) == (1, 0, 0)


def test_evaluate_matches_empty_predictions(spark):
    q = evaluate_matches(_pairs(spark, []), _pairs(spark, [("a1", "b1")]))
    assert (q.tp, q.fp, q.fn) == (0, 0, 1)
    assert q.recall == 0.0


def test_by_group_split(spark):
    matches = _pairs(spark, [("a1", "b1"), ("a2", "b2"), ("a3", "b9")])
    truth = _pairs(spark, [("a1", "b1"), ("a2", "b2"), ("a9", "b3")])
    groups = spark.createDataFrame(
        pd.DataFrame({"rec_id": ["b1", "b2", "b3", "b9"],
                      "group": ["g1", "g2", "g2", "g1"]})
    )
    pdf = evaluate_matches_by_group(matches, truth, groups).set_index("group")
    assert pdf.loc["g1", "tp"] == 1 and pdf.loc["g1", "fp"] == 1
    assert pdf.loc["g2", "tp"] == 1 and pdf.loc["g2", "fn"] == 1
    assert pdf.loc["g2", "recall"] == 0.5


def test_by_group_all_groups_present_even_without_predictions(spark):
    matches = _pairs(spark, [])
    truth = _pairs(spark, [("a1", "b1")])
    groups = spark.createDataFrame(pd.DataFrame({"rec_id": ["b1"], "group": ["g1"]}))
    pdf = evaluate_matches_by_group(matches, truth, groups)
    assert list(pdf["group"]) == ["g1"]
    assert pdf.loc[0, "recall"] == 0.0


def test_tp_count_against_duckdb(spark):
    matches = _pairs(spark, [("a1", "b1"), ("a2", "b2"), ("a3", "b9")])
    truth = _pairs(spark, [("a1", "b1"), ("a2", "b2")])
    q = evaluate_matches(matches, truth)
    got = spark.createDataFrame(pd.DataFrame({"tp": [q.tp]}))
    assert_equivalent(
        got,
        """SELECT count(*) AS tp FROM matches m
           JOIN truth t ON m.rec_id_a = t.rec_id_a AND m.rec_id_b = t.rec_id_b""",
        matches=matches, truth=truth,
    )

"""Tests for similarity functions (native array ops + Jaro-Winkler UDF)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.matching.similarity import (
    attach_pair_columns,
    dice_sim,
    hamming_dist,
    intersect_size,
    jaccard_sim,
    jaro_winkler,
    jaro_winkler_py,
    overlap_sim,
)
from repro.oracle import assert_equivalent

CASES = [
    # (a, b, inter, dice, jaccard, overlap, hamming)
    ([1, 2, 3], [2, 3, 4], 2, 4 / 6, 2 / 4, 2 / 3, 2),
    ([1, 2], [1, 2], 2, 1.0, 1.0, 1.0, 0),
    ([1, 2], [3, 4], 0, 0.0, 0.0, 0.0, 4),
    ([], [], 0, 0.0, 0.0, 0.0, 0),
    ([1], [], 0, 0.0, 0.0, 0.0, 1),
]


def _pairs_df(spark):
    return spark.createDataFrame(
        pd.DataFrame({"a": [c[0] for c in CASES], "b": [c[1] for c in CASES]})
    )


def test_set_similarities_known_values(spark):
    rows = (
        _pairs_df(spark)
        .select(
            intersect_size(F.col("a"), F.col("b")).alias("i"),
            dice_sim(F.col("a"), F.col("b")).alias("d"),
            jaccard_sim(F.col("a"), F.col("b")).alias("j"),
            overlap_sim(F.col("a"), F.col("b")).alias("o"),
            hamming_dist(F.col("a"), F.col("b")).alias("h"),
        )
        .collect()
    )
    for r, (_, _, i, d, j, o, h) in zip(rows, CASES):
        assert r["i"] == i
        assert abs(r["d"] - d) < 1e-12
        assert abs(r["j"] - j) < 1e-12
        assert abs(r["o"] - o) < 1e-12
        assert r["h"] == h


def test_similarities_symmetric(spark):
    df = _pairs_df(spark)
    fwd = df.select(dice_sim(F.col("a"), F.col("b")).alias("s")).collect()
    rev = df.select(dice_sim(F.col("b"), F.col("a")).alias("s")).collect()
    assert [r["s"] for r in fwd] == [r["s"] for r in rev]


def test_dice_against_duckdb_exploded(spark):
    """Oracle: Dice computed independently in DuckDB from exploded bit rows."""
    pairs = pd.DataFrame(
        {"pid": ["p0", "p1"], "a": [[1, 2, 3], [10, 20]], "b": [[2, 3, 4], [30, 40]]}
    )
    df = spark.createDataFrame(pairs)
    got = df.select("pid", dice_sim(F.col("a"), F.col("b")).alias("dice"))
    bits_a = pd.DataFrame(
        [(r.pid, p) for r in pairs.itertuples() for p in r.a], columns=["pid", "pos"]
    )
    bits_b = pd.DataFrame(
        [(r.pid, p) for r in pairs.itertuples() for p in r.b], columns=["pid", "pos"]
    )
    sizes = pd.DataFrame(
        {"pid": pairs["pid"], "na": pairs["a"].map(len), "nb": pairs["b"].map(len)}
    )
    assert_equivalent(
        got,
        """SELECT s.pid, 2.0 * COALESCE(c.c, 0) / (s.na + s.nb) AS dice
           FROM sizes s LEFT JOIN (
             SELECT a.pid, count(*) AS c FROM bits_a a
             JOIN bits_b b ON a.pid = b.pid AND a.pos = b.pos GROUP BY a.pid
           ) c ON s.pid = c.pid""",
        sizes=sizes, bits_a=bits_a, bits_b=bits_b,
    )


@pytest.mark.parametrize(
    "s1,s2,expected",
    [
        ("martha", "marhta", 0.9611),
        ("dixon", "dicksonx", 0.8133),
        ("jellyfish", "smellyfish", 0.8962),
        ("abc", "abc", 1.0),
        ("abc", "xyz", 0.0),
        ("", "abc", 0.0),
        ("", "", 1.0),
    ],
)
def test_jaro_winkler_reference_values(s1, s2, expected):
    assert abs(jaro_winkler_py(s1, s2) - expected) < 1e-3


def test_jaro_winkler_symmetric():
    for a, b in [("martha", "marhta"), ("ng", "nguyen"), ("x", "")]:
        assert abs(jaro_winkler_py(a, b) - jaro_winkler_py(b, a)) < 1e-12


def test_jaro_winkler_spark_matches_python(spark):
    pdf = pd.DataFrame({"a": ["martha", "dixon", None], "b": ["marhta", "dicksonx", "x"]})
    df = spark.createDataFrame(pdf)
    rows = df.select(jaro_winkler(F.col("a"), F.col("b")).alias("s")).collect()
    want = [jaro_winkler_py(a, b) for a, b in [("martha", "marhta"), ("dixon", "dicksonx"), (None, "x")]]
    for r, w in zip(rows, want):
        assert abs(r["s"] - w) < 1e-12


def test_attach_pair_columns(spark):
    cand = spark.createDataFrame(pd.DataFrame({"rec_id_a": ["a1"], "rec_id_b": ["b1"]}))
    da = spark.createDataFrame(pd.DataFrame({"rec_id": ["a1"], "v": [10]}))
    db = spark.createDataFrame(pd.DataFrame({"rec_id": ["b1"], "v": [20]}))
    row = attach_pair_columns(cand, da, db, ["v"]).collect()[0]
    assert row["v_a"] == 10 and row["v_b"] == 20

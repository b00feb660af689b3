"""Tests for native q-gram tokenization (against the Python reference and DuckDB)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.encoding.qgrams import normalize, qgrams, record_tokens, tagged_qgrams
from repro.oracle import assert_equivalent
from tests.helpers import ref_qgrams

WORDS = ["william", "ng", "a", "", "  Spaced  ", "MacIntosh", "o'neil", "李", "x" * 30]


def _spark_qgrams(spark, values, **kw):
    df = spark.createDataFrame(pd.DataFrame({"s": values}))
    return [r["g"] for r in df.select(qgrams(F.col("s"), **kw).alias("g")).collect()]


@pytest.mark.parametrize("q", [1, 2, 3])
@pytest.mark.parametrize("pad", [True, False])
def test_matches_reference(spark, q, pad):
    got = _spark_qgrams(spark, WORDS, q=q, pad=pad)
    for s, g in zip(WORDS, got):
        assert list(g) == ref_qgrams(s, q=q, pad=pad), (s, q, pad)


def test_empty_and_null_give_empty_array(spark):
    df = spark.createDataFrame(pd.DataFrame({"s": ["", None, "   "]}))
    rows = df.select(qgrams(F.col("s")).alias("g")).collect()
    for r in rows:
        assert list(r["g"] or []) == []


def test_padding_includes_boundaries(spark):
    (g,) = _spark_qgrams(spark, ["ab"], q=2, pad=True)
    assert list(g) == ["#a", "ab", "b#"]


def test_no_padding(spark):
    (g,) = _spark_qgrams(spark, ["abc"], q=2, pad=False)
    assert list(g) == ["ab", "bc"]


def test_distinct_flag(spark):
    (g_dist,) = _spark_qgrams(spark, ["aaaa"], q=2, pad=False, distinct=True)
    (g_all,) = _spark_qgrams(spark, ["aaaa"], q=2, pad=False, distinct=False)
    assert list(g_dist) == ["aa"] and list(g_all) == ["aa", "aa", "aa"]


def test_rejects_bad_q():
    with pytest.raises(ValueError):
        qgrams(F.col("s"), q=0)


def test_normalize(spark):
    df = spark.createDataFrame(pd.DataFrame({"s": ["  HeLLo "]}))
    assert df.select(normalize(F.col("s")).alias("n")).collect()[0]["n"] == "hello"


def test_tagged_qgrams_prefix(spark):
    df = spark.createDataFrame(pd.DataFrame({"s": ["ab"]}))
    (row,) = df.select(tagged_qgrams(F.col("s"), "fn").alias("g")).collect()
    assert list(row["g"]) == ["fn:#a", "fn:ab", "fn:b#"]


def test_record_tokens_union_distinct(spark):
    df = spark.createDataFrame(pd.DataFrame({"a": ["ab"], "b": ["ab"]}))
    (row,) = df.select(
        record_tokens({"x": F.col("a"), "y": F.col("b")}).alias("t")
    ).collect()
    toks = list(row["t"])
    assert len(toks) == len(set(toks)) == 6  # 3 per field, distinct tags


def test_record_tokens_rejects_empty():
    with pytest.raises(ValueError):
        record_tokens({})


def test_qgram_counts_against_duckdb(spark):
    """Oracle check: per-record distinct padded-bigram count (scalar output)."""
    pdf = pd.DataFrame({"rec_id": [f"r{i}" for i in range(len(WORDS))], "s": WORDS})
    df = spark.createDataFrame(pdf)
    got = df.select("rec_id", F.size(qgrams(F.col("s"))).alias("n_grams"))
    # Reference counts computed in Python, checked through DuckDB join so the
    # comparison machinery is the shared oracle path.
    ref = pd.DataFrame(
        {"rec_id": pdf["rec_id"], "n_grams": [len(ref_qgrams(s)) for s in WORDS]}
    )
    assert_equivalent(got, "SELECT rec_id, n_grams FROM ref", ref=ref)

"""Tests for phonetic encodings (Soundex wrapper + NYSIIS implementation)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.encoding.phonetic import nysiis, nysiis_py, soundex


@pytest.mark.parametrize(
    "a,b",
    [
        ("robert", "rupert"),
        ("smith", "smyth"),
        ("catherine", "katherine"),  # K/C differ in soundex 1st letter — see below
    ],
)
def test_soundex_known_equivalences(spark, a, b):
    df = spark.createDataFrame(pd.DataFrame({"a": [a], "b": [b]}))
    row = df.select(
        soundex(F.col("a")).alias("sa"), soundex(F.col("b")).alias("sb")
    ).collect()[0]
    if a[0] == b[0]:
        assert row["sa"] == row["sb"]
    else:
        # First letter is kept verbatim in Soundex, so these legitimately differ.
        assert row["sa"][1:] == row["sb"][1:]


def test_soundex_handles_empty_and_null(spark):
    df = spark.createDataFrame(pd.DataFrame({"a": ["", None, "  "]}))
    for r in df.select(soundex(F.col("a")).alias("s")).collect():
        assert (r["s"] or "") == ""


def test_soundex_normalizes_case(spark):
    df = spark.createDataFrame(pd.DataFrame({"a": ["SMITH"], "b": ["smith"]}))
    row = df.select(soundex(F.col("a")).alias("sa"), soundex(F.col("b")).alias("sb")).collect()[0]
    assert row["sa"] == row["sb"]


@pytest.mark.parametrize(
    "name,expected_prefix",
    [
        ("knight", "n"),  # kn -> nn
        ("schmidt", "s"),
        ("macintosh", "m"),
        ("phillips", "f"),  # ph -> ff
    ],
)
def test_nysiis_prefix_rules(name, expected_prefix):
    assert nysiis_py(name).startswith(expected_prefix)


@pytest.mark.parametrize(
    "a,b",
    [
        ("knight", "night"),
        ("phillip", "fillip"),
        ("stephen", "stefen"),
        ("colour", "color"),
    ],
)
def test_nysiis_groups_variants(a, b):
    assert nysiis_py(a) == nysiis_py(b)


def test_nysiis_empty_and_nonalpha():
    assert nysiis_py("") == ""
    assert nysiis_py("123") == ""
    assert nysiis_py("o'neil") == nysiis_py("oneil")


def test_nysiis_deterministic_and_lowercase():
    for name in ["anderson", "Thompson", "NG", "li"]:
        code = nysiis_py(name)
        assert code == code.lower()
        assert code == nysiis_py(name)


def test_nysiis_no_adjacent_duplicates():
    for name in ["aaron", "lloyd", "emmett", "pippa"]:
        code = nysiis_py(name)
        assert all(x != y for x, y in zip(code, code[1:])), (name, code)


def test_nysiis_spark_column_matches_python(spark):
    names = ["anderson", "knight", "schmidt", "ng", "macintosh", None, ""]
    df = spark.createDataFrame(pd.DataFrame({"n": names}))
    got = [r["c"] for r in df.select(nysiis(F.col("n")).alias("c")).collect()]
    want = [nysiis_py(n) if n is not None else "" for n in names]
    assert got == want

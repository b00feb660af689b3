"""Tests for SLK-581 derivation and HMAC keyed hashing."""
import hashlib
import hmac as hmac_mod

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.encoding.slk import hmac_sha256, slk581, slk581_hashed


def _slk(spark, first, last, dob, gender):
    df = spark.createDataFrame(
        pd.DataFrame({"fn": [first], "ln": [last], "dob": [dob], "g": [gender]})
    )
    return df.select(
        slk581(F.col("fn"), F.col("ln"), F.col("dob"), F.col("g")).alias("slk")
    ).collect()[0]["slk"]


def test_known_value(spark):
    # last=anderson: letters 2,3,5 = n,d,r ; first=mary: letters 2,3 = a,r
    # dob 1984-03-07 -> 07031984 ; gender f -> 2
    assert _slk(spark, "mary", "anderson", "1984-03-07", "f") == "NDRAR070319842"


def test_filler_for_short_names(spark):
    # last=ng: letters 2,3,5 = g,2,2 ; first=li: 2nd=i, 3rd=filler
    assert _slk(spark, "li", "ng", "2000-12-31", "m") == "G22I2311220001"


def test_gender_codes(spark):
    assert _slk(spark, "ann", "lee", "1990-01-02", "male").endswith("1")
    assert _slk(spark, "ann", "lee", "1990-01-02", "F").endswith("2")
    assert _slk(spark, "ann", "lee", "1990-01-02", "x").endswith("9")


def test_nonalpha_chars_skipped(spark):
    # Apostrophe is not a letter position: o'neil -> oneil, letters 2,3,5=n,e,l
    assert _slk(spark, "bob", "o'neil", "1970-06-15", "m")[:3] == "NEL"


def test_length_always_14(spark):
    for fn, ln in [("a", "b"), ("", ""), ("verylongfirstname", "x")]:
        assert len(_slk(spark, fn, ln, "1955-05-05", "f")) == 14


def test_typo_changes_slk_when_hit_positions(spark):
    clean = _slk(spark, "mary", "anderson", "1984-03-07", "f")
    typo = _slk(spark, "mary", "aneerson", "1984-03-07", "f")  # 3rd letter changed
    assert clean != typo


def test_typo_outside_positions_keeps_slk(spark):
    clean = _slk(spark, "mary", "anderson", "1984-03-07", "f")
    typo = _slk(spark, "mary", "andersen", "1984-03-07", "f")  # 8th letter changed
    assert clean == typo


def test_hmac_matches_stdlib(spark):
    df = spark.createDataFrame(pd.DataFrame({"v": ["hello", "", "anderson"]}))
    got = [r["h"] for r in df.select(hmac_sha256(F.col("v"), secret="k1").alias("h")).collect()]
    want = [
        hmac_mod.new(b"k1", v.encode(), hashlib.sha256).hexdigest()
        for v in ["hello", "", "anderson"]
    ]
    assert got == want


def test_hmac_secret_matters(spark):
    df = spark.createDataFrame(pd.DataFrame({"v": ["x"]}))
    h1 = df.select(hmac_sha256(F.col("v"), secret="a").alias("h")).collect()[0]["h"]
    h2 = df.select(hmac_sha256(F.col("v"), secret="b").alias("h")).collect()[0]["h"]
    assert h1 != h2


def test_slk_hashed_joins_equal_records(spark):
    pdf = pd.DataFrame(
        {"fn": ["mary", "mary"], "ln": ["anderson", "anderson"],
         "dob": ["1984-03-07"] * 2, "g": ["f", "F"]}
    )
    df = spark.createDataFrame(pdf)
    hashes = [
        r["h"]
        for r in df.select(
            slk581_hashed(F.col("fn"), F.col("ln"), F.col("dob"), F.col("g"), secret="s").alias("h")
        ).collect()
    ]
    assert hashes[0] == hashes[1]
    assert len(hashes[0]) == 64  # sha256 hex

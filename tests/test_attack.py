"""Tests for the frequency-alignment re-identification attack."""
import pandas as pd
from pyspark.sql import functions as F

from repro.privacy.attack import bf_pattern_col, frequency_attack


def _attack(spark, encoded_vals, register_vals, true_vals):
    n = len(encoded_vals)
    encoded = spark.createDataFrame(
        pd.DataFrame({"rec_id": [f"r{i}" for i in range(n)], "enc": encoded_vals})
    )
    register = spark.createDataFrame(pd.DataFrame({"value": register_vals}))
    truth = spark.createDataFrame(
        pd.DataFrame({"rec_id": [f"r{i}" for i in range(n)], "value": true_vals})
    )
    return frequency_attack(encoded, "enc", register, "value", truth, "value")


def test_deterministic_encoding_with_matching_register_fully_reidentified(spark):
    # Frequencies: smith x3, jones x2, brown x1 in both worlds.
    vals = ["smith"] * 3 + ["jones"] * 2 + ["brown"]
    enc = [f"H({v})" for v in vals]
    res = _attack(spark, enc, vals, vals)
    assert res.reid_rate == 1.0
    assert res.reid_rate_top5 == 1.0
    assert res.n_records == 6
    assert res.n_distinct_encodings == 3


def test_unique_encodings_defeat_alignment(spark):
    # Every record's encoding unique (like a record-level CLK): rank
    # alignment degenerates — only coincidental hits remain.
    vals = ["smith"] * 3 + ["jones"] * 2 + ["brown"]
    enc = [f"unique-{i}" for i in range(6)]
    res = _attack(spark, enc, vals, vals)
    assert res.n_distinct_encodings == 6
    assert res.reid_rate <= 0.5  # vs 1.0 for the deterministic encoding


def test_register_mismatch_lowers_accuracy(spark):
    vals = ["smith", "smith", "jones"]
    enc = [f"H({v})" for v in vals]
    res = _attack(spark, enc, vals, ["zzz", "zzz", "qqq"])
    assert res.reid_rate == 0.0


def test_rank_swap_partial_success(spark):
    # Register frequency order inverted vs encoded data: guesses land on the
    # wrong value for every record.
    enc_vals = ["smith"] * 3 + ["jones"]
    enc = [f"H({v})" for v in enc_vals]
    register = ["jones"] * 3 + ["smith"]
    res = _attack(spark, enc, register, enc_vals)
    assert res.reid_rate == 0.0
    # ...but the true value is only 1 rank away: the top-5 window catches it.
    assert res.reid_rate_top5 == 1.0


def test_bf_pattern_col_canonical(spark):
    df = spark.createDataFrame(pd.DataFrame({"bf": [[1, 5, 9], [1, 5, 9], [2, 3]]}))
    pats = [r["p"] for r in df.select(bf_pattern_col(F.col("bf")).alias("p")).collect()]
    assert pats[0] == pats[1] == "1,5,9"
    assert pats[2] == "2,3"

"""Tests for MinHash signatures and LSH banding."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.encoding.minhash import (
    _P,
    band_keys,
    lsh_collision_probability,
    minhash_signatures,
)
from repro.encoding.qgrams import qgrams
from tests.helpers import ref_jaccard, ref_qgrams


def _sigs(spark, values, num_hashes=12, seed=7):
    df = spark.createDataFrame(
        pd.DataFrame({"rec_id": [f"r{i}" for i in range(len(values))], "s": values})
    )
    return minhash_signatures(
        df, qgrams(F.col("s")), num_hashes=num_hashes, seed=seed
    )


def test_signature_shape_and_range(spark):
    sig = _sigs(spark, ["anderson", "smith"]).collect()
    assert len(sig) == 2
    for r in sig:
        for j in range(12):
            assert 0 <= r[f"mh_{j}"] < _P


def test_identical_values_identical_signatures(spark):
    rows = {r["rec_id"]: r for r in _sigs(spark, ["anderson", "anderson"]).collect()}
    assert all(
        rows["r0"][f"mh_{j}"] == rows["r1"][f"mh_{j}"] for j in range(12)
    )


def test_deterministic_in_seed(spark):
    a = {r["rec_id"]: [r[f"mh_{j}"] for j in range(12)] for r in _sigs(spark, ["x y"]).collect()}
    b = {r["rec_id"]: [r[f"mh_{j}"] for j in range(12)] for r in _sigs(spark, ["x y"]).collect()}
    assert a == b


def test_seed_changes_signatures(spark):
    a = _sigs(spark, ["anderson"], seed=1).collect()[0]
    b = _sigs(spark, ["anderson"], seed=2).collect()[0]
    assert any(a[f"mh_{j}"] != b[f"mh_{j}"] for j in range(12))


def test_empty_tokens_get_sentinel(spark):
    r = _sigs(spark, [""]).collect()[0]
    assert all(r[f"mh_{j}"] == _P for j in range(12))


def test_signature_agreement_estimates_jaccard(spark):
    """Fraction of agreeing minhashes ≈ Jaccard of the q-gram sets."""
    a, b = "anderson", "andersen"
    sig = {r["rec_id"]: r for r in _sigs(spark, [a, b], num_hashes=96).collect()}
    agree = np.mean([sig["r0"][f"mh_{j}"] == sig["r1"][f"mh_{j}"] for j in range(96)])
    true_j = ref_jaccard(set(ref_qgrams(a)), set(ref_qgrams(b)))
    assert abs(agree - true_j) < 0.17  # binomial noise at 96 samples


def test_band_keys_row_count(spark):
    sig = _sigs(spark, ["anderson", "smith"])
    keys = band_keys(sig, bands=4, rows=3)
    assert keys.count() == 2 * 4
    assert set(keys.columns) == {"rec_id", "band", "key"}


def test_band_keys_equal_records_share_all_bands(spark):
    sig = _sigs(spark, ["anderson", "anderson"])
    keys = band_keys(sig, bands=4, rows=3)
    a = {(r["band"], r["key"]) for r in keys.where(F.col("rec_id") == "r0").collect()}
    b = {(r["band"], r["key"]) for r in keys.where(F.col("rec_id") == "r1").collect()}
    assert a == b


def test_band_keys_rejects_overdraw(spark):
    sig = _sigs(spark, ["x"], num_hashes=6)
    with pytest.raises(ValueError):
        band_keys(sig, bands=4, rows=3)


def test_num_hashes_validation(spark):
    df = spark.createDataFrame(pd.DataFrame({"rec_id": ["a"], "s": ["x"]}))
    with pytest.raises(ValueError):
        minhash_signatures(df, qgrams(F.col("s")), num_hashes=0)


@pytest.mark.parametrize(
    "s,expected_low,expected_high",
    [(0.9, 0.95, 1.0), (0.5, 0.4, 0.9), (0.1, 0.0, 0.05)],
)
def test_collision_probability_s_curve(s, expected_low, expected_high):
    p = lsh_collision_probability(s, bands=8, rows=3)
    assert expected_low <= p <= expected_high


def test_collision_probability_monotone():
    ps = [lsh_collision_probability(s / 10, bands=8, rows=3) for s in range(11)]
    assert all(a <= b for a, b in zip(ps, ps[1:]))

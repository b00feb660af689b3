"""Tests for BLIP hardening."""
import math

import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.encoding.hardening import (
    blip,
    blip_positions,
    expected_dice_after_blip,
    flip_probability,
)


@pytest.mark.parametrize("eps,want", [(0.0001, 0.5), (1.0, 1 / (1 + math.e)), (10.0, 0.0000454)])
def test_flip_probability_values(eps, want):
    assert abs(flip_probability(eps) - want) < 1e-3


def test_flip_probability_rejects_nonpositive():
    with pytest.raises(ValueError):
        flip_probability(0.0)


def test_blip_positions_flip_rate():
    rng = np.random.default_rng(0)
    l, f = 4096, 0.1
    base = list(range(0, l, 4))  # 1024 set bits
    out = blip_positions(base, l=l, f=f, rng=rng)
    flipped = len(set(base) ^ set(out))
    assert abs(flipped / l - f) < 0.02


def test_blip_positions_zero_f_identity():
    rng = np.random.default_rng(1)
    base = [3, 17, 99]
    assert blip_positions(base, l=128, f=0.0, rng=rng) == base


def test_blip_positions_sorted_and_in_range():
    rng = np.random.default_rng(2)
    out = blip_positions([5, 80], l=100, f=0.3, rng=rng)
    assert out == sorted(set(out))
    assert all(0 <= p < 100 for p in out)


def _df(spark):
    return spark.createDataFrame(
        pd.DataFrame({"rec_id": ["a", "b"], "bf": [[1, 5, 9, 20], [2, 6]]})
    )


def test_blip_column_deterministic(spark):
    out1 = blip(_df(spark), "bf", l=64, epsilon=1.0, seed=5).collect()
    out2 = blip(_df(spark), "bf", l=64, epsilon=1.0, seed=5).collect()
    assert {r["rec_id"]: list(r["bf"]) for r in out1} == {
        r["rec_id"]: list(r["bf"]) for r in out2
    }


def test_blip_column_changes_bits(spark):
    out = {r["rec_id"]: list(r["bf"]) for r in blip(_df(spark), "bf", l=64, epsilon=1.0, seed=5).collect()}
    assert out["a"] != [1, 5, 9, 20] or out["b"] != [2, 6]


def test_blip_updates_popcount(spark):
    rows = blip(_df(spark), "bf", l=64, epsilon=2.0, seed=1).collect()
    for r in rows:
        assert r["bf_n"] == len(r["bf"])


def test_blip_out_column(spark):
    rows = blip(_df(spark), "bf", l=64, epsilon=2.0, seed=1, out="bf2").collect()
    for r in rows:
        assert list(r["bf"]) in ([1, 5, 9, 20], [2, 6])  # original untouched
        assert r["bf2_n"] == len(r["bf2"])


def test_expected_dice_identity_at_f0():
    for d in (0.0, 0.4, 0.9, 1.0):
        assert abs(expected_dice_after_blip(d, fill=0.4, f=0.0) - d) < 1e-12


def test_expected_dice_monotone_in_d():
    vals = [expected_dice_after_blip(d / 10, fill=0.4, f=0.2) for d in range(11)]
    assert all(a <= b for a, b in zip(vals, vals[1:]))


def test_expected_dice_empirical_agreement():
    """Monte-Carlo check of the expected-Dice transform."""
    rng = np.random.default_rng(3)
    l, f, m, c = 2048, 0.15, 800, 640  # clean dice = 2c/(2m) = 0.8
    common = list(range(c))
    a = common + list(range(c, m))
    b = common + list(range(m, 2 * m - c))
    dices = []
    for _ in range(30):
        ab = blip_positions(a, l=l, f=f, rng=rng)
        bb = blip_positions(b, l=l, f=f, rng=rng)
        inter = len(set(ab) & set(bb))
        dices.append(2 * inter / (len(ab) + len(bb)))
    want = expected_dice_after_blip(0.8, fill=m / l, f=f)
    assert abs(np.mean(dices) - want) < 0.03

"""Tests for encoding privacy metrics."""
import math

import pandas as pd

from repro.privacy.metrics import encoding_privacy


def _df(spark, vals):
    return spark.createDataFrame(pd.DataFrame({"enc": vals}))


def test_uniform_distribution(spark):
    p = encoding_privacy(_df(spark, ["a", "b", "c", "d"]), "enc")
    assert p.n_records == 4 and p.n_distinct == 4
    assert abs(p.entropy - 2.0) < 1e-9
    assert p.uniqueness == 1.0
    assert p.mean_group_size == 1.0
    assert abs(p.max_entropy - 2.0) < 1e-9


def test_degenerate_distribution(spark):
    p = encoding_privacy(_df(spark, ["x"] * 8), "enc")
    assert p.n_distinct == 1
    assert abs(p.entropy) < 1e-9
    assert p.uniqueness == 0.0
    assert p.mean_group_size == 8.0
    assert p.max_entropy == 0.0


def test_skewed_distribution(spark):
    vals = ["a"] * 4 + ["b", "c", "d", "e"]
    p = encoding_privacy(_df(spark, vals), "enc")
    want = -(0.5 * math.log2(0.5) + 4 * (1 / 8) * math.log2(1 / 8))
    assert abs(p.entropy - want) < 1e-9
    assert p.uniqueness == 0.5
    # mean group size = (4*4 + 4*1)/8
    assert abs(p.mean_group_size - 2.5) < 1e-9


def test_entropy_bounded_by_max(spark):
    vals = ["a"] * 3 + ["b"] * 2 + ["c"]
    p = encoding_privacy(_df(spark, vals), "enc")
    assert 0.0 < p.entropy < p.max_entropy + 1e-12

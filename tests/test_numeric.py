"""Tests for numeric neighbourhood encoding."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.encoding.numeric import expected_dice, neighbourhood_tokens
from repro.matching.similarity import dice_sim


def _tokens(spark, values, **kw):
    df = spark.createDataFrame(pd.DataFrame({"v": values}))
    return [
        list(r["t"])
        for r in df.select(
            neighbourhood_tokens(F.col("v").cast("double"), **kw).alias("t")
        ).collect()
    ]


def test_tokens_cover_neighbourhood(spark):
    (toks,) = _tokens(spark, [100.0], radius=30, step=10)
    assert toks == [f"num:{v}.0" for v in range(70, 131, 10)]


def test_tokens_prefix(spark):
    (toks,) = _tokens(spark, [5.0], radius=1, step=1, prefix="pc")
    assert all(t.startswith("pc:") for t in toks)


def test_null_gives_empty(spark):
    (toks,) = _tokens(spark, [None], radius=10, step=5)
    assert toks == []


def test_rejects_bad_params():
    with pytest.raises(ValueError):
        neighbourhood_tokens(F.col("v"), radius=0, step=1)
    with pytest.raises(ValueError):
        neighbourhood_tokens(F.col("v"), radius=1, step=-1)


@pytest.mark.parametrize("d", [0, 10, 20, 30, 40, 60, 100])
def test_dice_degrades_linearly_with_distance(spark, d):
    pdf = pd.DataFrame({"a": [100.0], "b": [100.0 + d]})
    df = spark.createDataFrame(pdf)
    out = df.select(
        dice_sim(
            neighbourhood_tokens(F.col("a"), radius=30, step=10),
            neighbourhood_tokens(F.col("b"), radius=30, step=10),
        ).alias("d")
    ).collect()[0]["d"]
    want = expected_dice(d, radius=30, step=10)
    assert abs(out - want) < 1e-9


def test_expected_dice_endpoints():
    assert expected_dice(0, radius=30, step=10) == 1.0
    assert expected_dice(1000, radius=30, step=10) == 0.0

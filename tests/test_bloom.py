"""Tests for Bloom-filter (CLK) encoding."""
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from pyspark.sql import functions as F

from repro.encoding.bloom import bloom_encode, bloom_positions, with_clk
from repro.encoding.qgrams import qgrams
from tests.helpers import ref_dice, ref_qgrams

tokens_strategy = st.lists(
    st.text(alphabet="abcdef#:", min_size=1, max_size=6), min_size=0, max_size=30
)


@given(tokens_strategy)
@settings(max_examples=50, deadline=None)
def test_reference_positions_sorted_in_range(tokens):
    pos = bloom_positions(tokens, l=128, k=5, salt="s")
    assert pos == sorted(set(pos))
    assert all(0 <= p < 128 for p in pos)
    assert len(pos) <= 5 * len(set(tokens))


@given(tokens_strategy)
@settings(max_examples=30, deadline=None)
def test_reference_deterministic(tokens):
    assert bloom_positions(tokens, l=256, k=8, salt="x") == bloom_positions(
        tokens, l=256, k=8, salt="x"
    )


def test_superset_tokens_superset_bits():
    a = bloom_positions(["ab", "bc"], l=512, k=10, salt="s")
    b = bloom_positions(["ab", "bc", "cd"], l=512, k=10, salt="s")
    assert set(a) <= set(b)


def test_salt_changes_positions():
    t = ["ab", "bc", "cd"]
    assert bloom_positions(t, l=1024, k=10, salt="s1") != bloom_positions(
        t, l=1024, k=10, salt="s2"
    )


def test_empty_tokens_empty_filter():
    assert bloom_positions([], l=64, k=4) == []


def test_spark_encoder_matches_reference(spark):
    vals = ["william", "ng", "anderson", ""]
    pdf = pd.DataFrame({"s": vals})
    df = spark.createDataFrame(pdf)
    rows = df.select(
        "s", bloom_encode(qgrams(F.col("s")), l=256, k=6, salt="z").alias("bf")
    ).collect()
    for r in rows:
        want = bloom_positions(ref_qgrams(r["s"]), l=256, k=6, salt="z")
        assert list(r["bf"]) == want, r["s"]


def test_spark_encoder_rejects_bad_params():
    with pytest.raises(ValueError):
        bloom_encode(F.col("x"), l=0, k=4)
    with pytest.raises(ValueError):
        bloom_encode(F.col("x"), l=64, k=0)


def test_with_clk_adds_bf_and_popcount(spark):
    pdf = pd.DataFrame({"rec_id": ["r1"], "fn": ["mary"], "ln": ["smith"]})
    df = spark.createDataFrame(pdf)
    out = with_clk(df, {"fn": F.col("fn"), "ln": F.col("ln")}, l=512, k=8, salt="s")
    row = out.collect()[0]
    assert row["bf_n"] == len(row["bf"]) > 0


def test_with_clk_deterministic_across_calls(spark):
    pdf = pd.DataFrame({"rec_id": ["r1", "r2"], "fn": ["mary", "john"], "ln": ["smith", "doe"]})
    df = spark.createDataFrame(pdf)
    fields = {"fn": F.col("fn"), "ln": F.col("ln")}
    a = with_clk(df, fields, l=512, k=8, salt="s").select("rec_id", "bf").collect()
    b = with_clk(df, fields, l=512, k=8, salt="s").select("rec_id", "bf").collect()
    assert sorted((r["rec_id"], tuple(r["bf"])) for r in a) == sorted(
        (r["rec_id"], tuple(r["bf"])) for r in b
    )


def test_bf_dice_approximates_token_dice(spark):
    """CLK Dice ≈ q-gram Dice (the core soundness claim of BF encoding)."""
    pairs = [
        ("anderson", "anderson"),
        ("anderson", "andersen"),
        ("anderson", "henderson"),
        ("anderson", "zzzzz"),
        ("williams", "wiliams"),
    ]
    pdf = pd.DataFrame({"a": [p[0] for p in pairs], "b": [p[1] for p in pairs]})
    df = spark.createDataFrame(pdf)
    enc = df.select(
        "a", "b",
        bloom_encode(qgrams(F.col("a")), l=2048, k=15, salt="s").alias("ba"),
        bloom_encode(qgrams(F.col("b")), l=2048, k=15, salt="s").alias("bb"),
    )
    from repro.matching.similarity import dice_sim

    rows = enc.withColumn("d", dice_sim(F.col("ba"), F.col("bb"))).collect()
    for r in rows:
        want = ref_dice(set(ref_qgrams(r["a"])), set(ref_qgrams(r["b"])))
        # Large sparse filter ⇒ collision inflation is small but positive.
        assert r["d"] >= want - 0.02
        assert r["d"] <= want + 0.12


def test_fill_rate_reasonable(spark):
    """Default params should not saturate the filter (fill ≈ 0.2-0.6)."""
    pdf = pd.DataFrame(
        {"rec_id": [f"r{i}" for i in range(20)],
         "fn": ["wilhelmina"] * 20, "ln": ["featherstonehaugh"] * 20,
         "dob": ["1984-03-07"] * 20, "ct": ["springfield"] * 20}
    )
    df = spark.createDataFrame(pdf)
    out = with_clk(
        df, {t: F.col(t) for t in ["fn", "ln", "dob", "ct"]}, l=1024, k=20, salt="s"
    )
    mean_fill = out.agg(F.avg("bf_n")).collect()[0][0] / 1024
    assert 0.15 < mean_fill < 0.65

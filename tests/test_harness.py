"""End-to-end pipeline harness tests (small data, every configuration arm)."""
import pytest
from pyspark.sql import functions as F

from repro.evaluation.harness import PipelineConfig, encode_clk, run_pipeline
from repro.evaluation.quality import evaluate_matches
from repro.persons import database_pair


@pytest.fixture(scope="module")
def tiny_pair(spark):
    df_a, df_b, truth = database_pair(
        spark, n_entities=120, overlap=0.5, corruption_rate=0.2, seed=42
    )
    return df_a.cache(), df_b.cache(), truth.cache()


@pytest.mark.parametrize("blocking", ["hlsh", "minhash", "standard", "none"])
def test_pipeline_all_blocking_modes(spark, tiny_pair, blocking):
    df_a, df_b, truth = tiny_pair
    res = run_pipeline(spark, df_a, df_b, PipelineConfig(blocking=blocking))
    q = evaluate_matches(res.matches, truth)
    assert q.precision > 0.85
    assert q.recall > 0.6
    assert res.n_candidates >= res.n_matches
    assert set(res.timings) == {"encode", "block", "filter", "match", "total"}


def test_pipeline_counts_consistent(spark, tiny_pair):
    df_a, df_b, _ = tiny_pair
    res = run_pipeline(spark, df_a, df_b, PipelineConfig(blocking="minhash"))
    assert res.n_after_filter <= res.n_candidates
    assert res.n_matches <= res.n_after_filter
    assert res.matches.count() == res.n_matches


def test_pipeline_unknown_blocking_rejected(spark, tiny_pair):
    df_a, df_b, _ = tiny_pair
    with pytest.raises(ValueError):
        run_pipeline(spark, df_a, df_b, PipelineConfig(blocking="nope"))


def test_pipeline_one_to_one_flag(spark, tiny_pair):
    df_a, df_b, _ = tiny_pair
    many = run_pipeline(
        spark, df_a, df_b, PipelineConfig(blocking="minhash", one_to_one_matching=False)
    )
    one = run_pipeline(spark, df_a, df_b, PipelineConfig(blocking="minhash"))
    assert many.n_matches >= one.n_matches
    pdf = one.matches.toPandas()
    assert pdf["rec_id_a"].is_unique and pdf["rec_id_b"].is_unique


def test_pipeline_blip_mode_still_links(spark, tiny_pair):
    df_a, df_b, truth = tiny_pair
    res = run_pipeline(spark, df_a, df_b, PipelineConfig(blip_epsilon=3.0))
    q = evaluate_matches(res.matches, truth)
    assert q.f1 > 0.6  # hardened but calibrated — must still mostly work


def test_pipeline_numeric_tokens_mode(spark, tiny_pair):
    df_a, df_b, truth = tiny_pair
    res = run_pipeline(spark, df_a, df_b, PipelineConfig(include_numeric=True))
    q = evaluate_matches(res.matches, truth)
    assert q.f1 > 0.7


def test_encode_clk_outputs(spark, tiny_pair):
    df_a, _, _ = tiny_pair
    enc = encode_clk(df_a, PipelineConfig())
    row = enc.select("bf", "bf_n").first()
    assert row["bf_n"] == len(row["bf"])
    assert all(0 <= p < 1024 for p in row["bf"])


def test_encode_clk_deterministic_between_sides(spark, tiny_pair):
    """Identical plaintext records must encode identically on both sides."""
    df_a, _, _ = tiny_pair
    cfg = PipelineConfig()
    e1 = encode_clk(df_a, cfg).select("rec_id", "bf")
    e2 = encode_clk(df_a, cfg).select("rec_id", F.col("bf").alias("bf2"))
    joined = e1.join(e2, "rec_id")
    assert joined.where(F.col("bf") != F.col("bf2")).isEmpty()

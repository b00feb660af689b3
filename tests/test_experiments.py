"""Smoke + shape tests for every experiment driver (tiny scale).

Each table must (a) run end-to-end, (b) produce its documented columns, and
(c) show the qualitative shape EXPERIMENTS.md claims — at reduced scale, with
generous margins.
"""
import pytest

from repro.experiments import (
    t1_encodings,
    t2_blocking,
    t3_metablocking,
    t4_classify,
    t5_scalability,
    t6_multiparty,
    t7_privacy,
    t8_incremental,
    t9_fairness,
)
from repro.experiments.common import to_markdown_table


@pytest.fixture(scope="module")
def t1(spark):
    return t1_encodings.run(spark, n_entities=200, corruptions=(0.0, 0.4), seed=1)


def test_t1_columns_and_coverage(t1):
    assert set(t1.columns) == {"corruption", "method", "precision", "recall", "f1", "secs"}
    assert set(t1["method"]) == {
        "exact_hmac", "slk581", "soundex_key", "plaintext_dice", "clk_dice"
    }
    assert len(t1) == 10


def test_t1_clean_data_all_methods_work(t1):
    clean = t1[t1["corruption"] == 0.0]
    assert (clean["f1"] > 0.9).all()


def test_t1_corruption_orders_methods(t1):
    dirty = t1[t1["corruption"] == 0.4].set_index("method")
    # Similarity-based matching beats exact keys under corruption...
    assert dirty.loc["clk_dice", "recall"] > dirty.loc["exact_hmac", "recall"] + 0.1
    # ...and the CLK tracks the plaintext upper baseline closely.
    assert dirty.loc["clk_dice", "f1"] > dirty.loc["plaintext_dice", "f1"] - 0.1


def test_t2_shapes(spark):
    pdf = t2_blocking.run(spark, n_entities=150, seed=1)
    by = pdf.set_index("method")
    assert by.loc["cartesian", "pc"] == 1.0 and by.loc["cartesian", "rr"] == 0.0
    for m in ["standard_soundex", "minhash_lsh", "hamming_lsh", "sorted_neighbourhood"]:
        assert by.loc[m, "rr"] > 0.8, m
        assert by.loc[m, "pc"] > 0.6, m
    # LSH at least matches standard blocking's completeness on corrupted data.
    assert by.loc["minhash_lsh", "pc"] >= by.loc["standard_soundex", "pc"] - 0.05


def test_t3_shapes(spark):
    pdf = t3_metablocking.run(spark, n_entities=150, seed=1)
    by = pdf.set_index("variant")
    assert by.loc["purge+cbs2", "n_candidates"] < by.loc["raw_blocks", "n_candidates"]
    assert by.loc["purge+cbs2", "pc"] > 0.8
    assert by.loc["prefix_filter", "pc"] > 0.9
    assert (pdf["comparisons_after_length_filter"] <= pdf["n_candidates"]).all()


def test_t4_shapes(spark):
    pdf = t4_classify.run(spark, n_entities=150, thresholds=(0.7, 0.9), seed=1)
    sweep = pdf[pdf["classifier"] == "dice_threshold"].set_index("threshold")
    assert sweep.loc[0.9, "precision"] >= sweep.loc[0.7, "precision"] - 1e-9
    assert sweep.loc[0.7, "recall"] >= sweep.loc[0.9, "recall"] - 1e-9
    fs = pdf[pdf["classifier"] == "fellegi_sunter_em"]
    assert len(fs) == 1 and fs.iloc[0]["f1"] > 0.7


def test_t5_shapes(spark):
    pdf = t5_scalability.run(spark, sizes=(150, 300), naive_cap=150, seed=1)
    assert set(pdf["method"]) == {"hlsh_blocked", "naive_cartesian"}
    naive = pdf[pdf["method"] == "naive_cartesian"]
    assert len(naive) == 1  # capped beyond 150
    blocked = pdf[pdf["method"] == "hlsh_blocked"].set_index("n_entities")
    assert blocked.loc[300, "n_candidates"] < 300 * 300  # actually blocks


def test_t6_shapes(spark):
    pdf = t6_multiparty.run(spark, ps=(3,), n_entities=80, mu=8, beta=20, seed=1)
    assert list(pdf["m"]) == [2, 3]
    assert (pdf["clusters_ge_m"] <= pdf["true_entities_ge_m"] * 1.3 + 5).all()
    # More databases required ⇒ fewer qualifying clusters.
    assert pdf.iloc[1]["clusters_ge_m"] <= pdf.iloc[0]["clusters_ge_m"]
    assert (pdf["pairwise_f1"] > 0.75).all()


def test_t7_shapes(spark):
    pdf = t7_privacy.run(spark, n_entities=200, blip_epsilons=(2.0,), seed=1)
    by = pdf.set_index("encoding")
    # Deterministic single-field encodings leak; CLK and BLIP resist.
    assert by.loc["hmac_lastname", "reid_rate"] > 0.15
    assert by.loc["clk", "reid_rate"] < by.loc["hmac_lastname", "reid_rate"] / 2
    assert by.loc["clk_blip_eps2", "reid_rate"] <= by.loc["hmac_lastname", "reid_rate"] / 2
    assert by.loc["clk", "uniqueness"] > 0.95
    assert by.loc["clk", "f1"] > 0.85


def test_t8_shapes(spark):
    pdf = t8_incremental.run(spark, n_entities=200, seed=1)
    row = pdf.iloc[0]
    assert bool(row["clusters_equal"])
    assert row["incr_secs"] > 0 and row["full_secs"] > 0


def test_t9_shapes(spark):
    pdf = t9_fairness.run(spark, n_entities=300, corruptions=(0.3,), seed=1)
    assert set(pdf["classifier"]) == {"record_clk", "mean_field"}
    mf = pdf[pdf["classifier"] == "mean_field"].set_index("group")
    # The field-mean classifier shows the minority recall deficit.
    assert mf.loc["minority", "recall"] <= mf.loc["majority", "recall"] + 0.02


def test_markdown_renderer():
    import pandas as pd

    pdf = pd.DataFrame({"a": [1], "b": [0.5]})
    md = to_markdown_table(pdf)
    assert md.splitlines()[0] == "| a | b |"
    assert "0.500" in md

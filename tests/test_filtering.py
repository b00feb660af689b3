"""Tests for similarity-join filters — above all: threshold-losslessness."""
import itertools

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.encoding.qgrams import qgrams
from repro.matching.filtering import (
    dice_length_bound,
    jaccard_length_bound,
    length_filter,
    prefix_filter_candidates,
)
from repro.matching.similarity import dice_sim, jaccard_sim
from tests.helpers import ref_jaccard, ref_qgrams

NAMES_A = ["anderson", "thompson", "martinez", "ng", "smith", "smyth", "schmidt"]
NAMES_B = ["andersen", "thomson", "martines", "ngo", "smith", "li", "schmitt"]


def test_dice_length_bound_values(spark):
    df = spark.createDataFrame(pd.DataFrame({"na": [10, 10, 0], "nb": [10, 5, 0]}))
    rows = df.select(dice_length_bound(F.col("na"), F.col("nb")).alias("b")).collect()
    assert [round(r["b"], 6) for r in rows] == [1.0, round(2 * 5 / 15, 6), 0.0]


def test_jaccard_length_bound_values(spark):
    df = spark.createDataFrame(pd.DataFrame({"na": [10, 4], "nb": [10, 8]}))
    rows = df.select(jaccard_length_bound(F.col("na"), F.col("nb")).alias("b")).collect()
    assert [round(r["b"], 6) for r in rows] == [1.0, 0.5]


def test_length_filter_rejects_unknown_measure(spark):
    df = spark.createDataFrame(pd.DataFrame({"na": [1], "nb": [1]}))
    with pytest.raises(ValueError):
        length_filter(df, n_a="na", n_b="nb", threshold=0.5, measure="cosine")


@pytest.mark.parametrize("threshold", [0.6, 0.8, 0.95])
def test_length_filter_lossless_for_dice(spark, threshold):
    """No pair with true Dice >= t may be dropped by the size bound."""
    pairs = list(itertools.product(NAMES_A, NAMES_B))
    pdf = pd.DataFrame({"a": [p[0] for p in pairs], "b": [p[1] for p in pairs]})
    df = spark.createDataFrame(pdf).select(
        "a", "b",
        qgrams(F.col("a")).alias("ta"), qgrams(F.col("b")).alias("tb"),
    ).withColumn("na", F.size("ta")).withColumn("nb", F.size("tb")) \
     .withColumn("sim", dice_sim(F.col("ta"), F.col("tb")))
    kept = length_filter(df, n_a="na", n_b="nb", threshold=threshold)
    dropped_above_t = df.exceptAll(kept).where(F.col("sim") >= threshold)
    assert dropped_above_t.isEmpty()


@pytest.mark.parametrize("threshold", [0.3, 0.5, 0.7])
def test_prefix_filter_lossless_for_jaccard(spark, threshold):
    """Every pair with true Jaccard >= t must appear among the candidates."""
    pdf_a = pd.DataFrame({"rec_id": [f"a{i}" for i in range(len(NAMES_A))], "s": NAMES_A})
    pdf_b = pd.DataFrame({"rec_id": [f"b{i}" for i in range(len(NAMES_B))], "s": NAMES_B})
    df_a, df_b = spark.createDataFrame(pdf_a), spark.createDataFrame(pdf_b)
    cand = {
        (r["rec_id_a"], r["rec_id_b"])
        for r in prefix_filter_candidates(
            df_a, df_b, qgrams(F.col("s")), threshold=threshold
        ).collect()
    }
    for i, a in enumerate(NAMES_A):
        for j, b in enumerate(NAMES_B):
            true_j = ref_jaccard(set(ref_qgrams(a)), set(ref_qgrams(b)))
            if true_j >= threshold:
                assert (f"a{i}", f"b{j}") in cand, (a, b, true_j)


def test_prefix_filter_prunes_something(spark):
    pdf_a = pd.DataFrame({"rec_id": [f"a{i}" for i in range(len(NAMES_A))], "s": NAMES_A})
    pdf_b = pd.DataFrame({"rec_id": [f"b{i}" for i in range(len(NAMES_B))], "s": NAMES_B})
    df_a, df_b = spark.createDataFrame(pdf_a), spark.createDataFrame(pdf_b)
    n = prefix_filter_candidates(df_a, df_b, qgrams(F.col("s")), threshold=0.8).count()
    assert n < len(NAMES_A) * len(NAMES_B)


def test_prefix_filter_rejects_bad_threshold(spark):
    df = spark.createDataFrame(pd.DataFrame({"rec_id": ["a"], "s": ["x"]}))
    with pytest.raises(ValueError):
        prefix_filter_candidates(df, df, qgrams(F.col("s")), threshold=0.0)


def test_prefix_filter_finds_exact_duplicates(spark):
    df_a = spark.createDataFrame(pd.DataFrame({"rec_id": ["a0"], "s": ["smith"]}))
    df_b = spark.createDataFrame(pd.DataFrame({"rec_id": ["b0"], "s": ["smith"]}))
    cand = prefix_filter_candidates(df_a, df_b, qgrams(F.col("s")), threshold=1.0)
    assert [(r["rec_id_a"], r["rec_id_b"]) for r in cand.collect()] == [("a0", "b0")]


def test_filtered_join_equals_bruteforce_join(spark):
    """prefix-filter + verify == brute-force similarity join (end to end)."""
    t = 0.5
    pdf_a = pd.DataFrame({"rec_id": [f"a{i}" for i in range(len(NAMES_A))], "s": NAMES_A})
    pdf_b = pd.DataFrame({"rec_id": [f"b{i}" for i in range(len(NAMES_B))], "s": NAMES_B})
    df_a, df_b = spark.createDataFrame(pdf_a), spark.createDataFrame(pdf_b)
    cand = prefix_filter_candidates(df_a, df_b, qgrams(F.col("s")), threshold=t)
    ta = df_a.select(F.col("rec_id").alias("rec_id_a"), qgrams(F.col("s")).alias("ta"))
    tb = df_b.select(F.col("rec_id").alias("rec_id_b"), qgrams(F.col("s")).alias("tb"))
    verified = {
        (r["rec_id_a"], r["rec_id_b"])
        for r in cand.join(ta, "rec_id_a").join(tb, "rec_id_b")
        .where(jaccard_sim(F.col("ta"), F.col("tb")) >= t).collect()
    }
    brute = {
        (f"a{i}", f"b{j}")
        for i, a in enumerate(NAMES_A)
        for j, b in enumerate(NAMES_B)
        if ref_jaccard(set(ref_qgrams(a)), set(ref_qgrams(b))) >= t
    }
    assert verified == brute

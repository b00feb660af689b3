"""Similarity-join filters (T3): length filter and prefix filter (PPJoin-lite).

Filters exploit the similarity threshold to discard pairs *before* the
expensive set-intersection (length filter) or to avoid generating them at all
(prefix filter). Both are threshold-lossless: no pair at or above the
threshold is ever dropped (tested against brute force).
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame, Window
from pyspark.sql import functions as F


def dice_length_bound(n_a: Column, n_b: Column) -> Column:
    """Upper bound on Dice from set sizes alone: ``2*min/(na+nb)``."""
    denom = n_a + n_b
    return F.when(denom > 0, 2.0 * F.least(n_a, n_b) / denom).otherwise(F.lit(0.0))


def jaccard_length_bound(n_a: Column, n_b: Column) -> Column:
    """Upper bound on Jaccard from set sizes alone: ``min/max``."""
    mx = F.greatest(n_a, n_b)
    return F.when(mx > 0, F.least(n_a, n_b) / mx).otherwise(F.lit(0.0))


def length_filter(
    pairs: DataFrame, *, n_a: str, n_b: str, threshold: float, measure: str = "dice"
) -> DataFrame:
    """Keep pairs whose size-based similarity upper bound reaches ``threshold``."""
    if measure == "dice":
        bound = dice_length_bound(F.col(n_a), F.col(n_b))
    elif measure == "jaccard":
        bound = jaccard_length_bound(F.col(n_a), F.col(n_b))
    else:
        raise ValueError(f"unknown measure {measure!r}")
    return pairs.where(bound >= threshold)


def _prefix_tokens(
    df: DataFrame, tokens_col: Column, order: DataFrame, *, threshold: float, id_col: str
) -> DataFrame:
    """Explode each record's Jaccard-prefix tokens (rarest-first ordering)."""
    ex = df.select(
        F.col(id_col).alias("rec_id"),
        F.size(tokens_col).alias("n_tok"),
        F.explode(tokens_col).alias("tok"),
    )
    ranked = ex.join(order, "tok", "left").withColumn(
        "rank",
        F.row_number().over(
            Window.partitionBy("rec_id").orderBy(F.col("freq").asc_nulls_first(), "tok")
        ),
    )
    # Jaccard prefix length: |x| - ceil(t*|x|) + 1 (Chaudhuri et al. / PPJoin).
    prefix_len = F.col("n_tok") - F.ceil(F.lit(threshold) * F.col("n_tok")) + 1
    return ranked.where(F.col("rank") <= prefix_len).select("rec_id", "tok", "n_tok")


def prefix_filter_candidates(
    df_a: DataFrame,
    df_b: DataFrame,
    tokens_col: Column,
    *,
    threshold: float,
    id_col: str = "rec_id",
) -> DataFrame:
    """PPJoin-style candidate generation for a Jaccard threshold.

    Tokens are globally ordered by ascending corpus frequency (rarest first);
    two sets with Jaccard ≥ t must share a token within their prefixes, so
    joining on prefix tokens is lossless. Returns distinct
    ``(rec_id_a, rec_id_b)``.
    """
    if not 0.0 < threshold <= 1.0:
        raise ValueError(f"threshold must be in (0,1], got {threshold}")
    corpus = df_a.select(F.explode(tokens_col).alias("tok")).unionByName(
        df_b.select(F.explode(tokens_col).alias("tok"))
    )
    order = corpus.groupBy("tok").agg(F.count("*").alias("freq"))
    pa = _prefix_tokens(df_a, tokens_col, order, threshold=threshold, id_col=id_col)
    pb = _prefix_tokens(df_b, tokens_col, order, threshold=threshold, id_col=id_col)
    pairs = (
        pa.select(F.col("rec_id").alias("rec_id_a"), "tok", F.col("n_tok").alias("n_a"))
        .join(pb.select(F.col("rec_id").alias("rec_id_b"), "tok", F.col("n_tok").alias("n_b")), "tok")
        .select("rec_id_a", "rec_id_b", "n_a", "n_b")
        .distinct()
    )
    # Length filter composes for free: sizes already travel with the pair.
    return length_filter(pairs, n_a="n_a", n_b="n_b", threshold=threshold, measure="jaccard").select(
        "rec_id_a", "rec_id_b"
    )

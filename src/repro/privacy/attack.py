"""Frequency-alignment re-identification attack (T7).

The canonical attack on deterministic PPRL encodings: an adversary (e.g. the
linkage unit) holding (a) the encoded values of one database and (b) a public
plaintext register with a similar value distribution ranks both sides by
frequency and aligns rank-for-rank — the most frequent ciphertext is guessed
to be the most frequent name, and so on. Name frequencies are heavy-tailed
(Zipf), so exact-hash encodings of single fields leak badly; encodings whose
value space is per-record-unique (record-level CLK, BLIP) break the
alignment.

All computation is DataFrame joins; ground truth enters only in scoring.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


@dataclass(frozen=True)
class AttackResult:
    """Re-identification rates of a frequency-alignment attack."""

    n_records: int
    reid_rate: float  # guessed value exactly correct (rank-aligned)
    reid_rate_top5: float  # true value within ±5 ranks of the aligned guess
    n_distinct_encodings: int


def _freq_ranked(df: DataFrame, col: str, out_rank: str) -> DataFrame:
    counts = df.groupBy(col).agg(F.count("*").alias("_freq"))
    w = Window.orderBy(F.col("_freq").desc(), F.col(col))
    return counts.withColumn(out_rank, F.row_number().over(w))


def frequency_attack(
    encoded: DataFrame,
    enc_col: str,
    register: DataFrame,
    reg_col: str,
    truth: DataFrame,
    truth_col: str,
    *,
    id_col: str = "rec_id",
) -> AttackResult:
    """Run the attack and score it.

    ``encoded``: ``(id_col, enc_col)`` — what the adversary sees.
    ``register``: plaintext values with realistic frequencies (one row per
    person in the public register).
    ``truth``: ``(id_col, truth_col)`` — actual plaintext behind each
    encoding (scoring only).
    """
    enc_ranks = _freq_ranked(encoded, enc_col, "_enc_rank")
    reg_ranks = _freq_ranked(register, reg_col, "_reg_rank")

    guesses = (
        encoded.join(enc_ranks.select(enc_col, "_enc_rank"), enc_col)
        .join(
            reg_ranks.select(F.col(reg_col).alias("_guess"), F.col("_reg_rank").alias("_enc_rank")),
            "_enc_rank",
            "left",
        )
        .select(id_col, "_enc_rank", "_guess")
    )
    scored = (
        guesses.join(truth.select(id_col, F.col(truth_col).alias("_true")), id_col)
        .join(
            reg_ranks.select(F.col(reg_col).alias("_true"), F.col("_reg_rank").alias("_true_rank")),
            "_true",
            "left",
        )
        .select(
            (F.col("_guess") == F.col("_true")).cast("int").alias("hit1"),
            F.when(
                F.col("_true_rank").isNotNull(),
                (F.abs(F.col("_true_rank") - F.col("_enc_rank")) <= 5).cast("int"),
            ).otherwise(F.lit(0)).alias("hit5"),
        )
        .agg(
            F.count("*").alias("n"),
            F.avg("hit1").alias("r1"),
            F.avg("hit5").alias("r5"),
        )
        .collect()[0]
    )
    n_distinct = encoded.select(enc_col).distinct().count()
    return AttackResult(
        n_records=scored["n"],
        reid_rate=float(scored["r1"] or 0.0),
        reid_rate_top5=float(scored["r5"] or 0.0),
        n_distinct_encodings=n_distinct,
    )


def bf_pattern_col(bf_col) -> F.Column:
    """Canonical string form of a Bloom filter — the 'value' a LU observes.

    Deterministic encodings map equal token sets to equal patterns, so
    frequency attacks apply to BF patterns exactly as to hashes.
    """
    return F.concat_ws(",", F.transform(bf_col, lambda x: x.cast("string")))

"""Canonical blocking-key representation.

Every blocking method in this package reduces to the same shape: a *keys
DataFrame* ``(rec_id, band, key)`` per database — one row per (record,
blocking key) — and candidate generation is an equi-join of the two sides on
``(band, key)``. ``band`` separates independent key families (LSH tables,
multiple standard keys) so keys from different families never collide.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

KEY_SCHEMA = ("rec_id", "band", "key")


def standard_keys(
    df: DataFrame,
    key_exprs: list[Column],
    *,
    id_col: str = "rec_id",
) -> DataFrame:
    """Keys frame from one-value-per-record key expressions.

    Each expression becomes its own band; NULL/empty keys are dropped (a
    record with a missing blocking value simply generates no candidates from
    that key — the classic missed-match failure mode of standard blocking).
    """
    if not key_exprs:
        raise ValueError("key_exprs must not be empty")
    parts = []
    for i, e in enumerate(key_exprs):
        k = e.cast("string")
        parts.append(
            df.select(
                F.col(id_col).alias("rec_id"),
                F.lit(i).alias("band"),
                F.xxhash64(F.lit(i), k).alias("key"),
            ).where(k.isNotNull() & (F.length(k) > 0))
        )
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out


def candidates_from_keys(
    keys_a: DataFrame,
    keys_b: DataFrame,
    *,
    max_block_pairs: int | None = None,
    cbs_min: int = 1,
) -> DataFrame:
    """Candidate pairs ``(rec_id_a, rec_id_b)`` from two keys frames.

    ``max_block_pairs``: block purging (meta-blocking) — drop any ``(band,
    key)`` block whose cross product ``|A_block|*|B_block|`` exceeds the cap
    before materializing its pairs. Oversized blocks are where blocking
    degenerates to the cartesian product (stop-word keys, empty-ish values).

    ``cbs_min``: common-block-scheme pruning — keep only pairs co-occurring
    in at least this many blocks (CBS weighting, the standard meta-blocking
    edge weight). ``cbs_min=1`` keeps everything.
    """
    a = keys_a.select(F.col("rec_id").alias("rec_id_a"), "band", "key")
    b = keys_b.select(F.col("rec_id").alias("rec_id_b"), "band", "key")
    if max_block_pairs is not None:
        sizes_a = a.groupBy("band", "key").agg(F.count("*").alias("_na"))
        sizes_b = b.groupBy("band", "key").agg(F.count("*").alias("_nb"))
        keep = (
            sizes_a.join(sizes_b, ["band", "key"])
            .where(F.col("_na") * F.col("_nb") <= max_block_pairs)
            .select("band", "key")
        )
        a = a.join(keep, ["band", "key"])
        b = b.join(keep, ["band", "key"])
    pairs = a.join(b, ["band", "key"]).select("rec_id_a", "rec_id_b", "band", "key")
    if cbs_min > 1:
        return (
            pairs.groupBy("rec_id_a", "rec_id_b")
            .agg(F.count("*").alias("cbs"))
            .where(F.col("cbs") >= cbs_min)
            .select("rec_id_a", "rec_id_b")
        )
    return pairs.select("rec_id_a", "rec_id_b").distinct()

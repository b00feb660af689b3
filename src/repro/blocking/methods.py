"""Candidate-generation methods (T2): cartesian, standard, LSH, sorted-neighbourhood.

All methods return a candidate-pair DataFrame ``(rec_id_a, rec_id_b)``; the
comparison step runs only on these pairs. Methods never look at ground truth.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame, Window
from pyspark.sql import functions as F

from repro.blocking.keys import candidates_from_keys, standard_keys
from repro.encoding.hlsh import hlsh_keys
from repro.encoding.minhash import band_keys, minhash_signatures


def cartesian_candidates(df_a: DataFrame, df_b: DataFrame, *, id_col: str = "rec_id") -> DataFrame:
    """All |A|·|B| pairs — the no-blocking baseline (quadratic)."""
    return df_a.select(F.col(id_col).alias("rec_id_a")).crossJoin(
        df_b.select(F.col(id_col).alias("rec_id_b"))
    )


def standard_blocking(
    df_a: DataFrame,
    df_b: DataFrame,
    key_exprs_a: list[Column],
    key_exprs_b: list[Column],
    *,
    id_col: str = "rec_id",
    max_block_pairs: int | None = None,
) -> DataFrame:
    """Equi-join on deterministic blocking keys (e.g. Soundex of last name)."""
    ka = standard_keys(df_a, key_exprs_a, id_col=id_col)
    kb = standard_keys(df_b, key_exprs_b, id_col=id_col)
    return candidates_from_keys(ka, kb, max_block_pairs=max_block_pairs)


def minhash_lsh_candidates(
    df_a: DataFrame,
    df_b: DataFrame,
    tokens_col: Column,
    *,
    id_col: str = "rec_id",
    num_hashes: int = 24,
    bands: int = 8,
    rows: int = 3,
    seed: int = 7,
    max_block_pairs: int | None = None,
) -> DataFrame:
    """MinHash-LSH blocking over a token-set expression (same expr both sides)."""
    ka = band_keys(
        minhash_signatures(df_a, tokens_col, id_col=id_col, num_hashes=num_hashes, seed=seed),
        id_col=id_col, bands=bands, rows=rows,
    )
    kb = band_keys(
        minhash_signatures(df_b, tokens_col, id_col=id_col, num_hashes=num_hashes, seed=seed),
        id_col=id_col, bands=bands, rows=rows,
    )
    return candidates_from_keys(ka, kb, max_block_pairs=max_block_pairs)


def hamming_lsh_candidates(
    df_a: DataFrame,
    df_b: DataFrame,
    bf_col: str,
    *,
    l: int,
    id_col: str = "rec_id",
    mu: int = 16,
    beta: int = 30,
    seed: int = 11,
    max_block_pairs: int | None = None,
) -> DataFrame:
    """Hamming-LSH blocking over Bloom-filter columns (encoded-side blocking)."""
    ka = hlsh_keys(df_a, bf_col, l=l, mu=mu, beta=beta, seed=seed, id_col=id_col)
    kb = hlsh_keys(df_b, bf_col, l=l, mu=mu, beta=beta, seed=seed, id_col=id_col)
    return candidates_from_keys(ka, kb, max_block_pairs=max_block_pairs)


def sorted_neighbourhood_candidates(
    df_a: DataFrame,
    df_b: DataFrame,
    key_expr_a: Column,
    key_expr_b: Column,
    *,
    window: int = 5,
    id_col: str = "rec_id",
) -> DataFrame:
    """Sorted-neighbourhood over a sortable (encoded) key.

    Both sides are merged, sorted by key, and records of opposite sides
    within ``window`` positions become candidates. The global sort uses an
    unpartitioned window — acceptable at reproduction scale (≤ ~10^5 rows),
    noted in DESIGN.md; the neighbourhood join itself is a bucketed
    equi-join, not a range join.
    """
    if window < 1:
        raise ValueError(f"window must be >= 1, got {window}")
    u = df_a.select(F.col(id_col).alias("rid"), F.lit("a").alias("src"), key_expr_a.cast("string").alias("k")).unionByName(
        df_b.select(F.col(id_col).alias("rid"), F.lit("b").alias("src"), key_expr_b.cast("string").alias("k"))
    )
    rn = F.row_number().over(Window.orderBy("k", "src", "rid"))
    seq = u.withColumn("rn", rn).withColumn("bucket", ((F.col("rn") - 1) / F.lit(window)).cast("long"))
    a = seq.where(F.col("src") == "a").select(F.col("rid").alias("rec_id_a"), F.col("rn").alias("rn_a"), F.col("bucket").alias("b_a"))
    b = seq.where(F.col("src") == "b").select(F.col("rid").alias("rec_id_b"), F.col("rn").alias("rn_b"), F.col("bucket").alias("b_b"))
    # A bucket plus its two neighbours covers every pair within `window`.
    b3 = b.withColumn("b_b", F.explode(F.array(F.col("b_b") - 1, F.col("b_b"), F.col("b_b") + 1)))
    return (
        a.join(b3, a["b_a"] == b3["b_b"])
        .where(F.abs(F.col("rn_a") - F.col("rn_b")) < window)
        .select("rec_id_a", "rec_id_b")
        .distinct()
    )

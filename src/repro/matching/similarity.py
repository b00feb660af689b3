"""Similarity functions over token arrays / Bloom-filter position arrays.

The position-array representation makes every set-based similarity a native
Catalyst expression (``array_intersect`` + ``size``), shared between
plaintext q-gram arrays (``array<string>``) and Bloom filters
(``array<int>``). Jaro-Winkler (character-based, for the unencoded baseline)
is the one pandas UDF.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import DoubleType


def intersect_size(a: Column, b: Column) -> Column:
    return F.size(F.array_intersect(a, b))


def dice_sim(a: Column, b: Column) -> Column:
    """Dice coefficient ``2c/(|a|+|b|)``; 0 when both sets are empty."""
    denom = F.size(a) + F.size(b)
    return F.when(denom > 0, 2.0 * intersect_size(a, b) / denom).otherwise(F.lit(0.0))


def jaccard_sim(a: Column, b: Column) -> Column:
    """Jaccard coefficient ``c/(|a|+|b|-c)``; 0 when both sets are empty."""
    c = intersect_size(a, b)
    denom = F.size(a) + F.size(b) - c
    return F.when(denom > 0, c / denom).otherwise(F.lit(0.0))


def overlap_sim(a: Column, b: Column) -> Column:
    """Overlap coefficient ``c/min(|a|,|b|)``; 0 when either set is empty."""
    denom = F.least(F.size(a), F.size(b))
    return F.when(denom > 0, intersect_size(a, b) / denom).otherwise(F.lit(0.0))


def hamming_dist(a: Column, b: Column) -> Column:
    """Hamming distance between two position-array bit vectors: ``|a|+|b|-2c``."""
    return F.size(a) + F.size(b) - 2 * intersect_size(a, b)


def jaro_winkler_py(s1: str, s2: str, *, prefix_scale: float = 0.1) -> float:
    """Jaro-Winkler similarity (pure Python reference; plaintext baseline)."""
    s1, s2 = s1 or "", s2 or ""
    if s1 == s2:
        return 1.0
    n1, n2 = len(s1), len(s2)
    if n1 == 0 or n2 == 0:
        return 0.0
    match_dist = max(n1, n2) // 2 - 1
    flags1 = [False] * n1
    flags2 = [False] * n2
    m = 0
    for i, ch in enumerate(s1):
        lo, hi = max(0, i - match_dist), min(n2, i + match_dist + 1)
        for j in range(lo, hi):
            if not flags2[j] and s2[j] == ch:
                flags1[i] = flags2[j] = True
                m += 1
                break
    if m == 0:
        return 0.0
    t = 0
    j = 0
    for i in range(n1):
        if flags1[i]:
            while not flags2[j]:
                j += 1
            if s1[i] != s2[j]:
                t += 1
            j += 1
    jaro = (m / n1 + m / n2 + (m - t / 2) / m) / 3.0
    prefix = 0
    for a, b in zip(s1[:4], s2[:4]):
        if a != b:
            break
        prefix += 1
    return jaro + prefix * prefix_scale * (1 - jaro)


@pandas_udf(DoubleType())
def _jw_udf(a: pd.Series, b: pd.Series) -> pd.Series:
    return pd.Series([jaro_winkler_py(x, y) for x, y in zip(a, b)])


def jaro_winkler(a: Column, b: Column) -> Column:
    """Jaro-Winkler as a Spark column (pandas UDF) — unencoded-baseline only."""
    return _jw_udf(a, b)


def attach_pair_columns(
    candidates: DataFrame,
    df_a: DataFrame,
    df_b: DataFrame,
    cols: list[str],
    *,
    id_col: str = "rec_id",
) -> DataFrame:
    """Join each side's ``cols`` onto candidate pairs as ``{col}_a`` / ``{col}_b``."""
    a = df_a.select(F.col(id_col).alias("rec_id_a"), *[F.col(c).alias(f"{c}_a") for c in cols])
    b = df_b.select(F.col(id_col).alias("rec_id_b"), *[F.col(c).alias(f"{c}_b") for c in cols])
    return candidates.join(a, "rec_id_a").join(b, "rec_id_b")

"""MinHash signatures + LSH banding over token sets (plaintext-side LSH).

Used for *blocking*: two records whose q-gram sets have Jaccard similarity
``s`` share at least one band key with probability ``1-(1-s^r)^b`` (b bands
of r rows). Signatures are computed natively: explode tokens once, hash with
``xxhash64``, and take ``num_hashes`` column-wise minima of independent
affine permutations mod a 31-bit prime — one shuffle, no UDFs.

Privacy note: minhash values are keyed by ``seed`` the way BF hashing is
keyed by salt; parties exchange only band-key hashes, never tokens.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

_P = 2_147_483_647  # 2^31 - 1, Mersenne prime; a*h+b stays within int64


def _perms(num_hashes: int, seed: int) -> tuple[np.ndarray, np.ndarray]:
    rng = np.random.default_rng(seed)
    a = rng.integers(1, _P, num_hashes, dtype=np.int64)
    b = rng.integers(0, _P, num_hashes, dtype=np.int64)
    return a, b


def minhash_signatures(
    df: DataFrame,
    tokens_col: Column,
    *,
    id_col: str = "rec_id",
    num_hashes: int = 24,
    seed: int = 7,
) -> DataFrame:
    """One row per record: ``id_col`` + ``mh_0..mh_{num_hashes-1}``.

    Records with empty token sets get the sentinel ``_P`` in every slot (they
    collide only with other empty records).
    """
    if num_hashes < 1:
        raise ValueError(f"num_hashes must be >= 1, got {num_hashes}")
    a, b = _perms(num_hashes, seed)
    ex = df.select(id_col, F.explode_outer(tokens_col).alias("_tok"))
    th = F.pmod(F.xxhash64(F.lit(seed), F.col("_tok")), F.lit(_P))
    aggs = [
        F.min(
            F.when(F.col("_tok").isNull(), F.lit(int(_P))).otherwise(
                F.pmod(F.lit(int(a[j])) * th + F.lit(int(b[j])), F.lit(_P))
            )
        ).alias(f"mh_{j}")
        for j in range(num_hashes)
    ]
    return ex.groupBy(id_col).agg(*aggs)


def band_keys(
    sig_df: DataFrame,
    *,
    id_col: str = "rec_id",
    bands: int = 8,
    rows: int = 3,
) -> DataFrame:
    """Explode signatures into ``(id_col, band, key)`` — one row per band.

    ``key`` is a 64-bit hash of the band's ``rows`` signature values, so two
    records share a blocking key iff a whole band agrees.
    """
    n_sig = len([c for c in sig_df.columns if c.startswith("mh_")])
    if bands * rows > n_sig:
        raise ValueError(f"bands*rows={bands*rows} exceeds available signatures ({n_sig})")
    parts = []
    for i in range(bands):
        cols = [F.col(f"mh_{i * rows + j}") for j in range(rows)]
        parts.append(
            sig_df.select(
                id_col,
                F.lit(i).alias("band"),
                F.xxhash64(F.lit(i), *cols).alias("key"),
            )
        )
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out


def lsh_collision_probability(s: float, *, bands: int, rows: int) -> float:
    """Theoretical P(≥1 shared band) for Jaccard similarity ``s`` — the S-curve."""
    return 1.0 - (1.0 - s**rows) ** bands

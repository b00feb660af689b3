"""Hamming-LSH key extraction over Bloom filters (Karapiperis & Verykios).

Each of ``mu`` keys samples ``beta`` fixed bit positions of the ``l``-bit
filter; the key value is a hash of the record's projection onto those
positions. Two filters at Hamming distance ``d`` agree on one key with
probability ``(1-d/l)^beta`` and on ≥1 of ``mu`` keys with probability
``1-(1-(1-d/l)^beta)^mu`` — the Hamming-space S-curve.

With the position-array representation the projection is just
``array_intersect(bf, sampled_positions)``: sampled positions absent from the
intersection are 0-bits, so the intersection fully determines the projected
bit vector. ``xxhash64`` accepts array columns, so each key is two native
expressions — no UDFs.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F


def sample_positions(*, l: int, mu: int, beta: int, seed: int) -> list[list[int]]:
    """``mu`` sorted samples of ``beta`` distinct positions from ``range(l)``."""
    if beta > l:
        raise ValueError(f"beta={beta} exceeds filter length l={l}")
    rng = np.random.default_rng(seed)
    return [sorted(rng.choice(l, size=beta, replace=False).tolist()) for _ in range(mu)]


def hlsh_keys(
    df: DataFrame,
    bf_col: str,
    *,
    l: int,
    mu: int = 16,
    beta: int = 30,
    seed: int = 11,
    id_col: str = "rec_id",
) -> DataFrame:
    """``(id_col, band, key)`` — one row per record per HLSH table."""
    samples = sample_positions(l=l, mu=mu, beta=beta, seed=seed)
    parts = []
    for i, pos in enumerate(samples):
        proj = F.array_intersect(F.col(bf_col), F.array(*[F.lit(p) for p in pos]))
        parts.append(
            df.select(id_col, F.lit(i).alias("band"), F.xxhash64(F.lit(i), proj).alias("key"))
        )
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out


def hlsh_collision_probability(d: int, *, l: int, mu: int, beta: int) -> float:
    """Theoretical P(≥1 shared key) at Hamming distance ``d``."""
    p_one = (1.0 - d / l) ** beta
    return 1.0 - (1.0 - p_one) ** mu

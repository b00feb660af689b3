"""BLIP hardening — per-bit randomized response over Bloom filters.

BLIP (Alaggan et al.) flips every bit of the encoding independently with
probability ``f``, giving ε-differential privacy *per bit* with
``ε = ln((1-f)/f)``, i.e. ``f = 1/(1+e^ε)``. Flipping noise breaks the
bit-frequency alignment that frequency/cryptanalysis attacks rely on (T7) at
the cost of similarity distortion, hence linkage quality — the
privacy–utility dial of the *yet-to-come* generation.

The flip mask is derived deterministically from ``(seed, rec_id)`` so runs
are reproducible; per record, bits are flipped by symmetric difference on the
position-array representation.
"""
from __future__ import annotations

import math
import zlib

import numpy as np
import pandas as pd
from pyspark.sql import Column, DataFrame
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import ArrayType, IntegerType


def flip_probability(epsilon: float) -> float:
    """Per-bit flip probability achieving per-bit ε-DP."""
    if epsilon <= 0:
        raise ValueError(f"epsilon must be positive, got {epsilon}")
    return 1.0 / (1.0 + math.exp(epsilon))


def blip_positions(positions: list[int], *, l: int, f: float, rng: np.random.Generator) -> list[int]:
    """Pure-Python reference: symmetric-difference flip of an l-bit filter."""
    flips = np.flatnonzero(rng.random(l) < f)
    cur = set(positions)
    return sorted(cur.symmetric_difference(flips.tolist()))


def blip(
    df: DataFrame,
    bf_col: str,
    *,
    l: int,
    epsilon: float,
    seed: int = 0,
    id_col: str = "rec_id",
    out: str | None = None,
) -> DataFrame:
    """Attach a BLIPed copy of ``bf_col`` (default: in place)."""
    f = flip_probability(epsilon)
    out = out or bf_col

    @pandas_udf(ArrayType(IntegerType()))
    def _blip(rec_id: pd.Series, bf: pd.Series) -> pd.Series:
        def one(rid, positions):
            # crc32 (not hash()) — stable across processes/executors.
            rng = np.random.default_rng([seed, zlib.crc32(str(rid).encode())])
            pos = [] if positions is None else [int(p) for p in positions]
            return blip_positions(pos, l=l, f=f, rng=rng)

        return pd.Series([one(r, p) for r, p in zip(rec_id, bf)])

    from pyspark.sql import functions as F

    return df.withColumn(out, _blip(F.col(id_col), F.col(bf_col))).withColumn(
        f"{out}_n", F.size(F.col(out))
    )


def expected_dice_after_blip(dice: float, *, fill: float, f: float) -> float:
    """Expected Dice after BLIPing both filters (exact in expectation).

    For two filters of fill fraction ``φ = popcount/l`` with clean Dice ``d``
    (common-set fraction ``c/l = d·φ``), flipping each bit independently with
    probability ``f`` on both sides gives, per bit position:

    * set in both (``dφ``):       both survive w.p. ``(1-f)²``
    * set in exactly one (``2(φ-dφ)``): other side flips on w.p. ``(1-f)f``
    * clear in both (``1-2φ+dφ``): both flip on w.p. ``f²``

    so ``E[c']/l`` is the weighted sum and ``E[m']/l = φ(1-f) + (1-φ)f``; the
    expected Dice is their ratio. Reduces to ``d`` at ``f=0``. Used to
    calibrate a clean-Dice threshold onto hardened filters (T7).
    """
    phi = fill
    c = dice * phi
    c_new = c * (1 - f) ** 2 + 2 * (phi - c) * (1 - f) * f + (1 - 2 * phi + c) * f * f
    m_new = phi * (1 - f) + (1 - phi) * f
    return min(1.0, c_new / max(m_new, 1e-12))

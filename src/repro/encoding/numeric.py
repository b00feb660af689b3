"""Neighbourhood encoding of numeric QIDs (Vatsalan & Christen, JBI 2016).

A numeric value ``v`` is expanded into the token set
``{prefix + str(i*step) : i*step ∈ [v-radius, v+radius]}``. Two values at
absolute distance ``d ≤ 2*radius`` then share ``≈ (2*radius - d)/step + 1``
tokens, so Dice over the token sets degrades linearly in ``d`` — approximate
*numeric* matching through the same Bloom-filter machinery used for strings.
Pure Catalyst (sequence/transform).
"""
from __future__ import annotations

from pyspark.sql import Column
from pyspark.sql import functions as F


def neighbourhood_tokens(col: Column, *, radius: float, step: float, prefix: str = "num") -> Column:
    """Token array for numeric column ``col`` (empty array for NULL)."""
    if radius <= 0 or step <= 0:
        raise ValueError(f"radius and step must be positive, got radius={radius}, step={step}")
    lo = F.ceil((col - F.lit(radius)) / F.lit(step)).cast("long")
    hi = F.floor((col + F.lit(radius)) / F.lit(step)).cast("long")
    # float(step) keeps the token text identical whether callers pass int or
    # float parameters — both sides of a linkage must tokenize identically.
    toks = F.transform(
        F.sequence(lo, hi),
        lambda i: F.concat(
            F.lit(prefix + ":"), (i * F.lit(float(step))).cast("double").cast("string")
        ),
    )
    return F.when(col.isNotNull(), toks).otherwise(F.expr("CAST(array() AS array<string>)"))


def expected_dice(d: float, *, radius: float, step: float) -> float:
    """Analytic Dice similarity of two neighbourhoods at distance ``d``.

    Each neighbourhood has ``m = 2*radius/step + 1`` grid tokens (up to
    rounding); the overlap shrinks by one token per ``step`` of distance.
    """
    m = int(2 * radius / step) + 1
    c = max(0, m - round(d / step))
    return 2.0 * c / (2 * m)

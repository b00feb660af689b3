"""q-gram tokenization as native Catalyst expressions.

q-grams (length-``q`` substrings) are the token universe for both plaintext
Dice similarity and Bloom-filter encoding. Everything here is pure column
expressions — no UDFs — so tokenization runs inside Catalyst.
"""
from __future__ import annotations

from pyspark.sql import Column
from pyspark.sql import functions as F

PAD_CHAR = "#"


def normalize(col: Column) -> Column:
    """Lower-case, trimmed view of a QID value (the canonical pre-encoding form)."""
    return F.lower(F.trim(col))


def qgrams(col: Column, *, q: int = 2, pad: bool = True, distinct: bool = True) -> Column:
    """Array of q-grams of ``col`` (normalized first).

    With ``pad`` the value is wrapped in ``q-1`` pad characters on each side,
    so boundary characters get full weight (standard in PPRL encodings).
    Values shorter than ``q`` after padding yield an empty array, as do
    NULLs/empty strings.
    """
    if q < 1:
        raise ValueError(f"q must be >= 1, got {q}")
    s = normalize(col)
    if pad:
        p = F.lit(PAD_CHAR * (q - 1))
        s = F.when(F.length(s) > 0, F.concat(p, s, p)).otherwise(F.lit(""))
    n = F.length(s)
    grams = F.when(
        n >= q,
        F.transform(F.sequence(F.lit(1), n - q + 1), lambda i: F.substring(s, i, q)),
    ).otherwise(F.expr("CAST(array() AS array<string>)"))
    return F.array_distinct(grams) if distinct else grams


def tagged_qgrams(col: Column, tag: str, *, q: int = 2, pad: bool = True) -> Column:
    """q-grams prefixed with a field tag (``"fn:wi"``).

    Tagging keeps tokens from different fields apart inside a record-level
    CLK, so a first name cannot collide with a city on equal substrings.
    """
    return F.transform(qgrams(col, q=q, pad=pad), lambda t: F.concat(F.lit(tag + ":"), t))


def record_tokens(fields: dict[str, Column], *, q: int = 2, pad: bool = True) -> Column:
    """Union of tagged q-grams over ``fields`` (tag -> column) — CLK token set."""
    if not fields:
        raise ValueError("fields must not be empty")
    arrs = [tagged_qgrams(c, tag, q=q, pad=pad) for tag, c in fields.items()]
    out = arrs[0]
    for a in arrs[1:]:
        out = F.concat(out, a)
    return F.array_distinct(out)

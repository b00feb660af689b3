"""Shared test utilities: pure-Python references the Spark code must agree with."""
from __future__ import annotations

PAD = "#"


def ref_qgrams(s: str | None, q: int = 2, pad: bool = True, distinct: bool = True) -> list[str]:
    """Reference q-gram tokenizer matching ``repro.encoding.qgrams.qgrams``."""
    s = (s or "").strip().lower()
    if pad and s:
        s = PAD * (q - 1) + s + PAD * (q - 1)
    grams = [s[i : i + q] for i in range(len(s) - q + 1)] if len(s) >= q else []
    if distinct:
        seen: dict[str, None] = {}
        for g in grams:
            seen.setdefault(g)
        return list(seen)
    return grams


def ref_dice(a: set, b: set) -> float:
    """Reference Dice coefficient over sets."""
    if not a and not b:
        return 0.0
    return 2.0 * len(a & b) / (len(a) + len(b))


def ref_jaccard(a: set, b: set) -> float:
    if not a and not b:
        return 0.0
    return len(a & b) / len(a | b)

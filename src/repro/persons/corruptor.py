"""GeCo-style record corruptor.

Applies realistic data-entry errors to person records so that the two
databases being linked disagree on QID values the way real registries do.
Error mix (weights follow the GeCo defaults, Tran et al. CIKM'13):

* character edits — insert / delete / substitute / transpose
* keyboard-adjacency substitutions (fat-finger)
* OCR confusions (``o``→``0``, ``m``→``rn``, …)
* date errors — day/month swap, single-digit typo
* field-level — value set to empty (missingness), first/last name swap

All corruption is deterministic in the supplied ``seed``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

_ALPHABET = "abcdefghijklmnopqrstuvwxyz"

_KEYBOARD_ADJ = {
    "a": "sq", "b": "vn", "c": "xv", "d": "sf", "e": "wr", "f": "dg",
    "g": "fh", "h": "gj", "i": "uo", "j": "hk", "k": "jl", "l": "k",
    "m": "n", "n": "bm", "o": "ip", "p": "o", "q": "wa", "r": "et",
    "s": "ad", "t": "ry", "u": "yi", "v": "cb", "w": "qe", "x": "zc",
    "y": "tu", "z": "x",
}

_OCR_MAP = {"o": "0", "l": "1", "s": "5", "b": "8", "g": "9", "m": "rn", "w": "vv", "d": "cl"}


def _edit_insert(s: str, rng: np.random.Generator) -> str:
    i = int(rng.integers(0, len(s) + 1))
    return s[:i] + _ALPHABET[int(rng.integers(0, 26))] + s[i:]


def _edit_delete(s: str, rng: np.random.Generator) -> str:
    if len(s) <= 1:
        return s
    i = int(rng.integers(0, len(s)))
    return s[:i] + s[i + 1 :]


def _edit_substitute(s: str, rng: np.random.Generator) -> str:
    if not s:
        return s
    i = int(rng.integers(0, len(s)))
    c = _ALPHABET[int(rng.integers(0, 26))]
    return s[:i] + c + s[i + 1 :]


def _edit_transpose(s: str, rng: np.random.Generator) -> str:
    if len(s) < 2:
        return s
    i = int(rng.integers(0, len(s) - 1))
    return s[:i] + s[i + 1] + s[i] + s[i + 2 :]


def _edit_keyboard(s: str, rng: np.random.Generator) -> str:
    idxs = [i for i, ch in enumerate(s) if ch in _KEYBOARD_ADJ]
    if not idxs:
        return _edit_substitute(s, rng)
    i = idxs[int(rng.integers(0, len(idxs)))]
    adj = _KEYBOARD_ADJ[s[i]]
    return s[:i] + adj[int(rng.integers(0, len(adj)))] + s[i + 1 :]


def _edit_ocr(s: str, rng: np.random.Generator) -> str:
    idxs = [i for i, ch in enumerate(s) if ch in _OCR_MAP]
    if not idxs:
        return _edit_substitute(s, rng)
    i = idxs[int(rng.integers(0, len(idxs)))]
    return s[:i] + _OCR_MAP[s[i]] + s[i + 1 :]


_STRING_OPS = [_edit_insert, _edit_delete, _edit_substitute, _edit_transpose, _edit_keyboard, _edit_ocr]
_STRING_OP_WEIGHTS = np.array([0.15, 0.15, 0.25, 0.15, 0.20, 0.10])


def corrupt_string(s: str, rng: np.random.Generator) -> str:
    """Apply one randomly chosen character-level error to ``s``."""
    op = _STRING_OPS[int(rng.choice(len(_STRING_OPS), p=_STRING_OP_WEIGHTS))]
    return op(s, rng)


def corrupt_dob(dob: str, rng: np.random.Generator) -> str:
    """Day/month swap (when valid) or a single-digit typo on a yyyy-mm-dd date."""
    y, m, d = dob.split("-")
    if int(d) <= 12 and rng.random() < 0.5 and d != m:
        return f"{y}-{d}-{m}"
    digits = y + m + d
    i = int(rng.integers(0, len(digits)))
    new = str(int(rng.integers(0, 10)))
    digits = digits[:i] + new + digits[i + 1 :]
    return f"{digits[:4]}-{digits[4:6]}-{digits[6:8]}"


#: Per-record corruption: which field is hit, with what probability mass.
_FIELD_WEIGHTS = {
    "first_name": 0.30,
    "last_name": 0.30,
    "dob": 0.15,
    "city": 0.15,
    "_swap_names": 0.05,
    "_missing": 0.05,
}


def corrupt_records(
    records: pd.DataFrame,
    *,
    corruption_rate: float,
    seed: int,
    max_mods: int = 2,
    group_rate_multiplier: dict[str, float] | None = None,
) -> pd.DataFrame:
    """Return a corrupted copy of ``records``.

    Each record is selected for corruption with probability
    ``corruption_rate``; a selected record receives 1..``max_mods``
    independent modifications (field chosen by ``_FIELD_WEIGHTS``).
    ``records`` must carry the generator schema. Deterministic in ``seed``.

    ``group_rate_multiplier`` scales the per-record rate by the record's
    ``group`` value (clipped to 1). This models group-dependent name
    variability — e.g. transliterated names exhibit more spelling variants —
    the mechanism behind subgroup recall gaps in the fairness literature (T9).
    """
    if not 0.0 <= corruption_rate <= 1.0:
        raise ValueError(f"corruption_rate must be in [0,1], got {corruption_rate}")
    rng = np.random.default_rng(seed)
    out = records.copy(deep=True)
    fields = list(_FIELD_WEIGHTS)
    weights = np.array(list(_FIELD_WEIGHTS.values()))
    weights = weights / weights.sum()

    rates = np.full(len(out), corruption_rate)
    if group_rate_multiplier:
        mult = out["group"].map(lambda g: group_rate_multiplier.get(g, 1.0)).to_numpy()
        rates = np.clip(rates * mult, 0.0, 1.0)
    hit = rng.random(len(out)) < rates
    n_mods = rng.integers(1, max_mods + 1, len(out))
    for pos in np.flatnonzero(hit):
        row = out.index[pos]
        for _ in range(int(n_mods[pos])):
            f = fields[int(rng.choice(len(fields), p=weights))]
            if f == "_swap_names":
                fn, ln = out.at[row, "first_name"], out.at[row, "last_name"]
                out.at[row, "first_name"], out.at[row, "last_name"] = ln, fn
            elif f == "_missing":
                col = ["first_name", "last_name", "city"][int(rng.integers(0, 3))]
                out.at[row, col] = ""
            elif f == "dob":
                out.at[row, "dob"] = corrupt_dob(out.at[row, "dob"], rng)
            else:
                out.at[row, f] = corrupt_string(out.at[row, f], rng)
    return out

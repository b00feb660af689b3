"""Phonetic encodings — the *past* generation of PPRL blocking/matching keys.

Soundex wraps the Spark built-in; NYSIIS is implemented in Python (no
Catalyst primitive exists) and exposed as a pandas UDF. Phonetic codes are
used two ways historically: as the *match key itself* (hash-and-join, T1) and
as a *blocking key* (T2).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import StringType

from repro.encoding.qgrams import normalize

_VOWELS = set("aeiou")


def soundex(col: Column) -> Column:
    """American Soundex of a (normalized) string QID; empty input → empty code."""
    s = normalize(col)
    return F.when(F.length(s) > 0, F.soundex(s)).otherwise(F.lit(""))


def nysiis_py(name: str) -> str:
    """NYSIIS phonetic code of ``name`` (pure Python reference implementation).

    Follows the classic NYSIIS algorithm (New York State Identification and
    Intelligence System): prefix/suffix rewrites, then left-to-right
    consonant/vowel recoding, then trailing cleanup.
    """
    s = "".join(ch for ch in (name or "").lower() if ch.isalpha())
    if not s:
        return ""
    for pre, rep in (("mac", "mcc"), ("kn", "nn"), ("k", "c"), ("ph", "ff"), ("pf", "ff"), ("sch", "sss")):
        if s.startswith(pre):
            s = rep + s[len(pre):]
            break
    for suf, rep in (("ee", "y"), ("ie", "y"), ("dt", "d"), ("rt", "d"), ("rd", "d"), ("nt", "d"), ("nd", "d")):
        if s.endswith(suf):
            s = s[: -len(suf)] + rep
            break
    key = s[0]
    i = 1
    prev = s[0]
    while i < len(s):
        ch = s[i]
        if s[i : i + 2] == "ev":
            ch, skip = "af", 2
        elif ch in _VOWELS:
            ch, skip = "a", 1
        elif ch == "q":
            ch, skip = "g", 1
        elif ch == "z":
            ch, skip = "s", 1
        elif ch == "m":
            ch, skip = "n", 1
        elif s[i : i + 2] == "kn":
            ch, skip = "n", 2
        elif ch == "k":
            ch, skip = "c", 1
        elif s[i : i + 3] == "sch":
            ch, skip = "sss", 3
        elif s[i : i + 2] == "ph":
            ch, skip = "ff", 2
        elif ch == "h" and (prev not in _VOWELS or (i + 1 < len(s) and s[i + 1] not in _VOWELS)):
            ch, skip = prev, 1
        elif ch == "w" and prev in _VOWELS:
            ch, skip = prev, 1
        else:
            skip = 1
        for c in ch:  # append with adjacent-duplicate collapse, per char
            if c != key[-1]:
                key += c
        prev = ch[-1] if ch else prev
        i += skip
    if key.endswith("s") and len(key) > 1:
        key = key[:-1]
    if key.endswith("ay") and len(key) > 2:
        key = key[:-2] + "y"
    if key.endswith("a") and len(key) > 1:
        key = key[:-1]
    return key


@pandas_udf(StringType())
def _nysiis_udf(s: pd.Series) -> pd.Series:
    return s.map(lambda v: nysiis_py(v) if v is not None else "")


def nysiis(col: Column) -> Column:
    """NYSIIS phonetic code as a Spark column (pandas UDF)."""
    return _nysiis_udf(col)

"""Shared helpers for the T1–T9 experiment drivers."""
from __future__ import annotations

import time
from contextlib import contextmanager

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.blocking.keys import candidates_from_keys, standard_keys


@contextmanager
def timer():
    """``with timer() as t: ...; t()`` → elapsed seconds (callable after exit too)."""
    t0 = time.perf_counter()
    elapsed = {"s": 0.0}
    yield lambda: elapsed["s"] or (time.perf_counter() - t0)
    elapsed["s"] = time.perf_counter() - t0


def key_join_matches(df_a: DataFrame, df_b: DataFrame, key_expr_factory) -> DataFrame:
    """Exact-key linkage (hash-and-join): distinct pairs agreeing on any key.

    ``key_expr_factory(df)`` returns the list of key expressions for a side —
    the *past*-generation linkage rule (SLK, exact HMAC, phonetic keys).
    """
    ka = standard_keys(df_a, key_expr_factory(df_a))
    kb = standard_keys(df_b, key_expr_factory(df_b))
    return candidates_from_keys(ka, kb)


def to_markdown_table(pdf: pd.DataFrame, *, floatfmt: str = "{:.3f}") -> str:
    """Render a result frame as a GitHub-markdown table (no external deps)."""
    show = pdf.copy()
    for c in show.columns:
        if show[c].dtype.kind == "f":
            show[c] = show[c].map(lambda v: floatfmt.format(v) if pd.notna(v) else "—")
    cols = list(show.columns)
    lines = ["| " + " | ".join(cols) + " |", "|" + "|".join("---" for _ in cols) + "|"]
    for _, r in show.iterrows():
        lines.append("| " + " | ".join(str(r[c]) for c in cols) + " |")
    return "\n".join(lines)

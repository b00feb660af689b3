"""Bloom-filter (CLK) encoding — the *present*-generation PPRL workhorse.

A record's token set (tagged q-grams + numeric-neighbourhood tokens) is
hashed into an ``l``-bit Bloom filter with ``k`` hash functions per token
(double hashing, Kirsch–Mitzenmacher: ``h_j = h1 + j*h2 mod l``). The filter
is represented throughout as a **sorted array of set bit positions**
(``array<int>``), which makes downstream similarity pure Catalyst:
``Dice = 2*|array_intersect| / (size+size)`` — no UDF in the O(candidates)
hot path; the only UDF is this per-record encoder.

``salt`` keys the hash family (the DOs share it; the linkage unit does not),
which defeats dictionary attacks by outsiders; frequency attacks remain (T7).
"""
from __future__ import annotations

import hashlib

import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import ArrayType, IntegerType

DEFAULT_L = 1024
DEFAULT_K = 20


def _h2pair(token: str, salt: str) -> tuple[int, int]:
    d1 = hashlib.md5((salt + "\x01" + token).encode()).digest()
    d2 = hashlib.sha1((salt + "\x02" + token).encode()).digest()
    h1 = int.from_bytes(d1[:8], "big")
    h2 = int.from_bytes(d2[:8], "big") | 1  # odd ⇒ full-period stride for 2^m l
    return h1, h2


def bloom_positions(tokens: list[str], *, l: int = DEFAULT_L, k: int = DEFAULT_K, salt: str = "") -> list[int]:
    """Pure-Python reference encoder: sorted set-bit positions of the CLK."""
    pos: set[int] = set()
    for t in tokens or []:
        h1, h2 = _h2pair(t, salt)
        for j in range(k):
            pos.add((h1 + j * h2) % l)
    return sorted(pos)


def bloom_encode(tokens_col: Column, *, l: int = DEFAULT_L, k: int = DEFAULT_K, salt: str = "") -> Column:
    """Spark column: token array → sorted array of set bit positions."""
    if l <= 0 or k <= 0:
        raise ValueError(f"l and k must be positive, got l={l}, k={k}")

    @pandas_udf(ArrayType(IntegerType()))
    def _enc(tokens: pd.Series) -> pd.Series:
        cache: dict[str, list[int]] = {}

        def one(ts) -> list[int]:
            pos: set[int] = set()
            for t in ts if ts is not None else []:
                hits = cache.get(t)
                if hits is None:
                    h1, h2 = _h2pair(t, salt)
                    hits = [(h1 + j * h2) % l for j in range(k)]
                    cache[t] = hits
                pos.update(hits)
            return sorted(pos)

        return tokens.map(one)

    return _enc(tokens_col)


def bf_size(bf_col: Column) -> Column:
    """Popcount of a position-array Bloom filter."""
    return F.size(bf_col)


def with_clk(
    df,
    fields: dict[str, Column],
    *,
    q: int = 2,
    l: int = DEFAULT_L,
    k: int = DEFAULT_K,
    salt: str = "",
    extra_tokens: Column | None = None,
    out: str = "bf",
):
    """Attach a record-level CLK column ``out`` (and ``{out}_n`` popcount).

    ``fields`` maps field tag → string column; ``extra_tokens`` (e.g. numeric
    neighbourhood tokens) are unioned into the token set before hashing.
    """
    from repro.encoding.qgrams import record_tokens

    toks = record_tokens(fields, q=q)
    if extra_tokens is not None:
        toks = F.array_distinct(F.concat(toks, extra_tokens))
    df = df.withColumn(out, bloom_encode(toks, l=l, k=k, salt=salt))
    return df.withColumn(f"{out}_n", F.size(F.col(out)))

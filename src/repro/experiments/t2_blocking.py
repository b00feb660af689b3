"""T2 — blocking methods: candidates, reduction ratio, pairs completeness.

Compares the candidate sets produced by each blocking generation at fixed
corruption. ``cartesian`` is included only while ``n_a*n_b`` stays under a
cap (it exists to anchor RR=0 / PC=1).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.blocking.methods import (
    cartesian_candidates,
    hamming_lsh_candidates,
    minhash_lsh_candidates,
    sorted_neighbourhood_candidates,
    standard_blocking,
)
from repro.blocking.metrics import evaluate_blocking
from repro.encoding.phonetic import soundex
from repro.encoding.qgrams import record_tokens
from repro.evaluation.harness import QID_TAGS, PipelineConfig, encode_clk
from repro.experiments.common import timer
from repro.persons import database_pair

CARTESIAN_CAP = 25_000_000


def run(
    spark: SparkSession,
    *,
    n_entities: int = 1000,
    corruption: float = 0.3,
    seed: int = 0,
    sn_window: int = 10,
) -> pd.DataFrame:
    """Rows: (method, n_candidates, rr, pc, pq, secs)."""
    cfg = PipelineConfig()
    df_a, df_b, truth = database_pair(
        spark, n_entities=n_entities, overlap=0.5, corruption_rate=corruption, seed=seed
    )
    enc_a = encode_clk(df_a, cfg).cache()
    enc_b = encode_clk(df_b, cfg).cache()
    n_a, n_b = enc_a.count(), enc_b.count()
    truth = truth.cache()
    truth.count()

    fields = {tag: F.col(c) for tag, c in QID_TAGS.items()}
    sn_key = lambda df: F.concat(  # noqa: E731
        soundex(F.col("last_name")), soundex(F.col("first_name")), F.col("dob")
    )
    std_keys = lambda df: [  # noqa: E731
        soundex(F.col("last_name")),
        F.concat(soundex(F.col("first_name")), F.substring(F.col("dob"), 1, 4)),
    ]

    methods = {}
    if n_a * n_b <= CARTESIAN_CAP:
        methods["cartesian"] = lambda: cartesian_candidates(enc_a, enc_b)
    methods["standard_soundex"] = lambda: standard_blocking(
        enc_a, enc_b, std_keys(enc_a), std_keys(enc_b), max_block_pairs=cfg.max_block_pairs
    )
    methods["sorted_neighbourhood"] = lambda: sorted_neighbourhood_candidates(
        enc_a, enc_b, sn_key(enc_a), sn_key(enc_b), window=sn_window
    )
    methods["minhash_lsh"] = lambda: minhash_lsh_candidates(
        enc_a, enc_b, record_tokens(fields, q=cfg.q),
        num_hashes=cfg.num_hashes, bands=cfg.bands, rows=cfg.rows,
        seed=cfg.lsh_seed, max_block_pairs=cfg.max_block_pairs,
    )
    methods["hamming_lsh"] = lambda: hamming_lsh_candidates(
        enc_a, enc_b, "bf", l=cfg.l, mu=cfg.mu, beta=cfg.beta,
        seed=cfg.lsh_seed, max_block_pairs=cfg.max_block_pairs,
    )

    rows = []
    for name, fn in methods.items():
        with timer() as t:
            cand = fn()
            m = evaluate_blocking(cand, truth, n_a=n_a, n_b=n_b)
        rows.append(dict(method=name, n_candidates=m.n_candidates,
                         rr=m.rr, pc=m.pc, pq=m.pq, secs=t()))
    for df in (enc_a, enc_b, truth):
        df.unpersist()
    return pd.DataFrame(rows)

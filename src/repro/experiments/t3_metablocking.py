"""T3 — meta-blocking & filtering: pruning the comparison space.

Starts from redundant multi-key standard blocking (the setting meta-blocking
assumes: several overlapping key families producing duplicate and superfluous
pairs) and applies, cumulatively:

* ``raw`` — union of all blocks, no processing;
* ``+purge`` — block purging (drop oversized blocks);
* ``+cbs2`` — keep pairs sharing ≥2 blocks (CBS edge weighting);
* ``prefix_filter`` — PPJoin-lite candidate generation at the Jaccard
  threshold (filtering replaces blocking);
* ``+length_filter`` column — comparisons surviving the size bound at the
  Dice threshold, i.e. pairs whose full similarity must actually be computed.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.blocking.keys import candidates_from_keys, standard_keys
from repro.blocking.metrics import evaluate_blocking
from repro.encoding.phonetic import soundex
from repro.encoding.qgrams import record_tokens
from repro.evaluation.harness import QID_TAGS, PipelineConfig, encode_clk
from repro.experiments.common import timer
from repro.matching.filtering import length_filter, prefix_filter_candidates
from repro.matching.similarity import attach_pair_columns
from repro.persons import database_pair


def _redundant_keys(df):
    """Overlapping low-selectivity key families (meta-blocking's input)."""
    return [
        soundex(F.col("last_name")),
        soundex(F.col("first_name")),
        F.substring(F.col("dob"), 1, 4),
        F.substring(F.col("city"), 1, 3),
    ]


def run(
    spark: SparkSession,
    *,
    n_entities: int = 1000,
    corruption: float = 0.3,
    threshold: float = 0.80,
    jaccard_threshold: float = 0.55,
    purge_max_pairs: int = 20_000,
    seed: int = 0,
) -> pd.DataFrame:
    """Rows: (variant, n_candidates, pc, comparisons_after_length_filter, secs)."""
    cfg = PipelineConfig(threshold=threshold)
    df_a, df_b, truth = database_pair(
        spark, n_entities=n_entities, overlap=0.5, corruption_rate=corruption, seed=seed
    )
    enc_a = encode_clk(df_a, cfg).cache()
    enc_b = encode_clk(df_b, cfg).cache()
    n_a, n_b = enc_a.count(), enc_b.count()
    truth = truth.cache()
    truth.count()
    fields = {tag: F.col(c) for tag, c in QID_TAGS.items()}

    ka = standard_keys(enc_a, _redundant_keys(enc_a)).localCheckpoint(eager=True)
    kb = standard_keys(enc_b, _redundant_keys(enc_b)).localCheckpoint(eager=True)

    variants = {
        "raw_blocks": lambda: candidates_from_keys(ka, kb),
        "purge": lambda: candidates_from_keys(ka, kb, max_block_pairs=purge_max_pairs),
        "purge+cbs2": lambda: candidates_from_keys(
            ka, kb, max_block_pairs=purge_max_pairs, cbs_min=2
        ),
        "prefix_filter": lambda: prefix_filter_candidates(
            enc_a, enc_b, record_tokens(fields, q=cfg.q), threshold=jaccard_threshold
        ),
    }

    rows = []
    for name, fn in variants.items():
        with timer() as t:
            cand = fn().localCheckpoint(eager=True)
            m = evaluate_blocking(cand, truth, n_a=n_a, n_b=n_b)
            survivors = length_filter(
                attach_pair_columns(cand, enc_a, enc_b, ["bf_n"]),
                n_a="bf_n_a", n_b="bf_n_b", threshold=threshold,
            ).count()
        rows.append(dict(variant=name, n_candidates=m.n_candidates, pc=m.pc,
                         comparisons_after_length_filter=survivors, secs=t()))
    for df in (enc_a, enc_b, truth):
        df.unpersist()
    return pd.DataFrame(rows)

"""T4 — classification: Dice-threshold sweep vs unsupervised Fellegi–Sunter.

One candidate set (MinHash-LSH over record tokens), two classifiers:

* threshold rule on record-level CLK Dice, swept over thresholds — shows the
  precision/recall crossover;
* Fellegi–Sunter over per-field Bloom-filter agreement indicators, fitted
  with EM (no labels), classified at posterior ≥ 0.5.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.blocking.methods import minhash_lsh_candidates
from repro.encoding.bloom import with_clk
from repro.encoding.qgrams import record_tokens
from repro.evaluation.harness import QID_TAGS, PipelineConfig, encode_clk
from repro.evaluation.quality import evaluate_matches
from repro.experiments.common import timer
from repro.linkage.one_to_one import one_to_one
from repro.matching.classify import (
    agreement_columns,
    fellegi_sunter_classify,
    fit_fellegi_sunter,
)
from repro.matching.similarity import attach_pair_columns, dice_sim
from repro.persons import database_pair

FIELD_L = 256
FIELD_K = 15
AGREE_CUTOFF = 0.8


def _encode_fields(df, cfg: PipelineConfig):
    """Record CLK + one small BF per QID field (for FS agreement vectors)."""
    out = encode_clk(df, cfg)
    for tag, col in QID_TAGS.items():
        out = with_clk(out, {tag: F.col(col)}, q=cfg.q, l=FIELD_L, k=FIELD_K,
                       salt=cfg.salt + tag, out=f"bf_{tag}")
    return out


def run(
    spark: SparkSession,
    *,
    n_entities: int = 1000,
    corruption: float = 0.3,
    thresholds: tuple[float, ...] = (0.70, 0.75, 0.80, 0.85, 0.90, 0.95),
    seed: int = 0,
) -> pd.DataFrame:
    """Rows: (classifier, threshold, precision, recall, f1, secs)."""
    cfg = PipelineConfig()
    df_a, df_b, truth = database_pair(
        spark, n_entities=n_entities, overlap=0.5, corruption_rate=corruption, seed=seed
    )
    enc_a = _encode_fields(df_a, cfg).cache()
    enc_b = _encode_fields(df_b, cfg).cache()
    enc_a.count(), enc_b.count()
    truth = truth.cache()
    truth.count()
    fields = {tag: F.col(c) for tag, c in QID_TAGS.items()}

    cand = minhash_lsh_candidates(
        enc_a, enc_b, record_tokens(fields, q=cfg.q),
        num_hashes=cfg.num_hashes, bands=cfg.bands, rows=cfg.rows,
        seed=cfg.lsh_seed, max_block_pairs=cfg.max_block_pairs,
    ).localCheckpoint(eager=True)

    bf_cols = ["bf"] + [f"bf_{t}" for t in QID_TAGS]
    pairs = attach_pair_columns(cand, enc_a, enc_b, bf_cols)
    pairs = pairs.withColumn("sim", dice_sim(F.col("bf_a"), F.col("bf_b")))
    for tag in QID_TAGS:
        pairs = pairs.withColumn(
            f"sim_{tag}", dice_sim(F.col(f"bf_{tag}_a"), F.col(f"bf_{tag}_b"))
        )
    pairs = pairs.select(
        "rec_id_a", "rec_id_b", "sim", *[f"sim_{t}" for t in QID_TAGS]
    ).localCheckpoint(eager=True)

    rows = []
    for t in thresholds:
        with timer() as tm:
            matched = one_to_one(pairs.where(F.col("sim") >= t), "sim")
            q = evaluate_matches(matched, truth)
        rows.append(dict(classifier="dice_threshold", threshold=t,
                         precision=q.precision, recall=q.recall, f1=q.f1, secs=tm()))

    with timer() as tm:
        ag, agree_cols = agreement_columns(
            pairs, {f"sim_{t}": AGREE_CUTOFF for t in QID_TAGS}
        )
        model = fit_fellegi_sunter(ag, agree_cols)
        matched = fellegi_sunter_classify(ag, agree_cols, model)
        matched = one_to_one(matched, "sim")
        q = evaluate_matches(matched, truth)
    rows.append(dict(classifier="fellegi_sunter_em", threshold=float("nan"),
                     precision=q.precision, recall=q.recall, f1=q.f1, secs=tm()))
    for df in (enc_a, enc_b, truth):
        df.unpersist()
    return pd.DataFrame(rows)

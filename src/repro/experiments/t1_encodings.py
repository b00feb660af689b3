"""T1 — linkage quality of encoding generations under corruption.

Methods compared (one per PPRL generation):

* ``exact_hmac`` — HMAC of the full normalized QID tuple; any typo breaks it.
* ``slk581`` — AIHW statistical linkage key, HMAC-protected.
* ``soundex_key`` — phonetic key join (soundex(ln)+soundex(fn)+dob).
* ``plaintext_dice`` — unencoded q-gram Dice (privacy-free upper baseline).
* ``clk_dice`` — Bloom-filter CLK Dice (the *present*-generation method).

Both Dice methods run on the same MinHash-LSH candidate set and the same
threshold, so the CLK column isolates the *encoding* loss, not blocking loss.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.blocking.methods import minhash_lsh_candidates
from repro.encoding.phonetic import soundex
from repro.encoding.qgrams import normalize, record_tokens
from repro.encoding.slk import hmac_sha256, slk581_hashed
from repro.evaluation.harness import QID_TAGS, PipelineConfig, encode_clk
from repro.evaluation.quality import evaluate_matches
from repro.experiments.common import key_join_matches, timer
from repro.linkage.one_to_one import one_to_one
from repro.matching.similarity import attach_pair_columns, dice_sim
from repro.persons import database_pair

SECRET = "shared-linkage-secret"


def _exact_keys(df):
    return [
        hmac_sha256(
            F.concat_ws("|", *[normalize(F.col(c)) for c in QID_TAGS.values()]), secret=SECRET
        )
    ]


def _slk_keys(df):
    return [
        slk581_hashed(
            F.col("first_name"), F.col("last_name"), F.col("dob"), F.col("gender"), secret=SECRET
        )
    ]


def _soundex_keys(df):
    return [F.concat(soundex(F.col("last_name")), soundex(F.col("first_name")), F.col("dob"))]


def run(
    spark: SparkSession,
    *,
    n_entities: int = 1000,
    corruptions: tuple[float, ...] = (0.0, 0.2, 0.4),
    threshold: float = 0.80,
    seed: int = 0,
) -> pd.DataFrame:
    """Rows: (corruption, method, precision, recall, f1, secs)."""
    cfg = PipelineConfig(threshold=threshold)
    rows = []
    for corr in corruptions:
        df_a, df_b, truth = database_pair(
            spark, n_entities=n_entities, overlap=0.5, corruption_rate=corr, seed=seed
        )
        df_a, df_b = df_a.cache(), df_b.cache()
        truth = truth.cache()
        truth.count()

        for method, keys in [
            ("exact_hmac", _exact_keys),
            ("slk581", _slk_keys),
            ("soundex_key", _soundex_keys),
        ]:
            with timer() as t:
                matches = key_join_matches(df_a, df_b, keys)
                q = evaluate_matches(matches, truth)
            rows.append(dict(corruption=corr, method=method,
                             precision=q.precision, recall=q.recall, f1=q.f1, secs=t()))

        fields = {tag: F.col(c) for tag, c in QID_TAGS.items()}
        cand = minhash_lsh_candidates(
            df_a, df_b, record_tokens(fields, q=cfg.q),
            num_hashes=cfg.num_hashes, bands=cfg.bands, rows=cfg.rows,
            seed=cfg.lsh_seed, max_block_pairs=cfg.max_block_pairs,
        ).localCheckpoint(eager=True)

        # plaintext q-gram Dice (no privacy) on the shared candidate set
        with timer() as t:
            tok_a = df_a.select("rec_id", record_tokens(fields, q=cfg.q).alias("toks"))
            tok_b = df_b.select("rec_id", record_tokens(fields, q=cfg.q).alias("toks"))
            pairs = attach_pair_columns(cand, tok_a, tok_b, ["toks"])
            scored = pairs.withColumn("sim", dice_sim(F.col("toks_a"), F.col("toks_b")))
            matched = one_to_one(scored.where(F.col("sim") >= threshold), "sim")
            q = evaluate_matches(matched, truth)
        rows.append(dict(corruption=corr, method="plaintext_dice",
                         precision=q.precision, recall=q.recall, f1=q.f1, secs=t()))

        # CLK Dice on the same candidate set
        with timer() as t:
            enc_a = encode_clk(df_a, cfg).select("rec_id", "bf", "bf_n")
            enc_b = encode_clk(df_b, cfg).select("rec_id", "bf", "bf_n")
            pairs = attach_pair_columns(cand, enc_a, enc_b, ["bf"])
            scored = pairs.withColumn("sim", dice_sim(F.col("bf_a"), F.col("bf_b")))
            matched = one_to_one(scored.where(F.col("sim") >= threshold), "sim")
            q = evaluate_matches(matched, truth)
        rows.append(dict(corruption=corr, method="clk_dice",
                         precision=q.precision, recall=q.recall, f1=q.f1, secs=t()))

        for df in (df_a, df_b, truth):
            df.unpersist()
    return pd.DataFrame(rows)

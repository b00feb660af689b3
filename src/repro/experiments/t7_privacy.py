"""T7 — privacy–utility: frequency attack vs linkage quality per encoding.

The adversary is the linkage unit: it sees DB B's encodings and a public
plaintext register (DB A's last names serve as the register — same Zipfian
population). For each encoding we report the frequency-alignment
re-identification rate of B's last names, distributional privacy indicators,
and the linkage F1 that the encoding generation achieves on the same data.

Encodings: keyed hash of last name (frequency-transparent), field-level BF
(deterministic ⇒ identical grouping to the hash), record-level CLK (patterns
near-unique ⇒ alignment collapses), CLK+BLIP (randomized ⇒ collapse plus
formal per-bit ε-DP).
"""
from __future__ import annotations

import math

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.encoding.bloom import with_clk
from repro.encoding.slk import hmac_sha256
from repro.evaluation.harness import PipelineConfig, run_pipeline
from repro.evaluation.quality import evaluate_matches
from repro.experiments.common import key_join_matches, timer
from repro.experiments.t1_encodings import _exact_keys
from repro.privacy.attack import bf_pattern_col, frequency_attack
from repro.privacy.metrics import encoding_privacy
from repro.persons import database_pair

FIELD_L = 256
FIELD_K = 15


def run(
    spark: SparkSession,
    *,
    n_entities: int = 1000,
    corruption: float = 0.2,
    blip_epsilons: tuple[float, ...] = (3.0, 1.0),
    seed: int = 0,
) -> pd.DataFrame:
    """Rows: (encoding, reid_rate, reid_top5, uniqueness, entropy_bits, f1, secs)."""
    cfg = PipelineConfig()
    df_a, df_b, truth = database_pair(
        spark, n_entities=n_entities, overlap=0.5, corruption_rate=corruption, seed=seed
    )
    df_a, df_b, truth = df_a.cache(), df_b.cache(), truth.cache()
    truth.count()
    register = df_a.select(F.col("last_name").alias("value"))
    truth_plain = df_b.select("rec_id", F.col("last_name").alias("value"))

    def attack_on(enc_df, enc_col):
        res = frequency_attack(
            enc_df, enc_col, register, "value", truth_plain, "value"
        )
        priv = encoding_privacy(enc_df, enc_col)
        return res, priv

    rows = []

    with timer() as t:
        enc = df_b.select("rec_id", hmac_sha256(F.col("last_name"), secret="k").alias("enc"))
        res, priv = attack_on(enc, "enc")
        f1 = evaluate_matches(key_join_matches(df_a, df_b, _exact_keys), truth).f1
    rows.append(dict(encoding="hmac_lastname", reid_rate=res.reid_rate,
                     reid_top5=res.reid_rate_top5, uniqueness=priv.uniqueness,
                     entropy_bits=priv.entropy, f1=f1, secs=t()))

    with timer() as t:
        fb = with_clk(df_b, {"ln": F.col("last_name")}, q=cfg.q, l=FIELD_L, k=FIELD_K,
                      salt=cfg.salt, out="fbf")
        enc = fb.select("rec_id", bf_pattern_col(F.col("fbf")).alias("enc"))
        res, priv = attack_on(enc, "enc")
    rows.append(dict(encoding="field_bf_lastname", reid_rate=res.reid_rate,
                     reid_top5=res.reid_rate_top5, uniqueness=priv.uniqueness,
                     entropy_bits=priv.entropy, f1=float("nan"), secs=t()))

    with timer() as t:
        pipeline_res = run_pipeline(spark, df_a, df_b, cfg)
        clk_f1 = evaluate_matches(pipeline_res.matches, truth).f1
        from repro.evaluation.harness import encode_clk

        enc = encode_clk(df_b, cfg).select("rec_id", bf_pattern_col(F.col("bf")).alias("enc"))
        res, priv = attack_on(enc, "enc")
    rows.append(dict(encoding="clk", reid_rate=res.reid_rate,
                     reid_top5=res.reid_rate_top5, uniqueness=priv.uniqueness,
                     entropy_bits=priv.entropy, f1=clk_f1, secs=t()))

    for eps in blip_epsilons:
        with timer() as t:
            bcfg = PipelineConfig(blip_epsilon=eps)
            pres = run_pipeline(spark, df_a, df_b, bcfg)
            f1 = evaluate_matches(pres.matches, truth).f1
            from repro.evaluation.harness import encode_clk

            enc = encode_clk(df_b, bcfg).select(
                "rec_id", bf_pattern_col(F.col("bf")).alias("enc")
            )
            res, priv = attack_on(enc, "enc")
        rows.append(dict(encoding=f"clk_blip_eps{eps:g}", reid_rate=res.reid_rate,
                         reid_top5=res.reid_rate_top5, uniqueness=priv.uniqueness,
                         entropy_bits=priv.entropy, f1=f1, secs=t()))

    for df in (df_a, df_b, truth):
        df.unpersist()
    out = pd.DataFrame(rows)
    # Sanity anchor: max achievable entropy given n records.
    out.attrs["max_entropy_bits"] = math.log2(max(2, truth_plain.count()))
    return out

"""T9 — fairness: per-subgroup linkage quality under a uniform threshold.

Minority-pool records have shorter names (fewer q-grams) and higher name
variability (transliterated names admit more spelling variants — modelled as
a per-group corruption-rate multiplier). Two classifiers are compared per
subgroup:

* ``record_clk`` — threshold on the record-level CLK Dice. Here short names
  contribute *fewer* tokens, so corrupting them moves the record Dice less:
  near-parity (an honest negative result worth reporting).
* ``mean_field`` — threshold on the unweighted mean of per-field BF Dices
  (how practical RL scores pairs). A single edit destroys most of a 2-letter
  surname's q-grams (field Dice ≈ 0.3) but few of a 9-letter one's (≈ 0.8),
  so the uniform threshold costs the minority subgroup recall — the gap the
  tutorial flags as an open problem.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.blocking.methods import minhash_lsh_candidates
from repro.encoding.qgrams import record_tokens
from repro.evaluation.harness import QID_TAGS, PipelineConfig
from repro.evaluation.quality import evaluate_matches_by_group
from repro.experiments.t4_classify import _encode_fields
from repro.linkage.one_to_one import one_to_one
from repro.matching.similarity import attach_pair_columns, dice_sim
from repro.persons import database_pair


def run(
    spark: SparkSession,
    *,
    n_entities: int = 1500,
    corruptions: tuple[float, ...] = (0.2, 0.4),
    minority_frac: float = 0.25,
    minority_variability: float = 2.0,
    record_threshold: float = 0.80,
    field_threshold: float = 0.80,
    seed: int = 0,
) -> pd.DataFrame:
    """Rows: (corruption, classifier, group, n_truth, precision, recall, f1)."""
    cfg = PipelineConfig()
    rows = []
    for corr in corruptions:
        df_a, df_b, truth = database_pair(
            spark, n_entities=n_entities, overlap=0.5, corruption_rate=corr,
            seed=seed, minority_frac=minority_frac,
            group_rate_multiplier={"minority": minority_variability},
        )
        enc_a = _encode_fields(df_a, cfg).cache()
        enc_b = _encode_fields(df_b, cfg).cache()
        enc_a.count(), enc_b.count()
        truth = truth.cache()
        truth.count()
        groups = df_b.select("rec_id", "group")
        fields = {tag: F.col(c) for tag, c in QID_TAGS.items()}

        cand = minhash_lsh_candidates(
            enc_a, enc_b, record_tokens(fields, q=cfg.q),
            num_hashes=cfg.num_hashes, bands=cfg.bands, rows=cfg.rows,
            seed=cfg.lsh_seed, max_block_pairs=cfg.max_block_pairs,
        ).localCheckpoint(eager=True)

        bf_cols = ["bf"] + [f"bf_{t}" for t in QID_TAGS]
        pairs = attach_pair_columns(cand, enc_a, enc_b, bf_cols)
        pairs = pairs.withColumn("sim_rec", dice_sim(F.col("bf_a"), F.col("bf_b")))
        field_sims = [
            dice_sim(F.col(f"bf_{t}_a"), F.col(f"bf_{t}_b")) for t in QID_TAGS
        ]
        mean_sim = sum(field_sims[1:], field_sims[0]) / len(field_sims)
        pairs = pairs.withColumn("sim_mean", mean_sim).select(
            "rec_id_a", "rec_id_b", "sim_rec", "sim_mean"
        ).localCheckpoint(eager=True)

        for clf, sim_col, t in [
            ("record_clk", "sim_rec", record_threshold),
            ("mean_field", "sim_mean", field_threshold),
        ]:
            matched = one_to_one(pairs.where(F.col(sim_col) >= t), sim_col)
            pdf = evaluate_matches_by_group(matched, truth, groups)
            for _, r in pdf.iterrows():
                rows.append(dict(corruption=corr, classifier=clf, group=r["group"],
                                 n_truth=int(r["n_truth"]), precision=r["precision"],
                                 recall=r["recall"], f1=r["f1"]))
        for df in (enc_a, enc_b, truth):
            df.unpersist()
    return pd.DataFrame(rows)

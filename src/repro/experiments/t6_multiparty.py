"""T6 — multi-party linkage and subset matching (m-of-p databases).

p databases are linked pairwise (Hamming-LSH blocking + CLK Dice per pair),
match edges are clustered into entities, and subset matching counts clusters
spanning ≥ m databases. Quality is pairwise F1 of the cluster-implied record
pairs against ground truth, plus the subset-count error vs the true number of
entities present in ≥ m databases.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.blocking.methods import hamming_lsh_candidates
from repro.evaluation.harness import PipelineConfig, encode_clk
from repro.evaluation.quality import evaluate_matches
from repro.experiments.common import timer
from repro.linkage.multiparty import multiparty_clusters, subset_match
from repro.matching.filtering import length_filter
from repro.matching.similarity import attach_pair_columns, dice_sim
from repro.persons import multi_databases


def _match_fn(cfg: PipelineConfig, key_cache: dict[int, DataFrame] | None = None):
    """Two-party HLSH + Dice matcher.

    ``key_cache`` (id(enc_df) → keys frame) lets multi-party runs compute each
    database's HLSH keys once instead of once per DB pair.
    """
    from repro.blocking.keys import candidates_from_keys
    from repro.encoding.hlsh import hlsh_keys

    def keys_of(enc: DataFrame) -> DataFrame:
        if key_cache is None:
            return hlsh_keys(enc, "bf", l=cfg.l, mu=cfg.mu, beta=cfg.beta, seed=cfg.lsh_seed)
        k = key_cache.get(id(enc))
        if k is None:
            k = hlsh_keys(
                enc, "bf", l=cfg.l, mu=cfg.mu, beta=cfg.beta, seed=cfg.lsh_seed
            ).localCheckpoint(eager=True)
            key_cache[id(enc)] = k
        return k

    def fn(enc_a: DataFrame, enc_b: DataFrame) -> DataFrame:
        cand = candidates_from_keys(
            keys_of(enc_a), keys_of(enc_b), max_block_pairs=cfg.max_block_pairs
        )
        pairs = attach_pair_columns(cand, enc_a, enc_b, ["bf", "bf_n"])
        pairs = length_filter(pairs, n_a="bf_n_a", n_b="bf_n_b", threshold=cfg.threshold)
        scored = pairs.withColumn("sim", dice_sim(F.col("bf_a"), F.col("bf_b")))
        return scored.where(F.col("sim") >= cfg.threshold).select("rec_id_a", "rec_id_b")

    return fn


def _cluster_pairs(labels: DataFrame) -> DataFrame:
    """All same-cluster record pairs (rec_id_a < rec_id_b) implied by a labelling."""
    a = labels.select(F.col("cluster"), F.col("rec_id").alias("rec_id_a"))
    b = labels.select(F.col("cluster"), F.col("rec_id").alias("rec_id_b"))
    return a.join(b, "cluster").where(F.col("rec_id_a") < F.col("rec_id_b")).select(
        "rec_id_a", "rec_id_b"
    )


def _truth_pairs(truth: DataFrame) -> DataFrame:
    a = truth.select(F.col("entity_id"), F.col("rec_id").alias("rec_id_a"))
    b = truth.select(F.col("entity_id"), F.col("rec_id").alias("rec_id_b"))
    return a.join(b, "entity_id").where(F.col("rec_id_a") < F.col("rec_id_b")).select(
        "rec_id_a", "rec_id_b"
    )


def run(
    spark: SparkSession,
    *,
    ps: tuple[int, ...] = (3, 5),
    n_entities: int = 400,
    presence: float = 0.6,
    corruption: float = 0.2,
    mu: int = 16,
    beta: int = 30,
    seed: int = 0,
) -> pd.DataFrame:
    """Rows: (p, m, clusters_ge_m, true_entities_ge_m, pairwise_f1, secs)."""
    cfg = PipelineConfig(mu=mu, beta=beta)
    rows = []
    for p in ps:
        dbs, truth = multi_databases(
            spark, p=p, n_entities=n_entities, presence=presence,
            corruption_rate=corruption, seed=seed,
        )
        truth = truth.cache()
        truth.count()
        with timer() as t:
            encoded = [
                encode_clk(db, cfg).select("rec_id", "db", "bf", "bf_n").cache() for db in dbs
            ]
            for e in encoded:
                e.count()
            labels = multiparty_clusters(
                encoded, _match_fn(cfg, key_cache={})
            ).localCheckpoint(eager=True)
        secs = t()
        q = evaluate_matches(_cluster_pairs(labels), _truth_pairs(truth))
        membership = truth.select("rec_id", "db")
        true_presence = truth.groupBy("entity_id").agg(
            F.countDistinct("db").alias("n_dbs")
        ).cache()
        for m in range(2, p + 1):
            pred = subset_match(labels, membership, min_dbs=m).count()
            true_m = true_presence.where(F.col("n_dbs") >= m).count()
            rows.append(dict(p=p, m=m, clusters_ge_m=pred, true_entities_ge_m=true_m,
                             pairwise_f1=q.f1, secs=secs))
        true_presence.unpersist()
        truth.unpersist()
        for e in encoded:
            e.unpersist()
    return pd.DataFrame(rows)

"""T8 — incremental linkage vs full batch re-run (the *velocity* challenge).

DB A is the stable registry; DB B arrives in two waves (B0, then batch B1).
The full arm re-links A against B0∪B1 and re-clusters from scratch; the
incremental arm links only A×B1 and merges the new edges into the existing
clustering with :func:`repro.linkage.incremental.incremental_update`.
The table reports runtime of each arm, the speedup, and whether the two
clusterings are identical (they must be — the match function is
deterministic and decomposes over record subsets).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.evaluation.harness import PipelineConfig, encode_clk
from repro.experiments.common import timer
from repro.experiments.t6_multiparty import _match_fn
from repro.linkage.clustering import connected_components
from repro.linkage.incremental import incremental_update
from repro.persons import database_pair


def _labels_equal(l1: DataFrame, l2: DataFrame) -> bool:
    """Two (rec_id, cluster) labellings are the same partition.

    Both use min-member labels, so partitions are equal iff the frames are.
    """
    if l1.count() != l2.count():
        return False
    return (
        l1.join(l2.withColumnRenamed("cluster", "c2"), "rec_id")
        .where(F.col("cluster") != F.col("c2"))
        .isEmpty()
    )


def run(
    spark: SparkSession,
    *,
    n_entities: int = 1000,
    batch_frac: float = 0.2,
    corruption: float = 0.3,
    seed: int = 0,
) -> pd.DataFrame:
    """Rows: (n_entities, batch_frac, full_secs, incr_secs, speedup, clusters_equal)."""
    cfg = PipelineConfig(one_to_one_matching=False)
    match = _match_fn(cfg)
    df_a, df_b, _truth = database_pair(
        spark, n_entities=n_entities, overlap=0.5, corruption_rate=corruption, seed=seed
    )
    enc_a = encode_clk(df_a, cfg).select("rec_id", "bf", "bf_n").cache()
    enc_b = encode_clk(df_b, cfg).select("rec_id", "bf", "bf_n").cache()
    enc_a.count()
    n_b = enc_b.count()
    n_batch = int(batch_frac * n_b)
    # Deterministic split on rec_id order: last n_batch records form the batch.
    b_ids = [r["rec_id"] for r in enc_b.select("rec_id").orderBy("rec_id").collect()]
    batch_ids = set(b_ids[-n_batch:])
    enc_b0 = enc_b.where(~F.col("rec_id").isin(batch_ids)).cache()
    enc_b1 = enc_b.where(F.col("rec_id").isin(batch_ids)).cache()
    enc_b0.count(), enc_b1.count()

    nodes_a = enc_a.select("rec_id")
    nodes_b0 = enc_b0.select("rec_id")
    nodes_b1 = enc_b1.select("rec_id")

    # Initial state (common to both arms): A linked against B0.
    edges0 = match(enc_a, enc_b0).localCheckpoint(eager=True)
    labels0 = connected_components(
        edges0, nodes=nodes_a.unionByName(nodes_b0)
    ).localCheckpoint(eager=True)

    with timer() as t_full:
        edges_full = match(enc_a, enc_b).localCheckpoint(eager=True)
        labels_full = connected_components(
            edges_full, nodes=nodes_a.unionByName(enc_b.select("rec_id"))
        ).localCheckpoint(eager=True)
    with timer() as t_incr:
        edges_new = match(enc_a, enc_b1).localCheckpoint(eager=True)
        labels_incr = incremental_update(labels0, edges_new, nodes_b1).localCheckpoint(eager=True)

    equal = _labels_equal(labels_full, labels_incr)
    full_s, incr_s = t_full(), t_incr()
    for df in (enc_a, enc_b, enc_b0, enc_b1):
        df.unpersist()
    return pd.DataFrame(
        [dict(n_entities=n_entities, batch_frac=batch_frac, full_secs=full_s,
              incr_secs=incr_s, speedup=full_s / incr_s if incr_s else float("inf"),
              clusters_equal=bool(equal))]
    )

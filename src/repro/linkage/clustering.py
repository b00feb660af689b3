"""Entity clustering via connected components over match edges.

Multi-party linkage needs record *clusters* (one per real-world entity), not
pairs. Components are computed with iterative min-label propagation expressed
as DataFrame joins: every node repeatedly adopts the smallest label in its
closed neighbourhood until fixpoint. Label = lexicographically smallest
member id, so cluster ids are stable and meaningful. ``localCheckpoint``
truncates lineage each round (standard iterative-dataflow hygiene).

Match-edge graphs have tiny diameters (duplicates of one entity), so the loop
converges in a handful of rounds; ``max_iter`` is a safety cap that raises if
hit without convergence.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def connected_components(
    edges: DataFrame,
    *,
    nodes: DataFrame | None = None,
    max_iter: int = 25,
) -> DataFrame:
    """``(rec_id, cluster)`` for every node in ``edges`` (plus optional isolated ``nodes``).

    ``edges`` carries ``(rec_id_a, rec_id_b)``; ``nodes`` (optional) carries
    ``rec_id`` for records that must appear in the output even if unmatched
    (they become singleton clusters).
    """
    e = edges.select(
        F.col("rec_id_a").alias("src"), F.col("rec_id_b").alias("dst")
    ).unionByName(
        edges.select(F.col("rec_id_b").alias("src"), F.col("rec_id_a").alias("dst"))
    ).distinct()

    node_df = e.select(F.col("src").alias("rec_id")).distinct()
    if nodes is not None:
        node_df = node_df.unionByName(nodes.select("rec_id")).distinct()

    labels = node_df.withColumn("cluster", F.col("rec_id")).localCheckpoint(eager=True)
    e = e.localCheckpoint(eager=True)
    for _ in range(max_iter):
        neigh_min = (
            e.join(labels.withColumnRenamed("rec_id", "dst"), "dst")
            .groupBy("src")
            .agg(F.min("cluster").alias("_nmin"))
            .withColumnRenamed("src", "rec_id")
        )
        new_labels = (
            labels.join(neigh_min, "rec_id", "left")
            .withColumn("_new", F.least(F.col("cluster"), F.coalesce(F.col("_nmin"), F.col("cluster"))))
            .select("rec_id", F.col("_new").alias("cluster"))
            .localCheckpoint(eager=True)
        )
        changed = (
            new_labels.withColumnRenamed("cluster", "_c2")
            .join(labels, "rec_id")
            .where(F.col("_c2") != F.col("cluster"))
            .isEmpty()
        )
        labels = new_labels
        if changed:
            return labels
    raise RuntimeError(f"connected_components did not converge in {max_iter} iterations")


def cluster_members(labels: DataFrame) -> DataFrame:
    """``(cluster, members, size)`` — aggregated view of a labelling."""
    return labels.groupBy("cluster").agg(
        F.sort_array(F.collect_list("rec_id")).alias("members"),
        F.count("*").alias("size"),
    )

"""Incremental cluster maintenance (T8) — the *velocity* challenge.

When a new batch of records arrives, re-running the whole linkage is wasted
work: only clusters touched by a new match edge can change. The update
therefore (1) matches the batch against existing records and within itself,
(2) extracts the *affected subgraph* — new records plus members of touched
clusters, the latter connected through membership edges to their cluster
label — and (3) re-runs connected components on that subgraph only.
Untouched clusters pass through unchanged. Output is identical to a full
batch re-run over the union (tested), at a fraction of the cost.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.linkage.clustering import connected_components


def incremental_update(
    labels: DataFrame,
    new_edges: DataFrame,
    new_nodes: DataFrame,
) -> DataFrame:
    """Merge a record batch into an existing clustering.

    ``labels``: current ``(rec_id, cluster)``. ``new_edges``: match pairs
    involving at least one batch record (batch↔existing or batch↔batch).
    ``new_nodes``: ``rec_id`` of every batch record (unmatched ones become
    singletons). Returns the updated full ``(rec_id, cluster)``.
    """
    ends = new_edges.select(F.col("rec_id_a").alias("rec_id")).unionByName(
        new_edges.select(F.col("rec_id_b").alias("rec_id"))
    ).distinct()
    touched_clusters = labels.join(ends, "rec_id").select("cluster").distinct()
    touched_members = labels.join(touched_clusters, "cluster").select("rec_id", "cluster")

    # Membership edges keep previously-merged members together even when no
    # new edge lands on them directly. A cluster label is itself the minimal
    # member's rec_id, so these edges only reference real records.
    membership_edges = touched_members.select(
        F.col("rec_id").alias("rec_id_a"), F.col("cluster").alias("rec_id_b")
    )
    sub_edges = new_edges.select("rec_id_a", "rec_id_b").unionByName(membership_edges)
    sub_labels = connected_components(sub_edges, nodes=new_nodes.select("rec_id"))

    untouched = labels.join(touched_clusters, "cluster", "left_anti").select("rec_id", "cluster")
    return untouched.unionByName(sub_labels.select("rec_id", "cluster"))

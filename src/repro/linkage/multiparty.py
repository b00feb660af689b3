"""Multi-party linkage (p > 2 databases) and subset matching (T6).

Records from ``p`` encoded databases are linked pairwise (all C(p,2) DB
pairs, each via the supplied two-party match function), the match edges are
merged, and connected components yield entity clusters spanning databases.
*Subset matching* then selects clusters covering at least ``m`` distinct
databases — "patients seen in ≥ m of p hospitals".

Pairwise-over-all-pairs is the complete communication pattern; because every
pair runs through blocking first, cost stays near-linear per DB pair (the
advanced ring/tree patterns of the literature trade completeness for fewer
pairings — out of scope for the claims T6 checks).
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.linkage.clustering import connected_components


def pairwise_edges(
    dbs: list[DataFrame],
    match_fn: Callable[[DataFrame, DataFrame], DataFrame],
) -> DataFrame:
    """Union of match edges over all database pairs ``i < j``.

    ``match_fn(df_i, df_j)`` returns matched pairs ``(rec_id_a, rec_id_b)``.
    """
    if len(dbs) < 2:
        raise ValueError("need at least two databases")
    parts = []
    for i in range(len(dbs)):
        for j in range(i + 1, len(dbs)):
            parts.append(match_fn(dbs[i], dbs[j]).select("rec_id_a", "rec_id_b"))
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out


def multiparty_clusters(
    dbs: list[DataFrame],
    match_fn: Callable[[DataFrame, DataFrame], DataFrame],
    *,
    id_col: str = "rec_id",
) -> DataFrame:
    """``(rec_id, cluster)`` over all records of all databases (singletons included)."""
    edges = pairwise_edges(dbs, match_fn)
    all_nodes = dbs[0].select(F.col(id_col).alias("rec_id"))
    for d in dbs[1:]:
        all_nodes = all_nodes.unionByName(d.select(F.col(id_col).alias("rec_id")))
    return connected_components(edges, nodes=all_nodes)


def subset_match(
    labels: DataFrame,
    membership: DataFrame,
    *,
    min_dbs: int,
) -> DataFrame:
    """Clusters present in at least ``min_dbs`` distinct databases.

    ``membership`` maps ``rec_id -> db``. Returns
    ``(cluster, n_dbs, n_records)`` for qualifying clusters.
    """
    if min_dbs < 1:
        raise ValueError(f"min_dbs must be >= 1, got {min_dbs}")
    return (
        labels.join(membership, "rec_id")
        .groupBy("cluster")
        .agg(F.countDistinct("db").alias("n_dbs"), F.count("*").alias("n_records"))
        .where(F.col("n_dbs") >= min_dbs)
    )

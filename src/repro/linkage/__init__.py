"""Linkage decisions: one-to-one assignment, clustering, multi-party, incremental."""
from repro.linkage.clustering import cluster_members, connected_components
from repro.linkage.incremental import incremental_update
from repro.linkage.multiparty import multiparty_clusters, pairwise_edges, subset_match
from repro.linkage.one_to_one import one_to_one

__all__ = [
    "cluster_members",
    "connected_components",
    "incremental_update",
    "multiparty_clusters",
    "one_to_one",
    "pairwise_edges",
    "subset_match",
]

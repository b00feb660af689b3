"""Tests for incremental cluster maintenance — must equal full re-clustering."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.linkage.clustering import connected_components
from repro.linkage.incremental import incremental_update


def _edges(spark, pairs):
    if not pairs:
        return spark.createDataFrame([], "rec_id_a string, rec_id_b string")
    return spark.createDataFrame(pd.DataFrame(pairs, columns=["rec_id_a", "rec_id_b"]))


def _nodes(spark, ids):
    if not ids:
        return spark.createDataFrame([], "rec_id string")
    return spark.createDataFrame(pd.DataFrame({"rec_id": list(ids)}))


def _partition(labels):
    out: dict[str, set] = {}
    for r in labels.collect():
        out.setdefault(r["cluster"], set()).add(r["rec_id"])
    return {frozenset(v) for v in out.values()}


def _check_equivalent(spark, old_edges, old_nodes, new_edges, new_nodes):
    labels0 = connected_components(_edges(spark, old_edges), nodes=_nodes(spark, old_nodes))
    incr = incremental_update(
        labels0, _edges(spark, new_edges), _nodes(spark, new_nodes)
    )
    full = connected_components(
        _edges(spark, old_edges + new_edges),
        nodes=_nodes(spark, set(old_nodes) | set(new_nodes)),
    )
    assert _partition(incr) == _partition(full)
    # Same label convention (min member) ⇒ frames must agree row-for-row.
    assert incr.exceptAll(full).isEmpty() and full.exceptAll(incr).isEmpty()


def test_batch_extends_existing_cluster(spark):
    _check_equivalent(
        spark,
        old_edges=[("a1", "b1")], old_nodes={"a1", "b1", "a2"},
        new_edges=[("b1", "n1")], new_nodes={"n1"},
    )


def test_batch_merges_two_clusters(spark):
    _check_equivalent(
        spark,
        old_edges=[("a1", "b1"), ("a2", "b2")], old_nodes={"a1", "b1", "a2", "b2"},
        new_edges=[("b1", "n1"), ("n1", "b2")], new_nodes={"n1"},
    )


def test_batch_all_new_singletons(spark):
    _check_equivalent(
        spark,
        old_edges=[("a1", "b1")], old_nodes={"a1", "b1"},
        new_edges=[], new_nodes={"n1", "n2"},
    )


def test_empty_batch_is_identity(spark):
    _check_equivalent(
        spark,
        old_edges=[("a1", "b1"), ("a2", "b2")], old_nodes={"a1", "b1", "a2", "b2"},
        new_edges=[], new_nodes=set(),
    )


def test_new_record_with_smaller_id_relabels_cluster(spark):
    # New node "a0" < existing labels: the cluster label must become "a0"
    # in both arms (min-member convention).
    _check_equivalent(
        spark,
        old_edges=[("a1", "b1")], old_nodes={"a1", "b1"},
        new_edges=[("a0", "b1")], new_nodes={"a0"},
    )


def test_batch_within_batch_edges(spark):
    _check_equivalent(
        spark,
        old_edges=[], old_nodes={"a1"},
        new_edges=[("n1", "n2"), ("n2", "n3")], new_nodes={"n1", "n2", "n3"},
    )


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_randomized_equivalence(spark, seed):
    """Random old graph + random batch: incremental == full, always."""
    rng = np.random.default_rng(seed)
    old_nodes = {f"o{i}" for i in range(20)}
    new_nodes = {f"z{i}" for i in range(6)}
    olds = sorted(old_nodes)
    news = sorted(new_nodes)
    old_edges = [
        (olds[rng.integers(20)], olds[rng.integers(20)]) for _ in range(12)
    ]
    old_edges = [(a, b) for a, b in old_edges if a != b]
    new_edges = [(news[rng.integers(6)], olds[rng.integers(20)]) for _ in range(5)]
    new_edges += [(news[rng.integers(6)], news[rng.integers(6)]) for _ in range(3)]
    new_edges = [(a, b) for a, b in new_edges if a != b]
    _check_equivalent(spark, old_edges, old_nodes, new_edges, new_nodes)

"""Tests for connected-components clustering."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.linkage.clustering import cluster_members, connected_components


def _edges(spark, pairs):
    return spark.createDataFrame(
        pd.DataFrame(pairs, columns=["rec_id_a", "rec_id_b"])
    )


def _clusters(labels):
    """Partition as a set of frozensets."""
    out: dict[str, set] = {}
    for r in labels.collect():
        out.setdefault(r["cluster"], set()).add(r["rec_id"])
    return {frozenset(v) for v in out.values()}


def test_single_edge(spark):
    labels = connected_components(_edges(spark, [("a", "b")]))
    assert _clusters(labels) == {frozenset({"a", "b"})}


def test_chain_collapses_to_one_cluster(spark):
    labels = connected_components(_edges(spark, [("a", "b"), ("b", "c"), ("c", "d")]))
    assert _clusters(labels) == {frozenset({"a", "b", "c", "d"})}


def test_two_components(spark):
    labels = connected_components(_edges(spark, [("a", "b"), ("x", "y")]))
    assert _clusters(labels) == {frozenset({"a", "b"}), frozenset({"x", "y"})}


def test_isolated_nodes_become_singletons(spark):
    nodes = spark.createDataFrame(pd.DataFrame({"rec_id": ["a", "b", "z"]}))
    labels = connected_components(_edges(spark, [("a", "b")]), nodes=nodes)
    assert _clusters(labels) == {frozenset({"a", "b"}), frozenset({"z"})}


def test_cluster_label_is_min_member(spark):
    labels = connected_components(_edges(spark, [("c", "b"), ("b", "a")]))
    assert {r["cluster"] for r in labels.collect()} == {"a"}


def test_long_path_converges(spark):
    """Min-label propagation doubles reach per round; a 20-node path needs
    several rounds but must converge well inside the iteration cap."""
    n = 20
    pairs = [(f"n{i:02d}", f"n{i+1:02d}") for i in range(n - 1)]
    labels = connected_components(_edges(spark, pairs))
    assert _clusters(labels) == {frozenset(f"n{i:02d}" for i in range(n))}


def test_duplicate_and_reversed_edges(spark):
    labels = connected_components(
        _edges(spark, [("a", "b"), ("b", "a"), ("a", "b")])
    )
    assert _clusters(labels) == {frozenset({"a", "b"})}


def test_convergence_cap_raises(spark):
    with pytest.raises(RuntimeError):
        connected_components(_edges(spark, [("a", "b"), ("b", "c")]), max_iter=0)


def test_cluster_members_view(spark):
    labels = connected_components(_edges(spark, [("a", "b"), ("x", "y"), ("y", "z")]))
    rows = {r["cluster"]: (list(r["members"]), r["size"]) for r in cluster_members(labels).collect()}
    assert rows["a"] == (["a", "b"], 2)
    assert rows["x"] == (["x", "y", "z"], 3)


def test_star_graph(spark):
    pairs = [("hub", f"s{i}") for i in range(8)]
    labels = connected_components(_edges(spark, pairs))
    assert len(_clusters(labels)) == 1
    assert labels.count() == 9

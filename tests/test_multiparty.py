"""Tests for multi-party linkage and subset matching."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.linkage.multiparty import multiparty_clusters, pairwise_edges, subset_match


def _db(spark, ids):
    return spark.createDataFrame(pd.DataFrame({"rec_id": ids, "v": range(len(ids))}))


def test_pairwise_edges_calls_every_pair(spark):
    calls = []

    def match_fn(a, b):
        calls.append((a, b))
        return a.select(F.col("rec_id").alias("rec_id_a")).limit(0).withColumn(
            "rec_id_b", F.lit("x")
        )

    dbs = [_db(spark, ["a"]), _db(spark, ["b"]), _db(spark, ["c"])]
    pairwise_edges(dbs, match_fn).count()
    assert len(calls) == 3  # C(3,2)


def test_pairwise_edges_rejects_single_db(spark):
    with pytest.raises(ValueError):
        pairwise_edges([_db(spark, ["a"])], lambda a, b: a)


def test_multiparty_clusters_transitive(spark):
    """a~b (dbs 0,1) and b~c (dbs 1,2) ⇒ one cluster {a,b,c}."""
    dbs = [_db(spark, ["a"]), _db(spark, ["b"]), _db(spark, ["c"])]
    links = {("a", "b"), ("b", "c")}

    def match_fn(x, y):
        xs = {r["rec_id"] for r in x.select("rec_id").collect()}
        ys = {r["rec_id"] for r in y.select("rec_id").collect()}
        pairs = [(i, j) for i in xs for j in ys if (i, j) in links or (j, i) in links]
        if not pairs:
            return spark.createDataFrame([], "rec_id_a string, rec_id_b string")
        return spark.createDataFrame(pd.DataFrame(pairs, columns=["rec_id_a", "rec_id_b"]))

    labels = multiparty_clusters(dbs, match_fn)
    assert {r["cluster"] for r in labels.collect()} == {"a"}
    assert labels.count() == 3


def test_multiparty_clusters_keeps_singletons(spark):
    dbs = [_db(spark, ["a"]), _db(spark, ["b"])]

    def no_match(x, y):
        return spark.createDataFrame([], "rec_id_a string, rec_id_b string")

    labels = multiparty_clusters(dbs, no_match)
    assert labels.count() == 2
    assert {r["cluster"] for r in labels.collect()} == {"a", "b"}


def _labels(spark, pairs):
    return spark.createDataFrame(pd.DataFrame(pairs, columns=["rec_id", "cluster"]))


def _membership(spark, pairs):
    return spark.createDataFrame(pd.DataFrame(pairs, columns=["rec_id", "db"]))


def test_subset_match_counts(spark):
    labels = _labels(
        spark, [("r1", "c1"), ("r2", "c1"), ("r3", "c1"), ("r4", "c2"), ("r5", "c2")]
    )
    membership = _membership(
        spark, [("r1", "P0"), ("r2", "P1"), ("r3", "P2"), ("r4", "P0"), ("r5", "P0")]
    )
    ge2 = subset_match(labels, membership, min_dbs=2)
    ge3 = subset_match(labels, membership, min_dbs=3)
    assert {r["cluster"] for r in ge2.collect()} == {"c1"}
    assert {r["cluster"] for r in ge3.collect()} == {"c1"}
    row = ge3.collect()[0]
    assert row["n_dbs"] == 3 and row["n_records"] == 3
    # c2 spans one DB only (two records in P0).
    assert subset_match(labels, membership, min_dbs=2).where(F.col("cluster") == "c2").isEmpty()


def test_subset_match_min1_keeps_all(spark):
    labels = _labels(spark, [("r1", "c1"), ("r2", "c2")])
    membership = _membership(spark, [("r1", "P0"), ("r2", "P1")])
    assert subset_match(labels, membership, min_dbs=1).count() == 2


def test_subset_match_rejects_bad_min(spark):
    labels = _labels(spark, [("r1", "c1")])
    membership = _membership(spark, [("r1", "P0")])
    with pytest.raises(ValueError):
        subset_match(labels, membership, min_dbs=0)

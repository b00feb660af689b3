"""Tests for per-party database construction and ground truth."""
import pytest
from pyspark.sql import functions as F

from repro.persons import database_pair, multi_databases, records_from_entities
from repro.persons.generator import generate_entities


def test_records_from_entities_ids_and_tags():
    ents = generate_entities(50, seed=0)
    recs = records_from_entities(ents, db_name="X", corruption_rate=0.0, seed=1)
    assert recs["rec_id"].str.match(r"X-\d{6}").all()
    assert (recs["db"] == "X").all()
    assert recs["rec_id"].is_unique


def test_database_pair_counts_and_truth(spark):
    df_a, df_b, truth = database_pair(
        spark, n_entities=200, overlap=0.5, corruption_rate=0.2, seed=0
    )
    n_a, n_b, n_t = df_a.count(), df_b.count(), truth.count()
    # 100 shared + 50 A-only / 50 B-only
    assert n_a == 150 and n_b == 150
    assert n_t == 100


def test_database_pair_truth_entities_agree(spark):
    df_a, df_b, truth = database_pair(
        spark, n_entities=150, overlap=0.4, corruption_rate=0.3, seed=1
    )
    joined = (
        truth.join(df_a.select(F.col("rec_id").alias("rec_id_a"), F.col("entity_id").alias("ea")), "rec_id_a")
        .join(df_b.select(F.col("rec_id").alias("rec_id_b"), F.col("entity_id").alias("eb")), "rec_id_b")
    )
    assert joined.where(F.col("ea") != F.col("eb")).isEmpty()
    assert joined.count() == truth.count()


@pytest.mark.parametrize("overlap", [0.0, 1.0])
def test_database_pair_extreme_overlap(spark, overlap):
    df_a, df_b, truth = database_pair(
        spark, n_entities=100, overlap=overlap, corruption_rate=0.1, seed=2
    )
    assert truth.count() == int(overlap * 100)


def test_database_pair_rejects_bad_overlap(spark):
    with pytest.raises(ValueError):
        database_pair(spark, n_entities=10, overlap=1.5, corruption_rate=0.1, seed=0)


def test_database_pair_deterministic(spark):
    a1, b1, t1 = database_pair(spark, n_entities=80, overlap=0.5, corruption_rate=0.3, seed=3)
    a2, b2, t2 = database_pair(spark, n_entities=80, overlap=0.5, corruption_rate=0.3, seed=3)
    assert a1.exceptAll(a2).isEmpty() and a2.exceptAll(a1).isEmpty()
    assert t1.exceptAll(t2).isEmpty() and t2.exceptAll(t1).isEmpty()


def test_multi_databases_membership(spark):
    dbs, truth = multi_databases(spark, p=3, n_entities=120, presence=0.7, seed=4)
    assert len(dbs) == 3
    names = {r["db"] for r in truth.select("db").distinct().collect()}
    assert names == {"P0", "P1", "P2"}
    # Truth covers exactly the records in the DBs.
    total = sum(d.count() for d in dbs)
    assert truth.count() == total


def test_multi_databases_presence_rate(spark):
    dbs, truth = multi_databases(spark, p=4, n_entities=400, presence=0.5, seed=5)
    rate = truth.count() / (4 * 400)
    assert abs(rate - 0.5) < 0.07


def test_multi_databases_rejects_small_p(spark):
    with pytest.raises(ValueError):
        multi_databases(spark, p=1, n_entities=10, seed=0)


def test_entity_clusters_span_multiple_dbs(spark):
    _, truth = multi_databases(spark, p=3, n_entities=200, presence=0.6, seed=6)
    spans = truth.groupBy("entity_id").agg(F.countDistinct("db").alias("k"))
    ks = {r["k"] for r in spans.select("k").distinct().collect()}
    assert ks >= {1, 2, 3}

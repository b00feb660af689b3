"""Tests for blocking-key candidate generation, methods, and metrics."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.blocking.keys import candidates_from_keys, standard_keys
from repro.blocking.methods import (
    cartesian_candidates,
    hamming_lsh_candidates,
    minhash_lsh_candidates,
    sorted_neighbourhood_candidates,
    standard_blocking,
)
from repro.blocking.metrics import BlockingMetrics, evaluate_blocking
from repro.oracle import assert_equivalent


def _df(spark, rows, cols=("rec_id", "k")):
    return spark.createDataFrame(pd.DataFrame(rows, columns=list(cols)))


def test_standard_keys_schema_and_null_drop(spark):
    df = _df(spark, [("a", "x"), ("b", None), ("c", "")])
    keys = standard_keys(df, [F.col("k")])
    got = {(r["rec_id"], r["band"]) for r in keys.collect()}
    assert got == {("a", 0)}


def test_standard_keys_multiple_bands(spark):
    df = _df(spark, [("a", "x")], cols=("rec_id", "k"))
    keys = standard_keys(df, [F.col("k"), F.upper(F.col("k"))])
    assert {r["band"] for r in keys.collect()} == {0, 1}


def test_standard_keys_band_separation(spark):
    """Same raw value in different bands must not collide across bands."""
    df = _df(spark, [("a", "x")])
    keys = standard_keys(df, [F.col("k"), F.col("k")]).collect()
    k0 = next(r["key"] for r in keys if r["band"] == 0)
    k1 = next(r["key"] for r in keys if r["band"] == 1)
    assert k0 != k1


def test_standard_keys_rejects_empty():
    with pytest.raises(ValueError):
        standard_keys(None, [])


def test_candidates_from_keys_matches_duckdb(spark):
    """Oracle: candidate pairs = distinct equi-join of the two keys tables."""
    ka = _df(spark, [("a1", "x"), ("a2", "x"), ("a3", "y")]).select(
        "rec_id", F.lit(0).alias("band"), F.xxhash64(F.lit(0), F.col("k")).alias("key")
    )
    kb = _df(spark, [("b1", "x"), ("b2", "z")]).select(
        "rec_id", F.lit(0).alias("band"), F.xxhash64(F.lit(0), F.col("k")).alias("key")
    )
    got = candidates_from_keys(ka, kb)
    assert_equivalent(
        got,
        """SELECT DISTINCT a.rec_id AS rec_id_a, b.rec_id AS rec_id_b
           FROM ka a JOIN kb b ON a.band = b.band AND a.key = b.key""",
        ka=ka, kb=kb,
    )


def test_block_purging_drops_oversized(spark):
    ka = _df(spark, [(f"a{i}", "big") for i in range(10)] + [("a_s", "small")])
    kb = _df(spark, [(f"b{i}", "big") for i in range(10)] + [("b_s", "small")])
    keys_a = standard_keys(ka, [F.col("k")])
    keys_b = standard_keys(kb, [F.col("k")])
    unpurged = candidates_from_keys(keys_a, keys_b)
    purged = candidates_from_keys(keys_a, keys_b, max_block_pairs=50)
    assert unpurged.count() == 101
    assert purged.count() == 1  # only the small block survives


def test_cbs_pruning(spark):
    # pair (a1,b1) shares two keys; (a2,b2) shares one.
    ka = spark.createDataFrame(
        pd.DataFrame({"rec_id": ["a1", "a1", "a2"], "k": ["x", "y", "z"]})
    )
    kb = spark.createDataFrame(
        pd.DataFrame({"rec_id": ["b1", "b1", "b2"], "k": ["x", "y", "z"]})
    )
    keys_a = standard_keys(ka, [F.col("k")])
    keys_b = standard_keys(kb, [F.col("k")])
    all_pairs = candidates_from_keys(keys_a, keys_b)
    pruned = candidates_from_keys(keys_a, keys_b, cbs_min=2)
    assert all_pairs.count() == 2
    got = [(r["rec_id_a"], r["rec_id_b"]) for r in pruned.collect()]
    assert got == [("a1", "b1")]


def test_cartesian_count(spark):
    a = _df(spark, [("a1", "x"), ("a2", "y")])
    b = _df(spark, [("b1", "x"), ("b2", "y"), ("b3", "z")])
    assert cartesian_candidates(a, b).count() == 6


def test_standard_blocking_end_to_end(spark):
    a = _df(spark, [("a1", "smith"), ("a2", "jones")], cols=("rec_id", "ln"))
    b = _df(spark, [("b1", "smyth"), ("b2", "clark")], cols=("rec_id", "ln"))
    cand = standard_blocking(a, b, [F.soundex(F.col("ln"))], [F.soundex(F.col("ln"))])
    got = {(r["rec_id_a"], r["rec_id_b"]) for r in cand.collect()}
    assert got == {("a1", "b1")}


def test_sorted_neighbourhood_window(spark):
    a = _df(spark, [("a1", "aaa"), ("a2", "mmm")], cols=("rec_id", "k"))
    b = _df(spark, [("b1", "aab"), ("b2", "zzz")], cols=("rec_id", "k"))
    cand = sorted_neighbourhood_candidates(a, b, F.col("k"), F.col("k"), window=2)
    got = {(r["rec_id_a"], r["rec_id_b"]) for r in cand.collect()}
    assert ("a1", "b1") in got
    assert ("a1", "b2") not in got


def test_sorted_neighbourhood_rejects_bad_window(spark):
    a = _df(spark, [("a1", "x")])
    with pytest.raises(ValueError):
        sorted_neighbourhood_candidates(a, a, F.col("k"), F.col("k"), window=0)


def test_sorted_neighbourhood_covers_all_within_window(spark):
    """Brute-force check of the bucketed range join."""
    a = _df(spark, [(f"a{i}", f"k{i:02d}") for i in range(10)])
    b = _df(spark, [(f"b{i}", f"k{i:02d}x") for i in range(10)])
    w = 3
    cand = {
        (r["rec_id_a"], r["rec_id_b"])
        for r in sorted_neighbourhood_candidates(
            a, b, F.col("k"), F.col("k"), window=w
        ).collect()
    }
    # Reference: merge-sort both sides, pair anything within w positions.
    seq = sorted(
        [(f"k{i:02d}", "a", f"a{i}") for i in range(10)]
        + [(f"k{i:02d}x", "b", f"b{i}") for i in range(10)]
    )
    want = set()
    for i, (_, s1, r1) in enumerate(seq):
        for j in range(max(0, i - w + 1), min(len(seq), i + w)):
            _, s2, r2 = seq[j]
            if s1 == "a" and s2 == "b":
                want.add((r1, r2))
    assert cand == want


def test_lsh_methods_find_identical_records(spark):
    pdf = pd.DataFrame(
        {"rec_id": ["a1"], "first_name": ["mary"], "last_name": ["smith"],
         "dob": ["1984-03-07"], "city": ["salem"]}
    )
    a = spark.createDataFrame(pdf)
    b = spark.createDataFrame(pdf.assign(rec_id=["b1"]))
    from repro.encoding.qgrams import record_tokens

    toks = record_tokens({"ln": F.col("last_name"), "fn": F.col("first_name")})
    mh = minhash_lsh_candidates(a, b, toks, num_hashes=12, bands=4, rows=3)
    assert {(r["rec_id_a"], r["rec_id_b"]) for r in mh.collect()} == {("a1", "b1")}

    from repro.encoding.bloom import with_clk

    ea = with_clk(a, {"ln": F.col("last_name")}, l=128, k=8)
    eb = with_clk(b, {"ln": F.col("last_name")}, l=128, k=8)
    hl = hamming_lsh_candidates(ea, eb, "bf", l=128, mu=4, beta=10)
    assert {(r["rec_id_a"], r["rec_id_b"]) for r in hl.collect()} == {("a1", "b1")}


def test_blocking_metrics_math():
    m = BlockingMetrics(n_candidates=50, n_truth=40, n_true_in_candidates=30, n_total_pairs=1000)
    assert m.pc == 0.75
    assert m.pq == 0.6
    assert m.rr == 0.95


def test_blocking_metrics_degenerate():
    m = BlockingMetrics(n_candidates=0, n_truth=0, n_true_in_candidates=0, n_total_pairs=0)
    assert m.pc == 1.0 and m.pq == 0.0 and m.rr == 0.0


def test_evaluate_blocking_against_duckdb(spark):
    cand = spark.createDataFrame(
        pd.DataFrame({"rec_id_a": ["a1", "a2", "a3"], "rec_id_b": ["b1", "b2", "b9"]})
    )
    truth = spark.createDataFrame(
        pd.DataFrame({"rec_id_a": ["a1", "a2", "a4"], "rec_id_b": ["b1", "b2", "b4"]})
    )
    m = evaluate_blocking(cand, truth, n_a=10, n_b=10)
    assert m.n_true_in_candidates == 2
    assert m.n_candidates == 3 and m.n_truth == 3
    got = spark.createDataFrame(
        pd.DataFrame({"hits": [m.n_true_in_candidates]})
    )
    assert_equivalent(
        got,
        """SELECT count(*) AS hits FROM cand c
           JOIN truth t ON c.rec_id_a = t.rec_id_a AND c.rec_id_b = t.rec_id_b""",
        cand=cand, truth=truth,
    )

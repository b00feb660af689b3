"""Tests for Hamming-LSH key extraction over Bloom filters."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.encoding.hlsh import hlsh_collision_probability, hlsh_keys, sample_positions


def test_sample_positions_shape_and_determinism():
    s1 = sample_positions(l=128, mu=5, beta=10, seed=3)
    s2 = sample_positions(l=128, mu=5, beta=10, seed=3)
    assert s1 == s2
    assert len(s1) == 5
    for s in s1:
        assert len(s) == len(set(s)) == 10
        assert all(0 <= p < 128 for p in s)


def test_sample_positions_rejects_beta_gt_l():
    with pytest.raises(ValueError):
        sample_positions(l=8, mu=2, beta=9, seed=0)


def _keys(spark, bfs, **kw):
    df = spark.createDataFrame(
        pd.DataFrame({"rec_id": [f"r{i}" for i in range(len(bfs))], "bf": bfs})
    )
    return hlsh_keys(df, "bf", **kw)


def test_key_count_per_record(spark):
    keys = _keys(spark, [[1, 5, 9], [2, 6]], l=64, mu=6, beta=8, seed=1)
    assert keys.count() == 2 * 6


def test_identical_filters_share_every_key(spark):
    keys = _keys(spark, [[1, 5, 9], [1, 5, 9]], l=64, mu=6, beta=8, seed=1)
    a = {(r["band"], r["key"]) for r in keys.where(F.col("rec_id") == "r0").collect()}
    b = {(r["band"], r["key"]) for r in keys.where(F.col("rec_id") == "r1").collect()}
    assert a == b


def test_projection_equality_drives_keys(spark):
    """Filters differing only outside the sampled positions share that key."""
    samples = sample_positions(l=64, mu=4, beta=8, seed=9)
    outside = next(p for p in range(64) if all(p not in s for s in samples))
    keys = _keys(spark, [[1, 5], [1, 5, outside]], l=64, mu=4, beta=8, seed=9)
    a = {(r["band"], r["key"]) for r in keys.where(F.col("rec_id") == "r0").collect()}
    b = {(r["band"], r["key"]) for r in keys.where(F.col("rec_id") == "r1").collect()}
    assert a == b


def test_empirical_collision_matches_theory(spark):
    """Random filters at Hamming distance d collide per the S-curve formula."""
    rng = np.random.default_rng(0)
    l, d, n = 256, 24, 60
    base = sorted(rng.choice(l, size=80, replace=False).tolist())
    bfs = [base]
    for _ in range(n):
        flip = rng.choice(l, size=d // 2, replace=False)
        # flip d/2 in, d/2 out → Hamming distance ≈ d
        cur = set(base) ^ set(flip.tolist())
        bfs.append(sorted(cur))
    mu, beta = 8, 12
    keys = _keys(spark, bfs, l=l, mu=mu, beta=beta, seed=4)
    k0 = {(r["band"], r["key"]) for r in keys.where(F.col("rec_id") == "r0").collect()}
    hits = 0
    rows = keys.where(F.col("rec_id") != "r0").collect()
    per_rec: dict[str, set] = {}
    for r in rows:
        per_rec.setdefault(r["rec_id"], set()).add((r["band"], r["key"]))
    for ks in per_rec.values():
        hits += bool(ks & k0)
    expected = hlsh_collision_probability(d, l=l, mu=mu, beta=beta)
    assert abs(hits / n - expected) < 0.25


def test_collision_probability_bounds():
    assert hlsh_collision_probability(0, l=128, mu=4, beta=8) == 1.0
    assert hlsh_collision_probability(128, l=128, mu=4, beta=8) == 0.0
    ps = [hlsh_collision_probability(d, l=128, mu=4, beta=8) for d in range(0, 129, 8)]
    assert all(a >= b for a, b in zip(ps, ps[1:]))

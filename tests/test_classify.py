"""Tests for threshold and Fellegi–Sunter classification."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.matching.classify import (
    FSModel,
    agreement_columns,
    fellegi_sunter_classify,
    fit_fellegi_sunter,
    fs_em,
    threshold_classify,
)


def test_threshold_classify(spark):
    df = spark.createDataFrame(pd.DataFrame({"sim": [0.5, 0.8, 0.9]}))
    assert threshold_classify(df, "sim", threshold=0.8).count() == 2


def test_agreement_columns(spark):
    df = spark.createDataFrame(pd.DataFrame({"s1": [0.9, 0.5], "s2": [0.2, 0.95]}))
    out, cols = agreement_columns(df, {"s1": 0.8, "s2": 0.8})
    assert cols == ["g_s1", "g_s2"]
    rows = out.collect()
    assert [(r["g_s1"], r["g_s2"]) for r in rows] == [(1, 0), (0, 1)]


def _synthetic_patterns(m, u, p, n, seed=0):
    """Sample agreement patterns from a known FS mixture."""
    rng = np.random.default_rng(seed)
    is_match = rng.random(n) < p
    probs = np.where(is_match[:, None], m, u)
    g = (rng.random((n, len(m))) < probs).astype(int)
    pdf = pd.DataFrame(g, columns=[f"g{i}" for i in range(len(m))])
    counts = pdf.value_counts().reset_index(name="n")
    return counts[[f"g{i}" for i in range(len(m))]].to_numpy(), counts["n"].to_numpy()


def test_fs_em_recovers_parameters():
    m_true = np.array([0.95, 0.9, 0.85])
    u_true = np.array([0.05, 0.1, 0.2])
    patterns, counts = _synthetic_patterns(m_true, u_true, p=0.2, n=20000)
    model = fs_em(patterns, counts)
    assert np.abs(model.m - m_true).max() < 0.05
    assert np.abs(model.u - u_true).max() < 0.05
    assert abs(model.p - 0.2) < 0.05


def test_fs_em_component_identifiability():
    """EM must label the agreement-heavy component as 'match' regardless of init."""
    m_true = np.array([0.9, 0.9])
    u_true = np.array([0.1, 0.1])
    patterns, counts = _synthetic_patterns(m_true, u_true, p=0.7, n=10000, seed=1)
    model = fs_em(patterns, counts, init_p=0.05)
    assert model.m.sum() > model.u.sum()


def test_fs_weights_ordering():
    model = FSModel(m=np.array([0.9, 0.9]), u=np.array([0.1, 0.1]), p=0.2, n_iter=1)
    w_full = model.pattern_weight(np.array([1, 1]))
    w_half = model.pattern_weight(np.array([1, 0]))
    w_none = model.pattern_weight(np.array([0, 0]))
    assert w_full > w_half > w_none
    assert w_full > 0 > w_none


def test_fs_posterior_bounds():
    model = FSModel(m=np.array([0.9]), u=np.array([0.1]), p=0.3, n_iter=1)
    assert 0.0 <= model.pattern_posterior(np.array([0])) < 0.5
    assert 0.5 < model.pattern_posterior(np.array([1])) <= 1.0


def test_fellegi_sunter_classify_end_to_end(spark):
    """Pairs drawn from a known mixture: FS should separate them cleanly."""
    rng = np.random.default_rng(2)
    n = 2000
    is_match = rng.random(n) < 0.3
    g1 = np.where(is_match, rng.random(n) < 0.95, rng.random(n) < 0.05).astype(int)
    g2 = np.where(is_match, rng.random(n) < 0.9, rng.random(n) < 0.1).astype(int)
    pdf = pd.DataFrame(
        {"rec_id_a": [f"a{i}" for i in range(n)], "rec_id_b": [f"b{i}" for i in range(n)],
         "g_1": g1, "g_2": g2, "truth": is_match}
    )
    df = spark.createDataFrame(pdf)
    model = fit_fellegi_sunter(df, ["g_1", "g_2"])
    matched = fellegi_sunter_classify(df, ["g_1", "g_2"], model)
    got = matched.select("rec_id_a", "truth").toPandas()
    # Both-agree pairs are overwhelmingly matches; accuracy should be high.
    accuracy = got["truth"].mean()
    assert accuracy > 0.85
    assert "fs_weight" in matched.columns and "fs_posterior" in matched.columns


def test_fellegi_sunter_posterior_threshold_monotone(spark):
    pdf = pd.DataFrame(
        {"rec_id_a": ["a1", "a2"], "rec_id_b": ["b1", "b2"], "g_1": [1, 0], "g_2": [1, 0]}
    )
    df = spark.createDataFrame(pdf)
    model = FSModel(m=np.array([0.9, 0.9]), u=np.array([0.1, 0.1]), p=0.3, n_iter=1)
    loose = fellegi_sunter_classify(df, ["g_1", "g_2"], model, posterior_threshold=0.1)
    strict = fellegi_sunter_classify(df, ["g_1", "g_2"], model, posterior_threshold=0.9)
    assert loose.count() >= strict.count()

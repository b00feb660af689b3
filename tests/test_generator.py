"""Tests for the synthetic person-entity generator."""
import numpy as np
import pandas as pd
import pytest

from repro.persons import generate_entities
from repro.persons.generator import QID_FIELDS, _zipf_weights

EXPECTED_COLS = [
    "entity_id", "first_name", "last_name", "gender", "dob", "city", "postcode", "group",
]


def test_schema():
    e = generate_entities(50, seed=0)
    assert list(e.columns) == EXPECTED_COLS
    assert len(e) == 50


def test_deterministic_in_seed():
    a = generate_entities(200, seed=7)
    b = generate_entities(200, seed=7)
    pd.testing.assert_frame_equal(a, b)


def test_different_seeds_differ():
    a = generate_entities(200, seed=1)
    b = generate_entities(200, seed=2)
    assert not a.equals(b)


def test_entity_ids_unique_and_dense():
    e = generate_entities(100, seed=0)
    assert list(e["entity_id"]) == list(range(100))


@pytest.mark.parametrize("frac", [0.0, 0.2, 0.5, 1.0])
def test_minority_fraction_respected(frac):
    e = generate_entities(2000, seed=3, minority_frac=frac)
    got = (e["group"] == "minority").mean()
    assert abs(got - frac) < 0.05


def test_dob_valid_iso_dates():
    e = generate_entities(500, seed=4)
    parsed = pd.to_datetime(e["dob"], format="%Y-%m-%d")
    assert parsed.min() >= pd.Timestamp("1940-01-01")
    assert parsed.max() <= pd.Timestamp("2005-12-31")


def test_postcode_range_and_city_correlation():
    e = generate_entities(1000, seed=5)
    assert e["postcode"].between(1000, 9999).all()
    # Same city ⇒ postcodes within the same 100-block.
    spans = e.groupby("city")["postcode"].agg(lambda s: s.max() - s.min())
    assert (spans < 100).all()


def test_gender_values():
    e = generate_entities(300, seed=6)
    assert set(e["gender"].unique()) <= {"f", "m"}


def test_zipf_weights_normalized_and_decreasing():
    w = _zipf_weights(50)
    assert abs(w.sum() - 1.0) < 1e-12
    assert (np.diff(w) < 0).all()


def test_name_frequencies_skewed():
    # Zipf sampling should make the most common name much more frequent
    # than the median one (frequency attacks in T7 rely on this).
    e = generate_entities(3000, seed=8, minority_frac=0.0)
    counts = e["last_name"].value_counts()
    assert counts.iloc[0] > 5 * counts.iloc[len(counts) // 2]


def test_qid_fields_exist():
    e = generate_entities(10, seed=0)
    for f in QID_FIELDS:
        assert f in e.columns


@pytest.mark.parametrize("bad", [0, -5])
def test_rejects_nonpositive_n(bad):
    with pytest.raises(ValueError):
        generate_entities(bad, seed=0)


@pytest.mark.parametrize("bad", [-0.1, 1.1])
def test_rejects_bad_minority_frac(bad):
    with pytest.raises(ValueError):
        generate_entities(10, seed=0, minority_frac=bad)


def test_minority_names_from_minority_pool():
    from repro.persons import pools

    e = generate_entities(500, seed=9, minority_frac=0.5)
    mino = e[e["group"] == "minority"]
    assert mino["first_name"].isin(pools.FIRST_NAMES_MINORITY).all()
    maj = e[e["group"] == "majority"]
    assert maj["first_name"].isin(pools.FIRST_NAMES_MAJORITY).all()

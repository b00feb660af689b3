"""Tests for the GeCo-style corruptor (pure Python, property-based where useful)."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.persons import corrupt_dob, corrupt_records, corrupt_string, generate_entities
from repro.persons.corruptor import (
    _edit_delete,
    _edit_insert,
    _edit_keyboard,
    _edit_ocr,
    _edit_substitute,
    _edit_transpose,
)

words = st.text(alphabet="abcdefghijklmnopqrstuvwxyz", min_size=1, max_size=15)


@given(words, st.integers(0, 2**31 - 1))
@settings(max_examples=60, deadline=None)
def test_insert_lengthens_by_one(s, seed):
    assert len(_edit_insert(s, np.random.default_rng(seed))) == len(s) + 1


@given(words, st.integers(0, 2**31 - 1))
@settings(max_examples=60, deadline=None)
def test_delete_shortens_unless_len1(s, seed):
    out = _edit_delete(s, np.random.default_rng(seed))
    assert len(out) == (len(s) if len(s) <= 1 else len(s) - 1)


@given(words, st.integers(0, 2**31 - 1))
@settings(max_examples=60, deadline=None)
def test_substitute_preserves_length(s, seed):
    assert len(_edit_substitute(s, np.random.default_rng(seed))) == len(s)


@given(words, st.integers(0, 2**31 - 1))
@settings(max_examples=60, deadline=None)
def test_transpose_preserves_multiset(s, seed):
    out = _edit_transpose(s, np.random.default_rng(seed))
    assert sorted(out) == sorted(s)


@given(words, st.integers(0, 2**31 - 1))
@settings(max_examples=60, deadline=None)
def test_keyboard_preserves_length(s, seed):
    assert len(_edit_keyboard(s, np.random.default_rng(seed))) == len(s)


@given(words, st.integers(0, 2**31 - 1))
@settings(max_examples=60, deadline=None)
def test_ocr_output_nonempty(s, seed):
    assert len(_edit_ocr(s, np.random.default_rng(seed))) >= len(s)


@given(words, st.integers(0, 2**31 - 1))
@settings(max_examples=60, deadline=None)
def test_corrupt_string_changes_or_preserves_validity(s, seed):
    out = corrupt_string(s, np.random.default_rng(seed))
    assert isinstance(out, str) and len(out) >= max(1, len(s) - 1)


def test_corrupt_dob_stays_digit_shaped():
    rng = np.random.default_rng(0)
    for _ in range(200):
        out = corrupt_dob("1984-03-07", rng)
        assert len(out) == 10 and out[4] == "-" and out[7] == "-"
        y, m, d = out.split("-")
        assert y.isdigit() and m.isdigit() and d.isdigit()


def test_corrupt_dob_changes_value_usually():
    rng = np.random.default_rng(1)
    changed = sum(corrupt_dob("1984-03-07", rng) != "1984-03-07" for _ in range(100))
    assert changed > 80


def _ents(n=300, seed=0):
    return generate_entities(n, seed=seed)


def test_zero_rate_is_identity():
    e = _ents()
    out = corrupt_records(e, corruption_rate=0.0, seed=1)
    pd.testing.assert_frame_equal(out, e)


def test_rate_one_changes_most_records():
    e = _ents()
    out = corrupt_records(e, corruption_rate=1.0, seed=1)
    qids = ["first_name", "last_name", "dob", "city"]
    changed = (out[qids] != e[qids]).any(axis=1).mean()
    # swap-names on identical fn/ln or same-char substitution can no-op
    assert changed > 0.85


@pytest.mark.parametrize("rate", [0.2, 0.5])
def test_rate_approximately_respected(rate):
    e = _ents(n=2000)
    out = corrupt_records(e, corruption_rate=rate, seed=2)
    qids = ["first_name", "last_name", "dob", "city"]
    changed = (out[qids] != e[qids]).any(axis=1).mean()
    assert abs(changed - rate) < 0.07


def test_deterministic_in_seed():
    e = _ents()
    a = corrupt_records(e, corruption_rate=0.5, seed=3)
    b = corrupt_records(e, corruption_rate=0.5, seed=3)
    pd.testing.assert_frame_equal(a, b)


def test_does_not_mutate_input():
    e = _ents()
    snapshot = e.copy(deep=True)
    corrupt_records(e, corruption_rate=1.0, seed=4)
    pd.testing.assert_frame_equal(e, snapshot)


def test_entity_id_and_group_untouched():
    e = _ents()
    out = corrupt_records(e, corruption_rate=1.0, seed=5)
    pd.testing.assert_series_equal(out["entity_id"], e["entity_id"])
    pd.testing.assert_series_equal(out["group"], e["group"])


def test_group_rate_multiplier_targets_minority():
    e = generate_entities(3000, seed=6, minority_frac=0.5)
    out = corrupt_records(
        e, corruption_rate=0.25, seed=7, group_rate_multiplier={"minority": 2.0}
    )
    qids = ["first_name", "last_name", "dob", "city"]
    changed = (out[qids] != e[qids]).any(axis=1)
    rate_min = changed[e["group"] == "minority"].mean()
    rate_maj = changed[e["group"] == "majority"].mean()
    assert rate_min > rate_maj + 0.12


def test_invalid_rate_rejected():
    with pytest.raises(ValueError):
        corrupt_records(_ents(10), corruption_rate=1.5, seed=0)

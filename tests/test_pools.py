"""Sanity checks on the name/place pools backing the person generator."""
import pytest

from repro.persons import pools

ALL_POOLS = {
    "first_majority": pools.FIRST_NAMES_MAJORITY,
    "last_majority": pools.LAST_NAMES_MAJORITY,
    "first_minority": pools.FIRST_NAMES_MINORITY,
    "last_minority": pools.LAST_NAMES_MINORITY,
    "cities": pools.CITIES,
}


@pytest.mark.parametrize("name", list(ALL_POOLS))
def test_pool_nonempty(name):
    assert len(ALL_POOLS[name]) >= 20


@pytest.mark.parametrize("name", list(ALL_POOLS))
def test_pool_lowercase_alpha(name):
    for v in ALL_POOLS[name]:
        assert v == v.lower() and v.isalpha(), v


@pytest.mark.parametrize("name", list(ALL_POOLS))
def test_pool_no_duplicates(name):
    vals = ALL_POOLS[name]
    assert len(set(vals)) == len(vals)


def test_minority_names_shorter_on_average():
    # The fairness mechanism (T9) depends on this asymmetry.
    maj = pools.FIRST_NAMES_MAJORITY + pools.LAST_NAMES_MAJORITY
    mino = pools.FIRST_NAMES_MINORITY + pools.LAST_NAMES_MINORITY
    avg = lambda xs: sum(map(len, xs)) / len(xs)  # noqa: E731
    assert avg(mino) < avg(maj) - 3

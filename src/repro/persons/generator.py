"""Synthetic person-entity generator (GeCo-style).

Produces a clean *entity* table in pandas, from which per-database record
tables are derived (see :mod:`repro.persons.corruptor` and
:mod:`repro.persons.databases`). Attribute values are drawn from
frequency-weighted pools (Zipfian, matching the heavy-tailed frequency
distributions of real name registries, which is what makes frequency attacks
on weak encodings work — T7).

Schema of the entity frame::

    entity_id   int64    ground-truth key (never used by linkage code)
    first_name  str
    last_name   str
    gender      str      'f' | 'm'
    dob         str      ISO yyyy-mm-dd, 1940..2005
    city        str
    postcode    int64    1000..9999, correlated with city (numeric QID)
    group       str      'majority' | 'minority' (fairness subgroup, T9)
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.persons import pools


def _zipf_weights(n: int, s: float = 1.0) -> np.ndarray:
    """Normalised Zipf weights for ranks 1..n with exponent ``s``."""
    w = 1.0 / np.arange(1, n + 1, dtype=float) ** s
    return w / w.sum()


def _zipf_choice(rng: np.random.Generator, pool: list[str], size: int, s: float = 1.0) -> np.ndarray:
    return rng.choice(np.asarray(pool, dtype=object), size=size, p=_zipf_weights(len(pool), s))


def generate_entities(
    n: int,
    *,
    seed: int = 0,
    minority_frac: float = 0.2,
    zipf_s: float = 1.0,
) -> pd.DataFrame:
    """Generate ``n`` clean person entities.

    ``minority_frac`` of entities draw their names from the minority pool
    (shorter names — see :mod:`repro.persons.pools`). Deterministic in
    ``seed``.
    """
    if n <= 0:
        raise ValueError(f"n must be positive, got {n}")
    if not 0.0 <= minority_frac <= 1.0:
        raise ValueError(f"minority_frac must be in [0,1], got {minority_frac}")
    rng = np.random.default_rng(seed)

    is_minority = rng.random(n) < minority_frac
    n_min = int(is_minority.sum())
    n_maj = n - n_min

    first = np.empty(n, dtype=object)
    last = np.empty(n, dtype=object)
    first[~is_minority] = _zipf_choice(rng, pools.FIRST_NAMES_MAJORITY, n_maj, zipf_s)
    last[~is_minority] = _zipf_choice(rng, pools.LAST_NAMES_MAJORITY, n_maj, zipf_s)
    first[is_minority] = _zipf_choice(rng, pools.FIRST_NAMES_MINORITY, n_min, zipf_s)
    last[is_minority] = _zipf_choice(rng, pools.LAST_NAMES_MINORITY, n_min, zipf_s)

    city_idx = rng.choice(len(pools.CITIES), size=n, p=_zipf_weights(len(pools.CITIES), zipf_s))
    city = np.asarray(pools.CITIES, dtype=object)[city_idx]
    # Postcode correlated with city so numeric-neighbourhood encoding (T1/T2
    # substrate) has structure: city block of 100 codes + per-person noise.
    postcode = 1000 + city_idx * 100 + rng.integers(0, 100, n)

    days = rng.integers(0, (pd.Timestamp("2005-12-31") - pd.Timestamp("1940-01-01")).days + 1, n)
    dob = (pd.Timestamp("1940-01-01") + pd.to_timedelta(days, unit="D")).strftime("%Y-%m-%d")

    return pd.DataFrame(
        {
            "entity_id": np.arange(n, dtype=np.int64),
            "first_name": first,
            "last_name": last,
            "gender": rng.choice(np.array(["f", "m"], dtype=object), n),
            "dob": dob,
            "city": city,
            "postcode": postcode.astype(np.int64),
            "group": np.where(is_minority, "minority", "majority"),
        }
    )


QID_FIELDS = ["first_name", "last_name", "dob", "city"]
"""String QIDs used by linkage code; ``postcode`` is the numeric QID."""

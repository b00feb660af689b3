"""SLK-581 statistical linkage key + keyed hashing — *past*-generation PPRL.

The AIHW SLK-581 derives a 14-character key from QIDs: letters 2,3 of first
name; letters 2,3,5 of surname; full date of birth (ddmmyyyy); sex code. A
missing letter position is encoded as ``'2'`` (the AIHW filler). Parties
exchange only ``HMAC-SHA256(secret, SLK)`` values and match on equality — so
any single typo in a contributing position breaks the match, which is exactly
the sensitivity failure Randall et al. (2016) report and T1 reproduces.
"""
from __future__ import annotations

import hashlib
import hmac as hmac_mod

import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import StringType

from repro.encoding.qgrams import normalize

_FILLER = "2"


def _letter(col: Column, pos: int) -> Column:
    """1-based alphabetic character ``pos`` of the normalized value, or filler."""
    s = F.regexp_replace(normalize(col), "[^a-z]", "")
    ch = F.substring(s, pos, 1)
    return F.when(F.length(ch) > 0, ch).otherwise(F.lit(_FILLER))


def slk581(first_name: Column, last_name: Column, dob: Column, gender: Column) -> Column:
    """The 14-character SLK-581 string (uppercase letters + digits).

    ``dob`` must be ISO ``yyyy-mm-dd``; gender maps f→2, m→1 (AIHW codes),
    anything else → 9.
    """
    name_part = F.upper(
        F.concat(
            _letter(last_name, 2), _letter(last_name, 3), _letter(last_name, 5),
            _letter(first_name, 2), _letter(first_name, 3),
        )
    )
    dob_part = F.concat(
        F.substring(dob, 9, 2), F.substring(dob, 6, 2), F.substring(dob, 1, 4)
    )
    sex = (
        F.when(normalize(gender).isin("m", "male", "1"), F.lit("1"))
        .when(normalize(gender).isin("f", "female", "2"), F.lit("2"))
        .otherwise(F.lit("9"))
    )
    return F.concat(name_part, dob_part, sex)


def hmac_sha256(col: Column, *, secret: str) -> Column:
    """Keyed hash of a column — what actually crosses the trust boundary.

    HMAC (not a bare hash) so that a party without the shared secret cannot
    mount a dictionary attack by hashing candidate plaintexts itself.
    """
    key = secret.encode()

    @pandas_udf(StringType())
    def _hmac(s: pd.Series) -> pd.Series:
        return s.map(
            lambda v: hmac_mod.new(key, (v or "").encode(), hashlib.sha256).hexdigest()
        )

    return _hmac(col)


def slk581_hashed(
    first_name: Column, last_name: Column, dob: Column, gender: Column, *, secret: str
) -> Column:
    """HMAC-protected SLK-581 — the exchanged linkage key."""
    return hmac_sha256(slk581(first_name, last_name, dob, gender), secret=secret)

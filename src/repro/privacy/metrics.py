"""Privacy metrics for encodings: entropy, uniqueness, k-anonymity-style risk."""
from __future__ import annotations

import math
from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class EncodingPrivacy:
    """Distributional privacy indicators of an encoded column.

    * ``entropy`` — Shannon entropy (bits) of the encoding distribution;
      higher = flatter = harder to exploit by frequency.
    * ``max_entropy`` — log2(#distinct); entropy/max_entropy ≈ flatness.
    * ``uniqueness`` — fraction of records whose encoding is unique
      (count == 1); unique encodings defeat frequency alignment but pinpoint
      the record if ever cross-referenced.
    * ``mean_group_size`` — average anonymity-set size per record.
    """

    n_records: int
    n_distinct: int
    entropy: float
    uniqueness: float
    mean_group_size: float

    @property
    def max_entropy(self) -> float:
        return math.log2(self.n_distinct) if self.n_distinct > 1 else 0.0


def encoding_privacy(df: DataFrame, col: str) -> EncodingPrivacy:
    """Compute :class:`EncodingPrivacy` for ``df[col]``."""
    counts = df.groupBy(col).agg(F.count("*").alias("c")).cache()
    row = counts.agg(
        F.sum("c").alias("n"),
        F.count("*").alias("d"),
        F.sum(F.when(F.col("c") == 1, 1).otherwise(0)).alias("uniq"),
        F.sum(F.col("c") * F.col("c")).alias("sumsq"),
    ).collect()[0]
    n = int(row["n"])
    ent = (
        counts.select(
            F.sum(-(F.col("c") / n) * F.log2(F.col("c") / F.lit(float(n)))).alias("h")
        ).collect()[0]["h"]
        or 0.0
    )
    counts.unpersist()
    return EncodingPrivacy(
        n_records=n,
        n_distinct=int(row["d"]),
        entropy=float(ent),
        uniqueness=int(row["uniq"]) / n if n else 0.0,
        mean_group_size=float(row["sumsq"]) / n if n else 0.0,
    )

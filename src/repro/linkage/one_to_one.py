"""One-to-one match assignment (deduplicated-database assumption).

When each database is internally duplicate-free, a record can match at most
one record on the other side. Greedy symmetric-best assignment: repeatedly
accept pairs that are each other's highest-similarity remaining candidate,
then drop both endpoints. Equivalent to the standard greedy weighted matching
(within a factor of optimal, and the usual choice in RL practice).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def one_to_one(
    matches: DataFrame,
    sim_col: str,
    *,
    max_iter: int = 15,
) -> DataFrame:
    """Subset of ``matches`` forming a one-to-one mapping, greedily by ``sim_col``.

    Deterministic: ties broken by record id. Iterates mutual-best selection;
    each round accepts at least one pair per connected component, so rounds
    needed ≤ max component matching size (tiny here); a safety cap remains.
    """
    remaining = matches.select("rec_id_a", "rec_id_b", sim_col).localCheckpoint(eager=True)
    accepted: list[DataFrame] = []
    for _ in range(max_iter):
        wa = Window.partitionBy("rec_id_a").orderBy(F.col(sim_col).desc(), F.col("rec_id_b"))
        wb = Window.partitionBy("rec_id_b").orderBy(F.col(sim_col).desc(), F.col("rec_id_a"))
        best = (
            remaining.withColumn("_ra", F.row_number().over(wa))
            .withColumn("_rb", F.row_number().over(wb))
            .where((F.col("_ra") == 1) & (F.col("_rb") == 1))
            .drop("_ra", "_rb")
            .localCheckpoint(eager=True)
        )
        if best.isEmpty():
            break
        accepted.append(best)
        remaining = (
            remaining.join(best.select("rec_id_a"), "rec_id_a", "left_anti")
            .join(best.select("rec_id_b"), "rec_id_b", "left_anti")
            .localCheckpoint(eager=True)
        )
        if remaining.isEmpty():
            break
    if not accepted:
        return matches.select("rec_id_a", "rec_id_b", sim_col).limit(0)
    out = accepted[0]
    for df in accepted[1:]:
        out = out.unionByName(df)
    return out

"""Blocking-quality metrics: pairs completeness, pairs quality, reduction ratio."""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame


@dataclass(frozen=True)
class BlockingMetrics:
    """Standard blocking evaluation triple plus raw counts.

    * ``pc`` (pairs completeness) — recall of the candidate set w.r.t. truth.
    * ``pq`` (pairs quality) — precision of the candidate set.
    * ``rr`` (reduction ratio) — fraction of the cartesian product pruned.
    """

    n_candidates: int
    n_truth: int
    n_true_in_candidates: int
    n_total_pairs: int

    @property
    def pc(self) -> float:
        return self.n_true_in_candidates / self.n_truth if self.n_truth else 1.0

    @property
    def pq(self) -> float:
        return self.n_true_in_candidates / self.n_candidates if self.n_candidates else 0.0

    @property
    def rr(self) -> float:
        return 1.0 - self.n_candidates / self.n_total_pairs if self.n_total_pairs else 0.0


def evaluate_blocking(
    candidates: DataFrame,
    truth: DataFrame,
    *,
    n_a: int,
    n_b: int,
) -> BlockingMetrics:
    """Compute PC/PQ/RR for a candidate set against truth pairs.

    ``candidates`` and ``truth`` both carry ``(rec_id_a, rec_id_b)``.
    """
    cand = candidates.select("rec_id_a", "rec_id_b").distinct().cache()
    n_cand = cand.count()
    n_truth = truth.count()
    n_hit = cand.join(truth, ["rec_id_a", "rec_id_b"]).count()
    cand.unpersist()
    return BlockingMetrics(
        n_candidates=n_cand,
        n_truth=n_truth,
        n_true_in_candidates=n_hit,
        n_total_pairs=n_a * n_b,
    )

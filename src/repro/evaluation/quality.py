"""Linkage-quality evaluation: precision / recall / F1, overall and per subgroup."""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class LinkageQuality:
    """Confusion counts of a pair classification against ground truth."""

    tp: int
    fp: int
    fn: int

    @property
    def precision(self) -> float:
        return self.tp / (self.tp + self.fp) if self.tp + self.fp else 0.0

    @property
    def recall(self) -> float:
        return self.tp / (self.tp + self.fn) if self.tp + self.fn else 0.0

    @property
    def f1(self) -> float:
        p, r = self.precision, self.recall
        return 2 * p * r / (p + r) if p + r else 0.0


def evaluate_matches(matches: DataFrame, truth: DataFrame) -> LinkageQuality:
    """Score predicted pairs ``(rec_id_a, rec_id_b)`` against truth pairs."""
    pred = matches.select("rec_id_a", "rec_id_b").distinct().cache()
    n_pred = pred.count()
    n_truth = truth.count()
    tp = pred.join(truth.select("rec_id_a", "rec_id_b"), ["rec_id_a", "rec_id_b"]).count()
    pred.unpersist()
    return LinkageQuality(tp=tp, fp=n_pred - tp, fn=n_truth - tp)


def evaluate_matches_by_group(
    matches: DataFrame,
    truth: DataFrame,
    groups: DataFrame,
    *,
    side: str = "rec_id_b",
) -> pd.DataFrame:
    """Per-subgroup quality (fairness view, T9).

    ``groups``: ``(rec_id, group)`` for records on ``side``. A pair belongs
    to the group of its ``side`` record. Returns one row per group with
    tp/fp/fn/precision/recall/f1.
    """
    g = groups.select(F.col("rec_id").alias(side), "group")
    pred = matches.select("rec_id_a", "rec_id_b").distinct().join(g, side)
    tru = truth.select("rec_id_a", "rec_id_b").join(g, side)
    tp = (
        pred.join(tru.select("rec_id_a", "rec_id_b"), ["rec_id_a", "rec_id_b"])
        .groupBy("group").agg(F.count("*").alias("tp"))
    )
    np_ = pred.groupBy("group").agg(F.count("*").alias("n_pred"))
    nt = tru.groupBy("group").agg(F.count("*").alias("n_truth"))
    pdf = (
        nt.join(np_, "group", "outer").join(tp, "group", "outer").fillna(0).toPandas()
    )
    pdf["fp"] = pdf["n_pred"] - pdf["tp"]
    pdf["fn"] = pdf["n_truth"] - pdf["tp"]
    pdf["precision"] = (pdf["tp"] / pdf["n_pred"].clip(lower=1)).where(pdf["n_pred"] > 0, 0.0)
    pdf["recall"] = (pdf["tp"] / pdf["n_truth"].clip(lower=1)).where(pdf["n_truth"] > 0, 0.0)
    denom = (pdf["precision"] + pdf["recall"]).clip(lower=1e-12)
    pdf["f1"] = 2 * pdf["precision"] * pdf["recall"] / denom
    return pdf.sort_values("group").reset_index(drop=True)

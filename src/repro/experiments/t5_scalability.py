"""T5 — scalability: runtime vs database size, blocked vs naive.

Runs the full pipeline at increasing n with (a) no blocking (cartesian
comparison — quadratic) and (b) Hamming-LSH blocking (near-linear). The naive
arm is capped: beyond ``naive_cap`` records it is skipped (that is the point
of the table).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.evaluation.harness import PipelineConfig, run_pipeline
from repro.evaluation.quality import evaluate_matches
from repro.experiments.common import timer
from repro.persons import database_pair


def run(
    spark: SparkSession,
    *,
    sizes: tuple[int, ...] = (500, 1000, 2000, 4000),
    naive_cap: int = 2000,
    corruption: float = 0.3,
    seed: int = 0,
) -> pd.DataFrame:
    """Rows: (n_entities, method, n_candidates, secs, f1)."""
    rows = []
    for n in sizes:
        df_a, df_b, truth = database_pair(
            spark, n_entities=n, overlap=0.5, corruption_rate=corruption, seed=seed
        )
        df_a, df_b, truth = df_a.cache(), df_b.cache(), truth.cache()
        truth.count()
        arms = [("hlsh_blocked", PipelineConfig(blocking="hlsh"))]
        if n <= naive_cap:
            arms.append(("naive_cartesian", PipelineConfig(blocking="none")))
        for name, cfg in arms:
            with timer() as t:
                res = run_pipeline(spark, df_a, df_b, cfg)
                q = evaluate_matches(res.matches, truth)
            rows.append(dict(n_entities=n, method=name, n_candidates=res.n_candidates,
                             secs=t(), f1=q.f1))
        for df in (df_a, df_b, truth):
            df.unpersist()
    return pd.DataFrame(rows)

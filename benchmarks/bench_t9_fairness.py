"""Benchmark — Per-subgroup quality (T9).

Runs the table's experiment driver once at benchmark scale (rounds=1: each
run is minutes of Spark work, statistical repetition is not affordable or
needed for the shape claims) and persists the measured rows to ``results/``.
"""
from benchmarks.common import save_table
from repro.experiments import t9_fairness


def test_bench_t9_fairness(spark, benchmark):
    kw=dict(n_entities=2000)
    out = {}

    def run():
        out["pdf"] = t9_fairness.run(spark, **kw)

    benchmark.pedantic(run, rounds=1, iterations=1)
    save_table("t9_fairness", out["pdf"])
    assert len(out["pdf"]) > 0

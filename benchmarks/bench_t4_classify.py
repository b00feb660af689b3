"""Benchmark — Threshold sweep vs Fellegi-Sunter (T4).

Runs the table's experiment driver once at benchmark scale (rounds=1: each
run is minutes of Spark work, statistical repetition is not affordable or
needed for the shape claims) and persists the measured rows to ``results/``.
"""
from benchmarks.common import save_table
from repro.experiments import t4_classify


def test_bench_t4_classify(spark, benchmark):
    kw=dict(n_entities=1500)
    out = {}

    def run():
        out["pdf"] = t4_classify.run(spark, **kw)

    benchmark.pedantic(run, rounds=1, iterations=1)
    save_table("t4_classify", out["pdf"])
    assert len(out["pdf"]) > 0

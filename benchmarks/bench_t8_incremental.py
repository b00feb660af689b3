"""Benchmark — Incremental vs full batch linkage (T8).

Runs the table's experiment driver once at benchmark scale (rounds=1: each
run is minutes of Spark work, statistical repetition is not affordable or
needed for the shape claims) and persists the measured rows to ``results/``.
"""
from benchmarks.common import save_table
from repro.experiments import t8_incremental


def test_bench_t8_incremental(spark, benchmark):
    kw=dict(n_entities=2000)
    out = {}

    def run():
        out["pdf"] = t8_incremental.run(spark, **kw)

    benchmark.pedantic(run, rounds=1, iterations=1)
    save_table("t8_incremental", out["pdf"])
    assert len(out["pdf"]) > 0

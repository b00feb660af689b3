"""Benchmark — Runtime vs size, blocked vs naive (T5).

Runs the table's experiment driver once at benchmark scale (rounds=1: each
run is minutes of Spark work, statistical repetition is not affordable or
needed for the shape claims) and persists the measured rows to ``results/``.
"""
from benchmarks.common import save_table
from repro.experiments import t5_scalability


def test_bench_t5_scalability(spark, benchmark):
    kw=dict(sizes=(500, 1000, 2000, 4000), naive_cap=2000)
    out = {}

    def run():
        out["pdf"] = t5_scalability.run(spark, **kw)

    benchmark.pedantic(run, rounds=1, iterations=1)
    save_table("t5_scalability", out["pdf"])
    assert len(out["pdf"]) > 0

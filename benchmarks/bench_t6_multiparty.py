"""Benchmark — Multi-party subset matching (T6).

Runs the table's experiment driver once at benchmark scale (rounds=1: each
run is minutes of Spark work, statistical repetition is not affordable or
needed for the shape claims) and persists the measured rows to ``results/``.
"""
from benchmarks.common import save_table
from repro.experiments import t6_multiparty


def test_bench_t6_multiparty(spark, benchmark):
    kw=dict(ps=(3, 5), n_entities=400)
    out = {}

    def run():
        out["pdf"] = t6_multiparty.run(spark, **kw)

    benchmark.pedantic(run, rounds=1, iterations=1)
    save_table("t6_multiparty", out["pdf"])
    assert len(out["pdf"]) > 0

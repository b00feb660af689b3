"""spark-submit entrypoint — T9: per-subgroup linkage quality.

Usage: ``spark-submit jobs/t9_fairness.py [options]``. Prints the table as
markdown; experiment logic lives in ``repro.experiments.t9_fairness``.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import build_session  # noqa: E402

from repro.experiments import t9_fairness  # noqa: E402
from repro.experiments.common import to_markdown_table  # noqa: E402


def main(argv=None) -> None:
    p = argparse.ArgumentParser(description='T9: per-subgroup linkage quality')
    p.add_argument("--n-entities", type=int, default=4000)
    ns = p.parse_args(argv)
    spark = build_session("t9_fairness")
    pdf = t9_fairness.run(spark, **{k: v for k, v in vars(ns).items()})
    print(to_markdown_table(pdf))
    spark.stop()


if __name__ == "__main__":
    main()

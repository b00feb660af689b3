"""spark-submit entrypoint — T3: meta-blocking and filtering.

Usage: ``spark-submit jobs/t3_metablocking.py [options]``. Prints the table as
markdown; experiment logic lives in ``repro.experiments.t3_metablocking``.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import build_session  # noqa: E402

from repro.experiments import t3_metablocking  # noqa: E402
from repro.experiments.common import to_markdown_table  # noqa: E402


def main(argv=None) -> None:
    p = argparse.ArgumentParser(description='T3: meta-blocking and filtering')
    p.add_argument("--n-entities", type=int, default=5000)
    ns = p.parse_args(argv)
    spark = build_session("t3_metablocking")
    pdf = t3_metablocking.run(spark, **{k: v for k, v in vars(ns).items()})
    print(to_markdown_table(pdf))
    spark.stop()


if __name__ == "__main__":
    main()

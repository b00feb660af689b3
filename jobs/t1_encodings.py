"""spark-submit entrypoint — T1: linkage quality of encoding generations.

Usage: ``spark-submit jobs/t1_encodings.py [options]``. Prints the table as
markdown; experiment logic lives in ``repro.experiments.t1_encodings``.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import build_session  # noqa: E402

from repro.experiments import t1_encodings  # noqa: E402
from repro.experiments.common import to_markdown_table  # noqa: E402


def main(argv=None) -> None:
    p = argparse.ArgumentParser(description='T1: linkage quality of encoding generations')
    p.add_argument("--n-entities", type=int, default=5000)
    ns = p.parse_args(argv)
    spark = build_session("t1_encodings")
    pdf = t1_encodings.run(spark, **{k: v for k, v in vars(ns).items()})
    print(to_markdown_table(pdf))
    spark.stop()


if __name__ == "__main__":
    main()

"""spark-submit entrypoint — T2: blocking methods — candidates, RR, PC.

Usage: ``spark-submit jobs/t2_blocking.py [options]``. Prints the table as
markdown; experiment logic lives in ``repro.experiments.t2_blocking``.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import build_session  # noqa: E402

from repro.experiments import t2_blocking  # noqa: E402
from repro.experiments.common import to_markdown_table  # noqa: E402


def main(argv=None) -> None:
    p = argparse.ArgumentParser(description='T2: blocking methods — candidates, RR, PC')
    p.add_argument("--n-entities", type=int, default=5000)
    p.add_argument("--corruption", type=float, default=0.3)
    ns = p.parse_args(argv)
    spark = build_session("t2_blocking")
    pdf = t2_blocking.run(spark, **{k: v for k, v in vars(ns).items()})
    print(to_markdown_table(pdf))
    spark.stop()


if __name__ == "__main__":
    main()

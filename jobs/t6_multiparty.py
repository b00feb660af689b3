"""spark-submit entrypoint — T6: multi-party linkage and subset matching.

Usage: ``spark-submit jobs/t6_multiparty.py [options]``. Prints the table as
markdown; experiment logic lives in ``repro.experiments.t6_multiparty``.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import build_session  # noqa: E402

from repro.experiments import t6_multiparty  # noqa: E402
from repro.experiments.common import to_markdown_table  # noqa: E402


def main(argv=None) -> None:
    p = argparse.ArgumentParser(description='T6: multi-party linkage and subset matching')
    p.add_argument("--n-entities", type=int, default=1000)
    ns = p.parse_args(argv)
    spark = build_session("t6_multiparty")
    pdf = t6_multiparty.run(spark, **{k: v for k, v in vars(ns).items()})
    print(to_markdown_table(pdf))
    spark.stop()


if __name__ == "__main__":
    main()

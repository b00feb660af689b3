"""spark-submit entrypoint — T8: incremental vs full batch linkage.

Usage: ``spark-submit jobs/t8_incremental.py [options]``. Prints the table as
markdown; experiment logic lives in ``repro.experiments.t8_incremental``.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import build_session  # noqa: E402

from repro.experiments import t8_incremental  # noqa: E402
from repro.experiments.common import to_markdown_table  # noqa: E402


def main(argv=None) -> None:
    p = argparse.ArgumentParser(description='T8: incremental vs full batch linkage')
    p.add_argument("--n-entities", type=int, default=3000)
    p.add_argument("--batch-frac", type=float, default=0.2)
    ns = p.parse_args(argv)
    spark = build_session("t8_incremental")
    pdf = t8_incremental.run(spark, **{k: v for k, v in vars(ns).items()})
    print(to_markdown_table(pdf))
    spark.stop()


if __name__ == "__main__":
    main()

"""spark-submit entrypoint — T5: runtime vs database size, blocked vs naive.

Usage: ``spark-submit jobs/t5_scalability.py [options]``. Prints the table as
markdown; experiment logic lives in ``repro.experiments.t5_scalability``.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import build_session  # noqa: E402

from repro.experiments import t5_scalability  # noqa: E402
from repro.experiments.common import to_markdown_table  # noqa: E402


def main(argv=None) -> None:
    p = argparse.ArgumentParser(description='T5: runtime vs database size, blocked vs naive')
    pass
    ns = p.parse_args(argv)
    spark = build_session("t5_scalability")
    pdf = t5_scalability.run(spark, **{k: v for k, v in vars(ns).items()})
    print(to_markdown_table(pdf))
    spark.stop()


if __name__ == "__main__":
    main()

"""spark-submit entrypoint — T4: threshold sweep vs Fellegi-Sunter EM.

Usage: ``spark-submit jobs/t4_classify.py [options]``. Prints the table as
markdown; experiment logic lives in ``repro.experiments.t4_classify``.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import build_session  # noqa: E402

from repro.experiments import t4_classify  # noqa: E402
from repro.experiments.common import to_markdown_table  # noqa: E402


def main(argv=None) -> None:
    p = argparse.ArgumentParser(description='T4: threshold sweep vs Fellegi-Sunter EM')
    p.add_argument("--n-entities", type=int, default=3000)
    p.add_argument("--corruption", type=float, default=0.3)
    ns = p.parse_args(argv)
    spark = build_session("t4_classify")
    pdf = t4_classify.run(spark, **{k: v for k, v in vars(ns).items()})
    print(to_markdown_table(pdf))
    spark.stop()


if __name__ == "__main__":
    main()

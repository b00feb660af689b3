"""Benchmark helpers: persist each table's measured rows under ``results/``.

EXPERIMENTS.md quotes these files; re-running the benchmarks regenerates
them (markdown for reading, CSV for diffing).
"""
from __future__ import annotations

from pathlib import Path

import pandas as pd

from repro.experiments.common import to_markdown_table

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


def save_table(name: str, pdf: pd.DataFrame) -> None:
    RESULTS_DIR.mkdir(exist_ok=True)
    (RESULTS_DIR / f"{name}.md").write_text(to_markdown_table(pdf) + "\n")
    pdf.to_csv(RESULTS_DIR / f"{name}.csv", index=False)

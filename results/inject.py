"""Inject measured benchmark tables into EXPERIMENTS.md.

Replaces each ``<!--Tn-->`` placeholder (or a previously injected block
delimited by ``<!--Tn--> ... <!--/Tn-->``) with the markdown table from
``results/t<n>_*.md``. Idempotent: rerunning after fresh benchmarks updates
the numbers in place.
"""
from __future__ import annotations

import re
from pathlib import Path

ROOT = Path(__file__).resolve().parent.parent
RESULTS = ROOT / "results"


def main() -> None:
    text = (ROOT / "EXPERIMENTS.md").read_text()
    for f in sorted(RESULTS.glob("t*.md")):
        tag = f.stem.split("_")[0].upper()  # t1_encodings -> T1
        table = f.read_text().strip()
        block = f"<!--{tag}-->\n{table}\n<!--/{tag}-->"
        pattern = re.compile(
            rf"<!--{tag}-->(?:.*?<!--/{tag}-->)?", re.DOTALL
        )
        if not pattern.search(text):
            raise SystemExit(f"no placeholder for {tag} in EXPERIMENTS.md")
        text = pattern.sub(block, text, count=1)
    (ROOT / "EXPERIMENTS.md").write_text(text)
    print("EXPERIMENTS.md updated")


if __name__ == "__main__":
    main()

"""Experiment drivers, one module per table in EXPERIMENTS.md (T1–T9)."""
from repro.experiments import (  # noqa: F401
    t1_encodings,
    t2_blocking,
    t3_metablocking,
    t4_classify,
    t5_scalability,
    t6_multiparty,
    t7_privacy,
    t8_incremental,
    t9_fairness,
)
from repro.experiments.common import to_markdown_table

__all__ = [
    "t1_encodings", "t2_blocking", "t3_metablocking", "t4_classify",
    "t5_scalability", "t6_multiparty", "t7_privacy", "t8_incremental",
    "t9_fairness", "to_markdown_table",
]

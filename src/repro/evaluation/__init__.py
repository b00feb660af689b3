"""Quality evaluation and the end-to-end pipeline harness."""
from repro.evaluation.harness import (
    PipelineConfig,
    PipelineResult,
    encode_clk,
    run_pipeline,
)
from repro.evaluation.quality import (
    LinkageQuality,
    evaluate_matches,
    evaluate_matches_by_group,
)

__all__ = [
    "LinkageQuality",
    "PipelineConfig",
    "PipelineResult",
    "encode_clk",
    "evaluate_matches",
    "evaluate_matches_by_group",
    "run_pipeline",
]

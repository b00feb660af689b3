"""Similarity computation, join filters, and pair classification."""
from repro.matching.classify import (
    FSModel,
    agreement_columns,
    fellegi_sunter_classify,
    fit_fellegi_sunter,
    fs_em,
    threshold_classify,
)
from repro.matching.filtering import (
    dice_length_bound,
    jaccard_length_bound,
    length_filter,
    prefix_filter_candidates,
)
from repro.matching.similarity import (
    attach_pair_columns,
    dice_sim,
    hamming_dist,
    intersect_size,
    jaccard_sim,
    jaro_winkler,
    jaro_winkler_py,
    overlap_sim,
)

__all__ = [
    "FSModel", "agreement_columns", "attach_pair_columns", "dice_length_bound",
    "dice_sim", "fellegi_sunter_classify", "fit_fellegi_sunter", "fs_em",
    "hamming_dist", "intersect_size", "jaccard_length_bound", "jaccard_sim",
    "jaro_winkler", "jaro_winkler_py", "length_filter", "overlap_sim",
    "prefix_filter_candidates", "threshold_classify",
]

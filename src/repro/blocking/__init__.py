"""Blocking / candidate generation: standard, LSH, sorted-neighbourhood, meta-blocking."""
from repro.blocking.keys import candidates_from_keys, standard_keys
from repro.blocking.methods import (
    cartesian_candidates,
    hamming_lsh_candidates,
    minhash_lsh_candidates,
    sorted_neighbourhood_candidates,
    standard_blocking,
)
from repro.blocking.metrics import BlockingMetrics, evaluate_blocking

__all__ = [
    "BlockingMetrics",
    "candidates_from_keys",
    "cartesian_candidates",
    "evaluate_blocking",
    "hamming_lsh_candidates",
    "minhash_lsh_candidates",
    "sorted_neighbourhood_candidates",
    "standard_blocking",
    "standard_keys",
]

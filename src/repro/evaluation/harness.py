"""End-to-end PPRL pipeline harness: encode → block → compare → classify.

One configurable entry point (:func:`run_pipeline`) used by experiments T1,
T2, T4, T5, T7 and T9, so every table exercises the same production code
path. Stage boundaries are timed with forced materialization
(``localCheckpoint``) so per-stage wall-clock is real, not lazy.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.blocking.methods import (
    cartesian_candidates,
    hamming_lsh_candidates,
    minhash_lsh_candidates,
    standard_blocking,
)
from repro.encoding.bloom import with_clk
from repro.encoding.hardening import blip
from repro.encoding.numeric import neighbourhood_tokens
from repro.encoding.phonetic import soundex
from repro.encoding.qgrams import record_tokens
from repro.linkage.one_to_one import one_to_one
from repro.matching.filtering import length_filter
from repro.matching.similarity import attach_pair_columns, dice_sim

QID_TAGS = {"fn": "first_name", "ln": "last_name", "db": "dob", "ct": "city"}


@dataclass
class PipelineConfig:
    """Knobs of the two-party Bloom-filter PPRL pipeline."""

    q: int = 2
    l: int = 1024
    k: int = 20
    salt: str = "pepper"
    include_numeric: bool = False  # postcode neighbourhood tokens into the CLK
    numeric_radius: float = 30.0
    numeric_step: float = 10.0
    blip_epsilon: float | None = None  # BLIP hardening (None = off)
    blocking: str = "hlsh"  # 'hlsh' | 'minhash' | 'standard' | 'none'
    mu: int = 16
    beta: int = 30
    lsh_seed: int = 11
    num_hashes: int = 24
    bands: int = 8
    rows: int = 3
    max_block_pairs: int | None = 50_000
    use_length_filter: bool = True
    threshold: float = 0.80
    one_to_one_matching: bool = True


@dataclass
class PipelineResult:
    """Matches plus the counters/timings the experiment tables report."""

    matches: DataFrame
    n_candidates: int
    n_after_filter: int
    n_matches: int
    timings: dict[str, float] = field(default_factory=dict)


def _qid_fields(df: DataFrame) -> dict[str, F.Column]:
    return {tag: F.col(c) for tag, c in QID_TAGS.items()}


def encode_clk(df: DataFrame, cfg: PipelineConfig) -> DataFrame:
    """Attach the record-level CLK (``bf``/``bf_n``) per the config."""
    extra = (
        neighbourhood_tokens(
            F.col("postcode").cast("double"), radius=cfg.numeric_radius, step=cfg.numeric_step
        )
        if cfg.include_numeric
        else None
    )
    out = with_clk(
        df, _qid_fields(df), q=cfg.q, l=cfg.l, k=cfg.k, salt=cfg.salt, extra_tokens=extra
    )
    if cfg.blip_epsilon is not None:
        out = blip(out, "bf", l=cfg.l, epsilon=cfg.blip_epsilon)
    return out


def _candidates(enc_a: DataFrame, enc_b: DataFrame, cfg: PipelineConfig) -> DataFrame:
    if cfg.blocking == "none":
        return cartesian_candidates(enc_a, enc_b)
    if cfg.blocking == "hlsh":
        return hamming_lsh_candidates(
            enc_a, enc_b, "bf", l=cfg.l, mu=cfg.mu, beta=cfg.beta, seed=cfg.lsh_seed,
            max_block_pairs=cfg.max_block_pairs,
        )
    if cfg.blocking == "minhash":
        toks = record_tokens(_qid_fields(enc_a), q=cfg.q)
        return minhash_lsh_candidates(
            enc_a, enc_b, toks, num_hashes=cfg.num_hashes, bands=cfg.bands, rows=cfg.rows,
            seed=cfg.lsh_seed, max_block_pairs=cfg.max_block_pairs,
        )
    if cfg.blocking == "standard":
        keys = lambda df: [  # noqa: E731
            soundex(F.col("last_name")),
            F.concat(soundex(F.col("first_name")), F.substring(F.col("dob"), 1, 4)),
        ]
        return standard_blocking(
            enc_a, enc_b, keys(enc_a), keys(enc_b), max_block_pairs=cfg.max_block_pairs
        )
    raise ValueError(f"unknown blocking method {cfg.blocking!r}")


def run_pipeline(
    spark: SparkSession,
    df_a: DataFrame,
    df_b: DataFrame,
    cfg: PipelineConfig | None = None,
) -> PipelineResult:
    """Run the full two-party pipeline and return matches + stage metrics."""
    cfg = cfg or PipelineConfig()
    timings: dict[str, float] = {}

    # Blocking keys are always derived from the *clean* (pre-hardening)
    # encodings: each DO computes its keys locally before randomizing what it
    # ships to the linkage unit. Only the filters used for similarity are
    # BLIPed, and the Dice threshold is recalibrated via the expected-Dice
    # transform (see encoding.hardening.expected_dice_after_blip).
    from dataclasses import replace as _replace

    from repro.encoding.hardening import expected_dice_after_blip, flip_probability

    clean_cfg = _replace(cfg, blip_epsilon=None)
    t0 = time.perf_counter()
    enc_a = encode_clk(df_a, clean_cfg).select("rec_id", "bf", "bf_n", *QID_TAGS.values()).localCheckpoint(eager=True)
    enc_b = encode_clk(df_b, clean_cfg).select("rec_id", "bf", "bf_n", *QID_TAGS.values()).localCheckpoint(eager=True)
    threshold = cfg.threshold
    sim_a, sim_b = enc_a, enc_b
    if cfg.blip_epsilon is not None:
        f = flip_probability(cfg.blip_epsilon)
        mean_n = (
            enc_a.select(F.avg("bf_n").alias("m")).unionByName(
                enc_b.select(F.avg("bf_n").alias("m"))
            ).agg(F.avg("m")).collect()[0][0]
        )
        threshold = expected_dice_after_blip(cfg.threshold, fill=float(mean_n) / cfg.l, f=f)
        sim_a = blip(enc_a, "bf", l=cfg.l, epsilon=cfg.blip_epsilon).localCheckpoint(eager=True)
        sim_b = blip(enc_b, "bf", l=cfg.l, epsilon=cfg.blip_epsilon).localCheckpoint(eager=True)
    timings["encode"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    cand = _candidates(enc_a, enc_b, cfg).localCheckpoint(eager=True)
    n_candidates = cand.count()
    timings["block"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    pairs = attach_pair_columns(cand, sim_a, sim_b, ["bf", "bf_n"])
    if cfg.use_length_filter:
        pairs = length_filter(pairs, n_a="bf_n_a", n_b="bf_n_b", threshold=threshold)
    n_after_filter = pairs.count()
    timings["filter"] = time.perf_counter() - t0

    t0 = time.perf_counter()
    scored = pairs.withColumn("sim", dice_sim(F.col("bf_a"), F.col("bf_b")))
    matched = scored.where(F.col("sim") >= threshold).select("rec_id_a", "rec_id_b", "sim")
    if cfg.one_to_one_matching:
        matched = one_to_one(matched, "sim")
    matched = matched.localCheckpoint(eager=True)
    n_matches = matched.count()
    timings["match"] = time.perf_counter() - t0
    timings["total"] = sum(timings.values())

    return PipelineResult(
        matches=matched,
        n_candidates=n_candidates,
        n_after_filter=n_after_filter,
        n_matches=n_matches,
        timings=timings,
    )

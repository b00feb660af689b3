"""Build the per-party record databases handed to the PPRL pipeline.

A *database owner* (DO) holds a record table derived from the shared entity
population: a subset of entities, each possibly corrupted. ``entity_id``
travels with every record but is ground truth only — linkage code must never
read it; evaluation code joins on it.

Record schema = generator schema + ``rec_id`` (``"{db}-{i:06d}"``) and
``db`` (source tag).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.persons.corruptor import corrupt_records
from repro.persons.generator import generate_entities


def records_from_entities(
    entities: pd.DataFrame,
    *,
    db_name: str,
    corruption_rate: float,
    seed: int,
    max_mods: int = 2,
    group_rate_multiplier: dict[str, float] | None = None,
) -> pd.DataFrame:
    """One record per entity, corrupted at ``corruption_rate``, tagged with ids."""
    recs = corrupt_records(
        entities, corruption_rate=corruption_rate, seed=seed, max_mods=max_mods,
        group_rate_multiplier=group_rate_multiplier,
    ).reset_index(drop=True)
    recs.insert(0, "rec_id", [f"{db_name}-{i:06d}" for i in range(len(recs))])
    recs.insert(1, "db", db_name)
    return recs


def database_pair(
    spark: SparkSession,
    *,
    n_entities: int = 1000,
    overlap: float = 0.5,
    corruption_rate: float = 0.3,
    seed: int = 0,
    max_mods: int = 2,
    minority_frac: float = 0.2,
    group_rate_multiplier: dict[str, float] | None = None,
) -> tuple[DataFrame, DataFrame, DataFrame]:
    """Two-party setting: DBs A and B over a shared population.

    ``overlap`` is the fraction of entities present in *both* DBs; the
    remainder is split evenly between A-only and B-only. A holds clean(er)
    records (corruption_rate/2 — the 'registry' side), B holds records
    corrupted at the full rate (the 'incoming' side), mirroring the
    registry-vs-claims asymmetry of real linkages.

    Returns ``(df_a, df_b, truth)`` where ``truth`` has columns
    ``(rec_id_a, rec_id_b)`` — the ground-truth matching record pairs.
    """
    if not 0.0 <= overlap <= 1.0:
        raise ValueError(f"overlap must be in [0,1], got {overlap}")
    ents = generate_entities(n_entities, seed=seed, minority_frac=minority_frac)
    rng = np.random.default_rng(seed + 1)
    perm = rng.permutation(n_entities)
    n_shared = int(round(overlap * n_entities))
    n_only = (n_entities - n_shared) // 2
    shared = perm[:n_shared]
    a_only = perm[n_shared : n_shared + n_only]
    b_only = perm[n_shared + n_only : n_shared + 2 * n_only]

    ents_a = ents.iloc[np.concatenate([shared, a_only])].reset_index(drop=True)
    ents_b = ents.iloc[np.concatenate([shared, b_only])].reset_index(drop=True)
    rec_a = records_from_entities(
        ents_a, db_name="A", corruption_rate=corruption_rate / 2, seed=seed + 2,
        max_mods=max_mods, group_rate_multiplier=group_rate_multiplier,
    )
    rec_b = records_from_entities(
        ents_b, db_name="B", corruption_rate=corruption_rate, seed=seed + 3,
        max_mods=max_mods, group_rate_multiplier=group_rate_multiplier,
    )

    truth = rec_a[["rec_id", "entity_id"]].merge(
        rec_b[["rec_id", "entity_id"]], on="entity_id", suffixes=("_a", "_b")
    )[["rec_id_a", "rec_id_b"]]
    truth_df = (
        spark.createDataFrame(truth)
        if len(truth)
        else spark.createDataFrame([], "rec_id_a string, rec_id_b string")
    )
    return spark.createDataFrame(rec_a), spark.createDataFrame(rec_b), truth_df


def multi_databases(
    spark: SparkSession,
    *,
    p: int = 3,
    n_entities: int = 1000,
    presence: float = 0.6,
    corruption_rate: float = 0.3,
    seed: int = 0,
) -> tuple[list[DataFrame], DataFrame]:
    """Multi-party setting: ``p`` databases over a shared population.

    Each entity appears in each DB independently with probability
    ``presence`` (entities appearing nowhere are dropped), so ground-truth
    clusters span 1..p databases — the substrate for subset matching (T6:
    "patients in ≥m of p hospitals").

    Returns ``(dbs, truth)`` where ``truth`` has one row per record:
    ``(rec_id, db, entity_id)``.
    """
    if p < 2:
        raise ValueError(f"p must be >= 2, got {p}")
    ents = generate_entities(n_entities, seed=seed)
    rng = np.random.default_rng(seed + 10)
    present = rng.random((n_entities, p)) < presence

    dbs: list[DataFrame] = []
    truth_parts: list[pd.DataFrame] = []
    for j in range(p):
        name = f"P{j}"
        sel = ents.iloc[np.flatnonzero(present[:, j])].reset_index(drop=True)
        if len(sel) == 0:
            sel = ents.iloc[:1].reset_index(drop=True)
        recs = records_from_entities(
            sel, db_name=name, corruption_rate=corruption_rate, seed=seed + 20 + j
        )
        dbs.append(spark.createDataFrame(recs))
        truth_parts.append(recs[["rec_id", "db", "entity_id"]])
    truth = pd.concat(truth_parts, ignore_index=True)
    return dbs, spark.createDataFrame(truth)

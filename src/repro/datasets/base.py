"""Shared machinery for the synthetic evaluation datasets.

Every dataset follows the same recipe (documented per dataset in its
module): entities carry latent factors; the outcome of each input-table
row is driven by its entity's latents plus row-level noise; the KG stores
noisy proxies of the latents (the plantable "ground-truth" confounders),
redundant variants (``X_Rank``), and a configurable amount of junk —
numeric noise, categorical noise, a constant ``Type``, and a unique
``WIKIID`` — so the offline/online pruning stages have realistic work.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.kg.graph import KnowledgeGraph


@dataclass
class SynthDataset:
    """A generated dataset: the input table, its KG, and metadata."""

    name: str
    df: DataFrame
    kg: KnowledgeGraph
    extraction_cols: list[str]
    n_rows: int
    #: entity-level frames used by the generators (handy for tests)
    entities: dict[str, pd.DataFrame] = field(default_factory=dict)


def zscore(x: np.ndarray) -> np.ndarray:
    sd = x.std()
    return (x - x.mean()) / (sd if sd > 0 else 1.0)


def rank_of(x: np.ndarray) -> np.ndarray:
    """Dense rank (1 = largest) — the redundant ``X_Rank`` variants."""
    order = np.argsort(-x)
    ranks = np.empty_like(order)
    ranks[order] = np.arange(1, len(x) + 1)
    return ranks.astype(float)


def mask_mcar(
    rng: np.random.Generator, values: np.ndarray, frac: float
) -> np.ndarray:
    """Return values with ``frac`` entries replaced by NaN/None (MCAR)."""
    out = values.astype(object).copy()
    drop = rng.random(len(values)) < frac
    out[drop] = None
    return out


def mask_mnar_top(values: np.ndarray, frac: float) -> np.ndarray:
    """Null the top-``frac`` values — entity-level selection bias."""
    out = values.astype(object).copy()
    if frac <= 0:
        return out
    k = max(1, int(round(frac * len(values))))
    top = np.argsort(-values.astype(float))[:k]
    out[top] = None
    return out


def add_junk_literals(
    kg: KnowledgeGraph,
    rng: np.random.Generator,
    entity_ids: list[str],
    n_junk: int,
    *,
    prefix: str = "kg",
    missing_frac: float = 0.35,
) -> list[str]:
    """Attach ``n_junk`` uninformative properties: cycling through numeric
    noise, categorical noise, constants, and near-unique ids (the mix the
    offline pruning stage exists for)."""
    names: list[str] = []
    n_ent = len(entity_ids)
    for i in range(n_junk):
        kind = i % 4
        name = f"{prefix}_junk_{i}"
        if kind == 0:  # numeric noise
            vals = rng.normal(size=n_ent)
        elif kind == 1:  # categorical noise
            vals = rng.choice([f"cat{j}" for j in range(5)], n_ent)
        elif kind == 2:  # constant (offline-pruned)
            vals = np.array(["fixed"] * n_ent, dtype=object)
        else:  # near-unique id (offline-pruned)
            vals = np.array([f"{prefix}id{i}_{j}" for j in range(n_ent)], dtype=object)
        masked = mask_mcar(rng, np.asarray(vals, dtype=object), missing_frac)
        for eid, v in zip(entity_ids, masked):
            if v is not None:
                kg.add_literal(eid, name, float(v) if kind == 0 else v)
        names.append(name)
    return names


def add_standard_ids(
    kg: KnowledgeGraph, entity_ids: list[str], type_value: str
) -> None:
    """The two canonical offline-pruning victims the paper names:
    a constant ``Type`` and a unique ``WIKIID``."""
    for j, eid in enumerate(entity_ids):
        kg.add_literal(eid, "Type", type_value)
        kg.add_literal(eid, "WIKIID", f"Q{90000 + j}")


def add_literal_series(
    kg: KnowledgeGraph,
    entity_ids: list[str],
    name: str,
    values: np.ndarray,
) -> None:
    """Attach one property; None/NaN entries are simply absent in the KG."""
    for eid, v in zip(entity_ids, values):
        if v is None:
            continue
        if isinstance(v, float) and np.isnan(v):
            continue
        kg.add_literal(eid, name, v)

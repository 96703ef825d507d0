"""Synthetic Forbes celebrity-earnings dataset (1,647 rows = ~150 celebs ×
11 years, like the paper's 2005–2015 panel).

Category-specific pay models (entity latents → pay in $M):

* Actors:               10·z(net_worth) + 6·[Gender = M]   — the gender pay
  gap and experience≈net-worth findings the paper cites for Forbes Q1.
* Directors/Producers:   8·z(net_worth) + 6·z(awards)       — Q2.
* Athletes:              8·z(cups) + 6·z(draft_pick)        — Q3
  (performance-based pay; Cups / Draft Pick attributes).
* Musicians/Authors:    filler categories.

The KG stores category-specific properties (Awards only for
actors/directors/authors; Cups / National_Cups / Draft_Pick only for
athletes), which is precisely why the paper measures 73% missing values
and the highest selection-bias rate (29.4%) on Forbes: the missingness of
Cups is fully determined by category, hence associated with the outcome.
One celebrity is planted with an ambiguous surface form ("Ronaldo"), the
paper's NED-ambiguity example.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.base import (
    SynthDataset,
    add_junk_literals,
    add_literal_series,
    add_standard_ids,
    mask_mcar,
    zscore,
)
from repro.kg.graph import KnowledgeGraph

N_ROWS_SF1 = 1_647
YEARS = list(range(2005, 2016))
CATEGORIES = [
    ("Actors", 40),
    ("Athletes", 40),
    ("Directors/Producers", 30),
    ("Musicians", 25),
    ("Authors", 15),
]


def make_forbes(
    spark: SparkSession,
    *,
    sf: float = 1.0,  # accepted for API uniformity; panel is fixed-size
    seed: int = 3,
    n_junk: int = 24,
    kg_missing: float = 0.15,
) -> SynthDataset:
    rng = np.random.default_rng(seed)
    celebs = []
    idx = 0
    for cat, count in CATEGORIES:
        for _ in range(count):
            celebs.append((f"Celeb{idx:03d}", cat))
            idx += 1
    ent = pd.DataFrame(celebs, columns=["name", "category"])
    n_c = len(ent)
    ent["net_worth"] = np.round(np.exp(rng.normal(4.0, 0.8, n_c)), 1)
    ent["gender"] = rng.choice(["M", "F"], n_c, p=[0.65, 0.35])
    ent["age"] = rng.integers(22, 75, n_c).astype(float)
    ent["awards"] = rng.integers(0, 20, n_c).astype(float)
    ent["cups"] = rng.integers(0, 15, n_c).astype(float)
    ent["draft_pick"] = rng.integers(1, 60, n_c).astype(float)
    ent["active_years"] = np.round(ent["age"] - 20 + rng.normal(0, 3, n_c), 0)

    nw_z = zscore(np.log(ent["net_worth"].to_numpy()))
    aw_z = zscore(ent["awards"].to_numpy())
    cup_z = zscore(ent["cups"].to_numpy())
    draft_z = zscore(-ent["draft_pick"].to_numpy())  # low pick = better
    male = (ent["gender"] == "M").to_numpy()
    base = np.select(
        [
            ent["category"] == "Actors",
            ent["category"] == "Directors/Producers",
            ent["category"] == "Athletes",
            ent["category"] == "Musicians",
        ],
        [
            25 + 10 * nw_z + 6 * male,
            20 + 8 * nw_z + 6 * aw_z,
            22 + 8 * cup_z + 6 * draft_z,
            18 + 9 * nw_z,
        ],
        default=10 + 5 * aw_z,
    )
    ent["pay_base"] = base

    # Surface forms: one athlete is ambiguous ("Ronaldo" matches two
    # entities), reproducing the paper's linker failure.
    ent["surface_form"] = ent["name"]
    amb_i = ent.index[ent["category"] == "Athletes"][0]
    ent.loc[amb_i, "surface_form"] = "Ronaldo"

    # Panel rows: every celeb × every year, trimmed to the paper's 1,647.
    rows = ent.loc[ent.index.repeat(len(YEARS))].reset_index(drop=True)
    rows["Year"] = np.tile(YEARS, n_c)
    rows = rows.iloc[:N_ROWS_SF1].copy()
    rows["Pay"] = np.round(
        np.maximum(
            rows["pay_base"].to_numpy()
            + 0.2 * (rows["Year"].to_numpy() - 2010)
            + rng.normal(0, 2.0, len(rows)),
            0.5,
        ),
        2,
    )
    pdf = rows[["surface_form", "category", "Year", "Pay"]].rename(
        columns={"surface_form": "Name", "category": "Category"}
    )

    # --- KG -----------------------------------------------------------------
    kg = KnowledgeGraph()
    eids = [f"P{i}" for i in range(n_c)]
    for i, (eid, name) in enumerate(zip(eids, ent["name"])):
        kg.add_entity(eid, name)
    # The ambiguity: two KG entities both answer to "Ronaldo".
    kg.add_entity("P_amb1", "Ronaldo L. N.", aliases=("Ronaldo",))
    kg.add_entity("P_amb2", "Cristiano R.", aliases=("Ronaldo",))

    cat = ent["category"].to_numpy()
    is_perf = np.isin(cat, ["Actors", "Directors/Producers", "Authors"])
    is_ath = cat == "Athletes"

    def cat_masked(values: np.ndarray, mask: np.ndarray) -> np.ndarray:
        out = values.astype(object).copy()
        out[~mask] = None
        return out

    add_literal_series(
        kg, eids, "Net_Worth", mask_mcar(rng, ent["net_worth"].to_numpy(), kg_missing)
    )
    add_literal_series(
        kg, eids, "Gender", mask_mcar(rng, ent["gender"].to_numpy(object), kg_missing)
    )
    add_literal_series(
        kg, eids, "Age", mask_mcar(rng, ent["age"].to_numpy(), kg_missing)
    )
    add_literal_series(
        kg,
        eids,
        "Active_Years",
        mask_mcar(rng, ent["active_years"].to_numpy(), kg_missing),
    )
    add_literal_series(
        kg,
        eids,
        "Citizenship",
        mask_mcar(rng, rng.choice(["US", "UK", "FR", "BR", "ES"], n_c), kg_missing),
    )
    add_literal_series(
        kg,
        eids,
        "Honors",
        mask_mcar(rng, rng.integers(0, 6, n_c).astype(float), kg_missing),
    )
    # Category-specific (→ 70%+ missing overall, missingness ⫫̸ outcome):
    add_literal_series(
        kg, eids, "Awards", cat_masked(ent["awards"].to_numpy(), is_perf)
    )
    add_literal_series(kg, eids, "Cups", cat_masked(ent["cups"].to_numpy(), is_ath))
    add_literal_series(
        kg,
        eids,
        "National_Cups",
        cat_masked(np.round(ent["cups"].to_numpy() * 0.6, 0), is_ath),
    )
    add_literal_series(
        kg, eids, "Draft_Pick", cat_masked(ent["draft_pick"].to_numpy(), is_ath)
    )
    add_standard_ids(kg, eids, "Person")
    add_junk_literals(kg, rng, eids, n_junk, prefix="person", missing_frac=0.6)

    return SynthDataset(
        name="Forbes",
        df=spark.createDataFrame(pdf),
        kg=kg,
        extraction_cols=["Name"],
        n_rows=len(pdf),
        entities={"celebs": ent},
    )

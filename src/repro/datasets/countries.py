"""Shared synthetic country world — entities behind the SO and Covid-19
datasets.

Planted latent structure (→ which KG attributes proxy it):

* ``hdi``      — development level; continent-based so that *within Europe
  the HDI variance is tiny* (the paper's Example 4.1 / Table 4 hinge on
  this). Proxied by ``HDI`` and ``HDI_Rank``.
* ``econ2``    — an economy component independent of HDI; ``GDP`` mixes
  hdi and econ2 (so GDP is informative beyond HDI — Covid Q1 selects both).
* ``gini``     — inequality, independent of HDI. Proxied by ``Gini`` and
  ``Gini_Rank``; planted with *selection bias*: Gini is preferentially
  missing for high-HDI countries (IPW's reason to exist).
* ``log_pop``  — population size. Proxied by ``Population_Census`` and
  ``Population_Estimate``.
* ``density``  — continent-correlated density. Proxied by ``Density``.

NED failures are planted: two countries appear in input tables under a
surface form the KG has no alias for ("… Federation"), reproducing the
paper's "Russian Federation" ≠ "Russia" linking loss.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.datasets.base import (
    add_junk_literals,
    add_literal_series,
    add_standard_ids,
    mask_mcar,
    rank_of,
    zscore,
)
from repro.kg.graph import KnowledgeGraph

CONTINENTS = [
    # (name, share of countries, hdi_mean, hdi_sd, density_base)
    ("Europe", 0.22, 0.91, 0.005, 120.0),
    ("Asia", 0.22, 0.70, 0.10, 150.0),
    ("North America", 0.17, 0.85, 0.04, 40.0),
    ("Africa", 0.17, 0.55, 0.07, 45.0),
    ("South America", 0.12, 0.72, 0.05, 25.0),
    ("Oceania", 0.10, 0.83, 0.06, 8.0),
]

#: number of countries whose input-table surface form fails NED linking
N_NED_FAILURES = 2


@dataclass
class CountryWorld:
    countries: pd.DataFrame  # one row per country: latents + table metadata
    kg: KnowledgeGraph


def make_country_world(
    rng: np.random.Generator,
    *,
    n_countries: int = 60,
    n_junk: int = 24,
    kg_missing: float = 0.30,
    gini_mnar_frac: float = 0.15,
    hdi_sd_scale: float = 1.0,
) -> CountryWorld:
    """Build the country entities, their latents, and the country KG.

    ``hdi_sd_scale`` widens the within-continent HDI spread: SO keeps the
    tight continent clustering (its Table 4 story needs a homogeneous
    Europe), Covid-19 uses a wider spread (country development varies
    within WHO regions, so the region attribute must not be a stand-in
    for HDI).
    """
    rows = []
    idx = 0
    for name, share, hdi_mu, hdi_sd, dens in CONTINENTS:
        n_c = max(2, int(round(share * n_countries)))
        for _ in range(n_c):
            rows.append((f"Country{idx:03d}", name, hdi_mu, hdi_sd, dens))
            idx += 1
    df = pd.DataFrame(
        rows, columns=["country", "continent", "hdi_mu", "hdi_sd", "dens"]
    )
    n = len(df)
    df["hdi"] = np.clip(
        rng.normal(df["hdi_mu"], df["hdi_sd"] * hdi_sd_scale), 0.30, 0.99
    )
    df["econ2"] = rng.normal(size=n)
    df["gdp"] = 100 + 40 * (0.6 * zscore(df["hdi"].to_numpy()) + 0.4 * df["econ2"])
    df["gini"] = np.clip(rng.normal(38, 8, n), 22, 62)
    df["log_pop"] = rng.normal(16.0, 1.5, n)
    df["density"] = df["dens"] * np.exp(rng.normal(0, 0.4, n))
    df["currency"] = [
        "Euro" if c == "Europe" and rng.random() < 0.8 else f"Cur{i % 17}"
        for i, c in enumerate(df["continent"])
    ]
    # Surface form used by input tables; NED failures get a form the KG
    # does not alias ("CountryNNN Federation").
    surface = df["country"].copy()
    fail_idx = rng.choice(n, size=N_NED_FAILURES, replace=False)
    surface.iloc[fail_idx] = df["country"].iloc[fail_idx] + " Federation"
    df["surface_form"] = surface

    kg = KnowledgeGraph()
    eids = [f"C{i}" for i in range(n)]
    for eid, (_, r) in zip(eids, df.iterrows()):
        kg.add_entity(eid, r["country"])  # canonical label only
    df["eid"] = eids

    hdi = df["hdi"].to_numpy()
    gdp = df["gdp"].to_numpy()
    gini = df["gini"].to_numpy()
    pop = np.exp(df["log_pop"].to_numpy())
    dens_v = df["density"].to_numpy()

    def noisy(x, rel=0.02):
        return x * (1 + rng.normal(0, rel, n))

    # HDI is a flagship, well-curated KG property: less missing than the tail.
    add_literal_series(
        kg, eids, "HDI", mask_mcar(rng, np.round(hdi, 2), kg_missing / 2)
    )
    add_literal_series(
        kg, eids, "HDI_Rank", mask_mcar(rng, rank_of(hdi), kg_missing)
    )
    add_literal_series(kg, eids, "GDP", mask_mcar(rng, np.round(gdp, 1), kg_missing))
    add_literal_series(
        kg, eids, "GDP_Rank", mask_mcar(rng, rank_of(gdp), kg_missing)
    )
    # Gini: MNAR — the highest-HDI countries preferentially lack it.
    gini_vals = np.round(gini, 1).astype(object)
    order = np.argsort(-hdi)
    k_mnar = int(round(gini_mnar_frac * n))
    gini_vals[order[:k_mnar]] = None
    gini_vals = mask_mcar(rng, gini_vals, kg_missing / 2)
    add_literal_series(kg, eids, "Gini", gini_vals)
    add_literal_series(
        kg, eids, "Gini_Rank", mask_mcar(rng, rank_of(gini), kg_missing)
    )
    add_literal_series(
        kg, eids, "Density", mask_mcar(rng, np.round(dens_v, 1), kg_missing)
    )
    add_literal_series(
        kg,
        eids,
        "Population_Census",
        mask_mcar(rng, np.round(noisy(pop), 0), kg_missing),
    )
    add_literal_series(
        kg,
        eids,
        "Population_Estimate",
        mask_mcar(rng, np.round(noisy(pop, 0.05), 0), kg_missing),
    )
    add_literal_series(
        kg, eids, "Area_Rank", mask_mcar(rng, rank_of(rng.normal(size=n)), kg_missing)
    )
    langs = {
        "Europe": ["German", "French", "English"],
        "Asia": ["Mandarin", "Hindi", "Japanese"],
        "North America": ["English", "Spanish"],
        "Africa": ["Swahili", "Arabic", "French"],
        "South America": ["Spanish", "Portuguese"],
        "Oceania": ["English", "Maori"],
    }
    lang = np.array(
        [rng.choice(langs[c]) for c in df["continent"]], dtype=object
    )
    add_literal_series(kg, eids, "Language", mask_mcar(rng, lang, kg_missing))
    add_literal_series(
        kg,
        eids,
        "Established_Date",
        mask_mcar(rng, rng.integers(1200, 1990, n).astype(float), kg_missing),
    )
    add_standard_ids(kg, eids, "Country")
    add_junk_literals(kg, rng, eids, n_junk, prefix="country")

    # Continent entities — SO's second extraction column ("Country,
    # Continent" in Table 1). Continent-level properties are aggregates of
    # their member countries plus noise.
    for k, (cname, _, _, _, _) in enumerate(CONTINENTS):
        ceid = f"CONT{k}"
        kg.add_entity(ceid, cname)
        members = df["continent"] == cname
        kg.add_literal(ceid, "GDP", float(np.round(gdp[members.to_numpy()].mean(), 1)))
        kg.add_literal(
            ceid, "Density", float(np.round(dens_v[members.to_numpy()].mean(), 1))
        )
        kg.add_literal(
            ceid, "Population_Total", float(np.round(pop[members.to_numpy()].sum(), 0))
        )
        kg.add_literal(ceid, "Area_Rank", float(k + 1))
        kg.add_literal(ceid, "Type", "Continent")

    # Multi-hop material: a leader per country, ethnic groups for a few.
    for i, eid in enumerate(eids):
        lid = f"L{i}"
        kg.add_entity(lid, f"Leader{i:03d}")
        kg.add_literal(lid, "Age", float(rng.integers(35, 85)))
        kg.add_literal(lid, "Gender", str(rng.choice(["M", "F"])))
        kg.add_link(eid, "Leader", lid)
    for i in range(0, n, 5):
        for j in range(2):
            gid = f"EG{i}_{j}"
            kg.add_entity(gid, f"EthnicGroup{i}_{j}")
            kg.add_literal(gid, "Population_size", float(rng.integers(1, 50)) * 1e5)
            kg.add_link(eids[i], "Ethnic_Group", gid)

    return CountryWorld(countries=df, kg=kg)

"""Synthetic Stack Overflow developer survey (47,623 rows at sf=1).

Planted outcome model (row-level):

    Salary = 28k + 65k·(hdi − .75) − 600·(gini − 38) − 2500·z(log_pop)
             + 2500·[Gender = Man] + N(0, 4000)

so that
* globally (Q1, per country) the dominant confounders are the countries'
  HDI and Gini — matching the paper's Table 2 explanation {HDI, Gini};
* within Europe (Q3) the HDI variance is negligible by construction, so
  the explanation shifts to {Population Census, Gini} — the paper's
  Example 4.1 / SO Q3 behaviour, and why Table 4's top unexplained group
  for Q1 is CONTINENT = EUROPE;
* per continent (Q2) the continent means are driven by the HDI/GDP
  continent bases and continent-correlated Density.

Input columns mirror the survey: Country, Continent, Currency (both FDs
of Country — logical-dependency pruning bait when T=Country, refinement
attributes for Table 4), Gender (small real effect), DevType, Hobby
(the paper's negative-interaction example), Age, YearsCode.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.base import SynthDataset, zscore
from repro.datasets.countries import make_country_world

N_ROWS_SF1 = 47_623
CONTINENT_POPULARITY = {
    "Europe": 0.38,
    "Asia": 0.36,
    "North America": 0.33,
    "Africa": 0.27,
    "South America": 0.17,
    "Oceania": 0.10,
}


def make_so(
    spark: SparkSession,
    *,
    sf: float = 1.0,
    seed: int = 0,
    n_countries: int = 150,
    n_junk: int = 24,
) -> SynthDataset:
    rng = np.random.default_rng(seed)
    world = make_country_world(rng, n_countries=n_countries, n_junk=n_junk)
    c = world.countries
    n = max(400, int(N_ROWS_SF1 * sf))

    # Sample developers per country, weighted so Europe/Asia/NA dominate —
    # Table 4's group sizes depend on this ordering.
    w = np.array([CONTINENT_POPULARITY[cc] for cc in c["continent"]])
    w = w / w.sum()
    ci = rng.choice(len(c), size=n, p=w)

    gender = rng.choice(["Man", "Woman", "Non-binary"], n, p=[0.72, 0.24, 0.04])
    hdi = c["hdi"].to_numpy()[ci]
    gini = c["gini"].to_numpy()[ci]
    pop_z = zscore(c["log_pop"].to_numpy())[ci]
    continent = c["continent"].to_numpy()[ci]
    # The population effect is strong *within Europe* and weak elsewhere —
    # globally the optimal explanation stays {HDI, Gini}, while inside
    # Europe it shifts to {Population, Gini} (SO Q3) and Europe becomes the
    # top unexplained group for the global explanation (Table 4 /
    # Example 4.1), exactly the paper's developer-scarcity narrative.
    pop_coef = np.where(continent == "Europe", -9_000, -1_000)
    salary = (
        28_000
        + 65_000 * (hdi - 0.75)
        - 900 * (gini - 38)
        + pop_coef * pop_z
        + 1_500 * (gender == "Man")
        + rng.normal(0, 3_000, n)
    )
    pdf = pd.DataFrame(
        {
            "Country": c["surface_form"].to_numpy()[ci],
            "Continent": c["continent"].to_numpy()[ci],
            "Currency": c["currency"].to_numpy()[ci],
            "Gender": gender,
            "DevType": rng.choice(
                ["Backend", "Frontend", "FullStack", "Data", "Mobile"], n
            ),
            "Hobby": rng.choice(["Yes", "No"], n, p=[0.7, 0.3]),
            "Age": rng.integers(18, 65, n).astype(float),
            "YearsCode": rng.integers(0, 40, n).astype(float),
            "Salary": np.round(np.maximum(salary, 1_000), 2),
        }
    )
    return SynthDataset(
        name="SO",
        df=spark.createDataFrame(pdf),
        kg=world.kg,
        extraction_cols=["Country", "Continent"],
        n_rows=n,
        entities={"countries": c},
    )

"""Synthetic Covid-19 dataset (188 country rows, like the paper's).

Planted outcome model (country-level):

    Deaths_per_100 = 8 − 20·(hdi − .7) − 0.05·(gdp − 100)
                     + 1.2·z(Confirmed) + N(0, 0.5)

GDP mixes HDI with an independent economy component (see
``repro.datasets.countries``), so HDI and GDP each carry signal — the
paper's Covid Q1 explanation is exactly {HDI, GDP, Confirmed cases},
where Confirmed_cases is an *input-table* attribute (Example 1.1's
"this attribute alone is not enough").

WHO_Region doubles as the second extraction column ("Country,
WHO-Region" in Table 1); region surface forms equal the continent
entities' labels.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.base import SynthDataset, zscore
from repro.datasets.countries import make_country_world

N_COUNTRIES = 188


def make_covid(
    spark: SparkSession,
    *,
    sf: float = 1.0,  # accepted for API uniformity; the dataset is fixed-size
    seed: int = 1,
    n_countries: int = N_COUNTRIES,
    n_junk: int = 24,
) -> SynthDataset:
    rng = np.random.default_rng(seed)
    world = make_country_world(
        rng, n_countries=n_countries, n_junk=n_junk, hdi_sd_scale=3.0
    )
    c = world.countries
    n = len(c)

    pop = np.exp(c["log_pop"].to_numpy())
    confirmed = np.round(pop * rng.uniform(0.001, 0.01, n), 0)
    hdi = c["hdi"].to_numpy()
    gdp = c["gdp"].to_numpy()
    deaths = (
        8.0
        - 20.0 * (hdi - 0.7)
        - 0.05 * (gdp - 100)
        + 1.2 * zscore(confirmed)
        + rng.normal(0, 0.5, n)
    )
    recovered = np.clip(rng.normal(85, 8, n), 20, 100)
    pdf = pd.DataFrame(
        {
            "Country": c["surface_form"],
            "WHO_Region": c["continent"],
            "Confirmed_cases": confirmed,
            "New_cases": np.round(confirmed * rng.uniform(0.001, 0.02, n), 0),
            "Recovered_per_100": np.round(recovered, 2),
            # NOT the accounting identity 100 − recovered − deaths: that
            # would leak the outcome into a candidate attribute.
            "Active_per_100": np.round(
                np.clip(100 - recovered + rng.normal(0, 3, n), 0, None), 2
            ),
            "Deaths_per_100": np.round(np.clip(deaths, 0.05, None), 2),
        }
    )
    return SynthDataset(
        name="Covid-19",
        df=spark.createDataFrame(pdf),
        kg=world.kg,
        extraction_cols=["Country", "WHO_Region"],
        n_rows=n,
        entities={"countries": c},
    )

"""Synthetic Flights-Delay dataset (5,819,079 rows at sf=1).

The row table is generated *inside Spark* (``spark.range`` + broadcast
joins against small entity lookups) — at sf=1 it matches the paper's 5.8M
tuples and never materializes on the driver.

Planted latents:

* city ``weather`` (precipitation/cold)  → Departure_Delay; proxied by
  Precipitation_Days, Year_Snow, Year_Low_F, December_percent_sun, …
* city ``size`` (population/traffic)     → Departure_Delay; proxied by
  Population_Total/Urban/Estimation, Density, Median_Household_Income, …
* state aggregates of member cities      → the per-state queries (Q2, Q4)
* airline ``ops1`` (fleet/scale) and ``ops2`` (finances) → Departure_Delay;
  proxied by Fleet_Size / Num_Employees (ops1) and Equity / Net_Income /
  Revenue (ops2) — the paper's Q5 explanation is {Equity, Fleet Size}.

Airline is itself an input attribute, so for per-city queries it shows up
inside the explanation exactly as in the paper's Flights Q1/Q2.
``BIG_STATE`` (12 cities) plays the role of California in Q3.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.datasets.base import (
    SynthDataset,
    add_junk_literals,
    add_literal_series,
    add_standard_ids,
    mask_mcar,
    rank_of,
)
from repro.kg.graph import KnowledgeGraph

N_ROWS_SF1 = 5_819_079
BIG_STATE = "ST00"  # the "CA" analogue: most cities, used by Q3


def _make_entities(
    rng: np.random.Generator, n_cities: int, n_states: int, n_airlines: int,
    n_junk: int, kg_missing: float,
) -> tuple[pd.DataFrame, pd.DataFrame, pd.DataFrame, KnowledgeGraph]:
    # States; ST00 gets a triple share of cities.
    state_names = [f"ST{i:02d}" for i in range(n_states)]
    weights = np.ones(n_states)
    weights[0] = 3.0
    weights /= weights.sum()
    city_state = rng.choice(n_states, size=n_cities, p=weights)
    cities = pd.DataFrame(
        {
            "city": [f"City{i:03d}" for i in range(n_cities)],
            "state": [state_names[s] for s in city_state],
            "weather": rng.normal(size=n_cities),
            "size": rng.normal(size=n_cities),
        }
    )
    states = (
        cities.groupby("state")
        .agg(weather=("weather", "mean"), size=("size", "mean"), n=("city", "size"))
        .reset_index()
    )
    states["weather"] += rng.normal(0, 0.2, len(states))
    states["size"] += rng.normal(0, 0.2, len(states))
    airlines = pd.DataFrame(
        {
            "airline": [f"AL{i:02d}" for i in range(n_airlines)],
            "ops1": rng.normal(size=n_airlines),
            "ops2": rng.normal(size=n_airlines),
        }
    )

    kg = KnowledgeGraph()
    # City entities + properties.
    ceids = [f"CITY{i}" for i in range(n_cities)]
    for eid, name in zip(ceids, cities["city"]):
        kg.add_entity(eid, name)
    w, s = cities["weather"].to_numpy(), cities["size"].to_numpy()
    nz = lambda sd: rng.normal(0, sd, n_cities)  # noqa: E731
    props = {
        "Precipitation_Days": np.round(95 + 35 * w + nz(8), 0),
        "Year_Snow": np.round(np.clip(10 + 12 * w + nz(4), 0, None), 1),
        "Year_Low_F": np.round(28 - 14 * w + nz(4), 1),
        "Year_Avg_F": np.round(58 - 10 * w + nz(4), 1),
        "December_Low_F": np.round(18 - 13 * w + nz(4), 1),
        "December_percent_sun": np.round(55 - 18 * w + nz(6), 1),
        "Year_UV": np.round(6 - 1.5 * w + nz(0.8), 1),
        "Record_Low_F": np.round(-5 - 12 * w + nz(6), 1),
        "Population_Total": np.round(np.exp(13 + 1.2 * s + nz(0.1)), 0),
        "Population_Urban": np.round(np.exp(12.6 + 1.2 * s + nz(0.1)), 0),
        "Population_Estimation": np.round(np.exp(13 + 1.2 * s + nz(0.15)), 0),
        "Population_Metropolitan": np.round(np.exp(13.5 + 1.2 * s + nz(0.2)), 0),
        "Population_Rank": rank_of(s),
        "Density": np.round(np.exp(6 + 0.9 * s + nz(0.3)), 1),
        "Median_Household_Income": np.round(52000 + 9000 * s + nz(3000), 0),
    }
    for name, vals in props.items():
        add_literal_series(kg, ceids, name, mask_mcar(rng, vals, kg_missing))
    add_standard_ids(kg, ceids, "City")
    add_junk_literals(kg, rng, ceids, n_junk, prefix="city")

    # State entities + properties.
    seids = [f"STATE{i}" for i in range(len(states))]
    for eid, name in zip(seids, states["state"]):
        kg.add_entity(eid, name)
    sw, ss = states["weather"].to_numpy(), states["size"].to_numpy()
    n_st = len(states)
    snz = lambda sd: rng.normal(0, sd, n_st)  # noqa: E731
    sprops = {
        "Population_estimation": np.round(
            np.exp(15 + 1.1 * ss + snz(0.1)) * states["n"].to_numpy(), 0
        ),
        "Population_Urban": np.round(np.exp(14.6 + 1.1 * ss + snz(0.1)), 0),
        "Density": np.round(np.exp(4.5 + 0.9 * ss + snz(0.3)), 1),
        "Year_Low_F": np.round(28 - 13 * sw + snz(3), 1),
        "Year_Snow": np.round(np.clip(10 + 11 * sw + snz(3), 0, None), 1),
        "Dec_Record_Low_F": np.round(-8 - 11 * sw + snz(5), 1),
        "Area_Rank": rank_of(rng.normal(size=n_st)),
        "Median_Household_Income": np.round(52000 + 8000 * ss + snz(2500), 0),
    }
    for name, vals in sprops.items():
        add_literal_series(kg, seids, name, mask_mcar(rng, vals, kg_missing))
    add_standard_ids(kg, seids, "State")
    add_junk_literals(
        kg, rng, seids, max(4, n_junk // 3), prefix="state", missing_frac=0.5
    )

    # Airline entities + properties.
    aeids = [f"AIR{i}" for i in range(n_airlines)]
    for eid, name in zip(aeids, airlines["airline"]):
        kg.add_entity(eid, name)
    o1, o2 = airlines["ops1"].to_numpy(), airlines["ops2"].to_numpy()
    n_al = len(airlines)
    anz = lambda sd: rng.normal(0, sd, n_al)  # noqa: E731
    aprops = {
        "Fleet_Size": np.round(np.clip(400 + 220 * o1 + anz(30), 40, None), 0),
        "Num_Employees": np.round(np.exp(10 + 0.8 * o1 + anz(0.15)), 0),
        "Equity": np.round(5000 + 2500 * o2 + anz(300), 0),
        "Net_Income": np.round(800 + 300 * o2 + 150 * o1 + anz(80), 0),
        "Revenue": np.round(np.exp(9 + 0.5 * o1 + 0.4 * o2 + anz(0.1)), 0),
    }
    for name, vals in aprops.items():
        add_literal_series(kg, aeids, name, mask_mcar(rng, vals, kg_missing / 2))
    add_standard_ids(kg, aeids, "Airline")
    add_junk_literals(
        kg, rng, aeids, max(4, n_junk // 3), prefix="airline", missing_frac=0.5
    )

    return cities, states, airlines, kg


def make_flights(
    spark: SparkSession,
    *,
    sf: float = 1.0,
    seed: int = 2,
    n_cities: int = 120,
    n_states: int = 30,
    n_airlines: int = 14,
    n_junk: int = 30,
    kg_missing: float = 0.30,
) -> SynthDataset:
    rng = np.random.default_rng(seed)
    cities, states, airlines, kg = _make_entities(
        rng, n_cities, n_states, n_airlines, n_junk, kg_missing
    )
    n = max(2_000, int(N_ROWS_SF1 * sf))

    city_lut = spark.createDataFrame(
        cities.reset_index().rename(columns={"index": "city_i"})
    )
    airline_lut = spark.createDataFrame(
        airlines.reset_index().rename(columns={"index": "al_i"})
    )
    base = (
        spark.range(n)
        .withColumn("city_i", (F.rand(seed) * n_cities).cast("int"))
        .withColumn("dest_i", (F.rand(seed + 1) * n_cities).cast("int"))
        # Hub structure: half the flights use one of the origin city's
        # three hub carriers — Airline correlates with Origin_City/State,
        # making it a genuine confounder for the per-city/state queries
        # (the paper's Flights Q1/Q2 explanations include Airline).
        .withColumn(
            "al_i",
            F.when(
                F.rand(seed + 9) < 0.5,
                (
                    F.col("city_i") * 7
                    + (F.rand(seed + 2) * 3).cast("int") * 5
                )
                % n_airlines,
            ).otherwise((F.rand(seed + 2) * n_airlines).cast("int")),
        )
        .withColumn("Day_of_Week", (F.rand(seed + 3) * 7).cast("int") + 1)
        .withColumn("Distance", F.round(F.rand(seed + 4) * 2400 + 100, 0))
    )
    origin = F.broadcast(
        city_lut.select(
            F.col("city_i"),
            F.col("city").alias("Origin_City"),
            F.col("state").alias("Origin_State"),
            F.col("weather").alias("__w"),
            F.col("size").alias("__s"),
        )
    )
    dest = F.broadcast(
        city_lut.select(
            F.col("city_i").alias("dest_i"),
            F.col("city").alias("Dest_City"),
            F.col("state").alias("Dest_State"),
        )
    )
    al = F.broadcast(
        airline_lut.select(
            F.col("al_i"),
            F.col("airline").alias("Airline"),
            F.col("ops1").alias("__o1"),
            F.col("ops2").alias("__o2"),
        )
    )
    df = (
        base.join(origin, "city_i")
        .join(dest, "dest_i")
        .join(al, "al_i")
        .withColumn(
            "Departure_Delay",
            F.round(
                F.lit(12.0)
                + 8.0 * F.col("__w")
                + 6.0 * F.col("__s")
                + 6.0 * F.col("__o1")
                + 5.0 * F.col("__o2")
                + F.randn(seed + 5) * 6.0,
                1,
            ),
        )
        .withColumn(
            "Arrival_Delay",
            F.round(F.col("Departure_Delay") + F.randn(seed + 6) * 4.0, 1),
        )
        .withColumn(
            "Security_Delay",
            F.round(
                F.greatest(
                    F.lit(0.0), 0.8 * F.col("__s") + F.randn(seed + 7) * 0.8
                ),
                1,
            ),
        )
        .withColumn(
            "Cancelled", (F.rand(seed + 8) < 0.015).cast("int")
        )
        .drop("id", "city_i", "dest_i", "al_i", "__w", "__s", "__o1", "__o2")
    )
    return SynthDataset(
        name="Flights",
        df=df,
        kg=kg,
        extraction_cols=["Origin_City", "Origin_State", "Airline"],
        n_rows=n,
        entities={"cities": cities, "states": states, "airlines": airlines},
    )

"""The 14 representative queries of Table 2, with ground-truth classes.

Each catalog entry fixes the aggregate query, the paper's reported MESA
explanation (recorded in EXPERIMENTS.md next to ours), and the planted
**ground-truth confounder classes**: sets of attribute names that proxy
the same latent factor (HDI ≈ HDI_Rank ≈ GDP where GDP is an HDI proxy…).
The surrogate user-study score credits an explanation once per class and
penalizes junk and duplicate-class picks — the programmatic stand-in for
the paper's MTurk "does this explanation make sense" rating.

Attribute names match by suffix (``Origin_City__Year_Low_F`` hits class
member ``Year_Low_F``) because multi-column extraction prefixes columns.

``random_queries`` generates the §5.1 usefulness experiment: random
(T, O, C) triples with T an extraction column, O a numeric attribute, and
a context covering ≥10% of the rows.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import functions as F

from repro.core.query import AggQuery, is_numeric
from repro.datasets.base import SynthDataset
from repro.datasets.flights import BIG_STATE

# Latent-factor equivalence classes reused across queries.
_ECON_HDI = frozenset({"HDI", "HDI_Rank"})
_ECON_GDP = frozenset({"GDP", "GDP_Rank"})
_GINI = frozenset({"Gini", "Gini_Rank"})
_POP = frozenset({"Population_Census", "Population_Estimate", "Population_Total"})
_DENSITY = frozenset({"Density"})
_WEATHER = frozenset(
    {
        "Precipitation_Days", "Year_Snow", "Year_Low_F", "Year_Avg_F",
        "December_Low_F", "December_percent_sun", "Year_UV", "Record_Low_F",
        "Dec_Record_Low_F",
    }
)
_CITY_SIZE = frozenset(
    {
        "Population_Total", "Population_Urban", "Population_Estimation",
        "Population_Metropolitan", "Population_Rank", "Density",
        "Median_Household_Income", "Population_estimation", "Security_Delay",
    }
)
_AIRLINE = frozenset(
    # The input Airline column or any airline-entity attribute — with 14
    # carriers every airline property identifies the carrier, so all of
    # them explain the same "which airline" factor.
    {"Airline", "Fleet_Size", "Num_Employees", "Equity", "Net_Income", "Revenue"}
)
_FLEET = frozenset({"Fleet_Size", "Num_Employees"})
_FINANCE = frozenset({"Equity", "Net_Income", "Revenue"})
_CONFIRMED_POP = frozenset(
    {"Confirmed_cases", "New_cases", "Population_Census", "Population_Estimate"}
)


@dataclass(frozen=True)
class CatalogQuery:
    dataset: str
    qid: str
    description: str
    query: AggQuery
    gt_classes: tuple[frozenset[str], ...]
    paper_mesa: tuple[str, ...]  # Table 2's MESA column, for EXPERIMENTS.md
    refine_attrs: tuple[str, ...] = field(default_factory=tuple)
    #: input columns excluded from the candidate set — sibling measurements
    #: of the outcome (Arrival vs Departure delay record the same quantity)
    exclude: frozenset[str] = frozenset()


CATALOG: list[CatalogQuery] = [
    # ----- Stack Overflow -----------------------------------------------
    CatalogQuery(
        "SO", "Q1", "Average salary per country",
        AggQuery(t="Country", o="Salary", name="SO_Q1"),
        (_ECON_HDI | _ECON_GDP, _GINI, _POP),
        ("HDI", "Gini"),
        refine_attrs=("Continent", "Currency", "Gender", "DevType", "Hobby"),
    ),
    CatalogQuery(
        "SO", "Q2", "Average salary per continent",
        AggQuery(t="Continent", o="Salary", name="SO_Q2"),
        (_ECON_HDI | _ECON_GDP, _DENSITY | _POP),
        ("GDP", "Density"),
    ),
    CatalogQuery(
        "SO", "Q3", "Average salary per country in Europe",
        AggQuery(
            t="Country", o="Salary",
            context=(("Continent", "Europe"),), name="SO_Q3",
        ),
        (_POP, _GINI),
        ("Population Census", "Gini"),
    ),
    # ----- Flights --------------------------------------------------------
    CatalogQuery(
        "Flights", "Q1", "Average delay per origin city",
        AggQuery(t="Origin_City", o="Departure_Delay", name="FL_Q1"),
        (_WEATHER, _CITY_SIZE, _AIRLINE),
        ("Population urban", "Year Low F", "Airline"),
        exclude=frozenset({"Arrival_Delay"}),
    ),
    CatalogQuery(
        "Flights", "Q2", "Average delay per origin state",
        AggQuery(t="Origin_State", o="Departure_Delay", name="FL_Q2"),
        (_WEATHER, _CITY_SIZE, _AIRLINE),
        ("Population estimation", "Year Low F", "Airline"),
        exclude=frozenset({"Arrival_Delay"}),
    ),
    CatalogQuery(
        "Flights", "Q3", "Average delay per origin city in the big state",
        AggQuery(
            t="Origin_City", o="Departure_Delay",
            context=(("Origin_State", BIG_STATE),), name="FL_Q3",
        ),
        (_WEATHER, _CITY_SIZE, _AIRLINE),
        ("Density", "Population Total", "Security Delay"),
        exclude=frozenset({"Arrival_Delay"}),
    ),
    CatalogQuery(
        "Flights", "Q4", "Average delay per origin state and airline",
        AggQuery(
            t=("Origin_State", "Airline"), o="Departure_Delay", name="FL_Q4"
        ),
        (_WEATHER | _CITY_SIZE, _FLEET | _FINANCE),
        ("Population Ranking", "Fleet size"),
        exclude=frozenset({"Arrival_Delay"}),
    ),
    CatalogQuery(
        "Flights", "Q5", "Average delay per airline",
        AggQuery(t="Airline", o="Departure_Delay", name="FL_Q5"),
        (_FINANCE, _FLEET),
        ("Equity", "Fleet Size"),
        exclude=frozenset({"Arrival_Delay"}),
    ),
    # ----- Covid-19 -------------------------------------------------------
    CatalogQuery(
        "Covid-19", "Q1", "Deaths per country",
        AggQuery(t="Country", o="Deaths_per_100", name="CV_Q1"),
        (_ECON_HDI, _ECON_GDP, _CONFIRMED_POP),
        ("HDI", "GDP", "Confirmed cases"),
    ),
    CatalogQuery(
        "Covid-19", "Q2", "Deaths per country in Europe",
        AggQuery(
            t="Country", o="Deaths_per_100",
            context=(("WHO_Region", "Europe"),), name="CV_Q2",
        ),
        (_ECON_GDP, _CONFIRMED_POP),
        ("Gini", "Population Census", "Confirmed cases"),
    ),
    CatalogQuery(
        "Covid-19", "Q3", "Average deaths per WHO region",
        AggQuery(t="WHO_Region", o="Deaths_per_100", name="CV_Q3"),
        (_ECON_HDI | _ECON_GDP, _DENSITY | _POP | frozenset({"Confirmed_cases"})),
        ("Density", "Confirmed cases"),
    ),
    # ----- Forbes ---------------------------------------------------------
    CatalogQuery(
        "Forbes", "Q1", "Salary of actors",
        AggQuery(
            t="Name", o="Pay", context=(("Category", "Actors"),), name="FB_Q1"
        ),
        (frozenset({"Net_Worth"}), frozenset({"Gender"})),
        ("Net Worth", "Gender"),
    ),
    CatalogQuery(
        "Forbes", "Q2", "Salary of directors/producers",
        AggQuery(
            t="Name", o="Pay",
            context=(("Category", "Directors/Producers"),), name="FB_Q2",
        ),
        (frozenset({"Net_Worth"}), frozenset({"Awards"})),
        ("Net Worth", "Awards"),
    ),
    CatalogQuery(
        "Forbes", "Q3", "Salary of athletes",
        AggQuery(
            t="Name", o="Pay", context=(("Category", "Athletes"),), name="FB_Q3"
        ),
        (frozenset({"Cups", "National_Cups"}), frozenset({"Draft_Pick"})),
        ("Cups", "Draft Pick"),
    ),
]


def catalog_for(dataset: str) -> list[CatalogQuery]:
    return [q for q in CATALOG if q.dataset == dataset]


def get_query(dataset: str, qid: str) -> CatalogQuery:
    for q in CATALOG:
        if q.dataset == dataset and q.qid == qid:
            return q
    raise KeyError(f"{dataset} {qid}")


# ---------------------------------------------------------------------------
# Random queries — the §5.1 usefulness experiment (72.5% stat)
# ---------------------------------------------------------------------------


def random_queries(
    ds: SynthDataset, n: int, *, seed: int = 0, min_context_frac: float = 0.10
) -> list[AggQuery]:
    """Generate ``n`` random (T, O, C) queries per the paper's §5.1 recipe:
    T is an extraction column, O a numeric attribute predictable from the
    data, C a random equality condition covering ≥10% of the tuples (or
    empty)."""
    rng = np.random.default_rng(seed)
    df = ds.df
    numeric = [
        c for c in df.columns if is_numeric(df, c) and c not in ds.extraction_cols
    ]
    categorical = [
        c
        for c in df.columns
        if not is_numeric(df, c) and c not in ds.extraction_cols
    ]
    total = df.count()
    out: list[AggQuery] = []
    for i in range(n):
        t = str(rng.choice(ds.extraction_cols))
        o = str(rng.choice(numeric))
        context: tuple = ()
        if categorical and rng.random() < 0.7:
            cattr = str(rng.choice(categorical))
            vals = (
                df.groupBy(cattr)
                .count()
                .where(F.col("count") >= min_context_frac * total)
                .collect()
            )
            if vals:
                v = vals[int(rng.integers(0, len(vals)))][cattr]
                if v is not None:
                    context = ((cattr, v),)
        out.append(
            AggQuery(t=t, o=o, context=context, name=f"{ds.name}_rand{i}")
        )
    return out

"""Synthetic dataset generators: sizes, schemas, planted structure."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.datasets.covid import make_covid
from repro.datasets.flights import BIG_STATE, make_flights
from repro.datasets.forbes import make_forbes
from repro.datasets.queries import CATALOG, catalog_for, get_query, random_queries
from repro.datasets.so import make_so
from repro.kg.ned import link_values
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def so(spark):
    return make_so(spark, sf=0.02, n_junk=8, n_countries=60)


@pytest.fixture(scope="module")
def covid(spark):
    return make_covid(spark, n_junk=8)


@pytest.fixture(scope="module")
def flights(spark):
    return make_flights(spark, sf=0.001, n_junk=8)


@pytest.fixture(scope="module")
def forbes(spark):
    return make_forbes(spark, n_junk=8)


class TestSO:
    def test_row_count_scales_with_sf(self, so):
        assert so.df.count() == so.n_rows == max(400, int(47_623 * 0.02))

    def test_schema(self, so):
        assert {"Country", "Continent", "Currency", "Gender", "Salary"} <= set(
            so.df.columns
        )

    def test_salary_correlates_with_hdi(self, so):
        """The planted confounding: country HDI drives mean salary."""
        c = so.entities["countries"]
        means = (
            so.df.groupBy("Country").agg(F.avg("Salary").alias("m")).toPandas()
        )
        joined = means.merge(
            c[["surface_form", "hdi"]], left_on="Country", right_on="surface_form"
        )
        corr = np.corrcoef(joined["m"], joined["hdi"])[0, 1]
        # At SF=0.02 (~950 rows over 60 countries) the per-country means
        # are noisy; the planted effect still dominates.
        assert corr > 0.5

    def test_europe_hdi_is_homogeneous(self, so):
        """Example 4.1's premise: within Europe, HDI variance is tiny."""
        c = so.entities["countries"]
        eu = c[c.continent == "Europe"]["hdi"].std()
        assert eu < c["hdi"].std() / 3

    def test_ned_failures_planted(self, so):
        forms = so.entities["countries"]["surface_form"]
        failing = [f for f in forms if f.endswith("Federation")]
        assert len(failing) == 2
        links = link_values(list(forms), so.kg)
        assert all(links[f] is None for f in failing)

    def test_kg_has_redundant_rank_variants(self, so):
        props = so.kg.literal_props()
        assert {"HDI", "HDI_Rank", "Gini", "Gini_Rank", "GDP", "GDP_Rank"} <= props

    def test_kg_continent_entities(self, so):
        assert so.kg.resolve("Europe")
        assert so.extraction_cols == ["Country", "Continent"]

    def test_kg_gini_mnar(self, so):
        """Gini is preferentially missing for the highest-HDI countries."""
        c = so.entities["countries"].copy()
        c["has_gini"] = [
            "Gini" in so.kg.properties_of(e) for e in c["eid"]
        ]
        high = c.nlargest(20, "hdi")["has_gini"].mean()
        rest = c.nsmallest(60, "hdi")["has_gini"].mean()
        assert high < rest

    def test_multihop_material(self, so):
        eid = so.entities["countries"]["eid"].iloc[0]
        assert "Leader" in so.kg.links_of(eid)

    def test_query_executes_and_matches_duckdb(self, so):
        from repro.core.query import run_query

        q = get_query("SO", "Q1").query
        assert_equivalent(
            run_query(so.df, q),
            "SELECT Country, avg(Salary) AS avg_Salary FROM so GROUP BY 1",
            so=so.df,
        )


class TestCovid:
    def test_fixed_size(self, covid):
        assert covid.n_rows == covid.df.count() == len(
            covid.entities["countries"]
        )

    def test_one_row_per_country(self, covid):
        assert covid.df.select("Country").distinct().count() == covid.n_rows

    def test_deaths_depend_on_hdi_and_gdp(self, covid):
        pdf = covid.df.toPandas().merge(
            covid.entities["countries"][["surface_form", "hdi", "gdp"]],
            left_on="Country",
            right_on="surface_form",
        )
        assert np.corrcoef(pdf["Deaths_per_100"], pdf["hdi"])[0, 1] < -0.5
        # GDP carries signal beyond HDI: residual after hdi still correlates.
        resid = pdf["Deaths_per_100"] + 20 * (pdf["hdi"] - 0.7)
        assert np.corrcoef(resid, pdf["gdp"])[0, 1] < -0.3

    def test_who_region_links_to_continent_entities(self, covid):
        regions = [
            r["WHO_Region"] for r in covid.df.select("WHO_Region").distinct().collect()
        ]
        links = link_values(regions, covid.kg)
        assert all(v is not None for v in links.values())


class TestFlights:
    def test_row_count(self, flights):
        assert flights.df.count() == flights.n_rows

    def test_spark_native_generation(self, flights):
        # Must not require a driver-side materialization: check plan exists
        # and schema is complete.
        cols = set(flights.df.columns)
        assert {
            "Airline", "Origin_City", "Origin_State", "Dest_City",
            "Departure_Delay", "Security_Delay", "Cancelled",
        } <= cols
        assert not any(c.startswith("__") for c in cols)

    def test_big_state_has_most_cities(self, flights):
        cities = flights.entities["cities"]
        counts = cities.groupby("state").size()
        assert counts.idxmax() == BIG_STATE

    def test_delay_depends_on_city_weather(self, flights):
        cities = flights.entities["cities"]
        means = (
            flights.df.groupBy("Origin_City")
            .agg(F.avg("Departure_Delay").alias("m"))
            .toPandas()
            .merge(cities, left_on="Origin_City", right_on="city")
        )
        assert np.corrcoef(means["m"], means["weather"])[0, 1] > 0.5

    def test_delay_depends_on_airline_ops(self, flights):
        airlines = flights.entities["airlines"]
        means = (
            flights.df.groupBy("Airline")
            .agg(F.avg("Departure_Delay").alias("m"))
            .toPandas()
            .merge(airlines, left_on="Airline", right_on="airline")
        )
        assert np.corrcoef(means["m"], means["ops1"])[0, 1] > 0.5

    def test_kg_covers_three_entity_types(self, flights):
        assert flights.kg.resolve("City000")
        assert flights.kg.resolve("ST00")
        assert flights.kg.resolve("AL00")


class TestForbes:
    def test_paper_row_count(self, forbes):
        assert forbes.n_rows == 1_647

    def test_category_specific_missingness(self, forbes):
        """Cups exist only for athletes, Awards only for performers —
        the source of the paper's 73% missingness on Forbes."""
        ent = forbes.entities["celebs"]
        for eid_idx, cat in enumerate(ent["category"]):
            props = forbes.kg.properties_of(f"P{eid_idx}")
            if cat == "Athletes":
                assert "Cups" in props and "Awards" not in props
            elif cat == "Musicians":
                assert "Cups" not in props and "Awards" not in props

    def test_ambiguous_name_planted(self, forbes):
        links = link_values(["Ronaldo"], forbes.kg)
        assert links["Ronaldo"] is None

    def test_actor_pay_gender_gap(self, forbes):
        pdf = forbes.df.where(F.col("Category") == "Actors").toPandas()
        ent = forbes.entities["celebs"]
        pdf = pdf.merge(
            ent[["surface_form", "gender"]],
            left_on="Name", right_on="surface_form",
        )
        gap = (
            pdf[pdf.gender == "M"]["Pay"].mean()
            - pdf[pdf.gender == "F"]["Pay"].mean()
        )
        assert gap > 3


class TestCatalog:
    def test_fourteen_queries(self):
        assert len(CATALOG) == 14

    def test_dataset_split(self):
        assert len(catalog_for("SO")) == 3
        assert len(catalog_for("Flights")) == 5
        assert len(catalog_for("Covid-19")) == 3
        assert len(catalog_for("Forbes")) == 3

    def test_get_query_unknown(self):
        with pytest.raises(KeyError):
            get_query("SO", "Q9")

    def test_queries_reference_existing_columns(self, so, covid, flights, forbes):
        dss = {"SO": so, "Covid-19": covid, "Flights": flights, "Forbes": forbes}
        for cq in CATALOG:
            df = dss[cq.dataset].df
            for c in cq.query.t_cols:
                assert c in df.columns, (cq.dataset, cq.qid, c)
            assert cq.query.o in df.columns
            for a, _ in cq.query.context:
                assert a in df.columns

    def test_composite_query_present(self):
        q = get_query("Flights", "Q4")
        assert len(q.query.t_cols) == 2

    def test_random_queries_valid(self, so):
        qs = random_queries(so, 5, seed=1)
        assert len(qs) == 5
        for q in qs:
            assert q.t in so.extraction_cols
            assert q.o in so.df.columns
            if q.context:
                (attr, val), = q.context
                n = so.df.where(F.col(attr) == val).count()
                assert n >= 0.10 * so.n_rows

    def test_random_queries_deterministic(self, so):
        a = random_queries(so, 3, seed=7)
        b = random_queries(so, 3, seed=7)
        assert [(q.t, q.o, q.context) for q in a] == [
            (q.t, q.o, q.context) for q in b
        ]

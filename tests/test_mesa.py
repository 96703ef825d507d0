"""End-to-end MESA pipeline on the synthetic SO dataset."""
import pytest

from repro.core.mesa import Mesa, MesaConfig, display_name
from repro.core.query import BIN_SUFFIX
from repro.datasets.queries import get_query
from repro.datasets.so import make_so
from repro.eval.scoring import class_of


@pytest.fixture(scope="module")
def so(spark):
    return make_so(spark, sf=0.05, n_junk=12)


@pytest.fixture(scope="module")
def q1_result(spark, so):
    cq = get_query("SO", "Q1")
    mesa = Mesa(spark, MesaConfig(k=5))
    return mesa.explain(so.df, cq.query, so.kg, so.extraction_cols)


class TestMesaEndToEnd:
    def test_recovers_planted_confounders(self, q1_result):
        cq = get_query("SO", "Q1")
        assert q1_result.explanation, "no explanation found"
        classes = {class_of(a, cq.gt_classes) for a in q1_result.explanation}
        assert None not in classes, f"junk selected: {q1_result.explanation}"
        assert len(classes) >= 2, "expected at least two distinct factors"

    def test_explains_most_of_correlation(self, q1_result):
        assert q1_result.explainability < 0.4 * q1_result.base_cmi

    def test_no_duplicate_class_selected(self, q1_result):
        cq = get_query("SO", "Q1")
        classes = [class_of(a, cq.gt_classes) for a in q1_result.explanation]
        assert len(classes) == len(set(classes))

    def test_responsibilities_sum_to_one(self, q1_result):
        assert sum(q1_result.responsibility.values()) == pytest.approx(
            1.0, abs=1e-6
        )

    def test_pruning_reduced_candidates(self, q1_result):
        assert (
            q1_result.candidates_after_offline < q1_result.candidates_initial
        )
        assert q1_result.offline_report.dropped

    def test_junk_id_and_constant_pruned_offline(self, q1_result):
        reasons = q1_result.offline_report.reasons()
        assert reasons.get("constant", 0) >= 1  # Type = 'Country'
        assert reasons.get("high_entropy", 0) >= 1  # WIKIID

    def test_selection_bias_detected_for_gini(self, q1_result):
        """Gini's missingness is planted MNAR-on-HDI; HDI drives salary,
        so missingness is associated with O and must be flagged."""
        assert any("Gini" in a for a in q1_result.biased_attrs)

    def test_timings_cover_all_stages(self, q1_result):
        assert {
            "context", "extract", "offline_prune", "binning",
            "ipw", "scan", "online_prune", "mcimr", "responsibility",
        } <= set(q1_result.timings)

    def test_exposure_not_in_explanation(self, q1_result):
        assert "Country" not in q1_result.explanation


class TestMesaConfig:
    def test_context_query(self, spark, so):
        cq = get_query("SO", "Q3")  # Europe only
        mesa = Mesa(spark, MesaConfig(k=3))
        res = mesa.explain(so.df, cq.query, so.kg, so.extraction_cols)
        # Within Europe, HDI is homogeneous: it must not be the explanation.
        assert not any("HDI" in a for a in res.explanation)

    def test_k_bounds_explanation(self, spark, so):
        cq = get_query("SO", "Q1")
        mesa = Mesa(spark, MesaConfig(k=1))
        res = mesa.explain(so.df, cq.query, so.kg, so.extraction_cols)
        assert len(res.explanation) <= 1

    def test_without_kg_uses_input_attrs_only(self, spark, so):
        cq = get_query("SO", "Q1")
        mesa = Mesa(spark, MesaConfig(k=3))
        res = mesa.explain(so.df, cq.query, kg=None)
        assert res.extracted_attrs == []
        for a in res.explanation:
            assert not a.startswith("Country__")

    def test_no_pruning_keeps_more_candidates(self, spark, so):
        cq = get_query("SO", "Q1")
        base_cfg = MesaConfig(k=2)
        mesa = Mesa(spark, base_cfg)
        pruned = mesa.explain(so.df, cq.query, so.kg, so.extraction_cols)
        cfg = MesaConfig(k=2, offline_pruning=False, online_pruning=False)
        unpruned = Mesa(spark, cfg).explain(
            so.df, cq.query, so.kg, so.extraction_cols
        )
        assert (
            unpruned.candidates_after_online > pruned.candidates_after_online
        )

    def test_display_name_strips_bin_suffix(self):
        assert display_name("HDI" + BIN_SUFFIX) == "HDI"
        assert display_name("Gender") == "Gender"

    def test_multi_extraction_columns_prefixed(self, q1_result):
        assert any(
            a.startswith("Country__") or a.startswith("Continent__")
            for a in q1_result.extracted_attrs
        )

"""Surrogate user-study scoring and explainability distance."""
import pytest

from repro.eval.scoring import (
    class_of,
    explainability_distance,
    surrogate_user_score,
)

GT = (frozenset({"HDI", "HDI_Rank", "GDP"}), frozenset({"Gini", "Gini_Rank"}))


class TestClassOf:
    def test_exact_match(self):
        assert class_of("HDI", GT) == 0
        assert class_of("Gini", GT) == 1

    def test_prefixed_match(self):
        assert class_of("Country__HDI", GT) == 0
        assert class_of("Origin_City__Gini_Rank", GT) == 1

    def test_no_false_suffix_match(self):
        # 'XHDI' is not 'HDI' and not '<prefix>__HDI'.
        assert class_of("XHDI", GT) is None

    def test_junk(self):
        assert class_of("country_junk_3", GT) is None


class TestScore:
    def test_perfect_explanation(self):
        s = surrogate_user_score(["HDI", "Gini"], GT)
        assert s.score == pytest.approx(5.0)
        assert s.f1 == pytest.approx(1.0)

    def test_empty_explanation_scores_one(self):
        s = surrogate_user_score([], GT)
        assert s.score == 1.0

    def test_redundant_pick_penalized(self):
        # Top-K's failure mode: two attrs from the same class.
        s = surrogate_user_score(["HDI", "HDI_Rank"], GT)
        assert s.redundant_picks == 1
        assert s.score < surrogate_user_score(["HDI", "Gini"], GT).score

    def test_junk_pick_penalized(self):
        s = surrogate_user_score(["HDI", "junk"], GT)
        assert s.junk_picks == 1
        assert s.score < 5.0

    def test_partial_recall(self):
        s = surrogate_user_score(["HDI"], GT)
        assert s.recall == pytest.approx(0.5)
        assert s.precision == pytest.approx(1.0)
        assert 1.0 < s.score < 5.0

    def test_equivalent_attrs_interchangeable(self):
        a = surrogate_user_score(["HDI", "Gini"], GT).score
        b = surrogate_user_score(["GDP", "Gini_Rank"], GT).score
        assert a == pytest.approx(b)

    def test_ordering_matches_paper_failure_modes(self):
        """MESA-like > redundant Top-K-like > junk-only LR-like."""
        mesa = surrogate_user_score(["HDI", "Gini"], GT).score
        topk = surrogate_user_score(["HDI", "HDI_Rank"], GT).score
        lr = surrogate_user_score(["junk_a", "junk_b"], GT).score
        assert mesa > topk > lr


class TestDistance:
    def test_zero_when_matching_bruteforce(self):
        assert explainability_distance(0.3, 0.3) == 0.0

    def test_positive_when_worse(self):
        assert explainability_distance(0.9, 0.3) == pytest.approx(0.6)

    def test_clamped_when_better(self):
        # A method can beat Brute-Force's k-limited objective on raw CMI;
        # Fig 2 plots distance, floored at 0.
        assert explainability_distance(0.1, 0.3) == 0.0

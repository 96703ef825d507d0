"""Unit tests for the plug-in estimators — pure numpy, no Spark."""
import math

import numpy as np
import pandas as pd
import pytest

from repro.core.info_theory import (
    chi2_sf,
    cmi_from_counts,
    cond_entropy_from_counts,
    entropy_from_counts,
    g_test,
    is_conditionally_independent,
    mi_from_counts,
)


def counts(rows, cols):
    return pd.DataFrame(rows, columns=cols + ["cnt"])


class TestEntropy:
    def test_uniform_binary(self):
        pdf = counts([["a", 1.0], ["b", 1.0]], ["x"])
        assert entropy_from_counts(pdf, ["x"]) == pytest.approx(1.0)

    def test_uniform_four(self):
        pdf = counts([[v, 1.0] for v in "abcd"], ["x"])
        assert entropy_from_counts(pdf, ["x"]) == pytest.approx(2.0)

    def test_deterministic(self):
        pdf = counts([["a", 5.0]], ["x"])
        assert entropy_from_counts(pdf, ["x"]) == pytest.approx(0.0)

    def test_skewed(self):
        pdf = counts([["a", 3.0], ["b", 1.0]], ["x"])
        expect = -(0.75 * math.log2(0.75) + 0.25 * math.log2(0.25))
        assert entropy_from_counts(pdf, ["x"]) == pytest.approx(expect)

    def test_joint_marginalizes(self):
        pdf = counts(
            [["a", "u", 1.0], ["a", "v", 1.0], ["b", "u", 1.0], ["b", "v", 1.0]],
            ["x", "y"],
        )
        assert entropy_from_counts(pdf, ["x"]) == pytest.approx(1.0)
        assert entropy_from_counts(pdf, ["x", "y"]) == pytest.approx(2.0)

    def test_weighted_counts(self):
        pdf = counts([["a", 0.5], ["b", 0.5]], ["x"])
        assert entropy_from_counts(pdf, ["x"]) == pytest.approx(1.0)

    def test_empty(self):
        assert entropy_from_counts(pd.DataFrame(columns=["x", "cnt"]), ["x"]) == 0.0


class TestCondEntropy:
    def test_functional_dependency(self):
        # y = f(x) => H(y|x) = 0
        pdf = counts([["a", "u", 2.0], ["b", "v", 2.0]], ["x", "y"])
        assert cond_entropy_from_counts(pdf, ["y"], ["x"]) == pytest.approx(0.0)

    def test_independent(self):
        pdf = counts(
            [["a", "u", 1.0], ["a", "v", 1.0], ["b", "u", 1.0], ["b", "v", 1.0]],
            ["x", "y"],
        )
        assert cond_entropy_from_counts(pdf, ["y"], ["x"]) == pytest.approx(1.0)


class TestMI:
    def test_independent_is_zero(self):
        pdf = counts(
            [["a", "u", 1.0], ["a", "v", 1.0], ["b", "u", 1.0], ["b", "v", 1.0]],
            ["x", "y"],
        )
        assert mi_from_counts(pdf, "x", "y") == pytest.approx(0.0)

    def test_identical_is_entropy(self):
        pdf = counts([["a", "a", 1.0], ["b", "b", 1.0]], ["x", "y"])
        assert mi_from_counts(pdf, "x", "y") == pytest.approx(1.0)

    def test_symmetric(self):
        rng = np.random.default_rng(0)
        rows = [
            [str(rng.integers(0, 3)), str(rng.integers(0, 4)), float(c)]
            for c in rng.integers(1, 10, 50)
        ]
        pdf = counts(rows, ["x", "y"]).groupby(["x", "y"], as_index=False).sum()
        assert mi_from_counts(pdf, "x", "y") == pytest.approx(
            mi_from_counts(pdf, "y", "x")
        )

    def test_nonnegative(self):
        rng = np.random.default_rng(1)
        rows = [
            [str(rng.integers(0, 5)), str(rng.integers(0, 5)), 1.0]
            for _ in range(200)
        ]
        pdf = counts(rows, ["x", "y"]).groupby(["x", "y"], as_index=False).sum()
        assert mi_from_counts(pdf, "x", "y") >= 0.0


class TestCMI:
    def test_explains_away(self):
        # x and y are both copies of z: I(x;y) = 1 but I(x;y|z) = 0.
        pdf = counts([["a", "a", "a", 1.0], ["b", "b", "b", 1.0]], ["x", "y", "z"])
        assert mi_from_counts(pdf, "x", "y") == pytest.approx(1.0)
        assert cmi_from_counts(pdf, "x", "y", "z") == pytest.approx(0.0)

    def test_cmi_equals_mi_without_z(self):
        pdf = counts([["a", "a", 1.0], ["b", "b", 1.0]], ["x", "y"])
        assert cmi_from_counts(pdf, "x", "y", ()) == pytest.approx(
            mi_from_counts(pdf, "x", "y")
        )

    def test_chain_rule(self):
        # I(x; y,z) = I(x;y) + I(x;z|y) on a random joint distribution.
        rng = np.random.default_rng(2)
        rows = []
        for _ in range(400):
            rows.append(
                [str(rng.integers(0, 3)), str(rng.integers(0, 3)),
                 str(rng.integers(0, 2)), 1.0]
            )
        pdf = counts(rows, ["x", "y", "z"]).groupby(
            ["x", "y", "z"], as_index=False
        ).sum()
        lhs = mi_from_counts(pdf, "x", ["y", "z"])
        rhs = mi_from_counts(pdf, "x", "y") + cmi_from_counts(pdf, "x", "z", "y")
        assert lhs == pytest.approx(rhs, abs=1e-9)

    def test_multi_column_conditioning(self):
        pdf = counts(
            [["a", "a", "p", "q", 2.0], ["b", "b", "p", "q", 2.0]],
            ["x", "y", "z1", "z2"],
        )
        # z1,z2 constant: conditioning on them changes nothing.
        assert cmi_from_counts(pdf, "x", "y", ["z1", "z2"]) == pytest.approx(1.0)

    def test_string_or_list_args_agree(self):
        pdf = counts([["a", "a", "a", 1.0], ["b", "b", "a", 1.0]], ["x", "y", "z"])
        assert cmi_from_counts(pdf, "x", "y", "z") == cmi_from_counts(
            pdf, ["x"], ["y"], ["z"]
        )


class TestChi2:
    @pytest.mark.parametrize(
        "x,dof,expect",
        [
            (3.841, 1, 0.05),
            (5.991, 2, 0.05),
            (6.635, 1, 0.01),
            (0.0, 1, 1.0),
            (18.307, 10, 0.05),
        ],
    )
    def test_against_known_quantiles(self, x, dof, expect):
        assert chi2_sf(x, dof) == pytest.approx(expect, abs=2e-3)

    def test_monotone_in_x(self):
        vals = [chi2_sf(x, 3) for x in (0.5, 1, 2, 4, 8, 16)]
        assert all(a > b for a, b in zip(vals, vals[1:]))

    def test_large_dof(self):
        # Far tail should be ~0, center ~0.5ish.
        assert chi2_sf(200.0, 50) < 1e-6
        assert 0.3 < chi2_sf(49.33, 50) < 0.7


class TestGTest:
    def test_independent_high_p(self):
        rng = np.random.default_rng(3)
        rows = [
            [str(rng.integers(0, 2)), str(rng.integers(0, 2)), 1.0]
            for _ in range(1000)
        ]
        pdf = counts(rows, ["x", "y"]).groupby(["x", "y"], as_index=False).sum()
        g, dof, p = g_test(pdf, "x", "y")
        assert dof == 1
        assert p > 0.01

    def test_dependent_low_p(self):
        pdf = counts([["a", "a", 500.0], ["b", "b", 500.0]], ["x", "y"])
        _, _, p = g_test(pdf, "x", "y")
        assert p < 1e-10

    def test_conditional_dof(self):
        pdf = counts(
            [["a", "a", "u", 50.0], ["b", "b", "u", 50.0],
             ["a", "b", "v", 50.0], ["b", "a", "v", 50.0]],
            ["x", "y", "z"],
        )
        _, dof, _ = g_test(pdf, "x", "y", "z")
        assert dof == 2  # (2-1)(2-1)*|z|=2


class TestCIDecision:
    def test_effect_size_floor(self):
        # Tiny dependence on a huge pseudo-sample: G-test rejects, but the
        # effect-size floor declares independence.
        pdf = counts(
            [["a", "a", 251000.0], ["a", "b", 249000.0],
             ["b", "a", 249000.0], ["b", "b", 251000.0]],
            ["x", "y"],
        )
        _, _, p = g_test(pdf, "x", "y")
        assert p < 0.05  # raw test rejects
        assert is_conditionally_independent(pdf, "x", "y", eps_bits=0.01)

    def test_strong_dependence_detected(self):
        pdf = counts([["a", "a", 500.0], ["b", "b", 500.0]], ["x", "y"])
        assert not is_conditionally_independent(pdf, "x", "y")

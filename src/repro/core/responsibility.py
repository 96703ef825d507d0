"""Degree of responsibility of selected attributes (Def 2.2).

    Resp(E_i) = [I(O;T | E \\ {E_i}, C) − I(O;T | E, C)]
                / Σ_j [I(O;T | E \\ {E_j}, C) − I(O;T | E, C)]

All leave-one-out CMIs marginalize from a *single* joint contingency over
(O, T, E₁…E_m) — one Spark job for the whole ranking. (The contingency is
restricted to complete cases of all of E, so each leave-one-out term uses
the same support; this is the standard estimator trade-off and keeps the
numerator comparisons consistent.)
"""
from __future__ import annotations

from typing import Mapping

from pyspark.sql import DataFrame

from repro.core.contingency import joint_counts
from repro.core.info_theory import cmi_from_counts
from repro.core.mcimr import combined_weight


def responsibilities(
    df: DataFrame,
    selected: list[str],
    *,
    o_bin: str,
    t: str,
    weights: Mapping[str, str] | None = None,
) -> dict[str, float]:
    """Responsibility of each attribute in ``selected`` (sums to 1 when the
    denominator is positive; a negative value flags an attribute that only
    harms the explanation, as in Example 2.4)."""
    if not selected:
        return {}
    dfw, wcol = combined_weight(df, selected, weights)
    pdf = joint_counts(dfw, [o_bin, t, *selected], weight_col=wcol)
    full = cmi_from_counts(pdf, o_bin, t, selected)
    deltas = {
        e: cmi_from_counts(pdf, o_bin, t, [x for x in selected if x != e]) - full
        for e in selected
    }
    denom = sum(deltas.values())
    if abs(denom) < 1e-12:
        # No attribute contributes: equal (zero-information) split.
        return {e: 0.0 for e in selected}
    return {e: d / denom for e, d in deltas.items()}

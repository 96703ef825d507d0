"""Explanation scoring — the programmatic stand-in for the MTurk study.

The paper's 150 subjects rated each explanation 1–5 for "how convincing".
What that operationalizes, given the ground-truth in-domain findings the
paper cites, is: *does the explanation name the real drivers, without
redundancy or junk?* With planted ground truth we can measure exactly
that:

* each ground-truth **class** (a set of attributes proxying one latent
  factor) is credited at most once — a second pick from the same class is
  redundancy (Top-K's failure), a pick outside every class is junk;
* ``score = 1 + 4 · F1(precision over picks, recall over classes)`` maps
  to the paper's 1–5 scale (empty explanation → 1, perfect → 5).

Matching is by suffix so prefixed extracted columns
(``Origin_City__Year_Low_F``) hit their class member (``Year_Low_F``).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable, Sequence


def _matches(attr: str, member: str) -> bool:
    return attr == member or attr.endswith("__" + member)


def class_of(attr: str, gt_classes: Sequence[frozenset[str]]) -> int | None:
    """Index of the ground-truth class ``attr`` belongs to, else None."""
    for i, cls in enumerate(gt_classes):
        if any(_matches(attr, m) for m in cls):
            return i
    return None


@dataclass
class ExplanationScore:
    score: float  # 1..5
    f1: float
    precision: float
    recall: float
    covered_classes: int
    junk_picks: int
    redundant_picks: int


def surrogate_user_score(
    selected: Iterable[str], gt_classes: Sequence[frozenset[str]]
) -> ExplanationScore:
    selected = list(selected)
    if not selected:
        return ExplanationScore(1.0, 0.0, 0.0, 0.0, 0, 0, 0)
    covered: set[int] = set()
    credited = junk = redundant = 0
    for a in selected:
        c = class_of(a, gt_classes)
        if c is None:
            junk += 1
        elif c in covered:
            redundant += 1
        else:
            covered.add(c)
            credited += 1
    precision = credited / len(selected)
    recall = len(covered) / len(gt_classes) if gt_classes else 0.0
    f1 = (
        2 * precision * recall / (precision + recall)
        if precision + recall > 0
        else 0.0
    )
    return ExplanationScore(
        score=1.0 + 4.0 * f1,
        f1=f1,
        precision=precision,
        recall=recall,
        covered_classes=len(covered),
        junk_picks=junk,
        redundant_picks=redundant,
    )


def explainability_distance(final_cmi: float, brute_force_cmi: float) -> float:
    """Fig 2's y-axis: distance of a method's explainability score from
    Brute-Force's (the gold standard; lower is better)."""
    return max(0.0, final_cmi - brute_force_cmi)

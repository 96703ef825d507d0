"""Simulated Named Entity Disambiguation (NED).

The paper links table values to KG entities with an off-the-shelf linker
(SpaCy) and reports two realistic failure modes (Appendix "Entity linker"):

* **surface-form mismatch** — the table says "Russian Federation", the KG
  entity is labelled "Russia" and no alias covers the table's form;
* **ambiguity** — "Ronaldo" matches two entities, the linker refuses.

Our linker reproduces both: it matches on canonical labels and aliases and
returns ``None`` on zero or multiple matches. Datasets *choose* which
surface forms get aliases, so linking failures (and the all-null extracted
rows they cause — a major source of missing data) are planted, not random.
"""
from __future__ import annotations

from typing import Iterable

from repro.kg.graph import KnowledgeGraph


def link_values(
    values: Iterable[str], kg: KnowledgeGraph
) -> dict[str, str | None]:
    """Map each distinct surface form to an entity id or ``None``.

    ``None`` means the NED step failed for that value (no exact label/alias
    match, or an ambiguous match) — its extracted attribute row will be
    all-null, exactly like the paper's unlinked "Russian Federation" rows.
    """
    out: dict[str, str | None] = {}
    for v in values:
        if v is None:
            continue
        v = str(v)
        if v in out:
            continue
        matches = kg.resolve(v)
        out[v] = matches[0] if len(matches) == 1 else None
    return out


def linking_report(links: dict[str, str | None]) -> dict[str, float]:
    """Share of values linked — surfaced in Table 1 / §5.2 style stats."""
    total = len(links)
    linked = sum(1 for e in links.values() if e is not None)
    return {
        "n_values": total,
        "n_linked": linked,
        "link_rate": linked / total if total else 0.0,
    }

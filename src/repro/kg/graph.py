"""Synthetic Knowledge Graph substrate.

The paper mines candidate confounders from DBpedia. This container is
offline, so we build the closest synthetic equivalent exercising the same
code path: a KG holding

* **entities** with a canonical label and optional surface-form aliases
  (the NED simulator matches table values against these — imperfectly,
  reproducing the paper's "Russian Federation" vs "Russia" failures),
* **literal properties** ``(entity, prop, value)`` — the candidate
  confounding attributes, with realistic missingness (a property simply
  absent for an entity),
* **entity-valued links** ``(entity, prop, target)`` — single-valued
  ("leader") or multi-valued ("ethnic group"), enabling multi-hop
  extraction and one-to-many aggregation exactly as §3.1 describes.

Entity tables are small (hundreds to thousands of rows — one per country /
city / airline / celebrity), so the graph itself is pandas; extraction
produces a Spark DataFrame that is then joined against the (potentially
multi-million-row) input table — that join and everything downstream is
distributed.
"""
from __future__ import annotations

from collections import defaultdict
from dataclasses import dataclass, field

import pandas as pd


@dataclass
class KnowledgeGraph:
    """In-memory triple store with the access paths extraction needs."""

    #: entity_id -> canonical label
    labels: dict[str, str] = field(default_factory=dict)
    #: surface form -> entity_id (aliases AND canonical labels)
    _surface: dict[str, set[str]] = field(default_factory=lambda: defaultdict(set))
    #: entity_id -> {prop: value}
    literals: dict[str, dict[str, object]] = field(
        default_factory=lambda: defaultdict(dict)
    )
    #: entity_id -> {prop: [target entity ids]}
    links: dict[str, dict[str, list[str]]] = field(
        default_factory=lambda: defaultdict(lambda: defaultdict(list))
    )

    # -- construction ------------------------------------------------------
    def add_entity(self, eid: str, label: str, aliases: tuple[str, ...] = ()) -> None:
        if eid in self.labels:
            raise ValueError(f"duplicate entity id {eid!r}")
        self.labels[eid] = label
        self._surface[label].add(eid)
        for a in aliases:
            self._surface[a].add(eid)

    def add_literal(self, eid: str, prop: str, value: object) -> None:
        self._require(eid)
        self.literals[eid][prop] = value

    def add_link(self, eid: str, prop: str, target: str) -> None:
        self._require(eid)
        self._require(target)
        self.links[eid][prop].append(target)

    def _require(self, eid: str) -> None:
        if eid not in self.labels:
            raise KeyError(f"unknown entity {eid!r}")

    # -- access ------------------------------------------------------------
    def resolve(self, surface_form: str) -> list[str]:
        """Entity ids whose label or alias matches ``surface_form`` exactly."""
        return sorted(self._surface.get(surface_form, ()))

    def properties_of(self, eid: str) -> dict[str, object]:
        return dict(self.literals.get(eid, {}))

    def links_of(self, eid: str) -> dict[str, list[str]]:
        return {p: list(ts) for p, ts in self.links.get(eid, {}).items()}

    @property
    def n_entities(self) -> int:
        return len(self.labels)

    def literal_props(self) -> set[str]:
        """All literal property names appearing anywhere in the graph."""
        out: set[str] = set()
        for props in self.literals.values():
            out.update(props)
        return out

    def to_triples(self) -> pd.DataFrame:
        """The graph as an (entity, prop, value, kind) frame — for tests and
        for persisting the substrate."""
        rows = []
        for eid, props in self.literals.items():
            for p, v in props.items():
                rows.append((eid, p, v, "literal"))
        for eid, props in self.links.items():
            for p, targets in props.items():
                for t in targets:
                    rows.append((eid, p, t, "link"))
        return pd.DataFrame(rows, columns=["entity", "prop", "value", "kind"])

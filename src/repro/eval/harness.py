"""Run every method of §5 on one catalog query — the engine behind
Tables 2 and 3.

All methods except MESA⁻ share a single prepared frame (extraction,
pruning, binning, IPW — MESA's own preparation), exactly like the paper
runs every baseline "after employing our pruning optimizations" for
fairness. MESA⁻ re-prepares without pruning. Brute-Force refuses
oversized instances (the paper only reports it on Covid-19 and Forbes);
the harness records that as absent rather than failing the run.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import SparkSession

from repro.baselines.brute_force import brute_force
from repro.baselines.hypdb import hypdb
from repro.baselines.linreg import linear_regression
from repro.baselines.topk import top_k
from repro.core.mesa import Mesa, MesaConfig, display_name
from repro.datasets.base import SynthDataset
from repro.datasets.queries import CatalogQuery
from repro.eval.scoring import surrogate_user_score

METHODS = ("Brute-Force", "MESA-", "MESA", "Top-K", "LR", "HypDB")


@dataclass
class MethodOutcome:
    method: str
    selected: list[str] = field(default_factory=list)
    final_cmi: float = float("nan")
    base_cmi: float = float("nan")
    seconds: float = 0.0
    score: float = float("nan")  # surrogate user score 1..5
    error: str | None = None

    @property
    def available(self) -> bool:
        return self.error is None


def run_all_methods(
    spark: SparkSession,
    ds: SynthDataset,
    cq: CatalogQuery,
    *,
    cfg: MesaConfig | None = None,
    methods: tuple[str, ...] = METHODS,
    brute_max_candidates: int = 32,
    brute_max_rows: int = 200_000,
    hypdb_max_attrs: int = 50,
) -> dict[str, MethodOutcome]:
    cfg = cfg or MesaConfig()
    mesa = Mesa(spark, cfg)
    prep = mesa.prepare(
        ds.df, cq.query, ds.kg, ds.extraction_cols, exclude=set(cq.exclude)
    )
    out: dict[str, MethodOutcome] = {}
    try:
        if "MESA" in methods:
            res = mesa.explain_prepared(prep)
            out["MESA"] = MethodOutcome(
                "MESA",
                selected=res.explanation,
                final_cmi=res.result.final_cmi,
                base_cmi=res.result.base_cmi,
                seconds=res.result.seconds,
            )
        if "MESA-" in methods:
            cfg_np = MesaConfig(
                **{
                    **cfg.__dict__,
                    "offline_pruning": False,
                    "online_pruning": False,
                }
            )
            mesa_np = Mesa(spark, cfg_np)
            t0 = time.perf_counter()
            res = mesa_np.explain(
                ds.df, cq.query, ds.kg, ds.extraction_cols,
                exclude=set(cq.exclude),
            )
            out["MESA-"] = MethodOutcome(
                "MESA-",
                selected=res.explanation,
                final_cmi=res.result.final_cmi,
                base_cmi=res.result.base_cmi,
                seconds=time.perf_counter() - t0,
            )
        if "Top-K" in methods:
            res = top_k(
                prep.df,
                prep.candidates,
                o_bin=prep.o_bin,
                t=prep.t,
                k=cfg.k,
                weights=prep.weights,
            )
            out["Top-K"] = MethodOutcome(
                "Top-K",
                selected=[display_name(c) for c in res.selected],
                final_cmi=res.final_cmi,
                base_cmi=res.base_cmi,
                seconds=res.seconds,
            )
        if "LR" in methods:
            raw_cands = [display_name(c) for c in prep.candidates]
            res = linear_regression(
                prep.df,
                raw_cands,
                o=cq.query.o,
                o_bin=prep.o_bin,
                t=prep.t,
                k=cfg.k,
            )
            out["LR"] = MethodOutcome(
                "LR",
                selected=res.selected,
                final_cmi=res.final_cmi,
                base_cmi=res.base_cmi,
                seconds=res.seconds,
            )
        if "HypDB" in methods:
            res = hypdb(
                prep.df,
                prep.candidates,
                o_bin=prep.o_bin,
                t=prep.t,
                k=cfg.k,
                weights=prep.weights,
                max_attrs=hypdb_max_attrs,
            )
            out["HypDB"] = MethodOutcome(
                "HypDB",
                selected=[display_name(c) for c in res.selected],
                final_cmi=res.final_cmi,
                base_cmi=res.base_cmi,
                seconds=res.seconds,
            )
        if "Brute-Force" in methods:
            # Shrink to MCIMR-relevant candidates when slightly over the cap
            # is NOT done: the paper simply omits Brute-Force on datasets
            # where it is infeasible, and so do we.
            try:
                # k ≤ 3 for the exhaustive search: every Brute-Force
                # explanation in the paper's Table 2 has at most 3
                # attributes, and C(|A|, 4..5) subsets would dominate the
                # whole benchmark for no additional signal.
                res = brute_force(
                    prep.df,
                    prep.candidates,
                    o_bin=prep.o_bin,
                    t=prep.t,
                    k=min(cfg.k, 3),
                    max_rows=brute_max_rows,
                    max_candidates=brute_max_candidates,
                )
                out["Brute-Force"] = MethodOutcome(
                    "Brute-Force",
                    selected=[display_name(c) for c in res.selected],
                    final_cmi=res.final_cmi,
                    base_cmi=res.base_cmi,
                    seconds=res.seconds,
                )
            except ValueError as e:
                out["Brute-Force"] = MethodOutcome(
                    "Brute-Force", error=str(e)
                )
    finally:
        prep.df.unpersist()
    for m in out.values():
        if m.available:
            m.score = surrogate_user_score(m.selected, cq.gt_classes).score
    return out

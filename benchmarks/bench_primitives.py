"""Micro-benchmarks of the distributed primitives underlying every score:
the wide scan pass, the joint contingency, and one MCIMR run at SF=0.1.
These isolate the per-iteration Spark cost that Figs 4–6 sweep."""
import pytest

from benchmarks.conftest import run_once
from repro.core.contingency import joint_counts, scan_counts
from repro.core.mcimr import mcimr
from repro.core.mesa import Mesa, MesaConfig
from repro.datasets.queries import get_query
from repro.datasets.so import make_so


@pytest.fixture(scope="module")
def prepared(spark, scale):
    ds = make_so(spark, sf=scale.so_sf, n_junk=scale.n_junk)
    cq = get_query("SO", "Q1")
    prep = Mesa(spark, MesaConfig(k=scale.k, ipw=False)).prepare(
        ds.df, cq.query, ds.kg, ds.extraction_cols
    )
    prep.df.count()
    yield prep
    prep.df.unpersist()


@pytest.mark.benchmark(group="primitives")
def bench_scan_pass(benchmark, prepared):
    scan = benchmark(
        scan_counts, prepared.df, [prepared.o_bin, prepared.t], prepared.candidates
    )
    assert len(scan) == len(prepared.candidates)


@pytest.mark.benchmark(group="primitives")
def bench_joint_contingency(benchmark, prepared):
    cols = [prepared.o_bin, prepared.t, *prepared.candidates[:3]]
    pdf = benchmark(joint_counts, prepared.df, cols)
    assert len(pdf) > 0


@pytest.mark.benchmark(group="primitives")
def bench_mcimr_end_to_end(benchmark, prepared, scale):
    res = run_once(
        benchmark,
        mcimr,
        prepared.df,
        prepared.candidates,
        o_bin=prepared.o_bin,
        t=prepared.t,
        k=scale.k,
    )
    assert res.selected

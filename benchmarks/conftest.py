"""Benchmark-scale fixtures: datasets built once per session at SF≈0.1.

pytest-benchmark runs each bench with ``pedantic(rounds=1, iterations=1)``
— every benchmark here is an end-to-end Spark pipeline (tens of seconds),
so statistical repetition would cost more than it tells.
"""
import pytest

from repro.eval.tables import Scale

BENCH_SCALE = Scale(so_sf=0.05, flights_sf=0.005, n_junk=12, k=5)


@pytest.fixture(scope="session")
def scale() -> Scale:
    return BENCH_SCALE


def run_once(benchmark, fn, *args, **kwargs):
    """Run an expensive end-to-end target exactly once under the timer."""
    return benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)

"""Benchmarks for the § VI-B scalability sweep (DESIGN.md row S1).

Times a fixed 200-query run per method at two candidate-set sizes; the
full sweep in EXPERIMENTS.md comes from ``python jobs/scalability.py``.
"""
import pytest

from repro.baselines.mw import run_mw
from repro.baselines.overlap import run_overlap
from repro.baselines.uniform import run_uniform
from repro.core.metam import MetamConfig, run_metam
from repro.experiments.scalability import synthetic_instance
from repro.tasks.monotonic import QueryOracle

BUDGET = 200


def _run(method, n):
    ids, profiles, util = synthetic_instance(n, 5, seed=0)
    oracle = QueryOracle(util, budget=BUDGET, monotone=False)
    if method == "metam":
        return run_metam(
            ids, profiles, oracle, MetamConfig(seed=0, minimality=False)
        )
    if method == "mw":
        return run_mw(ids, profiles, oracle, seed=0)
    if method == "overlap":
        return run_overlap(ids, profiles, oracle)
    return run_uniform(ids, oracle, seed=0)


@pytest.mark.benchmark(group="scalability-n500")
@pytest.mark.parametrize("method", ["metam", "mw", "overlap", "uniform"])
def test_bench_methods_n500(benchmark, method):
    res = benchmark(lambda: _run(method, 500))
    assert res.queries <= BUDGET


@pytest.mark.benchmark(group="scalability-n2000")
@pytest.mark.parametrize("method", ["metam", "mw", "overlap", "uniform"])
def test_bench_methods_n2000(benchmark, method):
    res = benchmark(lambda: _run(method, 2000))
    assert res.queries <= BUDGET

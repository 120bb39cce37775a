"""Benchmarks for the Table II pipeline.

One benchmark for the distributed scenario build (lake generation →
discovery → batch materialization → profiling) and one per search method
on the pre-built scenario. Utilities within budget land in
``extra_info`` so the benchmark log carries the table's content. The
full Table II in EXPERIMENTS.md comes from ``python jobs/table2.py``.
"""
import pytest

from repro.experiments.harness import run_method
from repro.experiments.scenarios import build_table2_scenario

BENCH_SF = 0.1


@pytest.fixture(scope="module")
def bench_scenario(spark):
    return build_table2_scenario(spark, "schools_c", sf=BENCH_SF)


@pytest.mark.benchmark(group="table2-build")
def test_bench_scenario_build(benchmark, spark):
    sc = benchmark.pedantic(
        lambda: build_table2_scenario(spark, "pharmacy", sf=BENCH_SF),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["n_candidates"] = len(sc.candidates)
    assert len(sc.candidates) > 20


@pytest.mark.benchmark(group="table2-search")
@pytest.mark.parametrize("method", ["metam", "mw", "overlap", "uniform"])
def test_bench_search_method(benchmark, bench_scenario, method):
    budget = max(10, int(0.12 * len(bench_scenario.candidates)))

    def run():
        return run_method(method, bench_scenario, budget=budget, seed=0)

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    benchmark.extra_info["utility_at_budget"] = round(res.utility_at(budget), 3)
    benchmark.extra_info["budget"] = budget
    assert res.queries <= budget

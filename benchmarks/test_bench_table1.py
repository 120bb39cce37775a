"""Benchmark for the Table I pipeline (repository characteristics).

Regenerates DESIGN.md row T1 at SF=0.1. The full-scale numbers recorded in
EXPERIMENTS.md come from ``python jobs/table1.py --sf 1.0``.
"""
import pytest

from repro.experiments.table1 import compute_table1


@pytest.mark.benchmark(group="table1")
def test_bench_table1_pipeline(benchmark, spark):
    stats = benchmark.pedantic(
        lambda: compute_table1(spark, sf=0.1, seed=0), rounds=1, iterations=1
    )
    assert len(stats) == 2
    for s in stats:
        benchmark.extra_info[s.name] = {
            "tables": s.n_tables,
            "columns": s.n_columns,
            "joinable_columns": s.n_joinable_columns,
            "size_mb": round(s.size_mb, 2),
        }
        assert 0 < s.n_joinable_columns <= s.n_columns

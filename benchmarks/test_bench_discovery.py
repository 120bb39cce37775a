"""Benchmarks for the distributed discovery/materialization substrate at
SF=0.1 (≈100 MB-scale configuration of the synthetic lake)."""
import pandas as pd
import pytest

from repro.discovery.index import build_value_index, containment_with_input
from repro.discovery.join_paths import enumerate_candidates
from repro.discovery.materialize import materialize_batch
from repro.lake.generator import open_data_lite


@pytest.fixture(scope="module")
def bench_lake(spark):
    return open_data_lite(spark, sf=0.1, seed=0)


@pytest.fixture(scope="module")
def bench_d_in(spark, bench_lake):
    import numpy as np

    _, gt = bench_lake
    g = np.random.default_rng(0)
    keys = g.choice(gt.key_domain, size=500, replace=True)
    return spark.createDataFrame(
        pd.DataFrame({"zone": keys.astype("int64"), "feat": g.normal(size=500)})
    )


@pytest.mark.benchmark(group="discovery")
def test_bench_value_index(benchmark, spark, bench_lake):
    lake, _ = bench_lake
    n = benchmark.pedantic(
        lambda: build_value_index(lake).count(), rounds=1, iterations=1
    )
    benchmark.extra_info["index_rows"] = n
    assert n > 0


@pytest.mark.benchmark(group="discovery")
def test_bench_enumerate_and_materialize(benchmark, spark, bench_lake, bench_d_in):
    lake, _ = bench_lake

    def pipeline():
        cands, _pair = enumerate_candidates(
            spark, bench_d_in, "zone", lake, min_containment=0.05
        )
        wide = materialize_batch(bench_d_in, "zone", lake, cands)
        return len(cands), wide.shape

    (n_cands, shape) = benchmark.pedantic(pipeline, rounds=1, iterations=1)
    benchmark.extra_info["n_candidates"] = n_cands
    assert shape[0] == 500

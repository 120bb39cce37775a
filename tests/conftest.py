"""Shared fixtures: tiny scenarios and lakes, built once per session."""
import numpy as np
import pytest

from repro.experiments.scenarios import (
    build_clustering_scenario,
    build_entity_linking_scenario,
    build_fairness_scenario,
    build_tabular_scenario,
)
from repro.lake.generator import LakeSpec, generate_lake

TINY_SF = 0.08


@pytest.fixture(scope="session")
def tiny_lake(spark):
    """Small generated lake + ground truth for substrate tests."""
    spec = LakeSpec(
        n_useful=3,
        n_irrelevant=8,
        n_erroneous=3,
        n_decoys=4,
        n_sparse=4,
        n_keys=120,
        n_signals=3,
        prefix="tl",
        seed=42,
    )
    return generate_lake(spark, spec)


@pytest.fixture(scope="session")
def clf_scenario(spark):
    """Tiny classification scenario reused across search/harness tests."""
    return build_tabular_scenario(
        spark, "tclf", "classification", sf=TINY_SF, seed=6, n_rows=400
    )


@pytest.fixture(scope="session")
def causal_scenario(spark):
    """Tiny what-if scenario reused across search/harness tests."""
    return build_tabular_scenario(
        spark, "twhatif", "what-if", sf=TINY_SF, seed=7, n_rows=400
    )


@pytest.fixture(scope="session")
def el_scenario(spark):
    return build_entity_linking_scenario(
        spark, seed=3, n_rows=250, n_cities=80, n_irrelevant=12, n_erroneous=2
    )


@pytest.fixture(scope="session")
def fair_scenario(spark):
    return build_fairness_scenario(
        spark, seed=3, n_rows=500, n_keys=250, n_irrelevant=10
    )


@pytest.fixture(scope="session")
def cluster_scenario(spark):
    return build_clustering_scenario(spark, seed=3, n_rows=160)


@pytest.fixture()
def rng():
    return np.random.default_rng(0)

"""Method dispatch: run any search method on a scenario under a budget."""
from __future__ import annotations

from repro.baselines.arda import run_iarda
from repro.baselines.mw import run_mw
from repro.baselines.overlap import run_overlap
from repro.baselines.uniform import run_uniform
from repro.baselines.variants import run_metam_eq, run_metam_nc, run_metam_nceq
from repro.core.metam import MetamConfig, run_metam
from repro.core.types import SearchResult
from repro.experiments.scenarios import Scenario
from repro.tasks.monotonic import QueryOracle

METHODS = (
    "metam", "mw", "overlap", "uniform", "iarda",
    "metam_eq", "metam_nc", "metam_nceq",
)


def make_oracle(
    scenario: Scenario, *, budget: int | None, monotone: bool = True
) -> QueryOracle:
    return QueryOracle(scenario.utility_fn(), budget=budget, monotone=monotone)


def run_method(
    method: str,
    scenario: Scenario,
    *,
    budget: int | None = None,
    theta: float | None = None,
    seed: int = 0,
    cfg: MetamConfig | None = None,
) -> SearchResult:
    """Run ``method`` on ``scenario`` with a fresh counting oracle."""
    oracle = make_oracle(scenario, budget=budget)
    ids = scenario.aug_ids
    profiles = scenario.profiles
    if cfg is None:
        cfg = MetamConfig(theta=theta, seed=seed)
    if method == "metam":
        return run_metam(ids, profiles, oracle, cfg)
    if method == "metam_eq":
        return run_metam_eq(ids, profiles, oracle, cfg)
    if method == "metam_nc":
        return run_metam_nc(ids, profiles, oracle, cfg)
    if method == "metam_nceq":
        return run_metam_nceq(ids, profiles, oracle, cfg)
    if method == "mw":
        return run_mw(ids, profiles, oracle, theta=theta, seed=seed)
    if method == "overlap":
        return run_overlap(ids, profiles, oracle, theta=theta)
    if method == "uniform":
        return run_uniform(ids, oracle, theta=theta, seed=seed)
    if method == "iarda":
        if scenario.target_col is None:
            raise ValueError("iARDA needs a prediction target")
        return run_iarda(
            ids,
            oracle,
            scenario.wide_pdf,
            scenario.target_col,
            classification=scenario.kind == "classification",
            theta=theta,
            seed=seed,
        )
    raise ValueError(f"unknown method: {method}")

"""Table II harness: utility within a query budget, per method × dataset.

Paper's Table II (utility in < 1000 queries; (C) = causal task):

    Dataset            | METAM | MW   | Overlap | Uniform
    Schools (C)        | 0.80  | 0.20 | 0.0     | 0.20
    Taxi (C)           | 1     | 0.5  | 0.5     | 0.5
    Crime (C)          | 0.90  | 0.20 | 0.1     | 0.1
    Housing prices (C) | 0.75  | 0.25 | 0.0     | 0.25
    Pharmacy           | 0.95  | 0.43 | 0.43    | 0.25
    Grocery stores     | 0.92  | 0.37 | 0.10    | 0.17

The paper's budget of 1000 queries covered ≈ 1/5 of its ≥ 5000-candidate
sets; we scale the budget to the same fraction of our candidate sets.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import SparkSession

from repro.experiments.harness import run_method
from repro.experiments.scenarios import TABLE2_SCENARIOS, build_table2_scenario

PAPER_TABLE2: dict[str, dict[str, float]] = {
    "schools_c": {"metam": 0.80, "mw": 0.20, "overlap": 0.0, "uniform": 0.20},
    "taxi_c": {"metam": 1.0, "mw": 0.5, "overlap": 0.5, "uniform": 0.5},
    "crime_c": {"metam": 0.90, "mw": 0.20, "overlap": 0.1, "uniform": 0.1},
    "housing_c": {"metam": 0.75, "mw": 0.25, "overlap": 0.0, "uniform": 0.25},
    "pharmacy": {"metam": 0.95, "mw": 0.43, "overlap": 0.43, "uniform": 0.25},
    "grocery": {"metam": 0.92, "mw": 0.37, "overlap": 0.10, "uniform": 0.17},
}

METHODS = ("metam", "mw", "overlap", "uniform")

#: Budget as a fraction of the candidate-set size. The paper's 1000-query
#: budget covered ≈1/5 of its ≥5000 candidates but its tasks were far
#: noisier; 0.12 keeps the same "budget ≪ what baselines need" regime at
#: our scale (calibration in EXPERIMENTS.md).
BUDGET_FRACTION = 0.12


@dataclass
class Table2Row:
    dataset: str
    n_candidates: int
    budget: int
    utilities: dict[str, float]  # method -> utility reached within budget
    base_utility: float


def compute_table2(
    spark: SparkSession,
    *,
    sf: float = 0.25,
    datasets: tuple[str, ...] | None = None,
    budget_fraction: float = BUDGET_FRACTION,
    seed: int = 0,
    n_seeds: int = 3,
) -> list[Table2Row]:
    """One row per dataset: mean utility-within-budget over ``n_seeds``
    method seeds (the search methods are randomized; averaging removes
    single-draw luck from the comparison)."""
    rows = []
    for name in datasets or tuple(TABLE2_SCENARIOS):
        sc = build_table2_scenario(spark, name, sf=sf)
        budget = max(10, int(budget_fraction * len(sc.candidates)))
        utilities = {}
        base = None
        for m in METHODS:
            us = []
            for s_i in range(n_seeds):
                res = run_method(m, sc, budget=budget, seed=seed + s_i)
                us.append(res.utility_at(budget))
                base = res.base_utility
            utilities[m] = sum(us) / len(us)
        rows.append(
            Table2Row(
                dataset=name,
                n_candidates=len(sc.candidates),
                budget=budget,
                utilities=utilities,
                base_utility=base,
            )
        )
    return rows


def format_table2(rows: list[Table2Row]) -> str:
    lines = [
        "Dataset | n_cand | budget | base | "
        + " | ".join(m.upper() for m in METHODS)
    ]
    for r in rows:
        lines.append(
            f"{r.dataset} | {r.n_candidates} | {r.budget} | "
            f"{r.base_utility:.2f} | "
            + " | ".join(f"{r.utilities[m]:.2f}" for m in METHODS)
        )
    lines.append("")
    lines.append("Paper's Table II (utility in < 1000 queries):")
    for name, vals in PAPER_TABLE2.items():
        lines.append(
            f"{name} | - | 1000 | - | "
            + " | ".join(f"{vals[m]:.2f}" for m in METHODS)
        )
    return "\n".join(lines)

"""Prediction-from-expert-advice baseline (randomized MW, § III-A, VI).

Each data profile is an expert that ranks candidates by its profile value.
At every step an expert is drawn proportionally to its weight, the
top-ranked unqueried candidate of that expert is queried on top of the
current solution, and the chosen expert's weight is multiplicatively
updated by whether the query improved utility.
"""
from __future__ import annotations

import numpy as np

from repro.core.types import SearchResult
from repro.profiles.profiler import ProfileSet
from repro.tasks.monotonic import BudgetExhausted, QueryOracle

_EPS = 1e-12


def run_mw(
    aug_ids: list[str],
    profiles: ProfileSet,
    oracle: QueryOracle,
    *,
    theta: float | None = None,
    eta: float = 0.3,
    seed: int = 0,
    gain_tol: float = 0.01,
) -> SearchResult:
    g = np.random.default_rng(seed)
    n_experts = profiles.dim
    weights = np.ones(n_experts)
    # Per-expert ranking of candidates, best first.
    rankings = [
        sorted(aug_ids, key=lambda a, k=k: (-profiles.vectors[a][k], a))
        for k in range(n_experts)
    ]
    cursors = [0] * n_experts
    queried: set[str] = set()
    selected: list[str] = []
    base = oracle.base_utility
    u_cur = base
    try:
        while len(queried) < len(aug_ids):
            p = weights / weights.sum()
            e = int(g.choice(n_experts, p=p))
            # Advance this expert's cursor to its best unqueried candidate.
            r, c = rankings[e], cursors[e]
            while c < len(r) and r[c] in queried:
                c += 1
            cursors[e] = c
            if c >= len(r):
                weights[e] = 0.0
                if weights.sum() == 0:
                    break
                continue
            a = r[c]
            queried.add(a)
            u = oracle.query(frozenset(selected) | {a})
            gain = u - u_cur
            tol = max(gain_tol, _EPS)
            # Multiplicative update: reward improvement, penalize waste.
            weights[e] *= (1.0 + eta) if gain > tol else (1.0 - eta)
            weights[e] = max(weights[e], 1e-9)
            if gain > tol:
                selected.append(a)
                u_cur = u
            if theta is not None and u_cur >= theta - _EPS:
                break
    except BudgetExhausted:
        pass
    return SearchResult(
        selected=selected,
        utility=u_cur,
        queries=oracle.queries,
        history=oracle.history,
        base_utility=base,
    )

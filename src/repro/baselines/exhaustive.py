"""Exhaustive subset search (§ III-A): the O(2^n) reference solver.

Enumerates subsets by increasing size, so the first subset reaching θ is a
minimum-size solution. Only usable for tiny n; the theory tests use it as
the ground-truth optimum (Theorems 1–3).
"""
from __future__ import annotations

from itertools import combinations

from repro.core.types import SearchResult
from repro.tasks.monotonic import BudgetExhausted, QueryOracle

_EPS = 1e-12


def run_exhaustive(
    aug_ids: list[str],
    oracle: QueryOracle,
    *,
    theta: float,
    max_size: int | None = None,
) -> SearchResult:
    base = oracle.base_utility
    best: list[str] = []
    best_u = base
    ids = sorted(aug_ids)
    cap = max_size if max_size is not None else len(ids)
    try:
        for size in range(1, cap + 1):
            for combo in combinations(ids, size):
                u = oracle.query(frozenset(combo))
                if u > best_u + _EPS:
                    best, best_u = list(combo), u
                if u >= theta - _EPS:
                    return SearchResult(
                        list(combo), u, oracle.queries, oracle.history, base
                    )
    except BudgetExhausted:
        pass
    return SearchResult(best, best_u, oracle.queries, oracle.history, base)

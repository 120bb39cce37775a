"""Shared greedy driver for ranking-based baselines (§ III-A).

Given a fixed candidate order, query candidates one by one on top of the
current solution and keep any candidate that improves utility — the
discover-then-augment strategy underlying Overlap, Uniform, and iARDA.
"""
from __future__ import annotations

from repro.core.types import SearchResult
from repro.tasks.monotonic import BudgetExhausted, QueryOracle

_EPS = 1e-12

#: Minimum utility gain treated as a real improvement (shared with Metam's
#: default ``gain_tol`` so all methods accept gains on equal footing).
GAIN_TOL = 0.01


def run_ranked(
    order: list[str],
    oracle: QueryOracle,
    *,
    theta: float | None = None,
    gain_tol: float = GAIN_TOL,
) -> SearchResult:
    """Query in ``order``; greedily keep improvements; stop at θ/budget."""
    base = oracle.base_utility
    selected: list[str] = []
    u_cur = base
    try:
        for a in order:
            u = oracle.query(frozenset(selected) | {a})
            if u > u_cur + max(gain_tol, _EPS):
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

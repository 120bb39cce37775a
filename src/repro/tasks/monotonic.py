"""Query oracle: counting, caching, budget, monotonicity certification.

All search methods (Metam and baselines) query the task exclusively
through :class:`QueryOracle`. It

- counts *distinct* utility evaluations (the paper's "queries");
- caches, so re-evaluating a seen augmentation set is free;
- enforces a query budget (raising :class:`BudgetExhausted`);
- optionally applies the paper's MONOTONICITY CERTIFICATION (Fig 2 / P3):
  the certified utility of a set ``S`` is the max raw utility over every
  *evaluated* subset of ``S`` — i.e. augmentations that worsen utility are
  ignored. Certified utilities are monotone over observed sets by
  construction;
- records ``(query_count, best_utility_so_far)`` history for
  query-vs-utility curves.
"""
from __future__ import annotations

from collections.abc import Callable


class BudgetExhausted(Exception):
    """Raised when a query would exceed the oracle's budget."""


class QueryOracle:
    """Counting/caching/certifying wrapper around a raw utility function."""

    def __init__(
        self,
        fn: Callable[[frozenset[str]], float],
        *,
        budget: int | None = None,
        monotone: bool = True,
    ) -> None:
        self._fn = fn
        self.budget = budget
        self.monotone = monotone
        self.queries = 0
        self._raw: dict[frozenset[str], float] = {}
        self._certified: dict[frozenset[str], float] = {}
        self.history: list[tuple[int, float]] = []
        self._best = float("-inf")
        self.base_utility = self.query(frozenset())

    def seen(self, ids: frozenset[str]) -> bool:
        return ids in self._raw

    def remaining(self) -> int | None:
        if self.budget is None:
            return None
        return max(0, self.budget - self.queries)

    def query(self, ids: frozenset[str]) -> float:
        """Certified utility of the augmentation set ``ids``."""
        ids = frozenset(ids)
        if ids not in self._raw:
            if self.budget is not None and self.queries >= self.budget:
                raise BudgetExhausted(f"budget {self.budget} exhausted")
            self.queries += 1
            u = float(self._fn(ids))
            self._raw[ids] = u
            self._best = max(self._best, u)
            self.history.append((self.queries, self._best))
        if not self.monotone:
            return self._raw[ids]
        cert = self._raw[ids]
        for other, u in self._raw.items():
            if u > cert and other < ids:
                cert = u
        self._certified[ids] = cert
        return cert

    def raw(self, ids: frozenset[str]) -> float:
        """Uncertified utility (must have been queried already)."""
        return self._raw[frozenset(ids)]

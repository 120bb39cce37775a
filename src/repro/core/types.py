"""Core datatypes shared across discovery, profiling and querying.

An :class:`Augmentation` is the paper's ``Γ(D_in, P[j])``: a join path ``P``
(ordered chain of join steps over lake tables) plus the single projected
column ``j`` that is appended to the input dataset.
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field


@dataclass(frozen=True)
class JoinStep:
    """One hop of a join path: join the running result with ``table``.

    ``left_on`` is a column of the running result (for the first hop, a
    column of ``D_in``); ``right_on`` is the join key in ``table``.
    """

    table: str
    left_on: str
    right_on: str


def _sanitize(name: str) -> str:
    return re.sub(r"[^0-9a-zA-Z_]", "_", name)


@dataclass(frozen=True)
class Augmentation:
    """A join path plus the projected augmentation column (Definition 4)."""

    steps: tuple[JoinStep, ...]
    column: str

    @property
    def depth(self) -> int:
        """Number of datasets in the join path (Definition 3's ``t``)."""
        return len(self.steps)

    @property
    def table(self) -> str:
        """Final table of the path — the one ``column`` comes from."""
        return self.steps[-1].table

    @property
    def aug_id(self) -> str:
        """Stable identifier, also used as the materialized column name."""
        hops = "__".join(
            f"{_sanitize(s.table)}_{_sanitize(s.left_on)}_{_sanitize(s.right_on)}"
            for s in self.steps
        )
        return f"aug__{hops}__{_sanitize(self.column)}"

    def __str__(self) -> str:  # pragma: no cover - debug aid
        path = " ⋈ ".join(f"{s.table}[{s.left_on}={s.right_on}]" for s in self.steps)
        return f"{path} → {self.column}"


@dataclass
class QueryRecord:
    """One interventional query: the augmentation set and its utility."""

    aug_ids: frozenset[str]
    utility: float


@dataclass
class SearchResult:
    """Outcome of a discovery run (Metam or a baseline).

    ``history`` records ``(query_count, best_utility_so_far)`` after every
    query so query-vs-utility curves (Fig 3 shape) can be re-derived.
    """

    selected: list[str]
    utility: float
    queries: int
    history: list[tuple[int, float]] = field(default_factory=list)
    base_utility: float = 0.0

    def utility_at(self, budget: int) -> float:
        """Best utility reached using at most ``budget`` queries."""
        best = self.base_utility
        for q, u in self.history:
            if q > budget:
                break
            best = max(best, u)
        return best

    def queries_to_reach(self, theta: float) -> int | None:
        """Queries needed to first reach utility ``theta`` (None if never)."""
        for q, u in self.history:
            if u >= theta:
                return q
        return None

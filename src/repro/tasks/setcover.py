"""Set-cover utility — the paper's NP-hardness gadget (Theorem 1).

``u(𝒫) = |⋃_{P_i ∈ 𝒫} S_i| / n``: each augmentation covers a subset of a
universe and utility is the covered fraction. Monotone and submodular, so
it also exercises the greedy approximation analysis (Lemma 3). Used by the
theory tests, not by the data pipeline.
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass
class SetCoverUtility:
    """Callable utility over frozensets of augmentation ids."""

    sets: dict[str, frozenset[int]]
    n_universe: int

    def __call__(self, ids: frozenset[str]) -> float:
        if self.n_universe == 0:
            return 0.0
        covered: set[int] = set()
        for i in ids:
            covered |= self.sets[i]
        return len(covered) / self.n_universe


@dataclass
class AdversarialUtility:
    """Theorem 2's adversary: utility stays flat except on one hidden set."""

    hidden: frozenset[str]
    theta: float = 1.0
    base: float = 0.0

    def __call__(self, ids: frozenset[str]) -> float:
        return self.theta if ids == self.hidden else self.base

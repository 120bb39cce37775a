"""Overlap-ranking baseline (used by S4 / Ver; § III-A, VI).

Queries augmentations in non-increasing order of overlap with ``D_in``
(the overlap data profile), greedily keeping improvements.
"""
from __future__ import annotations

from repro.baselines.ranked import run_ranked
from repro.core.types import SearchResult
from repro.profiles.profiler import ProfileSet
from repro.tasks.monotonic import QueryOracle


def run_overlap(
    aug_ids: list[str],
    profiles: ProfileSet,
    oracle: QueryOracle,
    *,
    theta: float | None = None,
) -> SearchResult:
    if "overlap" not in profiles.names:
        raise ValueError("profiles lack an 'overlap' dimension")
    k = profiles.names.index("overlap")
    order = sorted(
        aug_ids, key=lambda a: (-profiles.vectors[a][k], a)
    )
    return run_ranked(order, oracle, theta=theta)

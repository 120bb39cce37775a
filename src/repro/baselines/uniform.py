"""Uniform-sampling baseline (§ III-A, VI): random query order."""
from __future__ import annotations

import numpy as np

from repro.baselines.ranked import run_ranked
from repro.core.types import SearchResult
from repro.tasks.monotonic import QueryOracle


def run_uniform(
    aug_ids: list[str],
    oracle: QueryOracle,
    *,
    theta: float | None = None,
    seed: int = 0,
) -> SearchResult:
    g = np.random.default_rng(seed)
    order = list(np.array(sorted(aug_ids))[g.permutation(len(aug_ids))])
    return run_ranked(order, oracle, theta=theta)

"""iARDA baseline (§ VI-A): ARDA's feature-importance ranking, queried
interventionally.

ARDA joins all candidates, trains a model, and ranks candidate features by
importance. The interventional adaptation (the paper's iARDA) queries
augmentations in decreasing importance order. We compute importances with
the numpy random forest over the fully-augmented frame (or |ridge coef|
for regression-like targets when the forest is disabled).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.baselines.ranked import run_ranked
from repro.core.types import SearchResult
from repro.tasks.models import RandomForest, impute_mean
from repro.tasks.monotonic import QueryOracle


def arda_ranking(
    wide_pdf: pd.DataFrame,
    aug_ids: list[str],
    target: str,
    *,
    classification: bool,
    seed: int = 0,
) -> list[str]:
    """Candidates ranked by forest feature importance on the full join."""
    present = [a for a in aug_ids if a in wide_pdf.columns]
    absent = [a for a in aug_ids if a not in wide_pdf.columns]
    if not present:
        return sorted(aug_ids)
    X = impute_mean(wide_pdf[present].to_numpy(dtype="float64"))
    y = wide_pdf[target].to_numpy(dtype="float64")
    rf = RandomForest(
        n_trees=10, max_depth=3, seed=seed, classification=classification
    ).fit(X, y)
    imp = rf.feature_importances_
    order = sorted(
        range(len(present)), key=lambda i: (-imp[i], present[i])
    )
    return [present[i] for i in order] + sorted(absent)


def run_iarda(
    aug_ids: list[str],
    oracle: QueryOracle,
    wide_pdf: pd.DataFrame,
    target: str,
    *,
    classification: bool = True,
    theta: float | None = None,
    seed: int = 0,
) -> SearchResult:
    order = arda_ranking(
        wide_pdf, aug_ids, target, classification=classification, seed=seed
    )
    return run_ranked(order, oracle, theta=theta)

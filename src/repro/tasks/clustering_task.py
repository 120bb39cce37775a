"""Clustering task (paper § VI-A.4, raw-materials / satiety scores).

The paper clusters products and scores the additive inverse of the
largest cluster radius. We run greedy k-center over the standardized
numeric features and report cluster *purity* against the ground-truth
categories — the same mechanism (an informative augmentation such as the
ONI score tightens the clusters around the true categories) with a metric
that is already normalized to [0, 1]. Documented in DESIGN.md.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.tasks.base import Task
from repro.tasks.models import standardize


def k_center_assign(X: np.ndarray, k: int, seed: int = 0) -> np.ndarray:
    """Greedy k-center (Gonzalez) assignment labels."""
    g = np.random.default_rng(seed)
    n = len(X)
    centers = [int(g.integers(n))]
    d = np.linalg.norm(X - X[centers[0]], axis=1)
    while len(centers) < min(k, n):
        c = int(np.argmax(d))
        centers.append(c)
        d = np.minimum(d, np.linalg.norm(X - X[c], axis=1))
    dists = np.stack([np.linalg.norm(X - X[c], axis=1) for c in centers])
    return np.argmin(dists, axis=0)


@dataclass
class ClusteringTask(Task):
    """Cluster rows; utility = purity w.r.t. held-out category labels."""

    category_col: str
    exclude: tuple[str, ...] = ()
    seed: int = 0
    name: str = field(default="clustering")

    def utility(self, df: pd.DataFrame) -> float:
        cats = df[self.category_col].to_numpy()
        k = len(np.unique(cats))
        X, cols = self.feature_matrix(
            df, exclude=(self.category_col, *self.exclude)
        )
        if not cols or k < 2:
            return 0.0
        Xs, _, _ = standardize(X)
        labels = k_center_assign(Xs, k, seed=self.seed)
        total = 0
        for lbl in np.unique(labels):
            members = cats[labels == lbl]
            _, counts = np.unique(members, return_counts=True)
            total += counts.max()
        return total / len(df)

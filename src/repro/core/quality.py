"""Quality-score estimation (§ IV-B) and profile-importance learning.

The quality score of an augmentation is the sum of

- a **profile-based score**: weighted average of its profile values, with
  weights = learned profile importance (initialized uniform, re-estimated
  after every query by ridge-fitting observed utility gains on profile
  vectors — Lemma 4's linear model); and
- a **utility-based score**: its own observed gain if queried, else the
  nearest queried cluster-mate's gain attenuated by ``(1 − d(P, P'))``.
"""
from __future__ import annotations

import numpy as np

from repro.core.clustering import Clusters, chebyshev
from repro.profiles.profiler import ProfileSet


class QualityModel:
    """JPSCORE / UPDATE-QUALITY-SCORES of Algorithm 1."""

    def __init__(
        self,
        profiles: ProfileSet,
        *,
        lam: float = 1e-2,
        min_fit: int | None = None,
    ) -> None:
        self.profiles = profiles
        self.lam = lam
        self.dim = profiles.dim
        self.weights = np.full(self.dim, 1.0 / max(1, self.dim))
        self.min_fit = min_fit if min_fit is not None else max(3, self.dim)
        self.gains: dict[str, float] = {}  # aug_id -> observed marginal gain

    def profile_score(self, aug_id: str) -> float:
        return float(self.weights @ self.profiles.vectors[aug_id])

    def record_gain(self, aug_id: str, gain: float) -> None:
        """Store the observed marginal utility gain of a queried candidate."""
        self.gains[aug_id] = gain
        self._refit()

    def _refit(self) -> None:
        """Ridge fit: gains ≈ β · profiles; weights = |β| normalized."""
        if len(self.gains) < self.min_fit:
            return
        ids = sorted(self.gains)
        P = np.stack([self.profiles.vectors[a] for a in ids])
        g = np.array([self.gains[a] for a in ids])
        A = P.T @ P + self.lam * np.eye(self.dim)
        beta = np.linalg.solve(A, P.T @ g)
        w = np.abs(beta)
        s = w.sum()
        if s > 1e-12:
            self.weights = w / s

    def utility_score(self, aug_id: str, clusters: Clusters) -> float:
        """Own gain if queried; else nearest queried cluster-mate's gain
        attenuated by (1 − distance). Zero when nothing is known."""
        if aug_id in self.gains:
            return self.gains[aug_id]
        lbl = clusters.label_of.get(aug_id)
        if lbl is None:
            return 0.0
        best = 0.0
        found = False
        v = self.profiles.vectors[aug_id]
        for mate in clusters.members(lbl):
            if mate == aug_id or mate not in self.gains:
                continue
            d = chebyshev(v, self.profiles.vectors[mate])
            score = max(0.0, 1.0 - d) * self.gains[mate]
            if not found or abs(score) > abs(best):
                best, found = score, True
        return best

    def jpscore(self, aug_id: str, clusters: Clusters) -> float:
        """ESTIMATE-QUALITY-SCORES: profile score + utility score."""
        return self.profile_score(aug_id) + self.utility_score(aug_id, clusters)

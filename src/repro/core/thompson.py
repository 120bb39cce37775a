"""Thompson sampling over clusters (IDENTIFY-GROUP, § IV-B).

Each cluster is a Bernoulli bandit: "pulling an arm" samples an
augmentation from the cluster, and the reward is whether it improved the
task utility. Posteriors are Beta(1,1)-initialized and updated per query.
The group mechanism samples the clusters of a size-``t`` subset from
these posteriors.
"""
from __future__ import annotations

import numpy as np


class ThompsonClusters:
    """Beta-Bernoulli posteriors, one arm per cluster."""

    def __init__(self, n_clusters: int, *, seed: int = 0) -> None:
        self.n = n_clusters
        self.alpha = np.ones(n_clusters)
        self.beta = np.ones(n_clusters)
        self._g = np.random.default_rng(seed)

    def update(self, cluster: int, reward: bool) -> None:
        if reward:
            self.alpha[cluster] += 1.0
        else:
            self.beta[cluster] += 1.0

    def posterior_mean(self, cluster: int) -> float:
        return float(
            self.alpha[cluster] / (self.alpha[cluster] + self.beta[cluster])
        )

    def sample_clusters(self, k: int, *, eligible: list[int] | None = None) -> list[int]:
        """Pick ``k`` distinct clusters by ranked posterior draws."""
        pool = list(range(self.n)) if eligible is None else list(eligible)
        if not pool:
            return []
        draws = self._g.beta(self.alpha[pool], self.beta[pool])
        order = np.argsort(-draws)
        return [pool[i] for i in order[: min(k, len(pool))]]

    def sample_uniform(self, k: int, *, eligible: list[int] | None = None) -> list[int]:
        """Equal-importance variant (the Eq ablation ignores the posteriors)."""
        pool = list(range(self.n)) if eligible is None else list(eligible)
        if not pool:
            return []
        k = min(k, len(pool))
        return list(self._g.choice(pool, size=k, replace=False))

"""CLUSTER-PARTITION (Algorithm 2): ε-cover of candidates in profile space.

Greedy k-center (Gonzalez) under the Chebyshev metric
``d(P1, P2) = max_i |p1_i − p2_i|`` (the paper's max over profiles),
growing k until every candidate is within ε of its center.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


def chebyshev(a: np.ndarray, b: np.ndarray) -> float:
    """The paper's profile distance: max over profile dimensions."""
    return float(np.max(np.abs(a - b)))


@dataclass
class Clusters:
    """An ε-cover: centers, per-candidate assignment, members per cluster."""

    aug_ids: list[str]
    centers: list[int]  # indices into aug_ids
    labels: np.ndarray  # labels[i] = cluster index of aug_ids[i]
    radius: float

    @property
    def n_clusters(self) -> int:
        return len(self.centers)

    def cluster_of(self, aug_id: str) -> int:
        return int(self.labels[self.aug_ids.index(aug_id)])

    def members(self, cluster: int) -> list[str]:
        return [a for a, lbl in zip(self.aug_ids, self.labels) if lbl == cluster]

    @property
    def label_of(self) -> dict[str, int]:
        return {a: int(l) for a, l in zip(self.aug_ids, self.labels)}


def cluster_partition(
    aug_ids: list[str],
    profile_matrix: np.ndarray,
    *,
    epsilon: float = 0.05,
    seed: int = 0,
    max_clusters: int | None = None,
) -> Clusters:
    """Algorithm 2: grow centers until the cover radius is ≤ ε."""
    n = len(aug_ids)
    if n == 0:
        return Clusters([], [], np.zeros(0, dtype=int), 0.0)
    g = np.random.default_rng(seed)
    P = np.asarray(profile_matrix, dtype="float64")
    centers = [int(g.integers(n))]
    # dist[i] = Chebyshev distance of i to its nearest center.
    dist = np.max(np.abs(P - P[centers[0]]), axis=1)
    labels = np.zeros(n, dtype=int)
    cap = max_clusters if max_clusters is not None else n
    while dist.max() > epsilon and len(centers) < cap:
        c = int(np.argmax(dist))  # CHOOSE-FARTHEST
        centers.append(c)
        d_new = np.max(np.abs(P - P[c]), axis=1)
        closer = d_new < dist
        labels[closer] = len(centers) - 1
        dist = np.minimum(dist, d_new)
    return Clusters(
        aug_ids=list(aug_ids),
        centers=centers,
        labels=labels,
        radius=float(dist.max()),
    )


def singleton_clusters(aug_ids: list[str]) -> Clusters:
    """Degenerate partition used when P2 is ignored (Nc variant) or fails."""
    n = len(aug_ids)
    return Clusters(
        aug_ids=list(aug_ids),
        centers=list(range(n)),
        labels=np.arange(n, dtype=int),
        radius=0.0,
    )

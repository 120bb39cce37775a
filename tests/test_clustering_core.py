"""Tests for CLUSTER-PARTITION (Algorithm 2) and the ε-cover guarantees."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.core.clustering import (
    chebyshev,
    cluster_partition,
    singleton_clusters,
)


def _random_profiles(n, l, seed=0):
    return np.random.default_rng(seed).random((n, l))


class TestChebyshev:
    def test_identity_zero(self):
        v = np.array([0.2, 0.7])
        assert chebyshev(v, v) == 0.0

    def test_known_value(self):
        assert chebyshev(np.array([0.0, 0.5]), np.array([0.3, 0.6])) == pytest.approx(0.3)

    @settings(max_examples=30, deadline=None)
    @given(
        arrays(float, 4, elements=st.floats(0, 1)),
        arrays(float, 4, elements=st.floats(0, 1)),
    )
    def test_symmetric(self, a, b):
        assert chebyshev(a, b) == pytest.approx(chebyshev(b, a))

    @settings(max_examples=30, deadline=None)
    @given(
        arrays(float, 3, elements=st.floats(0, 1)),
        arrays(float, 3, elements=st.floats(0, 1)),
        arrays(float, 3, elements=st.floats(0, 1)),
    )
    def test_triangle_inequality(self, a, b, c):
        assert chebyshev(a, c) <= chebyshev(a, b) + chebyshev(b, c) + 1e-12


class TestClusterPartition:
    def test_radius_below_epsilon(self):
        P = _random_profiles(80, 3)
        ids = [f"a{i}" for i in range(80)]
        cl = cluster_partition(ids, P, epsilon=0.3, seed=0)
        assert cl.radius <= 0.3

    def test_every_point_within_eps_of_its_center(self):
        P = _random_profiles(60, 2, seed=1)
        ids = [f"a{i}" for i in range(60)]
        cl = cluster_partition(ids, P, epsilon=0.25, seed=0)
        for i, lbl in enumerate(cl.labels):
            c = cl.centers[lbl]
            assert chebyshev(P[i], P[c]) <= 0.25 + 1e-12

    def test_tight_epsilon_many_clusters(self):
        P = _random_profiles(50, 2, seed=2)
        ids = [f"a{i}" for i in range(50)]
        loose = cluster_partition(ids, P, epsilon=0.5, seed=0)
        tight = cluster_partition(ids, P, epsilon=0.05, seed=0)
        assert tight.n_clusters >= loose.n_clusters

    def test_identical_points_one_cluster(self):
        P = np.tile(np.array([[0.5, 0.5]]), (20, 1))
        ids = [f"a{i}" for i in range(20)]
        cl = cluster_partition(ids, P, epsilon=0.05, seed=0)
        assert cl.n_clusters == 1

    def test_two_well_separated_blobs(self):
        g = np.random.default_rng(0)
        P = np.vstack(
            [0.1 + 0.02 * g.random((10, 2)), 0.9 + 0.02 * g.random((10, 2))]
        )
        ids = [f"a{i}" for i in range(20)]
        cl = cluster_partition(ids, P, epsilon=0.1, seed=0)
        assert cl.n_clusters == 2
        # members of each blob share a label
        assert len(set(cl.labels[:10])) == 1
        assert len(set(cl.labels[10:])) == 1

    def test_deterministic_in_seed(self):
        P = _random_profiles(40, 3, seed=3)
        ids = [f"a{i}" for i in range(40)]
        a = cluster_partition(ids, P, epsilon=0.2, seed=7)
        b = cluster_partition(ids, P, epsilon=0.2, seed=7)
        np.testing.assert_array_equal(a.labels, b.labels)

    def test_members_partition_everything(self):
        P = _random_profiles(30, 2, seed=4)
        ids = [f"a{i}" for i in range(30)]
        cl = cluster_partition(ids, P, epsilon=0.2, seed=0)
        all_members = [m for c in range(cl.n_clusters) for m in cl.members(c)]
        assert sorted(all_members) == sorted(ids)

    def test_label_of_matches_members(self):
        P = _random_profiles(25, 2, seed=5)
        ids = [f"a{i}" for i in range(25)]
        cl = cluster_partition(ids, P, epsilon=0.3, seed=0)
        for a, lbl in cl.label_of.items():
            assert a in cl.members(lbl)

    def test_max_clusters_cap(self):
        P = _random_profiles(50, 2, seed=6)
        ids = [f"a{i}" for i in range(50)]
        cl = cluster_partition(ids, P, epsilon=0.01, seed=0, max_clusters=5)
        assert cl.n_clusters <= 5

    def test_empty_input(self):
        cl = cluster_partition([], np.zeros((0, 3)), epsilon=0.1)
        assert cl.n_clusters == 0

    def test_lemma2_cluster_count_bound(self):
        """Lemma 2: #clusters ≤ O((2/ε)^l) — check the explicit bound."""
        l, eps = 2, 0.25
        P = _random_profiles(400, l, seed=7)
        ids = [f"a{i}" for i in range(400)]
        cl = cluster_partition(ids, P, epsilon=eps, seed=0)
        # Chebyshev balls of radius eps are cubes of side 2*eps; a greedy
        # packing of [0,1]^l has at most (1 + 1/eps)^l centers (centers are
        # pairwise > eps apart).
        assert cl.n_clusters <= (1 + 1 / eps) ** l

    def test_centers_pairwise_farther_than_eps(self):
        P = _random_profiles(100, 3, seed=8)
        ids = [f"a{i}" for i in range(100)]
        eps = 0.3
        cl = cluster_partition(ids, P, epsilon=eps, seed=0)
        for i, ci in enumerate(cl.centers):
            for cj in cl.centers[i + 1:]:
                assert chebyshev(P[ci], P[cj]) > eps


class TestSingleton:
    def test_one_cluster_per_candidate(self):
        cl = singleton_clusters(["a", "b", "c"])
        assert cl.n_clusters == 3
        assert cl.members(0) == ["a"]

    def test_radius_zero(self):
        assert singleton_clusters(["a"]).radius == 0.0

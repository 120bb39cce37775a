"""Tests for Algorithm 1 on synthetic (Spark-free) instances."""
import numpy as np
import pytest

from repro.core.metam import MetamConfig, check_homogeneity, run_metam
from repro.core.clustering import cluster_partition
from repro.core.quality import QualityModel
from repro.profiles.profiler import ProfileSet
from repro.tasks.monotonic import QueryOracle
from repro.tasks.setcover import SetCoverUtility


def planted_instance(n=60, n_true=3, seed=0, informative=True):
    """n candidates; n_true cover a universe, the rest cover nothing.

    When ``informative``, useful candidates have visibly higher profile
    vectors; otherwise profiles are random noise.
    """
    g = np.random.default_rng(seed)
    ids = [f"c{i:03d}" for i in range(n)]
    true_idx = set(g.choice(n, size=n_true, replace=False).tolist())
    universe = 60
    sets, vectors = {}, {}
    true_ids = []
    for i, a in enumerate(ids):
        if i in true_idx:
            j = sorted(true_idx).index(i)
            lo, hi = j * universe // n_true, (j + 1) * universe // n_true
            sets[a] = frozenset(range(lo, hi))
            base = 0.75 if informative else None
            true_ids.append(a)
        else:
            sets[a] = frozenset()
            base = 0.25 if informative else None
        if base is None:
            vectors[a] = g.random(4)
        else:
            vectors[a] = np.clip(base + 0.05 * g.normal(size=4), 0, 1)
    names = ("corr", "mi", "semantic", "overlap")
    return (
        ids,
        ProfileSet(names=names, vectors=vectors),
        SetCoverUtility(sets=sets, n_universe=universe),
        true_ids,
    )


class TestMetamFindsPlanted:
    def test_reaches_theta_with_informative_profiles(self):
        ids, ps, util, true_ids = planted_instance()
        oracle = QueryOracle(util)
        res = run_metam(ids, ps, oracle, MetamConfig(theta=1.0, seed=0))
        assert res.utility == pytest.approx(1.0)
        assert set(res.selected) == set(true_ids)

    def test_informative_profiles_need_fewer_queries(self):
        """Informative profiles must not cost more queries than random
        ones (the paper's § VI-C informativeness claim)."""
        ids, ps_inf, util, _ = planted_instance(seed=1)
        ids2, ps_rnd, util2, _ = planted_instance(seed=1, informative=False)
        q_inf = run_metam(
            ids, ps_inf, QueryOracle(util), MetamConfig(theta=1.0, seed=0)
        ).queries
        q_rnd = run_metam(
            ids2, ps_rnd, QueryOracle(util2), MetamConfig(theta=1.0, seed=0)
        ).queries
        assert q_inf <= q_rnd

    def test_uninformative_profiles_still_find_solution(self):
        """§ VI-C: with random profiles Metam degrades to ~uniform order
        but still finds the optimal set (given enough queries)."""
        ids, ps, util, true_ids = planted_instance(informative=False, seed=3)
        oracle = QueryOracle(util)
        res = run_metam(ids, ps, oracle, MetamConfig(theta=1.0, seed=0))
        assert res.utility == pytest.approx(1.0)
        assert set(res.selected) == set(true_ids)

    def test_minimal_solution_size(self):
        """IDENTIFY-MINIMAL: the returned set has no redundant member."""
        ids, ps, util, true_ids = planted_instance(seed=2)
        oracle = QueryOracle(util)
        res = run_metam(ids, ps, oracle, MetamConfig(theta=1.0, seed=0))
        for a in res.selected:
            sub = frozenset(res.selected) - {a}
            assert util(sub) < 1.0


class TestBudgetsAndStops:
    def test_budget_respected(self):
        ids, ps, util, _ = planted_instance()
        oracle = QueryOracle(util, budget=15)
        res = run_metam(ids, ps, oracle, MetamConfig(seed=0))
        assert res.queries <= 15

    def test_theta_early_stop(self):
        ids, ps, util, _ = planted_instance()
        oracle = QueryOracle(util)
        res = run_metam(ids, ps, oracle, MetamConfig(theta=0.3, seed=0))
        assert res.utility >= 0.3
        # should stop well before exploring everything
        assert res.queries < 30

    def test_empty_candidates(self):
        util = SetCoverUtility(sets={}, n_universe=10)
        oracle = QueryOracle(util)
        res = run_metam([], ProfileSet(names=("p",), vectors={}), oracle)
        assert res.selected == []
        assert res.utility == 0.0

    def test_anytime_stops_when_nothing_improves(self):
        """All candidates useless → terminate after exploring, no hang."""
        g = np.random.default_rng(0)
        ids = [f"c{i}" for i in range(12)]
        ps = ProfileSet(
            names=("p1", "p2"), vectors={a: g.random(2) for a in ids}
        )
        util = SetCoverUtility(sets={a: frozenset() for a in ids}, n_universe=5)
        oracle = QueryOracle(util)
        res = run_metam(ids, ps, oracle, MetamConfig(seed=0))
        assert res.selected == []
        assert res.utility == 0.0

    def test_history_nondecreasing(self):
        ids, ps, util, _ = planted_instance()
        oracle = QueryOracle(util)
        res = run_metam(ids, ps, oracle, MetamConfig(theta=1.0, seed=0))
        bests = [u for _, u in res.history]
        assert bests == sorted(bests)


class TestVariantsAndHomogeneity:
    def test_nc_variant_runs_and_solves(self):
        ids, ps, util, _ = planted_instance()
        oracle = QueryOracle(util)
        res = run_metam(
            ids, ps, oracle, MetamConfig(theta=1.0, seed=0, use_clustering=False)
        )
        assert res.utility == pytest.approx(1.0)

    def test_eq_variant_runs_and_solves(self):
        ids, ps, util, _ = planted_instance()
        oracle = QueryOracle(util)
        res = run_metam(
            ids, ps, oracle, MetamConfig(theta=1.0, seed=0, use_thompson=False)
        )
        assert res.utility == pytest.approx(1.0)

    def test_homogeneity_check_passes_on_homogeneous_clusters(self):
        ids, ps, util, _ = planted_instance()
        oracle = QueryOracle(util)
        qm = QualityModel(ps)
        clusters = cluster_partition(ids, ps.matrix(ids), epsilon=0.3, seed=0)
        # useless candidates all have utility 0 → clusters homogeneous,
        # except possibly the cluster holding the true candidates
        ok = check_homogeneity(clusters, oracle, qm, tol=0.6, seed=0)
        assert ok is True

    def test_homogeneity_fallback_on_noisy_clusters(self):
        """When similar profiles map to wildly different utilities, the
        check must fail (→ Metam falls back to singleton clusters)."""
        g = np.random.default_rng(0)
        ids = [f"c{i}" for i in range(16)]
        # all profiles identical → one cluster; utilities alternate 0 / 1
        ps = ProfileSet(
            names=("p1", "p2"),
            vectors={a: np.array([0.5, 0.5]) for a in ids},
        )
        sets = {
            a: (frozenset(range(10)) if i % 2 == 0 else frozenset())
            for i, a in enumerate(ids)
        }
        util = SetCoverUtility(sets=sets, n_universe=10)
        oracle = QueryOracle(util)
        qm = QualityModel(ps)
        clusters = cluster_partition(ids, ps.matrix(ids), epsilon=0.1, seed=0)
        assert clusters.n_clusters == 1
        ok = check_homogeneity(clusters, oracle, qm, tol=0.05, seed=0)
        assert ok is False

    def test_metam_with_homogeneity_check_still_solves(self):
        ids, ps, util, _ = planted_instance(seed=5)
        oracle = QueryOracle(util)
        res = run_metam(
            ids, ps, oracle, MetamConfig(theta=1.0, seed=0, homogeneity="check")
        )
        assert res.utility == pytest.approx(1.0)

    def test_group_mechanism_contributes_under_adversarial_sequential(self):
        """With group querying disabled vs enabled, enabled never loses."""
        ids, ps, util, _ = planted_instance(seed=9)
        r_on = run_metam(
            ids, ps, QueryOracle(util), MetamConfig(theta=1.0, seed=1)
        )
        r_off = run_metam(
            ids, ps, QueryOracle(util),
            MetamConfig(theta=1.0, seed=1, group_querying=False),
        )
        assert r_on.utility >= r_off.utility - 1e-9

"""Tests for the paper's theoretical claims (Section V), on instances
small enough to verify exactly."""
import itertools

import numpy as np
import pytest

from repro.baselines.exhaustive import run_exhaustive
from repro.core.metam import MetamConfig, run_metam
from repro.profiles.profiler import ProfileSet
from repro.tasks.monotonic import QueryOracle
from repro.tasks.setcover import AdversarialUtility, SetCoverUtility


def _cover_instance(seed=0, n_sets=8, universe=12):
    g = np.random.default_rng(seed)
    sets = {}
    for i in range(n_sets):
        size = int(g.integers(1, universe // 2))
        sets[f"s{i}"] = frozenset(
            g.choice(universe, size=size, replace=False).tolist()
        )
    # guarantee coverability
    sets["s_all0"] = frozenset(range(0, universe // 2))
    sets["s_all1"] = frozenset(range(universe // 2, universe))
    return SetCoverUtility(sets=sets, n_universe=universe)


def _uniform_profiles(ids, seed=0, l=3):
    g = np.random.default_rng(seed)
    return ProfileSet(
        names=tuple(f"p{i}" for i in range(l)),
        vectors={a: g.random(l) for a in ids},
    )


class TestTheorem1Reduction:
    """Set-cover is expressible as goal-oriented discovery: solving the
    discovery instance optimally solves the set-cover instance."""

    def test_minimum_cover_equals_exhaustive_discovery_solution(self):
        util = _cover_instance(seed=1)
        ids = sorted(util.sets)
        res = run_exhaustive(ids, QueryOracle(util), theta=1.0)
        # brute-force minimum cover
        best = None
        for size in range(1, len(ids) + 1):
            for combo in itertools.combinations(ids, size):
                if util(frozenset(combo)) == 1.0:
                    best = combo
                    break
            if best:
                break
        assert len(res.selected) == len(best)
        assert util(frozenset(res.selected)) == 1.0


class TestTheorem2Adversary:
    def test_flat_utility_defeats_any_small_budget(self):
        """No algorithm can find the hidden set without hitting it: with a
        budget smaller than needed, Metam cannot reach θ."""
        ids = [f"x{i}" for i in range(10)]
        adv = AdversarialUtility(hidden=frozenset(ids[:4]), theta=1.0)
        ps = _uniform_profiles(ids, seed=0)
        res = run_metam(
            ids, ps, QueryOracle(adv, budget=20, monotone=False),
            MetamConfig(theta=1.0, seed=0),
        )
        assert res.utility < 1.0

    def test_exhaustive_eventually_finds_hidden_set(self):
        ids = [f"x{i}" for i in range(6)]
        adv = AdversarialUtility(hidden=frozenset(ids[:2]), theta=1.0)
        res = run_exhaustive(ids, QueryOracle(adv, monotone=False), theta=1.0)
        assert res.utility == 1.0
        assert sorted(res.selected) == sorted(ids[:2])


class TestTheorem3Optimality:
    def test_metam_reaches_theta_when_solution_exists(self):
        """If ∃ T* with u ≥ θ, Metam's output reaches θ (given queries)."""
        for seed in range(3):
            util = _cover_instance(seed=seed)
            ids = sorted(util.sets)
            ps = _uniform_profiles(ids, seed=seed)
            res = run_metam(
                ids, ps, QueryOracle(util),
                MetamConfig(theta=1.0, seed=seed, max_group_size=len(ids)),
            )
            assert res.utility == pytest.approx(1.0)

    def test_metam_solution_is_minimal(self):
        util = _cover_instance(seed=7)
        ids = sorted(util.sets)
        ps = _uniform_profiles(ids, seed=7)
        res = run_metam(
            ids, ps, QueryOracle(util), MetamConfig(theta=1.0, seed=0)
        )
        for a in res.selected:
            assert util(frozenset(res.selected) - {a}) < 1.0


class TestLemma3Greedy:
    def test_greedy_achieves_1_minus_1_over_e(self):
        """Greedy max-marginal-gain on a monotone submodular function is a
        (1 − 1/e)-approximation; verify on random cover instances."""
        for seed in range(5):
            util = _cover_instance(seed=seed, n_sets=10, universe=16)
            ids = sorted(util.sets)
            k = 3
            # exhaustive optimum of size ≤ k
            opt = max(
                util(frozenset(c))
                for c in itertools.combinations(ids, k)
            )
            # greedy with k rounds
            chosen: list[str] = []
            for _ in range(k):
                best = max(
                    (a for a in ids if a not in chosen),
                    key=lambda a: util(frozenset(chosen) | {a}),
                )
                chosen.append(best)
            greedy = util(frozenset(chosen))
            assert greedy >= (1 - 1 / np.e) * opt - 1e-9


class TestP1SmallSolutions:
    def test_small_subsets_found_before_large(self):
        """Prioritizing small subsets finds the (small) optimum quickly:
        exhaustive-by-size query count is far below 2^n when k is small."""
        util = SetCoverUtility(
            sets={
                **{f"junk{i}": frozenset() for i in range(10)},
                "gold": frozenset(range(5)),
            },
            n_universe=5,
        )
        ids = sorted(util.sets)
        res = run_exhaustive(ids, QueryOracle(util), theta=1.0)
        assert res.queries <= len(ids) + 1  # scanned size-1 subsets only

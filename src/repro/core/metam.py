"""METAM (Algorithm 1): adaptive interventional querying.

Interleaves the sequential mechanism (query candidates in quality-score
order, at most one per cluster per round, adopt the max-gain candidate
after τ queries) with the group mechanism (combinatorial testing of
size-``t`` subsets assembled by Thompson sampling over clusters), then
post-processes the best solution with the minimality check.

Ablation variants (§ VI-C, Fig 11) map to config flags:
``use_clustering=False`` → Nc, ``use_thompson=False`` → Eq, both → NcEq.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np

from repro.core.clustering import Clusters, cluster_partition, singleton_clusters
from repro.core.quality import QualityModel
from repro.core.thompson import ThompsonClusters
from repro.core.types import SearchResult
from repro.profiles.profiler import ProfileSet
from repro.tasks.monotonic import BudgetExhausted, QueryOracle

_EPS = 1e-12


@dataclass
class MetamConfig:
    """Knobs of Algorithm 1; defaults follow the paper (§ VI Settings).

    ``tau=None`` resolves to |C| as in the paper when there is no query
    budget; under a budget it is scaled to ``budget // 5`` (capped at |C|)
    so the sequential mechanism completes the same ~5 adoption rounds the
    paper's budget-to-cluster ratio allows (documented in DESIGN.md).
    """

    theta: float | None = None  # stop once reached; None = anytime mode
    epsilon: float = 0.05  # cluster radius (paper default)
    tau: int | None = None
    seed: int = 0
    gain_tol: float = 0.01  # minimum utility gain treated as improvement
    use_clustering: bool = True  # False = Nc variant
    use_thompson: bool = True  # False = Eq variant
    group_querying: bool = True
    group_tries_per_iter: int = 1
    max_group_size: int = 3
    group_rounds_per_size: int = 3
    homogeneity: str = "off"  # "off" | "check" (Generalization, § IV-B)
    homogeneity_tol: float = 0.1
    minimality: bool = True
    max_iters: int = 10_000


def check_homogeneity(
    clusters: Clusters,
    oracle: QueryOracle,
    qm: QualityModel,
    *,
    tol: float,
    seed: int,
) -> bool:
    """Sample ~log|C| members per multi-member cluster; True if in every
    cluster the majority of sampled utilities lie within ``tol`` of the
    cluster's mean sampled utility (the paper's homogeneity test)."""
    g = np.random.default_rng(seed)
    for c in range(clusters.n_clusters):
        members = clusters.members(c)
        if len(members) < 2:
            continue
        k = min(len(members), max(2, math.ceil(math.log2(len(members))) + 1))
        sample = list(g.choice(members, size=k, replace=False))
        us = []
        for a in sample:
            u = oracle.query(frozenset({a}))
            qm.record_gain(a, u - oracle.base_utility)
            us.append(u)
        mean = float(np.mean(us))
        within = sum(1 for u in us if abs(u - mean) <= tol)
        if within / len(us) < 0.5:
            return False
    return True


def run_metam(
    aug_ids: list[str],
    profiles: ProfileSet,
    oracle: QueryOracle,
    cfg: MetamConfig = MetamConfig(),
) -> SearchResult:
    """Run Algorithm 1 over candidate ``aug_ids``."""
    base = oracle.base_utility
    if not aug_ids:
        return SearchResult([], base, oracle.queries, oracle.history, base)
    tol = max(cfg.gain_tol, _EPS)

    qm = QualityModel(profiles)
    if cfg.use_clustering:
        clusters = cluster_partition(
            aug_ids,
            profiles.matrix(aug_ids),
            epsilon=cfg.epsilon,
            seed=cfg.seed,
        )
    else:
        clusters = singleton_clusters(aug_ids)

    g = np.random.default_rng(cfg.seed + 1)
    t_star: list[str] = []
    u_star = base
    t_group: list[str] = []
    u_group = base
    t_size = 1
    rounds_at_size = 0
    exhausted = False

    def safe_query(ids: frozenset[str]) -> float | None:
        nonlocal exhausted
        if exhausted:
            return None
        try:
            return oracle.query(ids)
        except BudgetExhausted:
            exhausted = True
            return None

    def theta_reached() -> bool:
        return cfg.theta is not None and max(u_star, u_group) >= cfg.theta - _EPS

    if cfg.homogeneity == "check" and clusters.n_clusters < len(aug_ids):
        try:
            if not check_homogeneity(
                clusters, oracle, qm, tol=cfg.homogeneity_tol, seed=cfg.seed
            ):
                # P2 fails: each candidate becomes its own cluster.
                clusters = singleton_clusters(aug_ids)
        except BudgetExhausted:
            exhausted = True

    ts = ThompsonClusters(clusters.n_clusters, seed=cfg.seed + 2)
    label_of = clusters.label_of

    # ---- vectorized JPSCORE state (O(n) per selection, not O(n²)) ----
    n = len(aug_ids)
    idx_of = {a: i for i, a in enumerate(aug_ids)}
    P = profiles.matrix(aug_ids)
    labels_arr = np.array([label_of[a] for a in aug_ids])
    members_idx = [
        np.nonzero(labels_arr == c)[0] for c in range(clusters.n_clusters)
    ]
    prof_scores = P @ qm.weights
    own_gain = np.full(n, np.nan)  # observed marginal gain per candidate
    prop = np.zeros(n)  # cluster-propagated utility score (1-d attenuated)

    def record_gain_vec(a: str, gain: float) -> None:
        nonlocal prof_scores
        qm.record_gain(a, gain)
        i = idx_of[a]
        own_gain[i] = gain
        m = members_idx[labels_arr[i]]
        if len(m) > 1:
            d = np.max(np.abs(P[m] - P[i]), axis=1)
            val = np.maximum(0.0, 1.0 - d) * gain
            upd = np.abs(val) > np.abs(prop[m])
            prop[m] = np.where(upd, val, prop[m])
        prof_scores = P @ qm.weights  # weights may have been refit

    # seed the vectorized state with gains from the homogeneity check
    for a, gain in qm.gains.items():
        if a in idx_of:
            i = idx_of[a]
            own_gain[i] = gain

    def jpscores() -> np.ndarray:
        return prof_scores + np.where(np.isnan(own_gain), prop, own_gain)

    tau = cfg.tau
    if tau is None:
        tau = clusters.n_clusters
        if oracle.budget is not None:
            # Scaled-down default: the paper's budget-to-|C| ratio allows
            # ~5+ adoption rounds; cap τ so the first round cannot consume
            # the whole budget (§ IV-B "Impact of τ", DESIGN.md).
            tau = max(3, min(tau, oracle.budget // 5, 15))

    for _ in range(cfg.max_iters):
        if exhausted or theta_reached():
            break
        # ---- sequential mechanism (Algorithm 1 lines 7–20) ----
        touched = np.zeros(clusters.n_clusters, dtype=bool)
        in_round = np.zeros(n, dtype=bool)
        selected_mask = np.zeros(n, dtype=bool)
        for a in t_star:
            selected_mask[idx_of[a]] = True
        q_round: dict[str, float] = {}
        pool_exhausted = False
        i = 0
        while not exhausted:
            eligible = ~selected_mask & ~in_round & ~touched[labels_arr]
            if not eligible.any():
                # Allow a second candidate per cluster once every cluster
                # was touched but none improved (line 8's continuation).
                eligible = ~selected_mask & ~in_round
            if not eligible.any():
                pool_exhausted = True
                break
            if i >= tau and q_round and max(q_round.values()) > u_star + tol:
                break
            scores = jpscores()
            scores = np.where(eligible, scores, -np.inf)
            a = aug_ids[int(np.argmax(scores))]
            u_a = safe_query(frozenset(t_star) | {a})
            if u_a is None:
                break
            q_round[a] = u_a
            in_round[idx_of[a]] = True
            record_gain_vec(a, u_a - u_star)  # UPDATE-QUALITY-SCORES
            ts.update(label_of[a], u_a > u_star + tol)
            touched[label_of[a]] = True
            i += 1
            if cfg.theta is not None and u_a >= cfg.theta - _EPS:
                break

        # Adoption (lines 17–20) — runs even when the budget died mid-round.
        improved = False
        if q_round:
            a_best = max(q_round, key=lambda x: (q_round[x], x))
            if q_round[a_best] > u_star + tol:
                t_star.append(a_best)
                u_star = q_round[a_best]
                improved = True
        if exhausted or theta_reached():
            break

        # ---- group mechanism (combinatorial testing, red path) ----
        if cfg.group_querying and clusters.n_clusters > 0:
            for _try in range(cfg.group_tries_per_iter):
                picker = (
                    ts.sample_clusters if cfg.use_thompson else ts.sample_uniform
                )
                chosen = picker(t_size)
                subset: set[str] = set()
                for c in chosen:
                    members = clusters.members(c)
                    subset.add(members[int(g.integers(len(members)))])
                fs = frozenset(subset)
                if not fs or oracle.seen(fs):
                    continue
                u_s = safe_query(fs)
                if u_s is None:
                    break
                for c in chosen:
                    ts.update(c, u_s > base + tol)
                if u_s > u_group + tol:
                    t_group = sorted(fs)
                    u_group = u_s
            rounds_at_size += 1
            if (
                rounds_at_size >= cfg.group_rounds_per_size
                and t_size < cfg.max_group_size
            ):
                t_size += 1
                rounds_at_size = 0
        if exhausted or theta_reached():
            break
        if not improved and pool_exhausted:
            break  # search space explored, no further progress

    # ---- line 23: best of the two mechanisms ----
    if u_group > u_star + _EPS:
        selected, final_u = list(t_group), u_group
    else:
        selected, final_u = list(t_star), u_star

    # ---- IDENTIFY-MINIMAL (line 24) ----
    if cfg.minimality and len(selected) > 1 and not exhausted:
        target = (
            cfg.theta
            if cfg.theta is not None and final_u >= cfg.theta - _EPS
            else final_u
        )
        changed = True
        while changed and len(selected) > 1 and not exhausted:
            changed = False
            for a in list(selected):
                u_sub = safe_query(frozenset(selected) - {a})
                if u_sub is None:
                    break
                if u_sub >= target - _EPS:
                    selected.remove(a)
                    changed = True
                    break
        u_final = safe_query(frozenset(selected))
        if u_final is not None:
            final_u = u_final

    return SearchResult(
        selected=selected,
        utility=final_u,
        queries=oracle.queries,
        history=oracle.history,
        base_utility=base,
    )

"""Section VI-B scalability harness (DESIGN.md row S1).

The paper reports (Fig 6, text): all methods scale linearly with the
number of joinable datasets; MW grows faster than Metam (O(n log n) sort
vs O(n) clustering); Overlap/Uniform are flat in the number of profiles;
Metam processes 1M augmentations in < 10 min.

We time a fixed number of queries over synthetic candidate sets of
increasing size / profile dimension. The utility is a cheap coverage
function, so measured time is method overhead — exactly what the paper's
scaling experiment isolates (its queries are equally task-dominated
across methods).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from repro.baselines.mw import run_mw
from repro.baselines.overlap import run_overlap
from repro.baselines.uniform import run_uniform
from repro.core.metam import MetamConfig, run_metam
from repro.profiles.profiler import ProfileSet
from repro.tasks.monotonic import QueryOracle
from repro.tasks.setcover import SetCoverUtility

METHODS = ("metam", "mw", "overlap", "uniform")


@dataclass
class ScalePoint:
    n_candidates: int
    n_profiles: int
    budget: int
    seconds: dict[str, float]  # method -> wall time


def synthetic_instance(
    n: int, l: int, *, n_true: int = 5, seed: int = 0
) -> tuple[list[str], ProfileSet, SetCoverUtility]:
    """n candidates with l-dim profiles; n_true cover a 100-element universe."""
    g = np.random.default_rng(seed)
    ids = [f"c{i:05d}" for i in range(n)]
    true = set(g.choice(n, size=n_true, replace=False).tolist())
    universe = 100
    sets = {}
    vectors = {}
    for i, a in enumerate(ids):
        if i in true:
            lo = (list(true).index(i) * universe) // n_true
            hi = ((list(true).index(i) + 1) * universe) // n_true
            sets[a] = frozenset(range(lo, hi))
            base = np.full(l, 0.8)
        else:
            sets[a] = frozenset()
            base = np.full(l, 0.2)
        vectors[a] = np.clip(base + g.normal(scale=0.1, size=l), 0, 1)
    names = tuple(f"p{k}" for k in range(l - 1)) + ("overlap",)
    ps = ProfileSet(names=names, vectors=vectors)
    return ids, ps, SetCoverUtility(sets=sets, n_universe=universe)


def time_methods(
    n: int,
    l: int,
    *,
    budget: int = 200,
    seed: int = 0,
    methods: tuple[str, ...] = METHODS,
) -> ScalePoint:
    ids, profiles, util = synthetic_instance(n, l, seed=seed)
    seconds = {}
    for m in methods:
        oracle = QueryOracle(util, budget=budget, monotone=False)
        t0 = time.perf_counter()
        if m == "metam":
            run_metam(
                ids, profiles, oracle,
                MetamConfig(seed=seed, minimality=False),
            )
        elif m == "mw":
            run_mw(ids, profiles, oracle, seed=seed)
        elif m == "overlap":
            run_overlap(ids, profiles, oracle)
        elif m == "uniform":
            run_uniform(ids, oracle, seed=seed)
        seconds[m] = time.perf_counter() - t0
    return ScalePoint(n_candidates=n, n_profiles=l, budget=budget, seconds=seconds)


def sweep_candidates(
    ns: tuple[int, ...] = (250, 500, 1000, 2000),
    *,
    l: int = 5,
    budget: int = 200,
    seed: int = 0,
) -> list[ScalePoint]:
    return [time_methods(n, l, budget=budget, seed=seed) for n in ns]


def sweep_profiles(
    ls: tuple[int, ...] = (5, 10, 20),
    *,
    n: int = 500,
    budget: int = 200,
    seed: int = 0,
) -> list[ScalePoint]:
    return [time_methods(n, l, budget=budget, seed=seed) for l in ls]


def format_sweep(points: list[ScalePoint], label: str) -> str:
    lines = [f"{label} | " + " | ".join(METHODS)]
    for p in points:
        key = p.n_candidates if label == "n_candidates" else p.n_profiles
        lines.append(
            f"{key} | "
            + " | ".join(f"{p.seconds[m]*1000:.1f}ms" for m in METHODS)
        )
    return "\n".join(lines)

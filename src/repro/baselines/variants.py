"""Metam ablation variants (Fig 11): Eq, Nc, NcEq.

- **Eq**   ignores Thompson sampling (clusters ranked with equal importance)
- **Nc**   ignores clustering (every candidate is its own cluster)
- **NcEq** ignores both
"""
from __future__ import annotations

from dataclasses import replace

from repro.core.metam import MetamConfig, run_metam
from repro.core.types import SearchResult
from repro.profiles.profiler import ProfileSet
from repro.tasks.monotonic import QueryOracle


def run_metam_eq(aug_ids, profiles: ProfileSet, oracle: QueryOracle, cfg: MetamConfig = MetamConfig()) -> SearchResult:
    return run_metam(aug_ids, profiles, oracle, replace(cfg, use_thompson=False))


def run_metam_nc(aug_ids, profiles: ProfileSet, oracle: QueryOracle, cfg: MetamConfig = MetamConfig()) -> SearchResult:
    return run_metam(aug_ids, profiles, oracle, replace(cfg, use_clustering=False))


def run_metam_nceq(aug_ids, profiles: ProfileSet, oracle: QueryOracle, cfg: MetamConfig = MetamConfig()) -> SearchResult:
    return run_metam(
        aug_ids, profiles, oracle,
        replace(cfg, use_clustering=False, use_thompson=False),
    )

"""Data profiles (Section II-C) for candidate augmentations.

Five profiles, each normalized to [0, 1]:

- ``corr``     |Pearson correlation| of the augmentation with the task's
               reference attribute (the target when one exists);
- ``mi``       normalized mutual information with the reference attribute;
- ``semantic`` cosine similarity of hashed-token table embeddings
               (BERT substitute, see ``repro.profiles.embedding``);
- ``metadata`` Jaccard similarity of source/attribute token sets;
- ``overlap``  fraction of input rows covered after augmentation
               (the paper's "cardinality of the final dataset").

Per the paper ("We generate all data profiles on a random sample of 100
records"), corr and mi are estimated on a seeded 100-record sample of the
materialized augmentation. Uninformative random profiles can be appended
to reproduce the Section VI-C profile-informativeness experiments.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.types import Augmentation
from repro.discovery.index import JoinablePair
from repro.lake.catalog import Lake
from repro.profiles.embedding import cosine, jaccard, text_embedding

PROFILE_NAMES = ("corr", "mi", "semantic", "metadata", "overlap")


@dataclass(frozen=True)
class ProfileConfig:
    """Knobs for profile computation."""

    sample_n: int = 100
    mi_bins: int = 6
    n_uninformative: int = 0  # extra random profiles (§ VI-C experiments)
    drop: tuple[str, ...] = ()  # profiles to remove (§ VI-C "removing profiles")
    seed: int = 0

    @property
    def names(self) -> tuple[str, ...]:
        base = tuple(n for n in PROFILE_NAMES if n not in self.drop)
        return base + tuple(
            f"uninformative_{i}" for i in range(self.n_uninformative)
        )


def pearson_abs(x: np.ndarray, y: np.ndarray) -> float:
    """|Pearson r| over pairwise-complete observations, 0 if undefined."""
    m = np.isfinite(x) & np.isfinite(y)
    if m.sum() < 3:
        return 0.0
    xs, ys = x[m], y[m]
    if xs.std() == 0 or ys.std() == 0:
        return 0.0
    return float(abs(np.corrcoef(xs, ys)[0, 1]))


def normalized_mi(x: np.ndarray, y: np.ndarray, bins: int = 6) -> float:
    """Histogram-based NMI ∈ [0,1]: I(X;Y) / min(H(X), H(Y))."""
    m = np.isfinite(x) & np.isfinite(y)
    if m.sum() < 3:
        return 0.0
    xs, ys = x[m], y[m]
    if xs.std() == 0 or ys.std() == 0:
        return 0.0
    joint, _, _ = np.histogram2d(xs, ys, bins=bins)
    p = joint / joint.sum()
    px = p.sum(axis=1, keepdims=True)
    py = p.sum(axis=0, keepdims=True)
    nz = p > 0
    mi = float((p[nz] * np.log(p[nz] / (px @ py)[nz])).sum())
    hx = float(-(px[px > 0] * np.log(px[px > 0])).sum())
    hy = float(-(py[py > 0] * np.log(py[py > 0])).sum())
    denom = min(hx, hy)
    if denom <= 0:
        return 0.0
    return float(np.clip(mi / denom, 0.0, 1.0))


@dataclass
class ProfileSet:
    """Profile vectors for a candidate set, in a fixed dimension order."""

    names: tuple[str, ...]
    vectors: dict[str, np.ndarray] = field(default_factory=dict)

    @property
    def dim(self) -> int:
        return len(self.names)

    def matrix(self, aug_ids: list[str]) -> np.ndarray:
        return np.stack([self.vectors[a] for a in aug_ids])


def compute_profiles(
    wide_pdf: pd.DataFrame,
    candidates: list[Augmentation],
    pair_of: dict[str, JoinablePair],
    lake: Lake,
    *,
    reference_col: str | None,
    input_tokens: tuple[str, ...],
    input_columns: list[str],
    cfg: ProfileConfig = ProfileConfig(),
) -> ProfileSet:
    """Profile vector per candidate from the batch-materialized frame.

    ``reference_col`` is the task's target attribute when it has one
    (classification/regression/causal outcome); for target-free tasks pass
    None and corr/mi fall back to the max against any input column.
    """
    g = np.random.default_rng(cfg.seed)
    n = len(wide_pdf)
    take = min(cfg.sample_n, n)
    idx = np.sort(g.choice(n, size=take, replace=False))
    sample = wide_pdf.iloc[idx]

    num_input = [
        c
        for c in input_columns
        if c in wide_pdf.columns and pd.api.types.is_numeric_dtype(wide_pdf[c])
    ]
    refs = (
        [reference_col]
        if reference_col is not None
        else (num_input or [])
    )
    ref_arrays = [sample[r].to_numpy(dtype="float64") for r in refs]

    in_emb = text_embedding(input_tokens)
    in_tokens_set = set(t.lower() for t in input_tokens) | set(
        c.lower() for c in input_columns
    )

    ps = ProfileSet(names=cfg.names)
    for a in candidates:
        col = (
            sample[a.aug_id].to_numpy(dtype="float64")
            if a.aug_id in sample.columns
            else np.full(take, np.nan)
        )
        vals: dict[str, float] = {}
        if ref_arrays:
            vals["corr"] = max(pearson_abs(col, r) for r in ref_arrays)
            vals["mi"] = max(
                normalized_mi(col, r, bins=cfg.mi_bins) for r in ref_arrays
            )
        else:
            vals["corr"] = 0.0
            vals["mi"] = 0.0
        meta = lake.meta[a.table]
        tbl_tokens = meta.tokens + tuple(lake.table(a.table).columns)
        vals["semantic"] = float(
            np.clip((cosine(text_embedding(tbl_tokens), in_emb) + 1) / 2, 0, 1)
        )
        vals["metadata"] = jaccard(
            set(t.lower() for t in tbl_tokens), in_tokens_set
        )
        full_col = (
            wide_pdf[a.aug_id].to_numpy(dtype="float64")
            if a.aug_id in wide_pdf.columns
            else np.full(n, np.nan)
        )
        covered = float(np.isfinite(full_col).mean()) if n else 0.0
        pair = pair_of.get(a.aug_id)
        vals["overlap"] = covered if pair is None else min(
            1.0, covered * 0.5 + min(pair.containment, 1.0) * 0.5
        )
        vec = [vals[nm] for nm in cfg.names if not nm.startswith("uninformative_")]
        vec += list(g.random(cfg.n_uninformative))
        ps.vectors[a.aug_id] = np.asarray(vec, dtype="float64")
    return ps


def spark_correlation(
    df: DataFrame, col_a: str, col_b: str
) -> float:
    """Pearson correlation as a distributed Spark aggregation.

    Used by oracle tests to cross-check the profile math against DuckDB.
    """
    try:
        row = df.agg(F.corr(F.col(col_a), F.col(col_b)).alias("r")).collect()[0]
    except Exception:
        # Spark 4 ANSI mode raises DIVIDE_BY_ZERO for zero-variance input,
        # where the correlation is undefined — report 0 like pearson_abs.
        return 0.0
    r = row["r"]
    if r is None or not np.isfinite(r):
        return 0.0
    return float(r)

"""Synthetic data-lake generator with a ground-truth generative model.

Substitutes the paper's crawled repositories (Open Data, Kaggle). The lake
has the structural properties Metam exploits:

- **P1** — only a handful of *useful* tables carry columns that proxy the
  hidden signals driving any downstream target (k ≪ n);
- **P2** — a fraction of tables have *near-duplicate* copies, so similar
  profile vectors imply similar utility;
- noise — *erroneous* tables join on value-overlapping but semantically
  wrong keys (the paper found ~60% of Schools candidates erroneous), and
  *irrelevant* tables join correctly but carry uninformative columns.

Downstream targets are built (in ``repro.experiments.scenarios``) from the
hidden signals, so ground truth about which augmentations help is known.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.lake.catalog import Lake, TableMeta

#: Themed vocabulary for useful tables; theme i proxies hidden signal i.
THEMES = (
    ("taxi", ("taxi", "trips", "daily", "count")),
    ("crime", ("crime", "incidents", "rate", "police")),
    ("grocery", ("grocery", "stores", "walmart", "presence")),
    ("income", ("income", "median", "household", "earnings")),
    ("school", ("school", "performance", "test", "score")),
    ("pharmacy", ("pharmacy", "locations", "count", "health")),
    ("transit", ("transit", "ridership", "bus", "subway")),
    ("permits", ("building", "permits", "construction", "count")),
)

_FILLER_TOKENS = (
    "survey", "annual", "report", "city", "data", "records", "list",
    "summary", "portal", "registry", "index", "catalog", "log", "archive",
)

_KEY_NAMES = ("zone_id", "zipcode", "area_code", "region_id", "geoid")


@dataclass(frozen=True)
class LakeSpec:
    """Shape parameters of a synthetic lake."""

    n_useful: int = 6
    n_irrelevant: int = 24
    n_erroneous: int = 8
    n_decoys: int = 10
    decoy_strength: float = 1.0
    #: Signals decoys may proxy; None → the upper half of the signal range
    #: (scenario targets are driven by the lower-numbered signals, so
    #: decoys correlate with *other* quantities, not the task's target).
    decoy_signals: tuple[int, ...] | None = None
    n_sparse: int = 10
    sparse_coverage: float = 0.12
    themed_irr_frac: float = 0.5
    dup_fraction: float = 0.3
    n_dups: int = 2
    n_keys: int = 400
    coverage: float = 0.85
    extra_cols_max: int = 3
    n_signals: int = 4
    noise: float = 1.2
    source_pool: tuple[str, ...] = (
        "nyc_open", "chicago_open", "worldbank", "kaggle", "census",
    )
    prefix: str = "t"
    seed: int = 0


@dataclass
class GroundTruth:
    """What the generator knows about the lake (used to define targets)."""

    key_domain: np.ndarray
    signals: np.ndarray  # shape (n_signals, n_keys); signals[j][k-1] = value at key k
    useful: dict[str, int] = field(default_factory=dict)  # table -> signal idx
    useful_col: dict[str, str] = field(default_factory=dict)  # table -> column
    irrelevant: list[str] = field(default_factory=list)
    erroneous: list[str] = field(default_factory=list)
    decoys: list[str] = field(default_factory=list)
    sparse: list[str] = field(default_factory=list)
    dup_of: dict[str, str] = field(default_factory=dict)  # dup -> original
    key_col: dict[str, str] = field(default_factory=dict)  # table -> key column

    def signal_at_keys(self, j: int, keys: np.ndarray) -> np.ndarray:
        """Hidden signal ``j`` evaluated at ``keys`` (1-based key ids)."""
        return self.signals[j][keys - 1]


def _table_pdf(
    g: np.random.Generator,
    spec: LakeSpec,
    key_name: str,
    value_cols: dict[str, np.ndarray],
    keys: np.ndarray,
) -> pd.DataFrame:
    data: dict[str, np.ndarray] = {key_name: keys.astype("int64")}
    data.update({c: v.astype("float64") for c, v in value_cols.items()})
    n_extra = int(g.integers(1, spec.extra_cols_max + 1))
    for i in range(n_extra):
        data[f"misc_{i}"] = g.normal(size=len(keys))
    return pd.DataFrame(data)


def generate_lake(
    spark: SparkSession, spec: LakeSpec
) -> tuple[Lake, GroundTruth]:
    """Build a synthetic lake and its ground truth, deterministic in seed."""
    g = np.random.default_rng(spec.seed)
    domain = np.arange(1, spec.n_keys + 1)
    signals = g.normal(size=(spec.n_signals, spec.n_keys))
    gt = GroundTruth(key_domain=domain, signals=signals)
    lake = Lake()
    pdfs: dict[str, pd.DataFrame] = {}
    metas: dict[str, TableMeta] = {}

    def cover_keys() -> np.ndarray:
        m = max(4, int(spec.coverage * spec.n_keys * (0.8 + 0.4 * g.random())))
        m = min(m, spec.n_keys)
        return np.sort(g.choice(domain, size=m, replace=False))

    # Useful tables: column = affine proxy of a hidden signal + noise.
    for i in range(spec.n_useful):
        sig = i % spec.n_signals
        theme, tokens = THEMES[sig % len(THEMES)]
        name = f"{spec.prefix}_useful_{theme}_{i}"
        keys = cover_keys()
        proxy = (
            1.5 * gt.signal_at_keys(sig, keys)
            + g.normal(scale=spec.noise, size=len(keys))
        )
        key_name = _KEY_NAMES[int(g.integers(len(_KEY_NAMES)))]
        col = f"{theme}_value"
        pdf = _table_pdf(g, spec, key_name, {col: proxy}, keys)
        pdfs[name] = pdf
        metas[name] = TableMeta(
            source=spec.source_pool[int(g.integers(len(spec.source_pool)))],
            tokens=tokens + (theme, "city"),
        )
        gt.useful[name] = sig
        gt.useful_col[name] = col
        gt.key_col[name] = key_name

    # Irrelevant tables: correct key, uninformative columns. A fraction
    # get themed tokens — semantic/metadata decoys that flood those
    # profiles' rankings exactly as real portals do (many tables *about*
    # crime that carry nothing predictive).
    for i in range(spec.n_irrelevant):
        name = f"{spec.prefix}_irr_{i}"
        keys = cover_keys()
        col = f"val_{i}"
        pdf = _table_pdf(
            g, spec, _KEY_NAMES[int(g.integers(len(_KEY_NAMES)))],
            {col: g.normal(size=len(keys))}, keys,
        )
        pdfs[name] = pdf
        if g.random() < spec.themed_irr_frac:
            # Popular themes (the ones tasks tend to be about) dominate
            # portal vocabulary, flooding the semantic/metadata profiles.
            theme, theme_tokens = THEMES[int(g.integers(spec.n_signals))]
            tokens = theme_tokens + (theme, "city")
        else:
            tokens = tuple(g.choice(_FILLER_TOKENS, size=4, replace=False).tolist())
        metas[name] = TableMeta(
            source=spec.source_pool[int(g.integers(len(spec.source_pool)))],
            tokens=tokens,
        )
        gt.irrelevant.append(name)
        gt.key_col[name] = pdf.columns[0]

    # Sparse tables: cover only a small slice of the key domain with
    # random values. Their correlation/MI profile estimates (computed on
    # the few overlapping sampled records) are wildly noisy — spuriously
    # high for many of them — while the augmentation is useless for any
    # task. These are the false tops that trap single-profile rankers.
    for i in range(spec.n_sparse):
        name = f"{spec.prefix}_sparse_{i}"
        m = max(4, int(spec.sparse_coverage * spec.n_keys))
        keys = np.sort(g.choice(domain, size=m, replace=False))
        pdf = _table_pdf(
            g, spec, _KEY_NAMES[int(g.integers(len(_KEY_NAMES)))],
            {f"sval_{i}": g.normal(size=len(keys))}, keys,
        )
        pdfs[name] = pdf
        if g.random() < spec.themed_irr_frac:
            theme, theme_tokens = THEMES[int(g.integers(spec.n_signals))]
            tokens = theme_tokens + (theme,)
        else:
            tokens = tuple(g.choice(_FILLER_TOKENS, size=4, replace=False).tolist())
        metas[name] = TableMeta(
            source=spec.source_pool[int(g.integers(len(spec.source_pool)))],
            tokens=tokens,
        )
        gt.sparse.append(name)
        gt.key_col[name] = pdf.columns[0]

    # Decoy tables: columns *weakly* mixed with a signal — enough target
    # correlation to fool a single-profile ranking, not enough to be the
    # signal proxy a task needs. Half get themed (semantic-decoy) tokens.
    decoy_sigs = (
        spec.decoy_signals
        if spec.decoy_signals is not None
        else tuple(range(spec.n_signals // 2, spec.n_signals)) or (0,)
    )
    for i in range(spec.n_decoys):
        name = f"{spec.prefix}_decoy_{i}"
        keys = cover_keys()
        sig = int(decoy_sigs[int(g.integers(len(decoy_sigs)))])
        vals = spec.decoy_strength * gt.signal_at_keys(sig, keys) + g.normal(
            size=len(keys)
        )
        theme, theme_tokens = THEMES[sig % len(THEMES)]
        themed = g.random() < 0.5
        pdf = _table_pdf(
            g, spec, _KEY_NAMES[int(g.integers(len(_KEY_NAMES)))],
            {f"index_{i}": vals}, keys,
        )
        pdfs[name] = pdf
        metas[name] = TableMeta(
            source=spec.source_pool[int(g.integers(len(spec.source_pool)))],
            tokens=(
                theme_tokens + ("index",)
                if themed
                else tuple(g.choice(_FILLER_TOKENS, size=4, replace=False).tolist())
            ),
        )
        gt.decoys.append(name)
        gt.key_col[name] = pdf.columns[0]

    # Erroneous tables: the "key" values overlap the domain but are a
    # permuted association — the join matches rows yet pairs wrong
    # entities, so the augmented column is noise w.r.t. any target.
    perm = g.permutation(domain)
    for i in range(spec.n_erroneous):
        name = f"{spec.prefix}_err_{i}"
        keys = cover_keys()
        sig = int(g.integers(spec.n_signals))
        # Value is signal-like, but indexed through the permutation.
        vals = 1.5 * gt.signals[sig][perm[keys - 1] - 1] + g.normal(
            scale=spec.noise, size=len(keys)
        )
        pdf = _table_pdf(
            g, spec, _KEY_NAMES[int(g.integers(len(_KEY_NAMES)))],
            {f"metric_{i}": vals}, keys,
        )
        pdfs[name] = pdf
        metas[name] = TableMeta(
            source=spec.source_pool[int(g.integers(len(spec.source_pool)))],
            tokens=tuple(
                g.choice(_FILLER_TOKENS, size=4, replace=False).tolist()
            ),
        )
        gt.erroneous.append(name)
        gt.key_col[name] = pdf.columns[0]

    # Near-duplicates of a deterministic subset of tables (P2 structure).
    originals = sorted(pdfs)
    n_dup_sources = int(spec.dup_fraction * len(originals))
    dup_sources = list(
        g.choice(originals, size=n_dup_sources, replace=False)
    )
    for src in dup_sources:
        base = pdfs[src]
        for v in range(spec.n_dups):
            name = f"{src}_v{v + 2}"
            dup = base.copy()
            for c in dup.columns[1:]:
                std = float(dup[c].std()) or 1.0
                dup[c] = dup[c] + g.normal(scale=0.02 * std, size=len(dup))
            keep = g.random(len(dup)) > 0.02
            dup = dup[keep].reset_index(drop=True)
            pdfs[name] = dup
            metas[name] = TableMeta(
                source=metas[src].source,
                tokens=metas[src].tokens + ("copy",),
            )
            gt.dup_of[name] = src
            gt.key_col[name] = gt.key_col[src]
            if src in gt.useful:
                gt.useful[name] = gt.useful[src]
                gt.useful_col[name] = gt.useful_col[src]
            elif src in gt.irrelevant:
                gt.irrelevant.append(name)
            elif src in gt.erroneous:
                gt.erroneous.append(name)
            elif src in gt.decoys:
                gt.decoys.append(name)
            elif src in gt.sparse:
                gt.sparse.append(name)

    for name in sorted(pdfs):
        lake.add(name, spark.createDataFrame(pdfs[name]), metas[name])
    return lake, gt


def open_data_lite(
    spark: SparkSession, *, sf: float = 1.0, seed: int = 0
) -> tuple[Lake, GroundTruth]:
    """Stand-in for the paper's Open-Data repository, scaled by ``sf``."""
    spec = LakeSpec(
        n_useful=max(2, int(8 * sf)),
        n_irrelevant=max(4, int(120 * sf)),
        n_erroneous=max(2, int(40 * sf)),
        n_decoys=max(2, int(80 * sf)),
        n_sparse=max(2, int(80 * sf)),
        n_keys=max(50, int(800 * sf)),
        n_signals=4,
        prefix="od",
        seed=seed,
    )
    return generate_lake(spark, spec)


def kaggle_lite(
    spark: SparkSession, *, sf: float = 1.0, seed: int = 7
) -> tuple[Lake, GroundTruth]:
    """Stand-in for the paper's Kaggle repository: fewer, wider tables."""
    spec = LakeSpec(
        n_useful=max(1, int(4 * sf)),
        n_irrelevant=max(3, int(30 * sf)),
        n_erroneous=max(1, int(10 * sf)),
        n_decoys=max(1, int(20 * sf)),
        n_sparse=max(1, int(20 * sf)),
        n_keys=max(50, int(500 * sf)),
        extra_cols_max=6,
        n_signals=3,
        prefix="kg",
        seed=seed,
    )
    return generate_lake(spark, spec)

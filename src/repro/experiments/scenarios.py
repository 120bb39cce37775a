"""Evaluation scenarios: (lake, D_in, task) triples with known ground truth.

Each scenario substitutes one of the paper's real-data evaluations
(DESIGN.md § 2). The builders run the full distributed pipeline:
generate the lake → discover candidates (Spark value-overlap index) →
materialize all candidates (Spark batch join) → compute profiles →
construct the downstream task. Ground truth (which augmentations help)
comes from the lake generator, so tests can assert the search recovers it.
"""
from __future__ import annotations

from collections.abc import Callable
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.types import Augmentation
from repro.discovery.index import JoinablePair
from repro.discovery.join_paths import enumerate_candidates
from repro.discovery.materialize import materialize_batch
from repro.lake.catalog import Lake, TableMeta
from repro.lake.generator import THEMES, GroundTruth, LakeSpec, generate_lake
from repro.profiles.profiler import ProfileConfig, ProfileSet, compute_profiles
from repro.tasks.base import Task
from repro.tasks.causal import CausalAttributionTask
from repro.tasks.classification import ClassificationTask
from repro.tasks.clustering_task import ClusteringTask
from repro.tasks.entity_linking import EntityLinkingTask, KnowledgeBase
from repro.tasks.fairness import FairClassificationTask
from repro.tasks.regression import RegressionTask


@dataclass
class Scenario:
    """A fully-built evaluation scenario."""

    name: str
    kind: str
    lake: Lake
    gt: GroundTruth | None
    d_in: DataFrame
    d_in_pdf: pd.DataFrame
    key_col: str
    target_col: str | None
    candidates: list[Augmentation]
    pair_of: dict[str, JoinablePair]
    wide_pdf: pd.DataFrame
    profiles: ProfileSet
    task: Task
    true_aug_ids: set[str] = field(default_factory=set)

    @property
    def aug_ids(self) -> list[str]:
        return [a.aug_id for a in self.candidates]

    def utility_fn(self) -> Callable[[frozenset[str]], float]:
        """Raw utility over augmentation-id sets (queried via QueryOracle)."""
        base = self.d_in_pdf

        def fn(ids: frozenset[str]) -> float:
            cols = [c for c in sorted(ids) if c in self.wide_pdf.columns]
            df = (
                pd.concat([base, self.wide_pdf[cols]], axis=1)
                if cols
                else base
            )
            return self.task.utility(df)

        return fn


def _true_aug_ids(
    candidates: list[Augmentation], gt: GroundTruth, true_signals: set[int]
) -> set[str]:
    out = set()
    for a in candidates:
        tbl = a.table
        if tbl in gt.useful and gt.useful[tbl] in true_signals:
            if a.column == gt.useful_col[tbl]:
                out.add(a.aug_id)
    return out


def _signal_of_columns(
    candidates: list[Augmentation], gt: GroundTruth
) -> dict[str, int]:
    """aug_id → hidden signal, for columns that proxy one."""
    out: dict[str, int] = {}
    for a in candidates:
        tbl = a.table
        if tbl in gt.useful and a.column == gt.useful_col[tbl]:
            out[a.aug_id] = gt.useful[tbl]
    return out


def build_tabular_scenario(
    spark: SparkSession,
    name: str,
    kind: str,
    *,
    sf: float = 0.25,
    seed: int = 0,
    n_rows: int = 600,
    n_true_signals: int = 2,
    model: str = "logistic",
    theme_tokens: tuple[str, ...] = ("city", "price", "prediction"),
    profile_cfg: ProfileConfig = ProfileConfig(),
    spec: LakeSpec | None = None,
    noise: float = 0.6,
    w_own: float = 0.6,
) -> Scenario:
    """Generic supervised / causal scenario over a generated lake.

    ``kind`` ∈ {classification, regression, what-if, how-to}. The target is
    driven by ``n_true_signals`` hidden signals (observable only through
    useful lake tables) plus one base feature and noise.
    """
    if spec is None:
        spec = LakeSpec(
            n_useful=max(2, int(8 * sf)),
            n_irrelevant=max(4, int(120 * sf)),
            n_erroneous=max(2, int(40 * sf)),
            n_decoys=max(2, int(80 * sf)),
            n_sparse=max(2, int(80 * sf)),
            n_keys=max(50, int(800 * sf)),
            n_signals=4,
            prefix=name[:6],
            seed=seed,
        )
    lake, gt = generate_lake(spark, spec)
    g = np.random.default_rng(seed + 1000)
    keys = g.choice(gt.key_domain, size=n_rows, replace=True)
    true_signals = set(range(min(n_true_signals, spec.n_signals)))
    # The analyst's dataset shares vocabulary with the datasets that carry
    # its driving signals (a housing table speaks of income, crime, ...),
    # so the semantic/metadata profiles carry information — as in the paper.
    for j in sorted(true_signals):
        theme_tokens = theme_tokens + THEMES[j % len(THEMES)][1]

    f1 = g.normal(size=n_rows)
    f2 = g.normal(size=n_rows)
    sig_sum = sum(gt.signal_at_keys(j, keys) for j in true_signals)
    score = sig_sum + w_own * f1 + g.normal(scale=noise, size=n_rows)

    d_in_pdf = pd.DataFrame(
        {
            "zone": keys.astype("int64"),
            "feat_a": f1,
            "feat_b": f2,
        }
    )
    target_col = "target"
    if kind == "classification":
        d_in_pdf[target_col] = (score > np.median(score)).astype("int64")
        task: Task = ClassificationTask(
            target=target_col, exclude=("zone",), model=model, seed=seed
        )
    elif kind == "regression":
        d_in_pdf[target_col] = score
        task = RegressionTask(
            target=target_col, exclude=("zone",),
            model="forest" if model == "forest" else "ridge", seed=seed,
        )
    elif kind in ("what-if", "how-to"):
        d_in_pdf[target_col] = score
        task = None  # built below, needs candidate → signal mapping
    else:
        raise ValueError(f"unknown kind: {kind}")

    d_in = spark.createDataFrame(d_in_pdf)
    candidates, pair_of = enumerate_candidates(
        spark, d_in, "zone", lake, min_containment=0.05
    )
    wide = materialize_batch(d_in, "zone", lake, candidates, base_pdf=d_in_pdf)
    profiles = compute_profiles(
        wide,
        candidates,
        pair_of,
        lake,
        reference_col=target_col,
        input_tokens=theme_tokens,
        input_columns=list(d_in_pdf.columns),
        cfg=profile_cfg,
    )
    if kind in ("what-if", "how-to"):
        task = CausalAttributionTask(
            outcome=target_col,
            true_signals=frozenset(true_signals),
            signal_of=_signal_of_columns(candidates, gt),
            exclude=("zone",),
            kind=kind,
        )
    return Scenario(
        name=name,
        kind=kind,
        lake=lake,
        gt=gt,
        d_in=d_in,
        d_in_pdf=d_in_pdf,
        key_col="zone",
        target_col=target_col,
        candidates=candidates,
        pair_of=pair_of,
        wide_pdf=wide,
        profiles=profiles,
        task=task,
        true_aug_ids=_true_aug_ids(candidates, gt, true_signals),
    )


# ---------------------------------------------------------------------------
# Hand-rolled lakes for the generalization tasks (§ VI-A.4)
# ---------------------------------------------------------------------------


def build_entity_linking_scenario(
    spark: SparkSession,
    *,
    seed: int = 0,
    n_rows: int = 400,
    n_cities: int = 120,
    ambiguous_frac: float = 0.4,
    n_irrelevant: int = 30,
    n_erroneous: int = 4,
) -> Scenario:
    """CDC-cities-style entity linking with a synthetic knowledge base.

    ``D_in`` has a record key and a city id; a fraction of cities exist in
    two states (two KB entities). One lake table maps record → state code
    (the disambiguating augmentation); the rest are noise.
    """
    g = np.random.default_rng(seed)
    n_states = 10
    entities: dict[tuple[int, int], int] = {}
    ent = 0
    city_states: dict[int, list[int]] = {}
    for c in range(1, n_cities + 1):
        k = 2 if g.random() < ambiguous_frac else 1
        states = list(g.choice(n_states, size=k, replace=False) + 1)
        city_states[c] = states
        for s in states:
            entities[(c, s)] = ent
            ent += 1
    kb = KnowledgeBase(entities=entities)

    rec = np.arange(1, n_rows + 1)
    cities = g.integers(1, n_cities + 1, n_rows)
    states = np.array([city_states[int(c)][int(g.integers(len(city_states[int(c)])))] for c in cities])
    truth = np.array([entities[(int(c), int(s))] for c, s in zip(cities, states)])
    d_in_pdf = pd.DataFrame(
        {
            "record_id": rec.astype("int64"),
            "city_id": cities.astype("int64"),
            "true_entity": truth.astype("int64"),
        }
    )
    d_in = spark.createDataFrame(d_in_pdf)

    lake = Lake()
    useful = pd.DataFrame(
        {"rid": rec.astype("int64"), "state_code": states.astype("float64")}
    )
    lake.add(
        "kg_city_states",
        spark.createDataFrame(useful),
        TableMeta(source="kaggle", tokens=("city", "state", "codes", "usa")),
    )
    for i in range(n_irrelevant):
        cover = g.random(n_rows) > 0.1
        pdf = pd.DataFrame(
            {
                "rid": rec[cover].astype("int64"),
                f"stat_{i}": g.normal(size=int(cover.sum())),
            }
        )
        lake.add(
            f"kg_irr_{i}",
            spark.createDataFrame(pdf),
            TableMeta(source="kaggle", tokens=("survey", "annual", "report")),
        )
    perm = g.permutation(rec)
    for i in range(n_erroneous):
        # Wrong-join state codes: out-of-range values that can never match
        # a KB candidate state (a wrong join yields garbage, not hints).
        pdf = pd.DataFrame(
            {
                "rid": perm.astype("int64"),
                f"code_{i}": (states + 50).astype("float64"),
            }
        )
        lake.add(
            f"kg_err_{i}",
            spark.createDataFrame(pdf),
            TableMeta(source="kaggle", tokens=("state", "list", "archive")),
        )

    candidates, pair_of = enumerate_candidates(
        spark, d_in, "record_id", lake, min_containment=0.05
    )
    wide = materialize_batch(
        d_in, "record_id", lake, candidates, base_pdf=d_in_pdf
    )
    task = EntityLinkingTask(
        kb=kb, city_col="city_id", true_entity_col="true_entity"
    )
    profiles = compute_profiles(
        wide,
        candidates,
        pair_of,
        lake,
        reference_col=None,
        input_tokens=("city", "state", "usa", "linking"),
        input_columns=["city_id"],
        cfg=ProfileConfig(),
    )
    true_ids = {
        a.aug_id
        for a in candidates
        if a.table == "kg_city_states" and a.column == "state_code"
    }
    return Scenario(
        name="entity_linking",
        kind="entity_linking",
        lake=lake,
        gt=None,
        d_in=d_in,
        d_in_pdf=d_in_pdf[["record_id", "city_id", "true_entity"]],
        key_col="record_id",
        target_col=None,
        candidates=candidates,
        pair_of=pair_of,
        wide_pdf=wide,
        profiles=profiles,
        task=task,
        true_aug_ids=true_ids,
    )


def build_fairness_scenario(
    spark: SparkSession,
    *,
    seed: int = 0,
    n_rows: int = 600,
    n_keys: int = 400,
    n_unfair: int = 6,
    n_fair_useful: int = 2,
    n_irrelevant: int = 25,
) -> Scenario:
    """Credit-style fair classification (§ VI-A.4).

    The target is driven by two signals: ``a`` (also drives the sensitive
    attribute → any proxy of it is discarded by the fairness filter) and
    ``b`` (independent of the sensitive attribute → fair and useful).
    Proxies of ``a`` have the highest target correlation, so the corr
    profile alone ranks them first and single-profile baselines stall.
    """
    g = np.random.default_rng(seed)
    domain = np.arange(1, n_keys + 1)
    sig_a = g.normal(size=n_keys)  # unfair driver
    sig_b = g.normal(size=n_keys)  # fair driver
    keys = g.choice(domain, size=n_rows, replace=True)
    a_v, b_v = sig_a[keys - 1], sig_b[keys - 1]
    sensitive = (a_v + g.normal(scale=0.3, size=n_rows) > 0).astype("int64")
    score = 1.2 * a_v + 1.0 * b_v + g.normal(scale=0.5, size=n_rows)
    y = (score > np.median(score)).astype("int64")
    d_in_pdf = pd.DataFrame(
        {
            "person": keys.astype("int64"),
            "sensitive": sensitive,
            "income_high": y,
        }
    )
    d_in = spark.createDataFrame(d_in_pdf)

    lake = Lake()

    def add_table(name, col, values, tokens):
        pdf = pd.DataFrame(
            {"pid": domain.astype("int64"), col: values.astype("float64")}
        )
        lake.add(
            name, spark.createDataFrame(pdf),
            TableMeta(source="kaggle", tokens=tokens),
        )

    for i in range(n_unfair):
        add_table(
            f"cr_unfair_{i}", f"demo_{i}",
            sig_a * 1.5 + g.normal(scale=0.2, size=n_keys),
            ("credit", "demographic", "history", "score"),
        )
    for i in range(n_fair_useful):
        add_table(
            f"cr_fair_{i}", f"skill_{i}",
            sig_b * 1.5 + g.normal(scale=0.2, size=n_keys),
            ("credit", "education", "skill", "employment"),
        )
    for i in range(n_irrelevant):
        add_table(
            f"cr_irr_{i}", f"misc_{i}", g.normal(size=n_keys),
            ("survey", "annual", "report", "data"),
        )

    candidates, pair_of = enumerate_candidates(
        spark, d_in, "person", lake, min_containment=0.05
    )
    wide = materialize_batch(d_in, "person", lake, candidates, base_pdf=d_in_pdf)
    task = FairClassificationTask(
        target="income_high",
        sensitive="sensitive",
        unfair_corr=0.55,
        exclude=("person",),
        seed=seed,
    )
    profiles = compute_profiles(
        wide, candidates, pair_of, lake,
        reference_col="income_high",
        input_tokens=("credit", "income", "fair", "employment", "education"),
        input_columns=list(d_in_pdf.columns),
        cfg=ProfileConfig(),
    )
    true_ids = {a.aug_id for a in candidates if a.table.startswith("cr_fair_")}
    return Scenario(
        name="fair_classification",
        kind="fair_classification",
        lake=lake, gt=None, d_in=d_in, d_in_pdf=d_in_pdf,
        key_col="person", target_col="income_high",
        candidates=candidates, pair_of=pair_of, wide_pdf=wide,
        profiles=profiles, task=task, true_aug_ids=true_ids,
    )


def build_clustering_scenario(
    spark: SparkSession,
    *,
    seed: int = 0,
    n_rows: int = 200,
    n_categories: int = 4,
    n_candidates: int = 8,
) -> Scenario:
    """Raw-materials clustering (§ VI-A.4): 8 candidates, one (ONI-like)
    informative augmentation highly correlated with the true categories."""
    g = np.random.default_rng(seed)
    items = np.arange(1, n_rows + 1)
    cats = g.integers(0, n_categories, n_rows)
    d_in_pdf = pd.DataFrame(
        {
            "item_id": items.astype("int64"),
            "category": cats.astype("int64"),
            "weak_feat": cats + g.normal(scale=2.0, size=n_rows),
        }
    )
    d_in = spark.createDataFrame(d_in_pdf)
    lake = Lake()
    oni = pd.DataFrame(
        {
            "iid": items.astype("int64"),
            "oni_score": (cats * 3.0 + g.normal(scale=0.2, size=n_rows)),
        }
    )
    lake.add(
        "nut_oni",
        spark.createDataFrame(oni),
        TableMeta(source="kaggle", tokens=("nutrient", "intake", "satiety", "food")),
    )
    for i in range(n_candidates - 1):
        pdf = pd.DataFrame(
            {
                "iid": items.astype("int64"),
                f"attr_{i}": g.normal(size=n_rows),
            }
        )
        lake.add(
            f"nut_other_{i}",
            spark.createDataFrame(pdf),
            TableMeta(source="kaggle", tokens=("food", "list", "catalog")),
        )
    candidates, pair_of = enumerate_candidates(
        spark, d_in, "item_id", lake, min_containment=0.05
    )
    wide = materialize_batch(d_in, "item_id", lake, candidates, base_pdf=d_in_pdf)
    task = ClusteringTask(
        category_col="category", exclude=("item_id",), seed=seed
    )
    profiles = compute_profiles(
        wide, candidates, pair_of, lake,
        reference_col=None,
        input_tokens=("food", "satiety", "ingredient", "category"),
        input_columns=["weak_feat"],
        cfg=ProfileConfig(),
    )
    true_ids = {
        a.aug_id for a in candidates
        if a.table == "nut_oni" and a.column == "oni_score"
    }
    return Scenario(
        name="clustering", kind="clustering",
        lake=lake, gt=None, d_in=d_in, d_in_pdf=d_in_pdf,
        key_col="item_id", target_col=None,
        candidates=candidates, pair_of=pair_of, wide_pdf=wide,
        profiles=profiles, task=task, true_aug_ids=true_ids,
    )


# ---------------------------------------------------------------------------
# Table II scenario registry
# ---------------------------------------------------------------------------

#: name → (kind, seed, model); (C) rows of Table II are causal tasks.
TABLE2_SCENARIOS: dict[str, tuple[str, int, str]] = {
    "schools_c": ("what-if", 11, "logistic"),
    "taxi_c": ("what-if", 12, "logistic"),
    "crime_c": ("how-to", 13, "logistic"),
    "housing_c": ("what-if", 14, "logistic"),
    "pharmacy": ("classification", 15, "logistic"),
    "grocery": ("regression", 16, "ridge"),
}

_THEMES_BY_NAME = {
    "schools_c": ("school", "performance", "test", "score"),
    "taxi_c": ("taxi", "trips", "daily", "count"),
    "crime_c": ("crime", "incidents", "rate", "police"),
    "housing_c": ("housing", "price", "city", "income"),
    "pharmacy": ("pharmacy", "locations", "count", "health"),
    "grocery": ("grocery", "stores", "walmart", "presence"),
}


def build_table2_scenario(
    spark: SparkSession, name: str, *, sf: float = 0.25
) -> Scenario:
    kind, seed, model = TABLE2_SCENARIOS[name]
    # The paper's how-to experiment has an optimal solution of three
    # causally-relevant attributes (§ VI-A "How-to analysis").
    return build_tabular_scenario(
        spark,
        name,
        kind,
        sf=sf,
        seed=seed,
        model=model,
        theme_tokens=_THEMES_BY_NAME[name],
        n_true_signals=3 if kind == "how-to" else 2,
    )

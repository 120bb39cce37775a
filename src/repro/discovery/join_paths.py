"""Enumeration of candidate augmentations (join paths, Definition 3-4).

Depth-1 candidates come from lake columns joinable with the input key;
depth-2 candidates chain through a second joinable column of the hop-1
table. Every *numeric, non-key* column reachable through a path becomes
one :class:`~repro.core.types.Augmentation` (the paper's ``Γ(D_in, P[j])``
— one candidate per projected column).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.types import Augmentation, JoinStep
from repro.discovery.index import (
    JoinablePair,
    build_value_index,
    containment_with_input,
    lake_joinable_pairs,
)
from repro.lake.catalog import Lake

_NUMERIC_TYPES = (
    T.ByteType, T.ShortType, T.IntegerType, T.LongType,
    T.FloatType, T.DoubleType, T.DecimalType,
)


def projectable_columns(
    df: DataFrame, *, exclude: set[str], numeric_only: bool = True
) -> list[str]:
    """Columns of a table worth projecting as augmentations."""
    out = []
    for f in df.schema.fields:
        if f.name in exclude:
            continue
        if numeric_only and not isinstance(f.dataType, _NUMERIC_TYPES):
            continue
        out.append(f.name)
    return out


def enumerate_candidates(
    spark: SparkSession,
    d_in: DataFrame,
    key_col: str,
    lake: Lake,
    *,
    min_containment: float = 0.05,
    max_depth: int = 1,
    numeric_only: bool = True,
    max_candidates: int | None = None,
    index: DataFrame | None = None,
) -> tuple[list[Augmentation], dict[str, JoinablePair]]:
    """Discover candidate augmentations for ``d_in`` joined on ``key_col``.

    Returns the candidate list plus, per ``aug_id``, the hop-1
    :class:`JoinablePair` (carrying the input-side containment used by the
    overlap profile and the Overlap baseline).
    """
    if index is None:
        index = build_value_index(lake)
    in_vals = d_in.select(F.col(key_col).cast("string").alias("value"))
    hop1 = containment_with_input(
        spark, index, in_vals, min_containment=min_containment
    )

    candidates: list[Augmentation] = []
    pair_of: dict[str, JoinablePair] = {}

    def add(aug: Augmentation, pair: JoinablePair) -> bool:
        if max_candidates is not None and len(candidates) >= max_candidates:
            return False
        candidates.append(aug)
        pair_of[aug.aug_id] = pair
        return True

    for p in hop1:
        tbl = lake.table(p.right_table)
        step1 = JoinStep(table=p.right_table, left_on=key_col, right_on=p.right_col)
        for c in projectable_columns(
            tbl, exclude={p.right_col}, numeric_only=numeric_only
        ):
            if not add(Augmentation(steps=(step1,), column=c), p):
                return candidates, pair_of

    if max_depth >= 2 and hop1:
        hop1_tables = {p.right_table for p in hop1}
        lake_pairs = [
            JoinablePair(r["t1"], r["c1"], r["t2"], r["c2"], r["containment"])
            for r in lake_joinable_pairs(
                index, min_containment=min_containment
            ).collect()
            if r["t1"] in hop1_tables
        ]
        lake_pairs.sort(
            key=lambda q: (-q.containment, q.left_table, q.right_table, q.right_col)
        )
        for p in hop1:
            step1 = JoinStep(p.right_table, key_col, p.right_col)
            for q in lake_pairs:
                # Chain through a *different* column of the hop-1 table.
                if q.left_table != p.right_table or q.left_col == p.right_col:
                    continue
                if q.right_table == p.right_table:
                    continue
                step2 = JoinStep(q.right_table, q.left_col, q.right_col)
                tbl2 = lake.table(q.right_table)
                for c in projectable_columns(
                    tbl2, exclude={q.right_col}, numeric_only=numeric_only
                ):
                    if not add(
                        Augmentation(steps=(step1, step2), column=c), p
                    ):
                        return candidates, pair_of

    return candidates, pair_of

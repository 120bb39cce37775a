"""Materialization of augmentations Γ(D_in, P[j]) as Spark joins.

Two paths:

- :func:`materialize` — faithful per-candidate chain of Spark left joins
  (any depth, any type). Used by core tests and the DuckDB oracle checks.
- :func:`materialize_batch` — one distributed long-format job materializing
  *all* depth-1 numeric candidates at once, returning a driver-side wide
  pandas frame keyed like ``D_in``. The experiment harness uses this so a
  search over hundreds of candidates does not launch hundreds of jobs.

Right sides are deduplicated by join key (``min`` per key) before the left
join so augmentation never changes the input's cardinality — Definition 4
appends a column, it does not multiply rows.
"""
from __future__ import annotations

from collections import defaultdict
from functools import reduce

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.types import Augmentation
from repro.lake.catalog import Lake


def dedup_by_key(df: DataFrame, key: str, cols: list[str]) -> DataFrame:
    """One row per key: ``min`` of each needed column (deterministic)."""
    return df.groupBy(key).agg(*[F.min(c).alias(c) for c in cols])


def materialize(
    d_in: DataFrame, lake: Lake, aug: Augmentation
) -> DataFrame:
    """``d_in`` plus one new column named ``aug.aug_id`` (left join chain)."""
    out = d_in
    carried = None  # column of `out` that joins the next hop
    for i, step in enumerate(aug.steps):
        right = lake.table(step.table)
        is_last = i == len(aug.steps) - 1
        needed = [aug.column] if is_last else [aug.steps[i + 1].left_on]
        needed = [c for c in needed if c != step.right_on]
        right = dedup_by_key(right, step.right_on, needed)
        # Prefix right-side columns to avoid clashes with d_in columns.
        prefix = f"__hop{i}__"
        for c in [step.right_on, *needed]:
            right = right.withColumnRenamed(c, prefix + c)
        left_col = step.left_on if i == 0 else carried
        out = out.join(
            right,
            on=out[left_col] == right[prefix + step.right_on],
            how="left",
        ).drop(prefix + step.right_on)
        carried = prefix + needed[0] if needed else None
    out = out.withColumnRenamed(carried, aug.aug_id)
    keep = d_in.columns + [aug.aug_id]
    return out.select(*keep)


def materialize_batch(
    d_in: DataFrame,
    key_col: str,
    lake: Lake,
    augs: list[Augmentation],
    *,
    base_pdf: pd.DataFrame | None = None,
) -> pd.DataFrame:
    """Wide pandas frame: ``d_in``'s rows plus one column per candidate.

    Only depth-1 candidates are materialized in the batch job; deeper
    paths fall back to :func:`materialize` individually. All candidate
    columns are cast to double; rows whose key has no match are NaN (the
    task layer imputes), mirroring missing values after real joins.
    """
    depth1 = [a for a in augs if a.depth == 1]
    deep = [a for a in augs if a.depth > 1]

    # Group depth-1 candidates by (table, right_on) so each table is
    # melted exactly once.
    groups: dict[tuple[str, str], list[Augmentation]] = defaultdict(list)
    for a in depth1:
        groups[(a.steps[0].table, a.steps[0].right_on)].append(a)

    parts = []
    for (tname, right_on), members in sorted(groups.items()):
        tbl = lake.table(tname)
        kvs = F.array(
            *[
                F.struct(
                    F.lit(a.aug_id).alias("aug_id"),
                    F.col(a.column).cast("double").alias("value"),
                )
                for a in members
            ]
        )
        parts.append(
            tbl.select(
                F.col(right_on).cast("string").alias("k"),
                F.explode(kvs).alias("kv"),
            ).select("k", F.col("kv.aug_id").alias("aug_id"), F.col("kv.value").alias("value"))
        )

    base = base_pdf if base_pdf is not None else d_in.toPandas()
    base = base.reset_index(drop=True)
    key_str = base[key_col].astype("string")
    new_cols: dict[str, np.ndarray] = {}

    if parts:
        long = reduce(DataFrame.unionByName, parts)
        # Dedup per (key, candidate) then keep only keys present in d_in.
        keys = d_in.select(
            F.col(key_col).cast("string").alias("k")
        ).distinct()
        agg = (
            long.groupBy("k", "aug_id")
            .agg(F.min("value").alias("value"))
            .join(keys, on="k", how="inner")
        )
        long_pdf = agg.toPandas()
        if len(long_pdf):
            pivot = long_pdf.pivot(index="k", columns="aug_id", values="value")
            aligned = pivot.reindex(key_str.to_numpy())
            for a in depth1:
                if a.aug_id in aligned.columns:
                    new_cols[a.aug_id] = aligned[a.aug_id].to_numpy()
                else:
                    new_cols[a.aug_id] = np.full(len(base), np.nan)
        else:
            for a in depth1:
                new_cols[a.aug_id] = np.full(len(base), np.nan)
    for a in deep:
        col_pdf = (
            materialize(d_in, lake, a)
            .select(key_col, a.aug_id)
            .toPandas()
            .drop_duplicates(subset=[key_col])
        )
        mapping = dict(
            zip(col_pdf[key_col].astype("string"), col_pdf[a.aug_id])
        )
        new_cols[a.aug_id] = pd.to_numeric(
            key_str.map(mapping), errors="coerce"
        ).to_numpy()
    if not new_cols:
        return base.copy()
    return pd.concat([base, pd.DataFrame(new_cols, index=base.index)], axis=1)

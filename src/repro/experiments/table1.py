"""Table I harness: characteristics of the two repositories.

Paper's Table I:

    Dataset   | #Tables | #Columns | #Joinable Columns | Size
    Open-Data | 69K     | 29.5M    | 28.6M             | 119G
    Kaggle    | 1950    | 91231    | 6.7M              | 18G

Ours reports the same four statistics for the scaled synthetic repos,
computed with distributed Spark jobs (DESIGN.md table row T1).
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.lake.generator import kaggle_lite, open_data_lite
from repro.lake.stats import LakeStats, compute_stats

PAPER_TABLE1 = {
    "Open-Data": ("69K", "29.5M", "28.6M", "119G"),
    "Kaggle": ("1950", "91231", "6.7M", "18G"),
}

HEADER = ("Dataset", "#Tables", "#Columns", "#Joinable Columns", "Size")


def compute_table1(
    spark: SparkSession, *, sf: float = 1.0, seed: int = 0
) -> list[LakeStats]:
    """Build both repositories and compute their Table I rows."""
    od, _ = open_data_lite(spark, sf=sf, seed=seed)
    kg, _ = kaggle_lite(spark, sf=sf, seed=seed + 7)
    return [
        compute_stats(od, "Open-Data-lite"),
        compute_stats(kg, "Kaggle-lite"),
    ]


def format_table1(stats: list[LakeStats]) -> str:
    lines = [" | ".join(HEADER)]
    for s in stats:
        lines.append(" | ".join(str(v) for v in s.row()))
    lines.append("")
    lines.append("Paper's Table I (full-scale crawled repositories):")
    for name, row in PAPER_TABLE1.items():
        lines.append(" | ".join([name, *row]))
    return "\n".join(lines)

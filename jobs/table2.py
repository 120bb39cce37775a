"""spark-submit entrypoint reproducing Table II (utility within budget).

Usage: python jobs/table2.py [--sf 0.25] [--datasets schools_c,taxi_c]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1]))
import conftest  # noqa: F401,E402

from pyspark.sql import SparkSession  # noqa: E402

from repro.experiments.table2 import compute_table2, format_table2  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.25)
    ap.add_argument("--datasets", type=str, default="")
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = (
        SparkSession.builder.appName("metam-table2")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    datasets = tuple(args.datasets.split(",")) if args.datasets else None
    rows = compute_table2(spark, sf=args.sf, datasets=datasets, seed=args.seed)
    print(format_table2(rows))
    spark.stop()


if __name__ == "__main__":
    main()

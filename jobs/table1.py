"""spark-submit entrypoint reproducing Table I (repository characteristics).

Usage: python jobs/table1.py [--sf 1.0]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1]))
import conftest  # noqa: F401,E402  (sets PYSPARK_SUBMIT_ARGS before pyspark loads)

from pyspark.sql import SparkSession  # noqa: E402

from repro.experiments.table1 import compute_table1, format_table1  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = (
        SparkSession.builder.appName("metam-table1")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    stats = compute_table1(spark, sf=args.sf, seed=args.seed)
    print(format_table1(stats))
    spark.stop()


if __name__ == "__main__":
    main()

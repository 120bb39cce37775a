"""Entrypoint reproducing the § VI-B scalability sweep (no Spark needed —
the sweep isolates search-loop overhead, like the paper's Fig 6).

Usage: python jobs/scalability.py [--budget 200]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1]))

from repro.experiments.scalability import (  # noqa: E402
    format_sweep,
    sweep_candidates,
    sweep_profiles,
)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--budget", type=int, default=200)
    args = ap.parse_args()
    print("Sweep over #candidates (l=5):")
    print(format_sweep(sweep_candidates(budget=args.budget), "n_candidates"))
    print()
    print("Sweep over #profiles (n=500):")
    print(format_sweep(sweep_profiles(budget=args.budget), "n_profiles"))


if __name__ == "__main__":
    main()

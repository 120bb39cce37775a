"""Prescriptive-analytics tasks: what-if and how-to analysis (§ II-B, VI-A).

Both tasks run a causal-discovery step (substituting causal-learn with a
Fisher-z correlation test — the paper's utility is "the fraction of
correctly identified attributes (p-value < 0.05)") and return the fraction
of ground-truth causal attributes recovered from the columns present in
the dataset. The utility is monotone: adding columns can only grow the
set of identified attributes (property P3 — the paper found what-if and
how-to "always monotonic").

Ground truth is expressed at the *signal* level: several lake tables may
proxy the same hidden causal signal (near-duplicates), and identifying any
proxy of a causal signal counts as identifying that attribute.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.tasks.base import Task


def fisher_z_pvalue(r: float, n: int) -> float:
    """Two-sided p-value for H0: ρ = 0 via the Fisher z-transform."""
    if n <= 3:
        return 1.0
    r = float(np.clip(r, -0.999999, 0.999999))
    z = 0.5 * math.log((1 + r) / (1 - r)) * math.sqrt(n - 3)
    return 2.0 * (1.0 - 0.5 * (1.0 + math.erf(abs(z) / math.sqrt(2.0))))


@dataclass
class CausalAttributionTask(Task):
    """What-if / how-to: utility = recall of true causal attributes."""

    outcome: str
    true_signals: frozenset[int]
    signal_of: dict[str, int]  # column name -> hidden signal it proxies
    exclude: tuple[str, ...] = ()
    alpha: float = 0.05
    kind: str = "what-if"  # or "how-to"; same utility mechanics
    name: str = field(default="causal")

    def identified_signals(self, df: pd.DataFrame) -> set[int]:
        y = df[self.outcome].to_numpy(dtype="float64")
        found: set[int] = set()
        for c in df.columns:
            if c == self.outcome or c in self.exclude:
                continue
            if c not in self.signal_of:
                continue
            if not pd.api.types.is_numeric_dtype(df[c]):
                continue
            x = df[c].to_numpy(dtype="float64")
            m = np.isfinite(x) & np.isfinite(y)
            if m.sum() < 10 or x[m].std() == 0 or y[m].std() == 0:
                continue
            r = float(np.corrcoef(x[m], y[m])[0, 1])
            if fisher_z_pvalue(r, int(m.sum())) < self.alpha:
                found.add(self.signal_of[c])
        return found & set(self.true_signals)

    def utility(self, df: pd.DataFrame) -> float:
        if not self.true_signals:
            return 0.0
        return len(self.identified_signals(df)) / len(self.true_signals)

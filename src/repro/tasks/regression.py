"""Supervised regression task (paper § VI-A: NYC collisions).

The paper's utility is ``1 − MAE`` with MAE computed on a normalized
target; we standardize the target by the train split's mean absolute
deviation so the trivial mean predictor scores MAE ≈ 1 (utility ≈ 0) and a
perfect model scores utility 1.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.tasks.base import Task
from repro.tasks.models import RandomForest, Ridge, mae, train_val_split


@dataclass
class RegressionTask(Task):
    """Regression; utility = max(0, 1 − MAE(normalized target))."""

    target: str
    exclude: tuple[str, ...] = ()
    model: str = "ridge"  # "ridge" | "forest"
    val_frac: float = 0.3
    n_splits: int = 3  # utilities are averaged over splits to damp noise
    seed: int = 0
    name: str = field(default="regression")

    def utility(self, df: pd.DataFrame) -> float:
        y = df[self.target].to_numpy(dtype="float64")
        X, cols = self.feature_matrix(df, exclude=(self.target, *self.exclude))
        errs = []
        for k in range(self.n_splits):
            tr, va = train_val_split(len(y), self.val_frac, self.seed + k)
            mad = float(np.abs(y[tr] - y[tr].mean()).mean()) or 1.0
            if not cols:
                pred = np.full(len(va), y[tr].mean())
            else:
                if self.model == "forest":
                    m = RandomForest(seed=self.seed).fit(X[tr], y[tr])
                else:
                    m = Ridge().fit(X[tr], y[tr])
                pred = m.predict(X[va])
            errs.append(mae(y[va] / mad, pred / mad))
        err = sum(errs) / len(errs)
        return float(min(1.0, max(0.0, 1.0 - err)))

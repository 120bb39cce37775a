"""Fair classification task (paper § VI-A.4, credit dataset).

The task performs fairness-aware feature selection — features whose
correlation with the sensitive attribute exceeds a threshold are
discarded — then trains a classifier on the surviving features and
returns the validation F-score. This reproduces the paper's tension:
features most correlated with the target are unfair (dropped), features
most fair are uninformative, so single-profile rankings fail while a
weighted combination succeeds.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.tasks.base import Task
from repro.tasks.models import Logistic, f1_score, impute_mean, train_val_split


@dataclass
class FairClassificationTask(Task):
    """Classification with fairness-aware feature selection; utility = F1."""

    target: str
    sensitive: str
    unfair_corr: float = 0.5  # drop features with |corr(f, sensitive)| above
    exclude: tuple[str, ...] = ()
    val_frac: float = 0.3
    seed: int = 0
    name: str = field(default="fair_classification")

    def fair_features(self, df: pd.DataFrame) -> list[str]:
        s = df[self.sensitive].to_numpy(dtype="float64")
        keep = []
        for c in df.columns:
            if c in (self.target, self.sensitive, *self.exclude):
                continue
            if not pd.api.types.is_numeric_dtype(df[c]):
                continue
            x = df[c].to_numpy(dtype="float64")
            m = np.isfinite(x) & np.isfinite(s)
            if m.sum() < 3 or x[m].std() == 0 or s[m].std() == 0:
                keep.append(c)
                continue
            if abs(float(np.corrcoef(x[m], s[m])[0, 1])) <= self.unfair_corr:
                keep.append(c)
        return keep

    def utility(self, df: pd.DataFrame) -> float:
        y = df[self.target].to_numpy(dtype="int64")
        cols = self.fair_features(df)
        if not cols:
            return 0.0
        X = impute_mean(df[cols].to_numpy(dtype="float64"))
        tr, va = train_val_split(len(y), self.val_frac, self.seed)
        m = Logistic().fit(X[tr], y[tr])
        return float(min(1.0, max(0.0, f1_score(y[va], m.predict(X[va])))))

"""Supervised classification task (paper § VI-A: Price, Schools, AutoML).

Trains a classifier on the train split of the (augmented) dataset and
returns validation accuracy or F-score as the utility.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd

from repro.tasks.base import Task
from repro.tasks.models import (
    Logistic,
    RandomForest,
    accuracy,
    f1_score,
    train_val_split,
)


@dataclass
class ClassificationTask(Task):
    """Binary classification; utility = validation accuracy (or F1)."""

    target: str
    exclude: tuple[str, ...] = ()
    model: str = "logistic"  # "logistic" | "forest"
    metric: str = "accuracy"  # "accuracy" | "f1"
    val_frac: float = 0.3
    n_splits: int = 3  # utilities are averaged over splits to damp noise
    seed: int = 0
    name: str = field(default="classification")

    def utility(self, df: pd.DataFrame) -> float:
        y = df[self.target].to_numpy(dtype="int64")
        X, cols = self.feature_matrix(df, exclude=(self.target, *self.exclude))
        if not cols:
            # Majority-class baseline when no features are available.
            maj = int(round(y.mean()))
            pred = pd.Series([maj] * len(y)).to_numpy()
            return accuracy(y, pred) if self.metric == "accuracy" else f1_score(y, pred)
        scores = []
        for k in range(self.n_splits):
            tr, va = train_val_split(len(y), self.val_frac, self.seed + k)
            if self.model == "forest":
                m = RandomForest(seed=self.seed, classification=True).fit(
                    X[tr], y[tr]
                )
            else:
                m = Logistic().fit(X[tr], y[tr])
            pred = m.predict(X[va])
            scores.append(
                accuracy(y[va], pred)
                if self.metric == "accuracy"
                else f1_score(y[va], pred)
            )
        score = sum(scores) / len(scores)
        return float(min(1.0, max(0.0, score)))

"""Task protocol: a black box mapping a dataset to a utility in [0, 1].

The task sees only the (possibly augmented) dataset — Definition 5. A
"query" is one call to :meth:`Task.utility`; the search layer counts and
caches queries through :class:`repro.tasks.monotonic.QueryOracle`.
"""
from __future__ import annotations

from abc import ABC, abstractmethod

import numpy as np
import pandas as pd

from repro.tasks.models import impute_mean


class Task(ABC):
    """A downstream task with a normalized utility score."""

    name: str = "task"

    @abstractmethod
    def utility(self, df: pd.DataFrame) -> float:
        """Utility of the task when run over ``df`` — must be in [0, 1]."""

    def feature_matrix(
        self, df: pd.DataFrame, exclude: tuple[str, ...]
    ) -> tuple[np.ndarray, list[str]]:
        """Numeric feature matrix with NaNs imputed, excluding ``exclude``."""
        cols = [
            c
            for c in df.columns
            if c not in exclude and pd.api.types.is_numeric_dtype(df[c])
        ]
        if not cols:
            return np.zeros((len(df), 0)), []
        return impute_mean(df[cols].to_numpy(dtype="float64")), cols

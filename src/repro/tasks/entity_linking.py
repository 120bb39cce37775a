"""Entity-linking task (paper § VI-A.4, CDC cities → Wikidata).

Offline substitute for Wikidata: a synthetic knowledge base of
``(city, state)`` entities where some city names are ambiguous (exist in
several states). A row links correctly when its city resolves to a unique
KB entity — either because the name is unambiguous, or because an
augmented state column disambiguates it. Utility = fraction of rows
linked to their true entity.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.tasks.base import Task


@dataclass
class KnowledgeBase:
    """Entities keyed by (city_id, state_id); mimics a KG entity store."""

    entities: dict[tuple[int, int], int]  # (city, state) -> entity id

    def candidates(self, city: int) -> list[tuple[int, int]]:
        return sorted(
            (ent, st) for (c, st), ent in self.entities.items() if c == city
        )


@dataclass
class EntityLinkingTask(Task):
    """Link each row's city to a KB entity; utility = linking accuracy."""

    kb: KnowledgeBase
    city_col: str
    true_entity_col: str  # ground-truth entity id per row (held out from features)
    state_tolerance: float = 0.5  # max |aug − state| to accept a state hint
    name: str = field(default="entity_linking")

    def _state_hint_cols(self, df: pd.DataFrame) -> list[str]:
        return [
            c
            for c in df.columns
            if c not in (self.city_col, self.true_entity_col)
            and pd.api.types.is_numeric_dtype(df[c])
        ]

    def utility(self, df: pd.DataFrame) -> float:
        cities = df[self.city_col].to_numpy(dtype="int64")
        truth = df[self.true_entity_col].to_numpy(dtype="int64")
        hints = self._state_hint_cols(df)
        linked = 0
        for i, city in enumerate(cities):
            cands = self.kb.candidates(int(city))
            if not cands:
                continue
            if len(cands) == 1:
                ent = cands[0][0]
            else:
                # Ambiguous: try to disambiguate with any augmented
                # state-code column whose value rounds to a candidate state.
                ent = None
                for h in hints:
                    v = df[h].iloc[i]
                    if not np.isfinite(v):
                        continue
                    match = [
                        e
                        for e, st in cands
                        if abs(float(v) - st) <= self.state_tolerance
                    ]
                    if len(match) == 1:
                        ent = match[0]
                        break
            if ent is not None and ent == truth[i]:
                linked += 1
        return linked / len(df) if len(df) else 0.0

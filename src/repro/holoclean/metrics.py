"""Repair-accuracy metrics (paper §7: precision / recall / F1, Table 5).

- precision = correct updates / total updates
- recall    = correct updates / total errors

An *update* is a cell whose chosen repair value differs from the observed
(dirty) value; it is *correct* when the chosen value equals the ground
truth.  ``truth`` is the datagen frame ``(rid, attr, clean_value, ...)``
listing every injected error.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd


@dataclass(frozen=True)
class Accuracy:
    precision: float
    recall: float

    @property
    def f1(self) -> float:
        p, r = self.precision, self.recall
        return 0.0 if p + r == 0 else 2 * p * r / (p + r)

    def row(self) -> tuple[float, float, float]:
        return (round(self.precision, 2), round(self.recall, 2), round(self.f1, 2))


def score_repairs(
    chosen: pd.DataFrame,
    dirty: pd.DataFrame,
    clean: pd.DataFrame,
    truth: pd.DataFrame,
    attrs: list[str],
) -> Accuracy:
    """Score per-cell chosen values against ground truth.

    ``chosen``: frame ``(rid, attr, value)`` — the system's final value for
    every cell it considered (unchanged cells may be listed or omitted).
    Only cells of ``attrs`` are scored (the attributes the active rules
    touch, as the paper does per rule set).
    """
    chosen = chosen[chosen["attr"].isin(attrs)]
    dirty = dirty.reset_index(drop=True)
    clean = clean.reset_index(drop=True)
    updates = 0
    correct = 0
    for rid, attr, value in chosen[["rid", "attr", "value"]].itertuples(index=False):
        observed = dirty.at[rid, attr]
        if value == observed:
            continue
        updates += 1
        if value == clean.at[rid, attr]:
            correct += 1
    total_errors = int((truth["attr"].isin(attrs)).sum())
    precision = correct / updates if updates else 1.0
    recall = correct / total_errors if total_errors else 1.0
    return Accuracy(precision, recall)

"""Extraction-quality metrics: precision / recall / F1 over
(doc_id, entity) prediction sets vs gold sets (§6.1)."""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd


@dataclass(frozen=True)
class PRF:
    precision: float
    recall: float
    f1: float
    n_pred: int
    n_gold: int


def _pairs(df: pd.DataFrame, value_col: str) -> set[tuple[int, str]]:
    return {(int(r["doc_id"]), str(r[value_col])) for _, r in df.iterrows()}


def prf(pred: pd.DataFrame, gold: pd.DataFrame, value_col: str = "entity") -> PRF:
    p = _pairs(pred, value_col) if len(pred) else set()
    g = _pairs(gold, "entity") if len(gold) else set()
    tp = len(p & g)
    precision = tp / len(p) if p else 0.0
    recall = tp / len(g) if g else 0.0
    f1 = 2 * precision * recall / (precision + recall) if precision + recall else 0.0
    return PRF(precision, recall, f1, len(p), len(g))

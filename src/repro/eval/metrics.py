"""Evaluation metrics: coverage/recall over true positives, precision,
F1 — the quantities reported throughout §4."""
from __future__ import annotations

import numpy as np


def precision_recall_f1(pred: np.ndarray, truth: np.ndarray) -> tuple[float, float, float]:
    """Binary P/R/F1 for 0-1 arrays of equal length."""
    pred = np.asarray(pred, dtype=bool)
    truth = np.asarray(truth, dtype=bool)
    tp = int((pred & truth).sum())
    fp = int((pred & ~truth).sum())
    fn = int((~pred & truth).sum())
    p = tp / (tp + fp) if tp + fp else 0.0
    r = tp / (tp + fn) if tp + fn else 0.0
    f1 = 2 * p * r / (p + r) if p + r else 0.0
    return p, r, f1


def coverage_of_ids(ids: set[int], truth: np.ndarray) -> float:
    """Fraction of true positives contained in ``ids`` (§4.3's coverage)."""
    truth = np.asarray(truth, dtype=bool)
    total = int(truth.sum())
    if total == 0:
        return 0.0
    idx = np.fromiter(ids, dtype=np.int64) if ids else np.array([], dtype=np.int64)
    return float(truth[idx].sum() / total)


def precision_of_ids(ids: set[int], truth: np.ndarray) -> float:
    """Fraction of ``ids`` that are true positives."""
    if not ids:
        return 0.0
    truth = np.asarray(truth, dtype=bool)
    idx = np.fromiter(ids, dtype=np.int64)
    return float(truth[idx].mean())

"""Evaluation metrics: PRAUC (average precision) and F1.

The paper evaluates MEL with PRAUC computed by sklearn (§5.1). sklearn
is not available offline, so ``pr_auc`` implements sklearn's
``average_precision_score`` definition exactly: step-wise summation
AP = Σ (R_k − R_{k−1}) · P_k over descending-score thresholds, with
ties grouped. Table 7 uses F1 (binary at threshold 0.5).
"""
from __future__ import annotations

import numpy as np


def _validate(y_true, y_score):
    y = np.asarray(y_true, dtype=float).ravel()
    s = np.asarray(y_score, dtype=float).ravel()
    if y.shape != s.shape:
        raise ValueError(f"shape mismatch: {y.shape} vs {s.shape}")
    if y.size == 0:
        raise ValueError("empty input")
    if not np.isin(y, (0.0, 1.0)).all():
        raise ValueError("y_true must be binary 0/1")
    return y, s


def pr_auc(y_true, y_score) -> float:
    """Average precision == sklearn.metrics.average_precision_score.

    Returns 0.0 if there are no positives (PR curve undefined; sklearn
    warns and returns 0 contributions — we make the convention explicit).
    """
    y, s = _validate(y_true, y_score)
    n_pos = y.sum()
    if n_pos == 0:
        return 0.0
    order = np.argsort(-s, kind="stable")
    y = y[order]
    s = s[order]
    # group tied scores: threshold boundaries are where the score changes
    distinct = np.where(np.diff(s))[0]
    idx = np.r_[distinct, y.size - 1]  # inclusive end index per threshold
    tp = np.cumsum(y)[idx]
    fp = np.cumsum(1 - y)[idx]
    precision = tp / (tp + fp)
    recall = tp / n_pos
    prev_recall = np.r_[0.0, recall[:-1]]
    return float(np.sum((recall - prev_recall) * precision))


def f1_at(y_true, y_score, threshold: float = 0.5) -> float:
    """F1 of the binary decision ``score >= threshold`` (Table 7 metric)."""
    y, s = _validate(y_true, y_score)
    pred = (s >= threshold).astype(float)
    tp = float(np.sum((pred == 1) & (y == 1)))
    fp = float(np.sum((pred == 1) & (y == 0)))
    fn = float(np.sum((pred == 0) & (y == 1)))
    if tp == 0:
        return 0.0
    precision = tp / (tp + fp)
    recall = tp / (tp + fn)
    return 2 * precision * recall / (precision + recall)


def best_f1(y_true, y_score) -> float:
    """Max F1 over all score thresholds (robust to uncalibrated scores)."""
    y, s = _validate(y_true, y_score)
    n_pos = y.sum()
    if n_pos == 0:
        return 0.0
    order = np.argsort(-s, kind="stable")
    y = y[order]
    tp = np.cumsum(y)
    k = np.arange(1, y.size + 1)
    precision = tp / k
    recall = tp / n_pos
    denom = precision + recall
    f1 = np.where(denom > 0, 2 * precision * recall / np.maximum(denom, 1e-12), 0.0)
    return float(f1.max())

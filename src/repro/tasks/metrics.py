"""Evaluation metrics: AUC (rank statistic), precision@K, micro/macro F1.

All pure numpy; each has a brute-force-checked unit test.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def auc_score(labels: np.ndarray, scores: np.ndarray) -> float:
    """Area under the ROC curve via the Mann-Whitney U statistic with
    average ranks for ties."""
    labels = np.asarray(labels).astype(bool)
    scores = np.asarray(scores, dtype=np.float64)
    n_pos = int(labels.sum())
    n_neg = int((~labels).sum())
    if n_pos == 0 or n_neg == 0:
        raise ValueError("AUC needs both positive and negative examples")
    ranks = pd.Series(scores).rank(method="average").to_numpy()
    u = ranks[labels].sum() - n_pos * (n_pos + 1) / 2.0
    return float(u / (n_pos * n_neg))


def precision_at_k(
    ranked_is_positive: np.ndarray, ks: list[int]
) -> dict[int, float]:
    """precision@K over a boolean array already sorted by descending score."""
    hits = np.cumsum(ranked_is_positive.astype(np.int64))
    out = {}
    for k in ks:
        kk = min(k, len(ranked_is_positive))
        out[k] = float(hits[kk - 1] / kk) if kk > 0 else 0.0
    return out


def micro_macro_f1(
    y_true: np.ndarray, y_pred: np.ndarray
) -> tuple[float, float]:
    """Micro- and macro-averaged F1 for single-label multiclass predictions.

    Micro-F1 over single-label data equals accuracy; macro averages the
    per-class F1 with equal class weight.
    """
    y_true = np.asarray(y_true)
    y_pred = np.asarray(y_pred)
    classes = np.unique(np.concatenate([y_true, y_pred]))
    tp_all = fp_all = fn_all = 0
    f1s = []
    for c in classes:
        tp = int(np.sum((y_pred == c) & (y_true == c)))
        fp = int(np.sum((y_pred == c) & (y_true != c)))
        fn = int(np.sum((y_pred != c) & (y_true == c)))
        tp_all, fp_all, fn_all = tp_all + tp, fp_all + fp, fn_all + fn
        denom = 2 * tp + fp + fn
        f1s.append(2 * tp / denom if denom else 0.0)
    micro = 2 * tp_all / (2 * tp_all + fp_all + fn_all) if tp_all + fp_all + fn_all else 0.0
    return float(micro), float(np.mean(f1s))

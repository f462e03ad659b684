"""ROC curves and AUC for the Fig-6 study (no sklearn in container).

Scores are *distances*: higher score => predicted fraudulent. The curve
sweeps the threshold over all observed score values.
"""
from __future__ import annotations

import numpy as np


def roc_curve(scores: np.ndarray, labels: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """(fpr, tpr) arrays, threshold swept from +inf down.

    ``labels`` are booleans (True = positive/fraud); ties in score are
    handled by processing all tied scores at once (standard ROC).
    """
    scores = np.asarray(scores, dtype=float)
    labels = np.asarray(labels, dtype=bool)
    order = np.argsort(-scores, kind="stable")
    s = scores[order]
    y = labels[order]
    tp = np.cumsum(y)
    fp = np.cumsum(~y)
    # Keep only the last index of each tied score block.
    distinct = np.r_[s[1:] != s[:-1], True]
    tp = tp[distinct]
    fp = fp[distinct]
    p = labels.sum()
    n = (~labels).sum()
    tpr = np.r_[0.0, tp / p] if p else np.r_[0.0, np.zeros(len(tp))]
    fpr = np.r_[0.0, fp / n] if n else np.r_[0.0, np.zeros(len(fp))]
    return fpr, tpr


def auc(fpr: np.ndarray, tpr: np.ndarray) -> float:
    """Area under the ROC curve (trapezoid rule)."""
    return float(np.trapz(tpr, fpr))

"""Evaluation criteria from Section VI-A2.

RMS error over masked cells; the R^2-style sparsity (R^2_S) and
heterogeneity (R^2_H) coefficients of determination, measured against a
per-attribute mean baseline; clustering purity; classification F1.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def rms(truth: np.ndarray, pred: np.ndarray) -> float:
    truth = np.asarray(truth, dtype=np.float64)
    pred = np.asarray(pred, dtype=np.float64)
    if truth.shape != pred.shape:
        raise ValueError("shape mismatch")
    return float(np.sqrt(np.mean((truth - pred) ** 2)))


def r2_against_mean(
    truth: np.ndarray, pred: np.ndarray, baseline_mean: np.ndarray
) -> float:
    """Coefficient of determination 1 - SSE/SS_tot where SS_tot measures
    the truth against the per-cell mean of the complete relation's
    attribute (``baseline_mean`` aligned with truth). Used for R^2_S
    (pred = kNN imputations) and R^2_H (pred = GLR imputations)."""
    truth = np.asarray(truth, dtype=np.float64)
    sse = ((truth - np.asarray(pred, dtype=np.float64)) ** 2).sum()
    sst = ((truth - np.asarray(baseline_mean, dtype=np.float64)) ** 2).sum()
    if sst <= 0:
        return 1.0
    return float(1.0 - sse / sst)


def purity(truth_labels: np.ndarray, pred_labels: np.ndarray) -> float:
    """Clustering purity: per predicted cluster, count the most common
    truth class; sum over clusters / n."""
    truth_labels = np.asarray(truth_labels)
    pred_labels = np.asarray(pred_labels)
    if len(truth_labels) != len(pred_labels):
        raise ValueError("length mismatch")
    total = 0
    for c in np.unique(pred_labels):
        members = truth_labels[pred_labels == c]
        if len(members):
            total += pd.Series(members).value_counts().iloc[0]
    return float(total) / len(truth_labels)


def f1_binary(y_true: np.ndarray, y_pred: np.ndarray, positive=1) -> float:
    y_true = np.asarray(y_true)
    y_pred = np.asarray(y_pred)
    tp = int(((y_pred == positive) & (y_true == positive)).sum())
    fp = int(((y_pred == positive) & (y_true != positive)).sum())
    fn = int(((y_pred != positive) & (y_true == positive)).sum())
    if 2 * tp + fp + fn == 0:
        return 0.0
    return 2 * tp / (2 * tp + fp + fn)


def f1_weighted(y_true: np.ndarray, y_pred: np.ndarray) -> float:
    """Class-frequency-weighted F1 (Weka's reported "weighted avg")."""
    y_true = np.asarray(y_true)
    classes, counts = np.unique(y_true, return_counts=True)
    score = 0.0
    for cls, cnt in zip(classes, counts):
        score += (cnt / len(y_true)) * f1_binary(y_true, y_pred, positive=cls)
    return float(score)

"""kNN classifier with Weka-ibk-style missing-value handling.

Table VII's classification application uses Weka's ibk over datasets
with *real* missing values (missing in both train and test folds).
Weka normalizes attributes to [0, 1] by train min/max and defines the
per-attribute difference for missing values as: both missing -> 1;
one missing -> max(v, 1 - v) of the observed normalized value. This
module reproduces that convention so the "Missing" (no-imputation)
column of Table VII is meaningful.
"""
from __future__ import annotations

import numpy as np


class IBk:
    def __init__(self, k: int = 5):
        self.k = k

    def fit(self, X: np.ndarray, y: np.ndarray) -> "IBk":
        X = np.atleast_2d(np.asarray(X, dtype=np.float64))
        self.min_ = np.nanmin(X, axis=0)
        rng = np.nanmax(X, axis=0) - self.min_
        rng[~np.isfinite(rng)] = 1.0
        rng[rng == 0] = 1.0
        self.range_ = rng
        self.Xn_ = self._norm(X)
        self.y_ = np.asarray(y)
        self.classes_ = np.unique(self.y_[~_isnan_obj(self.y_)])
        return self

    def _norm(self, X: np.ndarray) -> np.ndarray:
        # NaN propagates through clip, preserving missingness markers.
        return np.clip((X - self.min_) / self.range_, 0.0, 1.0)

    def _diff(self, Q: np.ndarray) -> np.ndarray:
        """(nq, nt) squared distances with Weka missing-diff rules."""
        T = self.Xn_
        nq, p = Q.shape
        d2 = np.zeros((nq, T.shape[0]))
        for a in range(p):
            q = Q[:, a][:, None]
            t = T[:, a][None, :]
            qn = np.isnan(q)
            tn = np.isnan(t)
            diff = np.abs(q - t)
            # one side missing -> max(v, 1-v) of the observed value
            only_t_missing = (~qn) & tn
            only_q_missing = qn & (~tn)
            both = qn & tn
            vq = np.broadcast_to(np.maximum(q, 1 - q), diff.shape)
            vt = np.broadcast_to(np.maximum(t, 1 - t), diff.shape)
            diff = np.where(only_t_missing, vq, diff)
            diff = np.where(only_q_missing, vt, diff)
            diff = np.where(both, 1.0, diff)
            d2 += diff**2
        return d2

    def predict(self, X: np.ndarray) -> np.ndarray:
        Q = self._norm(np.atleast_2d(np.asarray(X, dtype=np.float64)))
        d2 = self._diff(Q)
        k = min(self.k, d2.shape[1])
        idx = np.argsort(d2, axis=1, kind="stable")[:, :k]
        out = []
        for row in idx:
            labels = self.y_[row]
            vals, counts = np.unique(labels, return_counts=True)
            out.append(vals[int(np.argmax(counts))])
        return np.asarray(out)


def _isnan_obj(y: np.ndarray) -> np.ndarray:
    try:
        return np.isnan(y.astype(np.float64))
    except (TypeError, ValueError):
        return np.zeros(len(y), dtype=bool)

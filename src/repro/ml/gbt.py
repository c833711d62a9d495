"""Gradient-boosted regression trees (substrate for the XGB baseline).

Squared-loss gradient boosting over exact-greedy regression trees —
the core of what R's xgboost does for `reg:squarederror` (without the
second-order/histogram machinery, which does not change which method
family wins at the paper's data sizes). Deterministic in ``seed``
(used for optional column subsampling).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class _Node:
    feature: int = -1
    threshold: float = 0.0
    value: float = 0.0
    left: "_Node | None" = None
    right: "_Node | None" = None

    @property
    def is_leaf(self) -> bool:
        return self.left is None


def _best_split(X: np.ndarray, g: np.ndarray, feats: np.ndarray, min_leaf: int, lam: float):
    """Best (feature, threshold, gain) for residuals g; None if no split
    improves the squared-error objective."""
    n = len(g)
    total = g.sum()
    parent = (total**2) / (n + lam)
    best = (None, 0.0, 0.0)
    for f in feats:
        order = np.argsort(X[:, f], kind="stable")
        xs, gs = X[order, f], g[order]
        csum = np.cumsum(gs)[:-1]
        nl = np.arange(1, n)
        valid = xs[1:] != xs[:-1]
        nl_ok = (nl >= min_leaf) & ((n - nl) >= min_leaf) & valid
        if not nl_ok.any():
            continue
        gain = (
            csum**2 / (nl + lam)
            + (total - csum) ** 2 / (n - nl + lam)
            - parent
        )
        gain[~nl_ok] = -np.inf
        j = int(np.argmax(gain))
        if gain[j] > best[2] + 1e-12:
            thr = 0.5 * (xs[j] + xs[j + 1])
            best = (int(f), float(thr), float(gain[j]))
    return best


def _build(X, g, depth, max_depth, min_leaf, lam, feats) -> _Node:
    node = _Node(value=g.sum() / (len(g) + lam))
    if depth >= max_depth or len(g) < 2 * min_leaf:
        return node
    f, thr, gain = _best_split(X, g, feats, min_leaf, lam)
    if f is None:
        return node
    mask = X[:, f] <= thr
    node.feature, node.threshold = f, thr
    node.left = _build(X[mask], g[mask], depth + 1, max_depth, min_leaf, lam, feats)
    node.right = _build(X[~mask], g[~mask], depth + 1, max_depth, min_leaf, lam, feats)
    return node


def _predict_tree(node: _Node, X: np.ndarray) -> np.ndarray:
    if node.is_leaf:
        return np.full(X.shape[0], node.value)
    mask = X[:, node.feature] <= node.threshold
    out = np.empty(X.shape[0])
    out[mask] = _predict_tree(node.left, X[mask])
    out[~mask] = _predict_tree(node.right, X[~mask])
    return out


@dataclass
class GBTRegressor:
    n_estimators: int = 50
    max_depth: int = 3
    learning_rate: float = 0.3
    min_samples_leaf: int = 2
    reg_lambda: float = 1.0
    colsample: float = 1.0
    seed: int = 0
    trees_: list = field(default_factory=list, repr=False)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "GBTRegressor":
        X = np.atleast_2d(np.asarray(X, dtype=np.float64))
        y = np.asarray(y, dtype=np.float64)
        rng = np.random.default_rng(self.seed)
        self.base_ = float(y.mean())
        pred = np.full(len(y), self.base_)
        self.trees_ = []
        p = X.shape[1]
        n_feats = max(1, int(round(self.colsample * p)))
        for _ in range(self.n_estimators):
            resid = y - pred  # negative gradient of squared loss
            feats = (
                np.arange(p)
                if n_feats == p
                else np.sort(rng.choice(p, size=n_feats, replace=False))
            )
            tree = _build(
                X, resid, 0, self.max_depth, self.min_samples_leaf, self.reg_lambda, feats
            )
            self.trees_.append(tree)
            pred = pred + self.learning_rate * _predict_tree(tree, X)
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        X = np.atleast_2d(np.asarray(X, dtype=np.float64))
        out = np.full(X.shape[0], self.base_)
        for tree in self.trees_:
            out += self.learning_rate * _predict_tree(tree, X)
        return out

"""Fuzzy c-means clustering (substrate for IFC [27]).

Standard Bezdek FCM with fuzzifier ``fuzz`` (default 2.0): memberships
u_ic proportional to (1/d_ic^2)^(1/(fuzz-1)), centers are
membership^fuzz-weighted means. Deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np


class FuzzyCMeans:
    def __init__(
        self,
        c: int,
        *,
        fuzz: float = 2.0,
        max_iter: int = 100,
        tol: float = 1e-6,
        seed: int = 0,
    ):
        if fuzz <= 1:
            raise ValueError("fuzzifier must be > 1")
        self.c = c
        self.fuzz = fuzz
        self.max_iter = max_iter
        self.tol = tol
        self.seed = seed
        self.centers_: np.ndarray | None = None

    def _memberships(self, X: np.ndarray, C: np.ndarray) -> np.ndarray:
        d2 = ((X[:, None, :] - C[None, :, :]) ** 2).sum(-1)
        d2 = np.maximum(d2, 1e-12)
        inv = d2 ** (-1.0 / (self.fuzz - 1.0))
        return inv / inv.sum(axis=1, keepdims=True)

    def fit(self, X: np.ndarray) -> "FuzzyCMeans":
        X = np.asarray(X, dtype=np.float64)
        rng = np.random.default_rng(self.seed)
        c = min(self.c, X.shape[0])
        C = X[rng.choice(X.shape[0], size=c, replace=False)]
        for _ in range(self.max_iter):
            U = self._memberships(X, C) ** self.fuzz
            newC = (U.T @ X) / U.sum(axis=0)[:, None]
            if np.abs(newC - C).max() < self.tol:
                C = newC
                break
            C = newC
        self.centers_ = C
        return self

    def memberships(self, X: np.ndarray) -> np.ndarray:
        """(n, c) membership matrix for new points; rows sum to 1."""
        if self.centers_ is None:
            raise RuntimeError("fit first")
        return self._memberships(np.asarray(X, dtype=np.float64), self.centers_)

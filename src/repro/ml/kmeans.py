"""Lloyd k-means with k-means++ seeding (substrate for Weka's kmeans).

Used by the Table VII clustering application (truth clusters on the
original data, re-clustering after imputation) and as a building block
for tests. Deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np


def _pp_init(X: np.ndarray, k: int, rng: np.random.Generator) -> np.ndarray:
    n = X.shape[0]
    centers = [X[rng.integers(n)]]
    for _ in range(1, k):
        d2 = np.min(
            ((X[:, None, :] - np.asarray(centers)[None, :, :]) ** 2).sum(-1), axis=1
        )
        tot = d2.sum()
        if tot <= 0:
            centers.append(X[rng.integers(n)])
            continue
        centers.append(X[rng.choice(n, p=d2 / tot)])
    return np.asarray(centers)


class KMeans:
    """Plain Lloyd iterations; empty clusters are re-seeded to the point
    farthest from its center."""

    def __init__(self, k: int, *, max_iter: int = 100, tol: float = 1e-7, seed: int = 0):
        self.k = k
        self.max_iter = max_iter
        self.tol = tol
        self.seed = seed
        self.centers_: np.ndarray | None = None

    def fit(self, X: np.ndarray) -> "KMeans":
        X = np.asarray(X, dtype=np.float64)
        rng = np.random.default_rng(self.seed)
        k = min(self.k, X.shape[0])
        C = _pp_init(X, k, rng)
        for _ in range(self.max_iter):
            lab = self._assign(X, C)
            newC = C.copy()
            for c in range(k):
                mask = lab == c
                if mask.any():
                    newC[c] = X[mask].mean(axis=0)
                else:  # re-seed an empty cluster
                    d2 = ((X - C[lab]) ** 2).sum(1)
                    newC[c] = X[int(np.argmax(d2))]
            if np.abs(newC - C).max() < self.tol:
                C = newC
                break
            C = newC
        self.centers_ = C
        return self

    @staticmethod
    def _assign(X: np.ndarray, C: np.ndarray) -> np.ndarray:
        d2 = ((X[:, None, :] - C[None, :, :]) ** 2).sum(-1)
        return d2.argmin(axis=1)

    def predict(self, X: np.ndarray) -> np.ndarray:
        if self.centers_ is None:
            raise RuntimeError("fit first")
        return self._assign(np.asarray(X, dtype=np.float64), self.centers_)

    def fit_predict(self, X: np.ndarray) -> np.ndarray:
        return self.fit(X).predict(X)

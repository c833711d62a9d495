"""Ridge-regression linear algebra for IIM.

Implements the paper's Formulas 5-7 (ridge over a neighbor set), the
single-neighbor rule of Section III-A2, and the incremental U/V
computation of Proposition 3 (Formulas 15-21), which turns the cost of
learning the model at neighbor count ``l+h`` from O(m^2 (l+h)) into
O(m^2 h) given the model state at ``l``.

All functions are pure numpy so they can run inside Spark python
workers (mapInPandas) as well as on the driver.
"""
from __future__ import annotations

import numpy as np

#: Default ridge regularizer. Example 2/6 in the paper print parameters
#: that match plain OLS to two decimals, so alpha is effectively ~0; a
#: tiny positive value keeps U + alpha*E invertible when neighbors are
#: collinear (e.g. duplicated tuples).
DEFAULT_ALPHA = 1e-6


def design(X: np.ndarray) -> np.ndarray:
    """Prepend the intercept column of ones (Formula 7's X matrix)."""
    X = np.asarray(X, dtype=np.float64)
    if X.ndim == 1:
        X = X[:, None]
    return np.hstack([np.ones((X.shape[0], 1)), X])


def ridge_solve(U: np.ndarray, V: np.ndarray, alpha: float = DEFAULT_ALPHA) -> np.ndarray:
    """phi = (U + alpha*E)^-1 V  (Formula 19). U = X^T X, V = X^T Y."""
    m = U.shape[0]
    return np.linalg.solve(U + alpha * np.eye(m), V)


def ridge_fit(X: np.ndarray, y: np.ndarray, alpha: float = DEFAULT_ALPHA) -> np.ndarray:
    """Fit ridge regression y ~ (1, X) phi (Formula 5). Returns phi (m,)."""
    Xd = design(X)
    return ridge_solve(Xd.T @ Xd, Xd.T @ np.asarray(y, dtype=np.float64), alpha)


def predict(X: np.ndarray, phi: np.ndarray) -> np.ndarray:
    """Evaluate (1, X) @ phi (Formula 4/9) for rows of X."""
    return design(X) @ np.asarray(phi, dtype=np.float64)


def single_neighbor_phi(y_self: float, m: int) -> np.ndarray:
    """The l=1 rule (Section III-A2): phi[C] = t_i[A_m], slopes = 0."""
    phi = np.zeros(m, dtype=np.float64)
    phi[0] = float(y_self)
    return phi


class IncrementalRidge:
    """Stateful U/V accumulator implementing Proposition 3.

    ``add(X_delta, y_delta)`` folds a batch of h new neighbors into U and
    V in O(m^2 h); ``phi(alpha)`` solves Formula 19 in O(m^3), both
    independent of the number l of neighbors already absorbed.
    """

    def __init__(self, m: int):
        self.m = m  # parameter dimension incl. intercept
        self.U = np.zeros((m, m), dtype=np.float64)
        self.V = np.zeros(m, dtype=np.float64)
        self.count = 0

    def add(self, X_delta: np.ndarray, y_delta: np.ndarray) -> "IncrementalRidge":
        """Absorb the neighbor increment (Formulas 20-21)."""
        Xd = design(X_delta)
        if Xd.shape[1] != self.m:
            raise ValueError(f"expected {self.m - 1} features, got {Xd.shape[1] - 1}")
        self.U += Xd.T @ Xd
        self.V += Xd.T @ np.asarray(y_delta, dtype=np.float64)
        self.count += Xd.shape[0]
        return self

    def phi(self, alpha: float = DEFAULT_ALPHA) -> np.ndarray:
        return ridge_solve(self.U, self.V, alpha)


def make_grid(n: int, h: int = 1, l_max: int | None = None) -> np.ndarray:
    """Candidate neighbor counts {1, 1+h, 1+2h, ...} <= min(n, l_max).

    Stepping h trades accuracy for speed (Section V-A2). The grid always
    contains 1 and the cap, so the kNN-like and most-global candidates
    are both available to the adaptive selector.
    """
    if n < 1:
        raise ValueError("need at least one tuple")
    cap = n if l_max is None else min(n, l_max)
    if h < 1:
        raise ValueError("stepping h must be >= 1")
    grid = np.arange(1, cap + 1, h)
    if grid[-1] != cap:
        grid = np.append(grid, cap)
    return grid.astype(np.int64)


def prefix_params(
    X_sorted: np.ndarray,
    y_sorted: np.ndarray,
    grid: np.ndarray,
    alpha: float = DEFAULT_ALPHA,
) -> np.ndarray:
    """Candidate models phi^(l) for every l in ``grid`` — incremental.

    ``X_sorted``/``y_sorted`` are a tuple's neighbors ordered by
    ascending distance (self first). Between consecutive grid points the
    U/V state is updated with only the delta rows (Proposition 3), so
    the whole sweep costs O(m^2 n + |grid| m^3) instead of
    O(sum_l m^2 l). Returns a (|grid|, m) parameter matrix; grid point
    l=1 uses the single-neighbor rule.
    """
    X_sorted = np.asarray(X_sorted, dtype=np.float64)
    if X_sorted.ndim == 1:
        X_sorted = X_sorted[:, None]
    y_sorted = np.asarray(y_sorted, dtype=np.float64)
    n, p = X_sorted.shape
    m = p + 1
    grid = np.asarray(grid, dtype=np.int64)
    if grid[-1] > n:
        raise ValueError(f"grid max {grid[-1]} exceeds n={n}")

    acc = IncrementalRidge(m)
    Us = np.empty((len(grid), m, m))
    Vs = np.empty((len(grid), m))
    prev = 0
    for g, l in enumerate(grid):
        acc.add(X_sorted[prev:l], y_sorted[prev:l])
        prev = int(l)
        Us[g] = acc.U
        Vs[g] = acc.V
    eye = alpha * np.eye(m)
    phis = np.linalg.solve(Us + eye, Vs[..., None])[..., 0]
    if grid[0] == 1:
        phis[0] = single_neighbor_phi(y_sorted[0], m)
    return phis


def prefix_params_scratch(
    X_sorted: np.ndarray,
    y_sorted: np.ndarray,
    grid: np.ndarray,
    alpha: float = DEFAULT_ALPHA,
) -> np.ndarray:
    """Same as :func:`prefix_params` but recomputing U/V from scratch at
    every grid point (the straightforward Algorithm 1 loop). Kept as the
    baseline for Table III's from-scratch column and as a correctness
    cross-check for the incremental path.
    """
    X_sorted = np.asarray(X_sorted, dtype=np.float64)
    if X_sorted.ndim == 1:
        X_sorted = X_sorted[:, None]
    y_sorted = np.asarray(y_sorted, dtype=np.float64)
    m = X_sorted.shape[1] + 1
    out = np.empty((len(grid), m))
    for g, l in enumerate(np.asarray(grid, dtype=np.int64)):
        if l == 1:
            out[g] = single_neighbor_phi(y_sorted[0], m)
        else:
            out[g] = ridge_fit(X_sorted[:l], y_sorted[:l], alpha)
    return out

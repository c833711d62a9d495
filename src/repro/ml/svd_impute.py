"""SVDimpute (Troyanskaya et al. [38]) substrate.

Fit: standardize the complete relation, take the ``q`` most significant
right singular vectors ("eigengenes"). Impute: regress the incomplete
tuple's observed coordinates onto the eigenvectors restricted to the
observed attributes, then reconstruct the missing coordinate from the
fitted combination.
"""
from __future__ import annotations

import numpy as np


class SVDImputer:
    def __init__(self, q: int | None = None):
        #: number of retained eigenvectors; default ~25% of attributes
        #: (Troyanskaya's recommended regime), at least 1.
        self.q = q

    def fit(self, M: np.ndarray) -> "SVDImputer":
        M = np.asarray(M, dtype=np.float64)
        n, m = M.shape
        if m < 2:
            raise ValueError("SVDimpute needs at least 2 attributes")
        self.mean_ = M.mean(axis=0)
        self.std_ = M.std(axis=0)
        self.std_[self.std_ == 0] = 1.0
        Z = (M - self.mean_) / self.std_
        q = self.q or max(1, round(0.25 * m))
        q = min(q, m - 1, n - 1)
        _, _, Vt = np.linalg.svd(Z, full_matrices=False)
        self.V_ = Vt[:q].T  # (m, q)
        return self

    def impute(self, X_obs: np.ndarray, obs_idx: np.ndarray, miss_idx: int) -> np.ndarray:
        """Impute attribute ``miss_idx`` for rows whose observed attribute
        values (columns ``obs_idx``) are ``X_obs`` (n x |obs|)."""
        X_obs = np.atleast_2d(np.asarray(X_obs, dtype=np.float64))
        z = (X_obs - self.mean_[obs_idx]) / self.std_[obs_idx]
        Vo = self.V_[obs_idx]  # (|obs|, q)
        # least-squares coefficients per row: c = argmin ||Vo c - z||
        c, *_ = np.linalg.lstsq(Vo, z.T, rcond=None)  # (q, n)
        recon = self.V_[miss_idx] @ c  # (n,)
        return recon * self.std_[miss_idx] + self.mean_[miss_idx]

"""Missing-value injection following the paper's protocol (Section VI-A2).

``inject_missing`` picks incomplete tuples (a percentage or a count),
blanks one (or more) randomly chosen attribute per tuple, and returns
the masked frame plus the ground-truth table used for RMS scoring.
``cluster_size`` reproduces the Figure-8 setting where incomplete
tuples cluster together (the nearest neighbors of an incomplete tuple
are themselves incomplete).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .generators import ID


def inject_missing(
    pdf: pd.DataFrame,
    *,
    frac: float | None = 0.05,
    count: int | None = None,
    attrs: list[str] | None = None,
    fixed_attr: str | None = None,
    n_attrs: int = 1,
    cluster_size: int | None = None,
    seed: int = 0,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Mask values in ``pdf`` and return (masked, truth).

    ``truth`` has columns (row_id, attr, truth) — one row per masked
    cell. ``fixed_attr`` masks the same attribute everywhere (Table VI);
    otherwise each chosen tuple loses ``n_attrs`` random attributes from
    ``attrs`` (default: all non-id, non-label columns).
    """
    rng = np.random.default_rng(seed)
    cols = attrs or [c for c in pdf.columns if c not in (ID, "label")]
    n = len(pdf)
    n_x = count if count is not None else max(1, int(round(frac * n)))
    n_x = min(n_x, n - 1)  # keep at least one complete tuple

    if cluster_size and cluster_size > 1:
        # pick seeds, then their nearest rows (euclidean over cols) join them
        n_seeds = max(1, n_x // cluster_size)
        seeds = rng.choice(n, size=n_seeds, replace=False)
        X = pdf[cols].to_numpy(np.float64)
        chosen: list[int] = []
        for s in seeds:
            d = ((X - X[s]) ** 2).sum(axis=1)
            chosen.extend(np.argsort(d, kind="stable")[:cluster_size].tolist())
        rows = np.unique(np.asarray(chosen[:n_x], dtype=np.int64))
    else:
        rows = rng.choice(n, size=n_x, replace=False)

    masked = pdf.copy()
    records = []
    for row in np.sort(rows):
        if fixed_attr is not None:
            hit = [fixed_attr]
        else:
            hit = list(rng.choice(cols, size=min(n_attrs, len(cols)), replace=False))
        for a in hit:
            records.append((int(pdf[ID].iloc[row]), a, float(pdf[a].iloc[row])))
            masked.loc[masked.index[row], a] = np.nan
    truth = pd.DataFrame(records, columns=[ID, "attr", "truth"])
    return masked, truth


def split_complete(masked: pd.DataFrame, attrs: list[str]) -> pd.DataFrame:
    """Rows of ``masked`` with no missing value on ``attrs`` (the paper's
    complete relation r)."""
    return masked[~masked[attrs].isna().any(axis=1)].reset_index(drop=True)

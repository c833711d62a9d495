"""Matrix-factorization / tuple-regression baselines: SVD [38], ILLS [8].

Both need at least 2 complete attributes to be meaningful; the harness
reports them as unavailable ("-") on the 2-attribute SN dataset exactly
as the paper does.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from ..core.nn import collect_relation, knn_numpy
from ..ml.svd_impute import SVDImputer
from .common import map_impute


def svd_impute(
    spark: SparkSession,
    r: DataFrame,
    incomplete: DataFrame,
    F: Sequence[str],
    A_x: str,
    *,
    q: int | None = None,
) -> DataFrame:
    """SVDimpute: project onto the q most significant eigengenes of the
    complete relation and reconstruct the missing coordinate."""
    rel = collect_relation(r, F, A_x)
    p = rel.X.shape[1]
    M = np.hstack([rel.X, rel.y[:, None]])  # attribute order: F..., A_x
    imp = SVDImputer(q).fit(M)
    obs_idx = np.arange(p)

    def batch(payload, Q: np.ndarray) -> np.ndarray:
        imp_, obs = payload
        return imp_.impute(Q, obs, p)

    return map_impute(spark, incomplete, F, (imp, obs_idx), batch)


def ills_impute(
    spark: SparkSession,
    r: DataFrame,
    incomplete: DataFrame,
    F: Sequence[str],
    A_x: str,
    *,
    k: int = 10,
    iterations: int = 3,
) -> DataFrame:
    """Iterated Local Least Squares: express t_x[F] as a least-squares
    combination of its k neighbors' F-vectors and apply the same
    combination to their A_x values; iterate with distances refined over
    the full schema using the current imputations.
    """
    rel = collect_relation(r, F, A_x)
    inc = incomplete.select("row_id", *F).toPandas().sort_values("row_id")
    Q = inc[list(F)].to_numpy(np.float64)
    kk = min(k, rel.n)

    full_R = np.hstack([rel.X, rel.y[:, None]])
    est = None
    for it in range(max(1, iterations)):
        if it == 0 or est is None:
            idx, _ = knn_numpy(Q, rel.X, kk, r_ids=rel.ids)
        else:  # refine neighbors using the imputed full tuples
            Qfull = np.hstack([Q, est[:, None]])
            idx, _ = knn_numpy(Qfull, full_R, kk, r_ids=rel.ids)
        est = np.empty(len(Q))
        for qi in range(len(Q)):
            N = rel.X[idx[qi]]  # (k, |F|)
            w, *_ = np.linalg.lstsq(N.T, Q[qi], rcond=None)
            est[qi] = float(w @ rel.y[idx[qi]])
    # Driver-side result: the iteration couples all incomplete tuples
    # through the refined-distance step, so it cannot stream per batch.
    import pandas as pd

    out = pd.DataFrame(
        {"row_id": inc["row_id"].to_numpy(np.int64), "imputed": est}
    )
    return spark.createDataFrame(out)

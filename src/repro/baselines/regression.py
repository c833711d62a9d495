"""Attribute-model baselines: GLR [23], LOESS [10], BLR [29] (mice.norm),
ERACER [25], PMM [19] (mice.pmm).

GLR is fitted as a genuine distributed Catalyst plan: the normal-
equation sufficient statistics U = sum(x x^T), V = sum(x y) are computed
with DataFrame aggregations, solved on the driver, and the prediction
(1, t_x[F]) phi is a pure column expression — no data is collected.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np
from pyspark.sql import DataFrame, SparkSession, functions as F_

from ..core import linalg
from ..core.nn import ID, collect_relation, knn_numpy
from .common import map_impute


def glr_fit(
    r: DataFrame, F: Sequence[str], A_x: str, *, alpha: float = linalg.DEFAULT_ALPHA
) -> np.ndarray:
    """Fit the global ridge regression F -> A_x with Spark aggregations.

    Builds every entry of X^T X and X^T Y as a sum-of-products column
    (one aggregate row), then solves (U + alpha E) phi = V on the driver.
    """
    terms = [F_.lit(1.0).alias("_one")] + [F_.col(a) for a in F]
    names = ["_one"] + list(F)
    aggs = []
    m = len(names)
    for i in range(m):
        for j in range(i, m):
            aggs.append(F_.sum(terms[i] * terms[j]).alias(f"u_{i}_{j}"))
    for i in range(m):
        aggs.append(F_.sum(terms[i] * F_.col(A_x)).alias(f"v_{i}"))
    row = r.agg(*aggs).collect()[0]
    U = np.empty((m, m))
    V = np.empty(m)
    for i in range(m):
        for j in range(i, m):
            U[i, j] = U[j, i] = row[f"u_{i}_{j}"]
        V[i] = row[f"v_{i}"]
    return linalg.ridge_solve(U, V, alpha)


def glr_predict_expr(phi: np.ndarray, F: Sequence[str]):
    """Column expression (1, t[F]) @ phi."""
    expr = F_.lit(float(phi[0]))
    for coef, a in zip(phi[1:], F):
        expr = expr + F_.lit(float(coef)) * F_.col(a)
    return expr


def glr_impute(
    spark: SparkSession,
    r: DataFrame,
    incomplete: DataFrame,
    F: Sequence[str],
    A_x: str,
    *,
    alpha: float = linalg.DEFAULT_ALPHA,
) -> DataFrame:
    """Global linear (ridge) regression imputation (Formula 4)."""
    phi = glr_fit(r, F, A_x, alpha=alpha)
    return incomplete.select(ID, glr_predict_expr(phi, F).alias("imputed"))


def loess_impute(
    spark: SparkSession,
    r: DataFrame,
    incomplete: DataFrame,
    F: Sequence[str],
    A_x: str,
    *,
    span: float = 0.3,
    alpha: float = linalg.DEFAULT_ALPHA,
) -> DataFrame:
    """Local regression: tricube-weighted linear fit over the span*n
    nearest neighbors of each incomplete tuple, evaluated at t_x."""
    rel = collect_relation(r, F, A_x)
    n_loc = min(rel.n, max(len(F) + 2, int(np.ceil(span * rel.n))))

    def batch(rel_, Q: np.ndarray) -> np.ndarray:
        idx, dist = knn_numpy(Q, rel_.X, n_loc, r_ids=rel_.ids)
        out = np.empty(len(Q))
        for qi in range(len(Q)):
            d = dist[qi]
            dmax = d[-1] if d[-1] > 0 else 1.0
            w = (1.0 - np.minimum(d / dmax, 1.0) ** 3) ** 3
            w = np.maximum(w, 1e-9)
            Xd = linalg.design(rel_.X[idx[qi]])
            W = w[:, None]
            U = Xd.T @ (W * Xd)
            V = Xd.T @ (w * rel_.y[idx[qi]])
            phi = linalg.ridge_solve(U, V, alpha)
            out[qi] = linalg.design(Q[qi : qi + 1]) @ phi
        return out

    return map_impute(spark, incomplete, F, rel, batch)


def _bayes_draw(rel, alpha: float, seed: int) -> tuple[np.ndarray, float]:
    """Posterior draw (beta*, sigma*) a la mice.norm's .norm.draw."""
    Xd = linalg.design(rel.X)
    n, m = Xd.shape
    U = Xd.T @ Xd + alpha * np.eye(m)
    beta_hat = np.linalg.solve(U, Xd.T @ rel.y)
    resid = rel.y - Xd @ beta_hat
    dof = max(n - m, 1)
    rng = np.random.default_rng(seed)
    sigma2 = float(resid @ resid) / float(rng.chisquare(dof))
    cov = np.linalg.inv(U) * sigma2
    Lc = np.linalg.cholesky(cov + 1e-12 * np.eye(m))
    beta_star = beta_hat + Lc @ rng.standard_normal(m)
    return beta_star, float(np.sqrt(sigma2))


def blr_impute(
    spark: SparkSession,
    r: DataFrame,
    incomplete: DataFrame,
    F: Sequence[str],
    A_x: str,
    *,
    alpha: float = linalg.DEFAULT_ALPHA,
    seed: int = 0,
) -> DataFrame:
    """Bayesian linear regression (mice.norm): posterior-draw parameters,
    predict, add a residual-scale noise draw per imputed value.

    The per-value noise is seeded by row id so the result is
    deterministic under any partitioning.
    """
    rel = collect_relation(r, F, A_x)
    beta_star, sigma = _bayes_draw(rel, alpha, seed)
    b = spark.sparkContext.broadcast((beta_star, sigma, seed))
    cols = list(F)

    import pandas as pd
    from typing import Iterator

    from ..core.iim import IMPUTED_SCHEMA

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        bs, sg, sd = b.value
        for pdf in batches:
            if len(pdf) == 0:
                continue
            Q = pdf[cols].to_numpy(np.float64)
            ids = pdf[ID].to_numpy(np.int64)
            noise = np.array(
                [np.random.default_rng(sd + 7919 * int(i)).standard_normal() for i in ids]
            )
            vals = linalg.design(Q) @ bs + sg * noise
            yield pd.DataFrame({ID: ids, "imputed": vals})

    src = incomplete.select(ID, *cols).repartition(
        spark.sparkContext.defaultParallelism
    )
    return src.mapInPandas(run, IMPUTED_SCHEMA)


def pmm_impute(
    spark: SparkSession,
    r: DataFrame,
    incomplete: DataFrame,
    F: Sequence[str],
    A_x: str,
    *,
    donors: int = 5,
    alpha: float = linalg.DEFAULT_ALPHA,
    seed: int = 0,
) -> DataFrame:
    """Predictive mean matching (mice.pmm): predict y-hat for queries with
    a posterior-draw regression and for the complete tuples with the OLS
    fit; impute a randomly chosen *observed* value among the ``donors``
    complete tuples whose predictions are closest to the query's."""
    rel = collect_relation(r, F, A_x)
    beta_star, _ = _bayes_draw(rel, alpha, seed)
    Xd = linalg.design(rel.X)
    U = Xd.T @ Xd + alpha * np.eye(Xd.shape[1])
    beta_hat = np.linalg.solve(U, Xd.T @ rel.y)
    yhat_obs = Xd @ beta_hat

    def batch(payload, Q: np.ndarray) -> np.ndarray:
        rel_, bs, yh, d, sd = payload
        yq = linalg.design(Q) @ bs
        out = np.empty(len(Q))
        for qi in range(len(Q)):
            gaps = np.abs(yh - yq[qi])
            cand = np.argsort(gaps, kind="stable")[: min(d, rel_.n)]
            rng = np.random.default_rng(sd + 104729 * qi)
            out[qi] = rel_.y[int(rng.choice(cand))]
        return out

    return map_impute(
        spark, incomplete, F, (rel, beta_star, yhat_obs, donors, seed), batch
    )


def eracer_impute(
    spark: SparkSession,
    r: DataFrame,
    incomplete: DataFrame,
    F: Sequence[str],
    A_x: str,
    *,
    k: int = 10,
    alpha: float = linalg.DEFAULT_ALPHA,
) -> DataFrame:
    """ERACER-style relational regression: A_x modeled linearly from the
    tuple's own F *and* its neighbors' aggregated attributes (means of
    F and of A_x over the k nearest complete neighbors) — the g+h
    combination of Figure 2. Simplification of the full ERACER graphical
    model documented in DESIGN.md."""
    rel = collect_relation(r, F, A_x)
    kk = min(k, max(1, rel.n - 1))
    # training features: neighbors exclude self so y never leaks directly
    idx, _ = knn_numpy(rel.X, rel.X, kk, r_ids=rel.ids, exclude_ids=rel.ids)
    nb_F = rel.X[idx].mean(axis=1)
    nb_y = rel.y[idx].mean(axis=1)
    feats = np.hstack([rel.X, nb_F, nb_y[:, None]])
    phi = linalg.ridge_fit(feats, rel.y, alpha)

    def batch(payload, Q: np.ndarray) -> np.ndarray:
        rel_, ph, kk_ = payload
        qidx, _ = knn_numpy(Q, rel_.X, kk_, r_ids=rel_.ids)
        qf = np.hstack([Q, rel_.X[qidx].mean(axis=1), rel_.y[qidx].mean(axis=1)[:, None]])
        return linalg.design(qf) @ ph

    return map_impute(spark, incomplete, F, (rel, phi, kk), batch)

"""Tuple-model baselines: Mean [14], kNN [2][5], kNNE [13].

Mean and kNN also ship pure-Catalyst (SQL) variants that the tests
check against the DuckDB oracle; the default engine is the broadcast
numpy path used by the experiment harness.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np
from pyspark.sql import DataFrame, SparkSession, functions as F_

from ..core.nn import ID, Relation, collect_relation, knn_join, knn_numpy
from .common import map_impute


def mean_impute(
    spark: SparkSession,
    r: DataFrame,
    incomplete: DataFrame,
    F: Sequence[str],
    A_x: str,
) -> DataFrame:
    """Global column average of A_x over all complete tuples — a pure
    Catalyst plan (aggregate + crossJoin of the scalar)."""
    mean_df = r.agg(F_.avg(A_x).alias("imputed"))
    return incomplete.select(ID).crossJoin(mean_df)


def knn_impute(
    spark: SparkSession,
    r: DataFrame,
    incomplete: DataFrame,
    F: Sequence[str],
    A_x: str,
    *,
    k: int = 10,
    engine: str = "broadcast",
) -> DataFrame:
    """Arithmetic mean of the k nearest complete neighbors (Formula 2)."""
    if engine == "sql":
        nn = knn_join(incomplete, r, F, k)
        vals = r.select(F_.col(ID).alias("n_id"), F_.col(A_x).alias("_y"))
        return (
            nn.join(vals, "n_id")
            .groupBy("q_id")
            .agg(F_.avg("_y").alias("imputed"))
            .withColumnRenamed("q_id", ID)
        )
    rel = collect_relation(r, F, A_x)

    def batch(rel_: Relation, Q: np.ndarray) -> np.ndarray:
        idx, _ = knn_numpy(Q, rel_.X, min(k, rel_.n), r_ids=rel_.ids)
        return rel_.y[idx].mean(axis=1)

    return map_impute(spark, incomplete, F, rel, batch)


def knne_impute(
    spark: SparkSession,
    r: DataFrame,
    incomplete: DataFrame,
    F: Sequence[str],
    A_x: str,
    *,
    k: int = 10,
) -> DataFrame:
    """kNN Ensemble: kNN imputations computed on several feature subsets
    (F itself plus every leave-one-out subset), averaged.

    With a single complete attribute there is only one subset and kNNE
    degenerates to kNN, as in the paper's SN column.
    """
    rel = collect_relation(r, F, A_x)
    p = rel.X.shape[1]
    subsets = [tuple(range(p))]
    if p > 1:
        subsets += [tuple(j for j in range(p) if j != drop) for drop in range(p)]

    def batch(payload, Q: np.ndarray) -> np.ndarray:
        rel_, subs = payload
        preds = []
        for s in subs:
            cols = list(s)
            idx, _ = knn_numpy(Q[:, cols], rel_.X[:, cols], min(k, rel_.n), r_ids=rel_.ids)
            preds.append(rel_.y[idx].mean(axis=1))
        return np.mean(preds, axis=0)

    return map_impute(spark, incomplete, F, (rel, subsets), batch)

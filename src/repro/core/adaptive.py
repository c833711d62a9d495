"""Adaptive learning (Algorithm 3) with stepping and incremental U/V.

For every complete tuple t_i, candidate individual models are learned
over a grid of neighbor counts l in {1, 1+h, ...} (stepping, Section
V-A2). Every complete tuple t_j doubles as a validation tuple: its
value y_j is withheld and each of its k nearest neighbors t_i scores
cost[i][l] += (y_j - (1, t_j[F]) phi_i^(l))^2 (Line 7 of Algorithm 3).
Each tuple then keeps the candidate model with the lowest accumulated
validation cost.

Distribution strategy: the relation r is broadcast once; a first Spark
pass computes every tuple's k nearest neighbors (validation
assignments), which are inverted into reverse-kNN lists on the driver
(n*k ids — tiny); a second pass fans the per-tuple candidate sweep out
over executors, with the incremental prefix computation of Proposition
3 inside each task.

``adaptive_reference`` is a literal, driver-side O(n^2 * |grid|)
transcription of Algorithm 3 used by the tests to pin down the
distributed implementation exactly.
"""
from __future__ import annotations

import math
from typing import Iterator, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.types import (
    ArrayType,
    DoubleType,
    LongType,
    StructField,
    StructType,
)

from . import linalg
from .nn import ID, Relation, collect_relation, knn_numpy, pairwise_dist

ADAPTIVE_SCHEMA = StructType(
    [
        StructField(ID, LongType(), False),
        StructField("phi", ArrayType(DoubleType(), False), False),
        StructField("l_star", LongType(), False),
    ]
)

#: Default cap on the learning-neighbor grid: None = search l all the
#: way to n, as in Algorithm 3. (A finite cap trades the ability to
#: recover the global-regression regime, Prop. 2, for speed; the grid
#: stepping below already bounds the sweep cost.)
DEFAULT_L_MAX: int | None = None
#: Grid is thinned so it never exceeds this many candidate l values
#: unless the caller pins h explicitly (paper uses h=50 at n>=10k).
MAX_GRID_POINTS = 64


def auto_step(n: int, l_max: int | None) -> int:
    cap = n if l_max is None else min(n, l_max)
    return max(1, math.ceil(cap / MAX_GRID_POINTS))


def _sorted_neighbor_order(rel: Relation, pos: int) -> np.ndarray:
    """Positions of all tuples ordered by (distance to tuple #pos, id),
    with the tuple itself forced first (it is its own 1-NN)."""
    d = pairwise_dist(rel.X[pos], rel.X)[0]
    d[pos] = -np.inf
    return np.lexsort((rel.ids, d))


def _candidate_models(
    rel: Relation, pos: int, grid: np.ndarray, alpha: float, *, incremental: bool = True
) -> np.ndarray:
    order = _sorted_neighbor_order(rel, pos)
    fn = linalg.prefix_params if incremental else linalg.prefix_params_scratch
    return fn(rel.X[order], rel.y[order], grid, alpha)


def _pick(
    rel: Relation,
    pos: int,
    grid: np.ndarray,
    alpha: float,
    val_pos: np.ndarray,
    *,
    incremental: bool = True,
) -> tuple[np.ndarray, int]:
    """Candidate sweep + validation scoring for one tuple. Returns
    (phi, l_star)."""
    phis = _candidate_models(rel, pos, grid, alpha, incremental=incremental)
    Xv = linalg.design(rel.X[val_pos])  # (V, m)
    err = Xv @ phis.T - rel.y[val_pos][:, None]  # (V, |grid|)
    cost = (err**2).sum(axis=0)
    g = int(np.argmin(cost))  # ties -> smallest l (np.argmin is first-hit)
    return phis[g], int(grid[g])


def _reverse_validation(rel: Relation, nn_idx: np.ndarray, k: int) -> list[np.ndarray]:
    """Invert per-tuple kNN assignments into reverse-kNN validation lists.

    ``nn_idx[j]`` holds positions of NN(t_j, F, k) excluding t_j itself.
    Tuple i's validation set is {j : i in NN(j, k)}; tuples nobody picked
    fall back to their own kNN (so every tuple is validated on *some*
    nearby data rather than defaulting to l=1).
    """
    rev: list[list[int]] = [[] for _ in range(rel.n)]
    for j in range(rel.n):
        for i in nn_idx[j]:
            rev[int(i)].append(j)
    out = []
    for i in range(rel.n):
        v = rev[i] if rev[i] else list(nn_idx[i])
        out.append(np.asarray(sorted(v), dtype=np.int64))
    return out


def _self_knn(rel: Relation, k: int, block: int = 2048) -> np.ndarray:
    """kNN of every tuple within r, excluding itself, computed in query
    blocks so the n x n distance matrix is never materialized at once."""
    kk = min(k, rel.n - 1) if rel.n > 1 else 1
    out = np.empty((rel.n, kk), dtype=np.int64)
    for s in range(0, rel.n, block):
        e = min(s + block, rel.n)
        idx, _ = knn_numpy(
            rel.X[s:e], rel.X, kk,
            r_ids=rel.ids, exclude_ids=rel.ids[s:e], q_ids=rel.ids[s:e],
        )
        out[s:e] = idx
    return out


def adaptive_learn(
    spark: SparkSession,
    r: DataFrame,
    F: Sequence[str],
    A_x: str,
    *,
    k: int = 10,
    h: int | None = None,
    l_max: int | None = DEFAULT_L_MAX,
    alpha: float = linalg.DEFAULT_ALPHA,
    incremental: bool = True,
) -> DataFrame:
    """Distributed Algorithm 3. Returns ``(row_id, phi, l_star)``.

    ``incremental=False`` swaps in the from-scratch candidate sweep (the
    straightforward baseline of Table III / Fig. 12); results are
    identical, only slower — asserted by tests.
    """
    rel = collect_relation(r, F, A_x)
    grid = linalg.make_grid(rel.n, h or auto_step(rel.n, l_max), l_max)
    nn_idx = _self_knn(rel, k)
    val_sets = _reverse_validation(rel, nn_idx, k)
    pos_of_id = {int(i): p for p, i in enumerate(rel.ids)}
    b = spark.sparkContext.broadcast((rel, grid, val_sets, pos_of_id, alpha, incremental))

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        rv, g, vs, pos_of, a, inc = b.value
        for pdf in batches:
            rows = []
            for rid in pdf[ID].to_numpy(np.int64):
                pos = pos_of[int(rid)]
                phi, l_star = _pick(rv, pos, g, a, vs[pos], incremental=inc)
                rows.append((int(rid), phi.tolist(), l_star))
            yield pd.DataFrame(rows, columns=[ID, "phi", "l_star"])

    src = r.select(ID).repartition(spark.sparkContext.defaultParallelism)
    return src.mapInPandas(run, ADAPTIVE_SCHEMA)


def adaptive_reference(
    rel: Relation,
    *,
    k: int = 10,
    h: int = 1,
    l_max: int | None = None,
    alpha: float = linalg.DEFAULT_ALPHA,
) -> pd.DataFrame:
    """Literal driver-side Algorithm 3 (test oracle for adaptive_learn).

    Learns all candidate models from scratch for every l in the grid,
    accumulates cost[i][l] over all validation tuples, falls back to a
    tuple's own kNN when its reverse-kNN set is empty, and returns a
    pandas frame (row_id, phi, l_star).
    """
    n = rel.n
    grid = linalg.make_grid(n, h, l_max)
    # Phi[g][i] = model of tuple i learned over grid[g] neighbors.
    phis = np.empty((len(grid), n, rel.X.shape[1] + 1))
    for i in range(n):
        phis[:, i, :] = _candidate_models(rel, i, grid, alpha, incremental=False)

    nn_idx = _self_knn(rel, k)
    cost = np.zeros((n, len(grid)))
    hit = np.zeros(n, dtype=bool)
    for j in range(n):  # each tuple as validation tuple
        xj = linalg.design(rel.X[j][None, :])[0]
        for i in nn_idx[j]:
            pred = phis[:, int(i), :] @ xj
            cost[int(i)] += (rel.y[j] - pred) ** 2
            hit[int(i)] = True
    for i in np.where(~hit)[0]:  # fallback: validate on own kNN
        xv = linalg.design(rel.X[nn_idx[i]])
        cost[i] = ((xv @ phis[:, i, :].T - rel.y[nn_idx[i]][:, None]) ** 2).sum(axis=0)

    best = cost.argmin(axis=1)
    return pd.DataFrame(
        {
            ID: rel.ids,
            "phi": [phis[best[i], i, :].tolist() for i in range(n)],
            "l_star": grid[best].astype(np.int64),
        }
    )

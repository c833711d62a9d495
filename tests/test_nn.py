"""Nearest-neighbor engines: the Catalyst kNN join vs the broadcast
numpy kNN, plus DuckDB-oracle checks of the distance computation."""
import numpy as np
import pandas as pd
import pytest

from repro.core import nn
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def small_rel(spark):
    rng = np.random.default_rng(7)
    pdf = pd.DataFrame(
        {
            "row_id": np.arange(30, dtype=np.int64),
            "A1": rng.normal(size=30),
            "A2": rng.normal(size=30),
            "A3": rng.normal(size=30),
        }
    )
    return pdf, spark.createDataFrame(pdf)


@pytest.fixture(scope="module")
def queries(spark):
    rng = np.random.default_rng(8)
    pdf = pd.DataFrame(
        {
            "row_id": np.arange(100, 108, dtype=np.int64),
            "A1": rng.normal(size=8),
            "A2": rng.normal(size=8),
            "A3": rng.normal(size=8),
        }
    )
    return pdf, spark.createDataFrame(pdf)


class TestPairwiseDist:
    def test_formula1_normalization(self):
        # Formula 1 divides squared diffs by |F| before the sqrt
        Q = np.array([[0.0, 0.0]])
        R = np.array([[3.0, 4.0]])
        d = nn.pairwise_dist(Q, R)
        np.testing.assert_allclose(d, [[np.sqrt(25 / 2)]])

    def test_zero_self_distance(self):
        X = np.random.default_rng(0).normal(size=(10, 3))
        d = nn.pairwise_dist(X, X)
        np.testing.assert_allclose(np.diag(d), 0.0, atol=1e-7)

    def test_symmetry(self):
        X = np.random.default_rng(1).normal(size=(6, 2))
        d = nn.pairwise_dist(X, X)
        np.testing.assert_allclose(d, d.T, atol=1e-12)

    def test_matches_naive(self):
        rng = np.random.default_rng(2)
        Q, R = rng.normal(size=(4, 3)), rng.normal(size=(9, 3))
        d = nn.pairwise_dist(Q, R)
        naive = np.sqrt(((Q[:, None, :] - R[None, :, :]) ** 2).mean(-1))
        np.testing.assert_allclose(d, naive, atol=1e-9)


class TestKnnNumpy:
    def test_orders_by_distance(self):
        R = np.array([[0.0], [1.0], [2.0], [5.0]])
        idx, dist = nn.knn_numpy(np.array([[0.9]]), R, 3)
        assert idx[0].tolist() == [1, 0, 2]
        assert np.all(np.diff(dist[0]) >= 0)

    def test_tie_break_by_id(self):
        R = np.array([[1.0], [1.0], [1.0]])
        ids = np.array([30, 10, 20])
        idx, _ = nn.knn_numpy(np.array([[1.0]]), R, 3, r_ids=ids)
        assert ids[idx[0]].tolist() == [10, 20, 30]

    def test_exclude_self(self):
        R = np.array([[0.0], [1.0], [2.0]])
        ids = np.array([0, 1, 2])
        idx, _ = nn.knn_numpy(
            R, R, 1, r_ids=ids, exclude_ids=ids, q_ids=ids
        )
        assert not np.any(ids[idx[:, 0]] == ids)

    def test_k_clamped_to_n(self):
        R = np.array([[0.0], [1.0]])
        idx, _ = nn.knn_numpy(np.array([[0.5]]), R, 10)
        assert idx.shape == (1, 2)


@pytest.mark.parametrize("k", [1, 3, 7])
def test_sql_join_matches_numpy(spark, small_rel, queries, k):
    """Both engines return identical neighbor ids in identical order."""
    rel_pdf, rel_df = small_rel
    q_pdf, q_df = queries
    F = ["A1", "A2", "A3"]
    got = (
        nn.knn_join(q_df, rel_df, F, k)
        .toPandas()
        .sort_values(["q_id", "rank"])
        .reset_index(drop=True)
    )
    idx, dist = nn.knn_numpy(
        q_pdf[F].to_numpy(), rel_pdf[F].to_numpy(), k,
        r_ids=rel_pdf["row_id"].to_numpy(),
    )
    exp_nid = rel_pdf["row_id"].to_numpy()[idx].ravel()
    assert got["n_id"].to_numpy().tolist() == exp_nid.tolist()
    np.testing.assert_allclose(got["dist"].to_numpy(), dist.ravel(), atol=1e-9)


def test_sql_join_exclude_self(spark, small_rel):
    rel_pdf, rel_df = small_rel
    F = ["A1", "A2", "A3"]
    got = nn.knn_join(rel_df, rel_df, F, 1, exclude_self=True).toPandas()
    assert not np.any(got["q_id"].to_numpy() == got["n_id"].to_numpy())
    got2 = nn.knn_join(rel_df, rel_df, F, 1, exclude_self=False).toPandas()
    assert np.all(got2["q_id"].to_numpy() == got2["n_id"].to_numpy())


def test_knn_distance_oracle(spark, small_rel, queries):
    """DuckDB recomputes Formula 1 and the rank-k filter; results match."""
    rel_pdf, rel_df = small_rel
    q_pdf, q_df = queries
    F = ["A1", "A2", "A3"]
    got = nn.knn_join(q_df, rel_df, F, 3).select("q_id", "n_id", "rank")
    sql = """
        SELECT q_id, n_id, rank FROM (
          SELECT q.row_id AS q_id, r.row_id AS n_id,
                 ROW_NUMBER() OVER (
                   PARTITION BY q.row_id
                   ORDER BY sqrt(((q.A1-r.A1)^2 + (q.A2-r.A2)^2
                                  + (q.A3-r.A3)^2)/3.0), r.row_id
                 ) AS rank
          FROM q CROSS JOIN r)
        WHERE rank <= 3
    """
    assert_equivalent(got, sql, q=q_pdf, r=rel_pdf)


def test_collect_relation_sorted(spark, small_rel):
    rel_pdf, rel_df = small_rel
    rel = nn.collect_relation(rel_df.orderBy("A2"), ["A1", "A2"], "A3")
    assert np.all(np.diff(rel.ids) > 0)
    assert rel.n == len(rel_pdf)
    row = rel_pdf.set_index("row_id")
    np.testing.assert_allclose(rel.y, row.loc[rel.ids, "A3"].to_numpy())


def test_knn_pairs_numpy_matches_join(spark, small_rel):
    rel_pdf, rel_df = small_rel
    F = ["A1", "A2"]
    rel = nn.collect_relation(rel_df, F, "A3")
    # exclude_self variant equals the SQL join with exclude_self
    pairs = nn.knn_pairs_numpy(rel, 4, exclude_self=True)
    sql_pairs = (
        nn.knn_join(rel_df, rel_df, F, 4, exclude_self=True)
        .toPandas()
        .sort_values(["q_id", "rank"])
        .reset_index(drop=True)
    )
    pairs = pairs.sort_values(["q_id", "rank"]).reset_index(drop=True)
    assert pairs["n_id"].tolist() == sql_pairs["n_id"].tolist()

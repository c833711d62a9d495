"""ML substrates: kmeans, fuzzy c-means, GMM-EM, SVD imputer, gradient
boosted trees, and the ibk kNN classifier with missing-value handling."""
import numpy as np
import pytest

from repro.ml import (
    FuzzyCMeans,
    GBTRegressor,
    GaussianMixture,
    IBk,
    KMeans,
    SVDImputer,
)


def _blobs(n_per=50, centers=((0, 0), (10, 10), (-10, 10)), spread=0.5, seed=0):
    rng = np.random.default_rng(seed)
    X, lab = [], []
    for i, c in enumerate(centers):
        X.append(rng.normal(scale=spread, size=(n_per, len(c))) + np.asarray(c))
        lab.extend([i] * n_per)
    return np.vstack(X), np.asarray(lab)


class TestKMeans:
    def test_recovers_separated_blobs(self):
        X, lab = _blobs()
        pred = KMeans(3, seed=1).fit_predict(X)
        # same-cluster points get the same predicted label
        for c in range(3):
            members = pred[lab == c]
            assert len(np.unique(members)) == 1

    def test_predict_new_points(self):
        X, _ = _blobs()
        km = KMeans(3, seed=2).fit(X)
        p = km.predict(np.array([[0.1, -0.2], [9.5, 10.5]]))
        assert p[0] != p[1]

    def test_deterministic_in_seed(self):
        X, _ = _blobs(seed=3)
        a = KMeans(3, seed=7).fit(X).centers_
        b = KMeans(3, seed=7).fit(X).centers_
        np.testing.assert_allclose(a, b)

    def test_k_clamped(self):
        X = np.array([[0.0, 0.0], [1.0, 1.0]])
        km = KMeans(5, seed=0).fit(X)
        assert km.centers_.shape[0] == 2

    def test_predict_before_fit_raises(self):
        with pytest.raises(RuntimeError):
            KMeans(2).predict(np.zeros((1, 2)))


class TestFuzzyCMeans:
    def test_memberships_sum_to_one(self):
        X, _ = _blobs(seed=4)
        f = FuzzyCMeans(3, seed=0).fit(X)
        U = f.memberships(X)
        np.testing.assert_allclose(U.sum(axis=1), 1.0, atol=1e-9)
        assert np.all(U >= 0)

    def test_blob_points_have_dominant_membership(self):
        X, _ = _blobs(seed=5)
        f = FuzzyCMeans(3, seed=1).fit(X)
        U = f.memberships(X)
        assert (U.max(axis=1) > 0.9).mean() > 0.95

    def test_bad_fuzzifier(self):
        with pytest.raises(ValueError):
            FuzzyCMeans(2, fuzz=1.0)

    def test_centers_near_blob_centers(self):
        X, _ = _blobs(seed=6)
        f = FuzzyCMeans(3, seed=2).fit(X)
        for c in [(0, 0), (10, 10), (-10, 10)]:
            d = np.linalg.norm(f.centers_ - np.asarray(c), axis=1).min()
            assert d < 1.0


class TestGMM:
    def test_responsibilities_sum_to_one(self):
        X, _ = _blobs(seed=7)
        g = GaussianMixture(3, seed=0).fit(X)
        R = g.responsibilities(X)
        np.testing.assert_allclose(R.sum(axis=1), 1.0, atol=1e-9)

    def test_means_near_blob_centers(self):
        X, _ = _blobs(seed=8)
        g = GaussianMixture(3, seed=1).fit(X)
        for c in [(0, 0), (10, 10), (-10, 10)]:
            d = np.linalg.norm(g.means_ - np.asarray(c), axis=1).min()
            assert d < 1.0

    def test_weights_simplex(self):
        X, _ = _blobs(seed=9)
        g = GaussianMixture(3, seed=2).fit(X)
        np.testing.assert_allclose(g.weights_.sum(), 1.0, atol=1e-9)
        assert np.all(g.weights_ > 0)

    def test_hard_assignment_matches_blobs(self):
        X, lab = _blobs(seed=10)
        g = GaussianMixture(3, seed=3).fit(X)
        pred = g.responsibilities(X).argmax(axis=1)
        for c in range(3):
            assert len(np.unique(pred[lab == c])) == 1


class TestSVDImputer:
    def test_recovers_low_rank_missing_entry(self):
        rng = np.random.default_rng(11)
        z = rng.normal(size=(200, 2))
        W = rng.normal(size=(2, 5))
        M = z @ W
        imp = SVDImputer(q=2).fit(M)
        obs = np.array([0, 1, 2, 3])
        got = imp.impute(M[:20, obs], obs, 4)
        np.testing.assert_allclose(got, M[:20, 4], atol=1e-6)

    def test_default_rank(self):
        M = np.random.default_rng(12).normal(size=(50, 8))
        imp = SVDImputer().fit(M)
        assert imp.V_.shape == (8, 2)  # 25% of 8

    def test_needs_two_attrs(self):
        with pytest.raises(ValueError):
            SVDImputer().fit(np.zeros((10, 1)))

    def test_constant_column_no_nan(self):
        M = np.random.default_rng(13).normal(size=(30, 4))
        M[:, 2] = 5.0
        imp = SVDImputer(q=2).fit(M)
        out = imp.impute(M[:5, [0, 1, 2]], np.array([0, 1, 2]), 3)
        assert np.all(np.isfinite(out))


class TestGBT:
    def test_fits_nonlinear_function(self):
        rng = np.random.default_rng(14)
        X = rng.uniform(-3, 3, size=(500, 2))
        y = np.sin(X[:, 0]) * 3 + (X[:, 1] > 0) * 2
        m = GBTRegressor(n_estimators=80, max_depth=3, learning_rate=0.3).fit(X, y)
        rms = np.sqrt(((m.predict(X) - y) ** 2).mean())
        assert rms < 0.35

    def test_beats_constant_baseline(self):
        rng = np.random.default_rng(15)
        X = rng.normal(size=(300, 3))
        y = X[:, 0] * 2 - X[:, 1]
        m = GBTRegressor(n_estimators=50).fit(X, y)
        rms = np.sqrt(((m.predict(X) - y) ** 2).mean())
        assert rms < y.std() * 0.5

    def test_constant_target(self):
        X = np.random.default_rng(16).normal(size=(50, 2))
        m = GBTRegressor(n_estimators=5).fit(X, np.full(50, 3.0))
        np.testing.assert_allclose(m.predict(X), 3.0, atol=1e-9)

    def test_deterministic(self):
        rng = np.random.default_rng(17)
        X, y = rng.normal(size=(100, 2)), rng.normal(size=100)
        a = GBTRegressor(n_estimators=10, seed=5).fit(X, y).predict(X[:10])
        b = GBTRegressor(n_estimators=10, seed=5).fit(X, y).predict(X[:10])
        np.testing.assert_allclose(a, b)

    def test_more_rounds_fit_train_better(self):
        rng = np.random.default_rng(18)
        X = rng.uniform(-2, 2, size=(200, 1))
        y = X[:, 0] ** 2
        r5 = np.sqrt(((GBTRegressor(n_estimators=5).fit(X, y).predict(X) - y) ** 2).mean())
        r60 = np.sqrt(((GBTRegressor(n_estimators=60).fit(X, y).predict(X) - y) ** 2).mean())
        assert r60 < r5


class TestIBk:
    def test_separable_classification(self):
        X, lab = _blobs(seed=19)
        y = (lab > 0).astype(int)
        clf = IBk(k=3).fit(X, y)
        assert (clf.predict(X) == y).mean() > 0.99

    def test_handles_missing_in_train_and_test(self):
        X, lab = _blobs(n_per=40, seed=20)
        y = (lab > 0).astype(int)
        rng = np.random.default_rng(21)
        Xm = X.copy()
        Xm[rng.random(X.shape) < 0.15] = np.nan
        clf = IBk(k=5).fit(Xm, y)
        Xt = X[:30].copy()
        Xt[rng.random(Xt.shape) < 0.15] = np.nan
        acc = (clf.predict(Xt) == y[:30]).mean()
        assert acc > 0.8

    def test_both_missing_distance_is_one(self):
        X = np.array([[0.0, 0.0], [1.0, 1.0]])
        clf = IBk(k=1).fit(X, np.array([0, 1]))
        Q = clf._norm(np.array([[np.nan, 0.5]]))
        d2 = clf._diff(Q)
        # first attr: one/both-missing rule applies; finite output
        assert np.all(np.isfinite(d2))

    def test_k_clamped_to_train_size(self):
        X = np.array([[0.0], [1.0]])
        clf = IBk(k=10).fit(X, np.array([0, 1]))
        assert clf.predict(np.array([[0.1]]))[0] in (0, 1)

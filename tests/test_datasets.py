"""Synthetic dataset generators: shapes, determinism, and — the
load-bearing part — each dataset's sparsity/heterogeneity regime
(Table IV/V properties the Table V reproduction depends on)."""
import numpy as np
import pytest

from repro.core import linalg
from repro.core.nn import knn_numpy
from repro.datasets import DATASETS, attributes, generate


@pytest.mark.parametrize("name", list(DATASETS))
class TestShapes:
    def test_paper_shape(self, name):
        spec = DATASETS[name]
        pdf = generate(name)
        assert len(pdf) == spec.n
        assert attributes(name) == [f"A{j}" for j in range(1, spec.m + 1)]
        assert set(attributes(name)).issubset(pdf.columns)
        assert ("label" in pdf.columns) == spec.labelled

    def test_deterministic(self, name):
        a = generate(name, n=150)
        b = generate(name, n=150)
        assert a.equals(b)

    def test_n_override(self, name):
        assert len(generate(name, n=77)) == 77

    def test_row_ids_unique(self, name):
        pdf = generate(name, n=120)
        assert pdf["row_id"].is_unique
        assert pdf["row_id"].dtype == np.int64


@pytest.mark.parametrize("name", ["ASF", "CCS", "CCPP", "SN", "PHASE", "CA", "DA"])
def test_ground_truth_datasets_complete(name):
    pdf = generate(name, n=200)
    assert not pdf[attributes(name)].isna().any().any()


@pytest.mark.parametrize("name", ["MAM", "HEP"])
def test_labelled_datasets_have_real_missing(name):
    pdf = generate(name)
    attrs = attributes(name)
    assert pdf[attrs].isna().any().any()
    # never a fully-blank tuple, and labels are binary and complete
    assert not pdf[attrs].isna().all(axis=1).any()
    assert set(pdf["label"].unique()) == {0, 1}
    # some fully complete tuples must remain to learn from
    assert (~pdf[attrs].isna().any(axis=1)).sum() >= 20


def _regime(name, n, k=10, n_mask=150, seed=0):
    """Pooled R^2_S (kNN) and R^2_H (GLR) exactly as eval.metrics does."""
    pdf = generate(name, n=n)
    attrs = attributes(name)
    rng = np.random.default_rng(seed)
    X = pdf[attrs].to_numpy(float)
    rows = rng.choice(len(X), size=min(n_mask, len(X) // 3), replace=False)
    mask_attr = rng.integers(0, len(attrs), len(rows))
    comp = np.setdiff1d(np.arange(len(X)), rows)
    Xc = X[comp]
    phis = {
        a: linalg.ridge_fit(
            Xc[:, [j for j in range(len(attrs)) if j != a]], Xc[:, a]
        )
        for a in set(mask_attr)
    }
    sk = sg = st = 0.0
    for r_, a in zip(rows, mask_attr):
        Fi = [j for j in range(len(attrs)) if j != a]
        idx, _ = knn_numpy(X[r_, Fi][None, :], Xc[:, Fi], k)
        sk += (X[r_, a] - Xc[idx[0], a].mean()) ** 2
        sg += (X[r_, a] - (linalg.design(X[r_, Fi][None, :]) @ phis[a])[0]) ** 2
        st += (X[r_, a] - Xc[:, a].mean()) ** 2
    return 1 - sk / st, 1 - sg / st


class TestRegimes:
    """Direction and rough magnitude of each dataset's R^2_S / R^2_H."""

    def test_asf_heterogeneous(self):
        r2s, r2h = _regime("ASF", 1500)
        assert r2s > r2h  # neighbors beat the global model (paper .85/.73)
        assert r2s > 0.7

    def test_sn_nonlinear(self):
        r2s, r2h = _regime("SN", 8000)
        assert r2h < 0.2  # global regression useless (paper .05)
        assert r2s > 0.6  # neighbors fine (paper .79)

    def test_ca_sparse(self):
        r2s, r2h = _regime("CA", 8000)
        assert r2h > 0.85  # global regression excellent (paper .90)
        assert r2s < r2h - 0.25  # neighbors much worse (paper .03)

    def test_phase_global_regression(self):
        r2s, r2h = _regime("PHASE", 4000)
        assert r2h > 0.8 and r2s > 0.7  # both good, regression >= (paper .90/.91)

    def test_ccpp_dense_linear(self):
        r2s, r2h = _regime("CCPP", 4000)
        assert r2s > 0.9 and r2h > 0.9  # paper .95/.93

    def test_ccs_moderate(self):
        r2s, r2h = _regime("CCS", 1000)
        assert 0.4 < r2s < 0.9 and 0.4 < r2h < 0.9  # paper .63/.56

    def test_da_moderate(self):
        r2s, r2h = _regime("DA", 3000)
        assert 0.5 < r2s and 0.5 < r2h < 0.95  # paper .65/.68
        assert r2s > r2h  # three regimes break the global map first


def test_asf_attribute_scales_spread():
    """Table VI's per-attribute RMS spans ~2 orders of magnitude; the
    generator's per-attribute scales must spread accordingly."""
    pdf = generate("ASF")
    stds = pdf[attributes("ASF")].std()
    assert stds.max() / stds.min() > 20


def test_unknown_dataset_raises():
    with pytest.raises(KeyError):
        generate("NOPE")

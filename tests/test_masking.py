"""Missing-value injection (Section VI-A2 protocol)."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import generate, inject_missing, split_complete
from repro.datasets.generators import attributes


@pytest.fixture()
def pdf():
    return generate("CCS", n=200)


ATTRS = attributes("CCS")


class TestInjectMissing:
    def test_frac_count(self, pdf):
        masked, truth = inject_missing(pdf, frac=0.05, seed=0)
        assert len(truth) == 10  # 5% of 200, one attr each
        assert masked[ATTRS].isna().sum().sum() == 10

    def test_count_override(self, pdf):
        masked, truth = inject_missing(pdf, count=17, seed=1)
        assert len(truth) == 17

    def test_truth_matches_original(self, pdf):
        masked, truth = inject_missing(pdf, frac=0.1, seed=2)
        orig = pdf.set_index("row_id")
        for _, row in truth.iterrows():
            assert row["truth"] == orig.loc[row["row_id"], row["attr"]]
            assert np.isnan(
                masked.set_index("row_id").loc[row["row_id"], row["attr"]]
            )

    def test_fixed_attr(self, pdf):
        masked, truth = inject_missing(pdf, count=25, fixed_attr="A3", seed=3)
        assert set(truth["attr"]) == {"A3"}
        assert masked["A3"].isna().sum() == 25
        for a in ATTRS:
            if a != "A3":
                assert not masked[a].isna().any()

    def test_multi_attr(self, pdf):
        masked, truth = inject_missing(pdf, count=10, n_attrs=3, seed=4)
        assert len(truth) == 30
        per_tuple = truth.groupby("row_id")["attr"].nunique()
        assert (per_tuple == 3).all()

    def test_deterministic(self, pdf):
        a = inject_missing(pdf, frac=0.05, seed=7)
        b = inject_missing(pdf, frac=0.05, seed=7)
        assert a[0].equals(b[0]) and a[1].equals(b[1])

    def test_different_seeds_differ(self, pdf):
        _, ta = inject_missing(pdf, frac=0.05, seed=0)
        _, tb = inject_missing(pdf, frac=0.05, seed=99)
        assert not ta.equals(tb)

    def test_keeps_at_least_one_complete(self, pdf):
        masked, truth = inject_missing(pdf, frac=1.0, seed=5)
        assert len(truth) <= len(pdf) - 1

    def test_label_column_never_masked(self):
        mam = generate("MAM", n=100)
        masked, truth = inject_missing(mam, frac=0.2, seed=6)
        assert not masked["label"].isna().any()
        assert "label" not in set(truth["attr"])

    def test_cluster_mode_groups_neighbors(self, pdf):
        """Figure-8 protocol: the nearest neighbors of an incomplete tuple
        are themselves incomplete."""
        masked, truth = inject_missing(pdf, count=30, cluster_size=5, seed=8)
        ids = set(truth["row_id"])
        X = pdf[ATTRS].to_numpy(float)
        pos = {int(r): i for i, r in enumerate(pdf["row_id"])}
        hits = 0
        for rid in list(ids)[:10]:
            d = ((X - X[pos[rid]]) ** 2).sum(axis=1)
            nn = pdf["row_id"].to_numpy()[np.argsort(d, kind="stable")[1:3]]
            hits += sum(int(j) in ids for j in nn)
        # clustered masking: most 2-NN of incomplete tuples also incomplete
        assert hits >= 10


class TestSplitComplete:
    def test_partitions_rows(self, pdf):
        masked, truth = inject_missing(pdf, frac=0.1, seed=9)
        comp = split_complete(masked, ATTRS)
        assert len(comp) == len(pdf) - truth["row_id"].nunique()
        assert not comp[ATTRS].isna().any().any()

    def test_no_missing_noop(self, pdf):
        comp = split_complete(pdf, ATTRS)
        assert len(comp) == len(pdf)

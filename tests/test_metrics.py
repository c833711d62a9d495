"""Evaluation metrics (Section VI-A2): RMS, R^2, purity, F1."""
import numpy as np
import pytest

from repro.eval import metrics


class TestRMS:
    def test_zero_for_exact(self):
        assert metrics.rms([1.0, 2.0], [1.0, 2.0]) == 0.0

    def test_hand_value(self):
        assert metrics.rms([0.0, 0.0], [3.0, 4.0]) == pytest.approx(
            np.sqrt(12.5)
        )

    def test_shape_mismatch(self):
        with pytest.raises(ValueError):
            metrics.rms([1.0], [1.0, 2.0])


class TestR2:
    def test_perfect_prediction(self):
        t = np.array([1.0, 2.0, 3.0])
        assert metrics.r2_against_mean(t, t, np.full(3, 2.0)) == 1.0

    def test_mean_prediction_is_zero(self):
        t = np.array([1.0, 2.0, 3.0])
        base = np.full(3, 2.0)
        assert metrics.r2_against_mean(t, base, base) == pytest.approx(0.0)

    def test_worse_than_mean_is_negative(self):
        t = np.array([1.0, 2.0, 3.0])
        assert metrics.r2_against_mean(t, [3.0, 0.0, 6.0], np.full(3, 2.0)) < 0

    def test_degenerate_sst(self):
        t = np.array([2.0, 2.0])
        assert metrics.r2_against_mean(t, [2.0, 2.0], t) == 1.0


class TestPurity:
    def test_perfect_clustering(self):
        assert metrics.purity([0, 0, 1, 1], [5, 5, 9, 9]) == 1.0

    def test_hand_example(self):
        truth = [0, 0, 0, 1, 1, 1]
        pred = [0, 0, 1, 1, 1, 1]
        # cluster 0: {0,0} -> 2; cluster 1: {0,1,1,1} -> 3; purity 5/6
        assert metrics.purity(truth, pred) == pytest.approx(5 / 6)

    def test_label_permutation_invariant(self):
        truth = [0, 0, 1, 1, 2, 2]
        pred = [1, 1, 2, 2, 0, 0]
        assert metrics.purity(truth, pred) == 1.0

    def test_length_mismatch(self):
        with pytest.raises(ValueError):
            metrics.purity([0], [0, 1])


class TestF1:
    def test_perfect(self):
        assert metrics.f1_binary([1, 0, 1], [1, 0, 1]) == 1.0

    def test_hand_example(self):
        # tp=1, fp=1, fn=1 -> f1 = 2/(2+1+1) = 0.5
        assert metrics.f1_binary([1, 0, 1, 0], [1, 1, 0, 0]) == 0.5

    def test_no_positives(self):
        assert metrics.f1_binary([0, 0], [0, 0]) == 0.0

    def test_weighted_combines_classes(self):
        y = np.array([0, 0, 0, 1])
        p = np.array([0, 0, 1, 1])
        f0 = metrics.f1_binary(y, p, positive=0)
        f1 = metrics.f1_binary(y, p, positive=1)
        assert metrics.f1_weighted(y, p) == pytest.approx(0.75 * f0 + 0.25 * f1)

    def test_weighted_perfect(self):
        assert metrics.f1_weighted([0, 1, 1], [0, 1, 1]) == 1.0

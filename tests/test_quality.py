"""Tests for the evaluation metrics (eval.quality)."""
import numpy as np
import pytest

from repro.eval.quality import ari, avg_precision_recall, nmi


class TestAvgPrecisionRecall:
    def test_perfect_clustering(self):
        gt = [np.array([0, 1, 2]), np.array([3, 4])]
        assign = np.array([0, 0, 0, 1, 1])
        p, r = avg_precision_recall(gt, assign)
        assert p == 1.0 and r == 1.0

    def test_single_giant_cluster(self):
        gt = [np.array([0, 1]), np.array([2, 3])]
        assign = np.zeros(4, dtype="int64")
        p, r = avg_precision_recall(gt, assign)
        assert r == 1.0  # every community fully inside the blob
        assert p == pytest.approx(0.5)  # but precision halves

    def test_all_singletons(self):
        gt = [np.array([0, 1, 2, 3])]
        assign = np.arange(4)
        p, r = avg_precision_recall(gt, assign)
        assert p == 1.0 and r == pytest.approx(0.25)

    def test_overlapping_communities_allowed(self):
        # SNAP's top-5000 communities overlap; the metric must not assume
        # a partition on the ground-truth side.
        gt = [np.array([0, 1, 2]), np.array([2, 3, 4])]
        assign = np.array([0, 0, 0, 1, 1])
        p, r = avg_precision_recall(gt, assign)
        assert 0 < p <= 1 and 0 < r <= 1

    def test_split_cluster(self):
        gt = [np.array([0, 1, 2, 3])]
        assign = np.array([0, 0, 1, 1])
        p, r = avg_precision_recall(gt, assign)
        assert p == 1.0 and r == pytest.approx(0.5)


class TestARI:
    def test_identical(self):
        a = np.array([0, 0, 1, 1, 2])
        assert ari(a, a) == pytest.approx(1.0)

    def test_permuted_labels(self):
        a = np.array([0, 0, 1, 1, 2, 2])
        b = np.array([5, 5, 9, 9, 1, 1])
        assert ari(a, b) == pytest.approx(1.0)

    def test_random_labels_near_zero(self):
        rng = np.random.default_rng(0)
        a = rng.integers(0, 5, 2000)
        b = rng.integers(0, 5, 2000)
        assert abs(ari(a, b)) < 0.05

    def test_partial_agreement_between(self):
        a = np.array([0, 0, 0, 1, 1, 1])
        b = np.array([0, 0, 1, 1, 1, 1])
        assert 0.0 < ari(a, b) < 1.0


class TestNMI:
    def test_identical(self):
        a = np.array([0, 0, 1, 1, 2])
        assert nmi(a, a) == pytest.approx(1.0)

    def test_independent_near_zero(self):
        rng = np.random.default_rng(1)
        a = rng.integers(0, 4, 3000)
        b = rng.integers(0, 4, 3000)
        assert nmi(a, b) < 0.02

    def test_constant_assignment(self):
        a = np.array([0, 1, 2, 3])
        b = np.zeros(4, dtype="int64")
        assert nmi(a, b) == pytest.approx(0.0, abs=1e-12)

    def test_symmetric(self):
        rng = np.random.default_rng(2)
        a = rng.integers(0, 3, 500)
        b = (a + rng.integers(0, 2, 500)) % 3
        assert nmi(a, b) == pytest.approx(nmi(b, a))

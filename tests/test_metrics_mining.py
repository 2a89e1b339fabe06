"""Numpy metric kernels and the mining (KNN/K-means) substrate."""
import numpy as np
import pytest

from repro.metrics import evaluate, repair_distance, repair_number, rmse
from repro.mining import (
    kmeans,
    knn_classify,
    knn_predict,
    macro_f1,
    rand_index,
)


class TestRmse:
    def test_zero_for_identical(self):
        a = np.random.default_rng(0).random((10, 3))
        assert rmse(a, a) == 0.0

    def test_known_value(self):
        a = np.array([[0.0, 0.0], [0.0, 0.0]])
        b = np.array([[1.0, 1.0], [1.0, 1.0]])
        assert rmse(a, b) == pytest.approx(1.0)

    def test_shape_mismatch(self):
        with pytest.raises(ValueError):
            rmse(np.zeros((2, 2)), np.zeros((3, 2)))


class TestRepairDistance:
    def test_zero_for_identical(self):
        a = np.ones((5, 2))
        assert repair_distance(a, a) == 0.0

    def test_euclidean_per_point(self):
        a = np.array([[3.0, 4.0], [0.0, 0.0]])
        b = np.zeros((2, 2))
        assert repair_distance(a, b) == pytest.approx(2.5)  # (5+0)/2


class TestRepairNumber:
    def test_counts_points_not_cells(self):
        a = np.zeros((4, 3))
        b = a.copy()
        b[1] = [1, 1, 1]
        b[3, 0] = 2
        assert repair_number(b, a) == 2

    def test_tolerance(self):
        a = np.zeros((3, 1))
        b = a + 1e-12
        assert repair_number(b, a) == 0

    def test_evaluate_bundle(self):
        orig = np.zeros((10, 2))
        rep = orig.copy()
        rep[4] = [1.0, 0.0]
        truth = np.zeros((10, 2))
        m = evaluate(rep, orig, truth)
        assert m["repair_number"] == 1
        assert m["repair_fraction"] == pytest.approx(0.1)
        assert m["rmse"] == pytest.approx(np.sqrt(1.0 / 20))


class TestKnn:
    def test_perfect_separation(self):
        train = np.vstack([np.zeros((5, 4)), np.ones((5, 4)) * 10])
        y = np.array([0] * 5 + [1] * 5)
        test = np.vstack([np.zeros((2, 4)) + 0.1, np.ones((2, 4)) * 9.9])
        pred = knn_predict(train, y, test, 3)
        np.testing.assert_array_equal(pred, [0, 0, 1, 1])

    def test_k1_nearest(self):
        train = np.array([[0.0], [10.0]])
        y = np.array([7, 9])
        assert knn_predict(train, y, np.array([[1.0]]), 1)[0] == 7

    def test_classify_grid_search(self):
        g = np.random.default_rng(1)
        train = np.vstack([g.normal(0, 0.5, (20, 3)), g.normal(5, 0.5, (20, 3))])
        y = np.array([0] * 20 + [1] * 20)
        test = np.vstack([g.normal(0, 0.5, (10, 3)), g.normal(5, 0.5, (10, 3))])
        ty = np.array([0] * 10 + [1] * 10)
        f1, k = knn_classify(train, y, test, ty)
        assert f1 == pytest.approx(1.0)
        assert k in (1, 3, 5, 7)

    def test_3d_input_flattened(self):
        X = np.zeros((4, 6, 2))
        X[2:] += 5
        y = np.array([0, 0, 1, 1])
        pred = knn_predict(X, y, X, 1)
        np.testing.assert_array_equal(pred, y)


class TestF1:
    def test_perfect(self):
        y = np.array([0, 1, 2, 0, 1, 2])
        assert macro_f1(y, y) == 1.0

    def test_all_wrong(self):
        assert macro_f1(np.array([0, 0]), np.array([1, 1])) == 0.0

    def test_known_value(self):
        y_true = np.array([0, 0, 1, 1])
        y_pred = np.array([0, 1, 1, 1])
        # class0: P=1, R=.5, F1=2/3; class1: P=2/3, R=1, F1=0.8.
        assert macro_f1(y_true, y_pred) == pytest.approx((2 / 3 + 0.8) / 2)


class TestKmeans:
    def test_two_blobs(self):
        g = np.random.default_rng(2)
        X = np.vstack([g.normal(0, 0.3, (30, 2)), g.normal(8, 0.3, (30, 2))])
        assign = kmeans(X, 2, seed=0)
        y = np.array([0] * 30 + [1] * 30)
        assert rand_index(y, assign) == pytest.approx(1.0)

    def test_k_clusters_returned(self):
        g = np.random.default_rng(3)
        X = g.random((40, 3))
        assign = kmeans(X, 4, seed=1)
        assert set(assign) <= set(range(4))


class TestRandIndex:
    def test_identical(self):
        y = np.array([0, 0, 1, 1, 2])
        assert rand_index(y, y) == 1.0

    def test_label_permutation_invariant(self):
        y = np.array([0, 0, 1, 1])
        p = np.array([1, 1, 0, 0])
        assert rand_index(y, p) == 1.0

    def test_known_value(self):
        y = np.array([0, 0, 1, 1])
        p = np.array([0, 1, 1, 1])
        # pairs: (01):disagree,(02):agree(diff/diff? y:0,1 diff; p:0,1 diff -> agree)
        # enumerate: agree pairs = (0,2)?: y diff p diff agree; (0,3): agree;
        # (1,2): y diff p same disagree; (1,3): disagree; (2,3): same/same agree;
        # (0,1): same/diff disagree => 3/6.
        assert rand_index(y, p) == pytest.approx(0.5)

"""Logistic regression and random forest substrate tests."""
import numpy as np
import pytest

from repro.ml.forest import DecisionTree, RandomForest
from repro.ml.logreg import LogisticRegression


def _blobs(n=200, d=4, sep=2.5, seed=0):
    rng = np.random.default_rng(seed)
    y = rng.integers(0, 2, n)
    X = rng.normal(0, 1, (n, d))
    X[:, 0] += sep * y
    return X, y


class TestLogisticRegression:
    def test_separable_accuracy(self):
        X, y = _blobs(sep=4.0)
        clf = LogisticRegression(epochs=500).fit(X, y)
        assert (clf.predict(X) == y).mean() > 0.95

    def test_proba_in_unit_interval(self):
        X, y = _blobs()
        p = LogisticRegression().fit(X, y).predict_proba(X)
        assert np.all((p >= 0) & (p <= 1))

    def test_deterministic(self):
        X, y = _blobs()
        p1 = LogisticRegression(seed=3).fit(X, y).predict_proba(X)
        p2 = LogisticRegression(seed=3).fit(X, y).predict_proba(X)
        np.testing.assert_array_equal(p1, p2)

    def test_generalizes(self):
        Xtr, ytr = _blobs(seed=0)
        Xte, yte = _blobs(seed=1)
        clf = LogisticRegression(epochs=500).fit(Xtr, ytr)
        assert (clf.predict(Xte) == yte).mean() > 0.85

    def test_constant_feature_no_nan(self):
        X, y = _blobs()
        X[:, 1] = 7.0
        p = LogisticRegression().fit(X, y).predict_proba(X)
        assert np.all(np.isfinite(p))

    def test_predict_before_fit_raises(self):
        with pytest.raises(RuntimeError):
            LogisticRegression().predict(np.zeros((2, 3)))

    def test_shape_mismatch_raises(self):
        with pytest.raises(ValueError):
            LogisticRegression().fit(np.zeros((5, 2)), np.zeros(4))

    def test_l2_shrinks_weights(self):
        X, y = _blobs(sep=4.0)
        w_small = LogisticRegression(l2=1e-4, epochs=500).fit(X, y).w_
        w_big = LogisticRegression(l2=1.0, epochs=500).fit(X, y).w_
        assert np.linalg.norm(w_big) < np.linalg.norm(w_small)


class TestDecisionTree:
    def test_pure_leaf_on_separable(self):
        X = np.array([[0.0], [1.0], [2.0], [10.0], [11.0], [12.0]])
        y = np.array([0, 0, 0, 1, 1, 1])
        tree = DecisionTree(min_samples_leaf=1).fit(X, y)
        assert (tree.predict_proba(X) >= 0.5).astype(int).tolist() == y.tolist()

    def test_single_class(self):
        X = np.random.default_rng(0).random((10, 3))
        y = np.ones(10, dtype=int)
        tree = DecisionTree().fit(X, y)
        assert np.all(tree.predict_proba(X) == 1.0)

    def test_max_depth_zero_is_prior(self):
        X, y = _blobs()
        tree = DecisionTree(max_depth=0).fit(X, y)
        assert np.allclose(tree.predict_proba(X), y.mean())

    def test_xor_needs_depth(self):
        rng = np.random.default_rng(0)
        X = rng.random((400, 2))
        y = ((X[:, 0] > 0.5) ^ (X[:, 1] > 0.5)).astype(int)
        deep = DecisionTree(max_depth=4, min_samples_leaf=1).fit(X, y)
        assert ((deep.predict_proba(X) >= 0.5).astype(int) == y).mean() > 0.9


class TestRandomForest:
    def test_separable_accuracy(self):
        X, y = _blobs(sep=3.0)
        clf = RandomForest(n_estimators=30).fit(X, y)
        assert (clf.predict(X) == y).mean() > 0.95

    def test_generalizes(self):
        Xtr, ytr = _blobs(seed=0)
        Xte, yte = _blobs(seed=1)
        clf = RandomForest(n_estimators=30).fit(Xtr, ytr)
        assert (clf.predict(Xte) == yte).mean() > 0.8

    def test_deterministic(self):
        X, y = _blobs()
        p1 = RandomForest(n_estimators=10, seed=5).fit(X, y).predict_proba(X)
        p2 = RandomForest(n_estimators=10, seed=5).fit(X, y).predict_proba(X)
        np.testing.assert_array_equal(p1, p2)

    def test_proba_in_unit_interval(self):
        X, y = _blobs()
        p = RandomForest(n_estimators=10).fit(X, y).predict_proba(X)
        assert np.all((p >= 0) & (p <= 1))

    def test_predict_before_fit_raises(self):
        with pytest.raises(RuntimeError):
            RandomForest().predict(np.zeros((2, 3)))

    def test_nonlinear_beats_logreg(self):
        """XOR-style target: forest should clearly beat a linear model."""
        rng = np.random.default_rng(0)
        X = rng.random((500, 2))
        y = ((X[:, 0] > 0.5) ^ (X[:, 1] > 0.5)).astype(int)
        rf_acc = (RandomForest(n_estimators=30, max_depth=6).fit(X, y).predict(X) == y).mean()
        lr_acc = (LogisticRegression(epochs=300).fit(X, y).predict(X) == y).mean()
        assert rf_acc > lr_acc + 0.2

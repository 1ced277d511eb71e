"""Unit tests for the histogram CART substrate."""
import numpy as np
import pytest

from repro.ml.tree import (
    Binner,
    fit_tree_classifier,
    fit_tree_newton,
    tree_apply,
    tree_depth,
)


@pytest.fixture
def blobs():
    rng = np.random.default_rng(0)
    n = 400
    X = rng.normal(size=(n, 5))
    y = (X[:, 0] + 0.5 * X[:, 2] > 0).astype(np.int64)
    return X, y


class TestBinner:
    def test_bins_within_range(self, blobs):
        X, _ = blobs
        B = Binner().fit_transform(X)
        assert B.dtype == np.uint8
        assert B.max() < 32

    def test_monotone_binning(self):
        X = np.linspace(0, 1, 100).reshape(-1, 1)
        B = Binner().fit_transform(X)
        assert np.all(np.diff(B[:, 0].astype(int)) >= 0)

    def test_constant_column(self):
        X = np.ones((50, 1))
        B = Binner().fit_transform(X)
        assert np.all(B == B[0, 0])

    def test_transform_unseen_values(self):
        binner = Binner().fit(np.linspace(0, 1, 100).reshape(-1, 1))
        B = binner.transform(np.array([[-10.0], [10.0]]))
        assert B[0, 0] == 0
        assert B[1, 0] == B.max()


class TestClassifierTree:
    def test_fits_separable(self, blobs):
        X, y = blobs
        B = Binner().fit_transform(X)
        tree = fit_tree_classifier(B, y, max_depth=6)
        pred = (tree_apply(tree, B) > 0.5).astype(int)
        assert (pred == y).mean() > 0.9

    def test_depth_limit(self, blobs):
        X, y = blobs
        B = Binner().fit_transform(X)
        tree = fit_tree_classifier(B, y, max_depth=2)
        assert tree_depth(tree) <= 2

    def test_pure_node_is_leaf(self):
        B = np.zeros((20, 2), dtype=np.uint8)
        y = np.ones(20, dtype=np.int64)
        tree = fit_tree_classifier(B, y)
        assert "leaf" in tree and tree["leaf"] == 1.0

    def test_sample_weights_steer_split(self):
        # Two candidate splits; weights make the second feature decisive.
        rng = np.random.default_rng(1)
        X = rng.random((200, 2))
        y = (X[:, 1] > 0.5).astype(np.int64)
        w = np.ones(200)
        B = Binner().fit_transform(X)
        tree = fit_tree_classifier(B, y, w, max_depth=1)
        assert tree["feat"] == 1

    def test_min_leaf_respected(self, blobs):
        X, y = blobs
        B = Binner().fit_transform(X)
        tree = fit_tree_classifier(B, y, max_depth=10, min_leaf=50)

        def smallest_leaf(node, idx):
            if "leaf" in node:
                return idx.size
            mask = B[idx, node["feat"]] <= node["thr"]
            return min(
                smallest_leaf(node["left"], idx[mask]),
                smallest_leaf(node["right"], idx[~mask]),
            )

        assert smallest_leaf(tree, np.arange(B.shape[0])) >= 50

    def test_deterministic(self, blobs):
        X, y = blobs
        B = Binner().fit_transform(X)
        t1 = fit_tree_classifier(B, y)
        t2 = fit_tree_classifier(B, y)
        assert t1 == t2

    def test_feature_subsample_uses_rng(self, blobs):
        X, y = blobs
        B = Binner().fit_transform(X)
        t1 = fit_tree_classifier(
            B, y, max_features=2, rng=np.random.default_rng(0)
        )
        t2 = fit_tree_classifier(
            B, y, max_features=2, rng=np.random.default_rng(42)
        )
        assert t1 != t2 or tree_depth(t1) == 0


class TestNewtonTree:
    def test_reduces_logloss(self, blobs):
        X, y = blobs
        B = Binner().fit_transform(X)
        p = np.full(y.size, 0.5)
        grad = p - y
        hess = p * (1 - p)
        tree = fit_tree_newton(B, grad, hess, max_depth=3)
        raw = tree_apply(tree, B)
        # Moving along the Newton step must reduce logloss.
        def logloss(f):
            q = 1 / (1 + np.exp(-f))
            return -(y * np.log(q + 1e-12) + (1 - y) * np.log(1 - q + 1e-12)).mean()

        assert logloss(raw) < logloss(np.zeros_like(raw))

    def test_leaf_value_formula(self):
        # Single leaf: value must equal -G/(H+lam).
        B = np.zeros((10, 1), dtype=np.uint8)
        grad = np.full(10, 0.3)
        hess = np.full(10, 0.25)
        tree = fit_tree_newton(B, grad, hess, max_depth=3, lam=1.0)
        assert tree["leaf"] == pytest.approx(-3.0 / 3.5)

    def test_depth_limit(self, blobs):
        X, y = blobs
        B = Binner().fit_transform(X)
        grad = np.random.default_rng(0).normal(size=y.size)
        tree = fit_tree_newton(B, grad, np.ones(y.size), max_depth=2)
        assert tree_depth(tree) <= 2


class TestApply:
    def test_single_leaf(self):
        out = tree_apply({"leaf": 0.7}, np.zeros((5, 3), dtype=np.uint8))
        assert np.allclose(out, 0.7)

    def test_routing(self):
        tree = {
            "feat": 0,
            "thr": 2,
            "left": {"leaf": 0.0},
            "right": {"leaf": 1.0},
        }
        B = np.array([[0], [2], [3], [10]], dtype=np.uint8)
        assert tree_apply(tree, B).tolist() == [0.0, 0.0, 1.0, 1.0]

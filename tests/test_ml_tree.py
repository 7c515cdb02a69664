"""Unit tests for the binned multi-output CART tree."""
import numpy as np
import pytest

from repro.ml import metrics as mx
from repro.ml.tree import RegressionTree


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
@pytest.mark.parametrize("n", [80, 300])
def test_fits_linear_signal(seed, n):
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(n, 4))
    y = 3 * X[:, 0] + 0.05 * rng.normal(size=n)
    t = RegressionTree(max_depth=5, min_samples_leaf=3).fit(X, y)
    assert mx.r2(y, t.predict(X)) > 0.85


@pytest.mark.parametrize("depth", [0, 1, 2, 3])
def test_depth_bounds_leaf_count(depth):
    rng = np.random.default_rng(0)
    X = rng.normal(size=(200, 3))
    y = rng.normal(size=200)
    t = RegressionTree(max_depth=depth, min_samples_leaf=1).fit(X, y)
    n_leaves = sum(1 for f in t._feature if f == -1)
    assert n_leaves <= 2**depth


def test_constant_target_single_leaf():
    X = np.random.default_rng(0).normal(size=(50, 2))
    t = RegressionTree(max_depth=4).fit(X, np.full(50, 7.0))
    assert np.allclose(t.predict(X), 7.0)


def test_multioutput_predicts_both_columns():
    rng = np.random.default_rng(1)
    X = rng.normal(size=(300, 3))
    Y = np.column_stack([X[:, 0], -2 * X[:, 1]])
    t = RegressionTree(max_depth=6, min_samples_leaf=2).fit(X, Y)
    P = t.predict(X)
    assert P.shape == (300, 2)
    assert mx.r2(Y[:, 0], P[:, 0]) > 0.7
    assert mx.r2(Y[:, 1], P[:, 1]) > 0.7


def test_onehot_variance_split_behaves_like_gini():
    """A perfectly separable class boundary is found by the one-hot tree."""
    rng = np.random.default_rng(2)
    X = rng.normal(size=(200, 2))
    y = (X[:, 0] > 0.3).astype(int)
    onehot = np.eye(2)[y]
    t = RegressionTree(max_depth=2, min_samples_leaf=2).fit(X, onehot)
    pred = np.argmax(np.atleast_2d(t.predict(X)), axis=1)
    assert (pred == y).mean() > 0.97


def test_min_samples_leaf_respected():
    rng = np.random.default_rng(3)
    X = rng.normal(size=(60, 2))
    y = rng.normal(size=60)
    t = RegressionTree(max_depth=8, min_samples_leaf=10).fit(X, y)
    # count rows routed to each leaf
    out = np.empty((60, 1))
    t._apply(X, np.arange(60), 0, out)
    leaves = {}
    # route manually and count via unique leaf values as proxy: instead,
    # assert all leaf value arrays came from >= min_samples_leaf rows by
    # reconstruction: each split had both sides >= 10, so every leaf
    # holds >= 10 training rows; check leaf count consistent with that.
    n_leaves = sum(1 for f in t._feature if f == -1)
    assert n_leaves <= 60 // 10 + 1


def test_deterministic():
    rng = np.random.default_rng(4)
    X = rng.normal(size=(150, 3))
    y = rng.normal(size=150)
    p1 = RegressionTree(max_depth=4).fit(X, y).predict(X)
    p2 = RegressionTree(max_depth=4).fit(X, y).predict(X)
    assert np.array_equal(p1, p2)


def test_feature_importances_sum_and_focus():
    rng = np.random.default_rng(5)
    X = rng.normal(size=(400, 5))
    y = 5 * X[:, 2] + 0.01 * rng.normal(size=400)
    t = RegressionTree(max_depth=4).fit(X, y)
    imp = t.feature_importances_
    assert abs(imp.sum() - 1.0) < 1e-9
    assert imp.argmax() == 2


def test_prediction_on_unseen_values_uses_thresholds():
    X = np.linspace(0, 1, 100)[:, None]
    y = (X[:, 0] > 0.5).astype(float)
    t = RegressionTree(max_depth=3, min_samples_leaf=1).fit(X, y)
    assert t.predict(np.array([[10.0]]))[0] == pytest.approx(1.0)
    assert t.predict(np.array([[-10.0]]))[0] == pytest.approx(0.0)


@pytest.mark.parametrize("max_features", [None, "sqrt", 2])
def test_max_features_variants_fit(max_features):
    rng = np.random.default_rng(6)
    X = rng.normal(size=(200, 6))
    y = X[:, 0] + X[:, 1]
    t = RegressionTree(
        max_depth=5, max_features=max_features, rng=np.random.default_rng(0)
    ).fit(X, y)
    assert np.isfinite(t.predict(X)).all()

"""Unit tests for RandomForest, LogisticRegression, LinearRegression."""
import numpy as np
import pytest

from repro.ml import metrics as mx
from repro.ml.forest import RandomForestClassifier
from repro.ml.linear import LinearRegression, LogisticRegression


@pytest.mark.parametrize("seed", [0, 1])
@pytest.mark.parametrize("n_classes", [2, 3])
def test_forest_fits_separable(seed, n_classes):
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(300, 4))
    s = X[:, 0] + X[:, 1]
    y = np.digitize(s, np.quantile(s, np.linspace(0, 1, n_classes + 1)[1:-1]))
    rf = RandomForestClassifier(n_estimators=15, max_depth=7, seed=seed).fit(X, y)
    assert mx.accuracy(y, rf.predict(X)) > 0.8


def test_forest_proba_is_distribution():
    rng = np.random.default_rng(2)
    X = rng.normal(size=(120, 3))
    y = (X[:, 0] > 0).astype(int)
    rf = RandomForestClassifier(n_estimators=8).fit(X, y)
    P = rf.predict_proba(X)
    assert np.allclose(P.sum(axis=1), 1.0)
    assert (P >= 0).all()


def test_forest_deterministic_in_seed():
    rng = np.random.default_rng(3)
    X = rng.normal(size=(100, 3))
    y = (X[:, 1] > 0).astype(int)
    a = RandomForestClassifier(n_estimators=5, seed=1).fit(X, y).predict_proba(X)
    b = RandomForestClassifier(n_estimators=5, seed=1).fit(X, y).predict_proba(X)
    assert np.array_equal(a, b)


def test_linear_regression_exact_on_linear():
    rng = np.random.default_rng(4)
    X = rng.normal(size=(200, 3))
    y = 2 * X[:, 0] - 3 * X[:, 1] + 0.5
    lr = LinearRegression().fit(X, y)
    assert np.allclose(lr.coef_, [2, -3, 0], atol=1e-4)
    assert lr.intercept_ == pytest.approx(0.5, abs=1e-4)
    assert mx.r2(y, lr.predict(X)) > 0.9999


def test_linear_regression_ridge_shrinks():
    rng = np.random.default_rng(5)
    X = rng.normal(size=(50, 2))
    y = X[:, 0]
    small = LinearRegression(l2=1e-8).fit(X, y)
    big = LinearRegression(l2=100.0).fit(X, y)
    assert abs(big.coef_[0]) < abs(small.coef_[0])


@pytest.mark.parametrize("n_classes", [2, 3])
def test_logistic_fits_separable(n_classes):
    rng = np.random.default_rng(6)
    X = rng.normal(size=(300, 4))
    s = X[:, 0] - X[:, 2]
    y = np.digitize(s, np.quantile(s, np.linspace(0, 1, n_classes + 1)[1:-1]))
    lr = LogisticRegression(n_iter=300).fit(X, y)
    assert mx.accuracy(y, lr.predict(X)) > 0.8
    P = lr.predict_proba(X)
    assert np.allclose(P.sum(axis=1), 1.0)


def test_logistic_handles_constant_feature():
    rng = np.random.default_rng(7)
    X = np.column_stack([rng.normal(size=100), np.ones(100)])
    y = (X[:, 0] > 0).astype(int)
    lr = LogisticRegression(n_iter=100).fit(X, y)
    assert mx.accuracy(y, lr.predict(X)) > 0.9


def test_logistic_string_labels():
    rng = np.random.default_rng(8)
    X = rng.normal(size=(80, 2))
    y = np.where(X[:, 0] > 0, "a", "b")
    lr = LogisticRegression(n_iter=100).fit(X, y)
    assert set(lr.predict(X)) <= {"a", "b"}

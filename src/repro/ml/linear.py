"""Linear models: ridge least-squares regression and softmax logistic
regression (full-batch gradient descent with L2), standing in for the
paper's LRavocado task model and the H2O linear feature-selection
backend.
"""
from __future__ import annotations

import numpy as np


class LinearRegression:
    """Ridge regression via normal equations (small, dense problems)."""

    def __init__(self, l2: float = 1e-6):
        self.l2 = l2

    def fit(self, X: np.ndarray, y: np.ndarray) -> "LinearRegression":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        Xb = np.hstack([X, np.ones((X.shape[0], 1))])
        A = Xb.T @ Xb + self.l2 * np.eye(Xb.shape[1])
        w = np.linalg.solve(A, Xb.T @ y)
        self.coef_, self.intercept_ = w[:-1], w[-1]
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        return np.asarray(X, dtype=np.float64) @ self.coef_ + self.intercept_


class LogisticRegression:
    """Softmax regression, full-batch GD on standardized inputs."""

    def __init__(self, lr: float = 0.5, n_iter: int = 200, l2: float = 1e-4):
        self.lr = lr
        self.n_iter = n_iter
        self.l2 = l2

    def fit(self, X: np.ndarray, y: np.ndarray) -> "LogisticRegression":
        X = np.asarray(X, dtype=np.float64)
        self._mu = X.mean(axis=0)
        self._sd = X.std(axis=0)
        self._sd[self._sd == 0] = 1.0
        Z = (X - self._mu) / self._sd
        self.classes_, yi = np.unique(y, return_inverse=True)
        K = len(self.classes_)
        onehot = np.eye(K)[yi]
        n, d = Z.shape
        W = np.zeros((d, K))
        b = np.zeros(K)
        for _ in range(self.n_iter):
            F = Z @ W + b
            F -= F.max(axis=1, keepdims=True)
            P = np.exp(F)
            P /= P.sum(axis=1, keepdims=True)
            G = (P - onehot) / n
            W -= self.lr * (Z.T @ G + self.l2 * W)
            b -= self.lr * G.sum(axis=0)
        self.W_, self.b_ = W, b
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        Z = (np.asarray(X, dtype=np.float64) - self._mu) / self._sd
        F = Z @ self.W_ + self.b_
        F -= F.max(axis=1, keepdims=True)
        P = np.exp(F)
        return P / P.sum(axis=1, keepdims=True)

    def predict(self, X: np.ndarray) -> np.ndarray:
        return self.classes_[np.argmax(self.predict_proba(X), axis=1)]

    @property
    def coef_(self) -> np.ndarray:
        return self.W_.T

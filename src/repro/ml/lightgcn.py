"""LightGCN-lite: implicit-feedback link regression for T5.

LightGCN [17] learns user/item embeddings with BPR over a simplified
(weight-free) graph convolution. Offline stand-in with the same two
ingredients, deterministically:

1. weighted implicit ALS matrix factorization on the observed bipartite
   edges (confidence 1 + α on positives);
2. LightGCN's layer propagation: embeddings are averaged with their
   D^{-1/2} A D^{-1/2}-propagated versions over ``n_layers`` hops.

An optional bilinear node-feature term (ridge-fit on positive edges vs
sampled negatives) adds feature signal to the score, so the search's
feature-presence bits genuinely move the ranking metrics.
"""
from __future__ import annotations

import numpy as np


class LightGCNLite:
    def __init__(
        self,
        n_users: int,
        n_items: int,
        k: int = 8,
        n_layers: int = 2,
        n_iters: int = 6,
        alpha: float = 9.0,
        reg: float = 0.1,
        seed: int = 0,
    ):
        self.n_users = n_users
        self.n_items = n_items
        self.k = k
        self.n_layers = n_layers
        self.n_iters = n_iters
        self.alpha = alpha
        self.reg = reg
        self.seed = seed

    def fit(self, edges: np.ndarray) -> "LightGCNLite":
        """edges: (m, 2) int array of (user, item) observed links."""
        R = np.zeros((self.n_users, self.n_items))
        R[edges[:, 0], edges[:, 1]] = 1.0
        rng = np.random.default_rng(self.seed)
        U = rng.normal(scale=0.1, size=(self.n_users, self.k))
        V = rng.normal(scale=0.1, size=(self.n_items, self.k))
        I = np.eye(self.k)
        for _ in range(self.n_iters):
            # weighted implicit ALS, dense closed form per side
            VtV = V.T @ V
            for u in range(self.n_users):
                pos = np.flatnonzero(R[u])
                A = VtV + self.alpha * (V[pos].T @ V[pos]) + self.reg * I
                b = (1 + self.alpha) * V[pos].sum(axis=0)
                U[u] = np.linalg.solve(A, b)
            UtU = U.T @ U
            for i in range(self.n_items):
                pos = np.flatnonzero(R[:, i])
                A = UtU + self.alpha * (U[pos].T @ U[pos]) + self.reg * I
                b = (1 + self.alpha) * U[pos].sum(axis=0)
                V[i] = np.linalg.solve(A, b)
        # LightGCN propagation: average embeddings over n_layers hops.
        du = np.maximum(R.sum(axis=1), 1.0)
        di = np.maximum(R.sum(axis=0), 1.0)
        An = R / np.sqrt(du)[:, None] / np.sqrt(di)[None, :]
        Us, Vs = [U], [V]
        cu, cv = U, V
        for _ in range(self.n_layers):
            cu, cv = An @ cv, An.T @ cu
            Us.append(cu)
            Vs.append(cv)
        self.U_ = np.mean(Us, axis=0)
        self.V_ = np.mean(Vs, axis=0)
        self._train_R = R
        return self

    def scores(self) -> np.ndarray:
        return self.U_ @ self.V_.T

    def rank(
        self, extra: np.ndarray | None = None, topn: int = 10
    ) -> dict[int, list[int]]:
        """Per-user top-n item ranking, excluding training edges.

        ``extra``: optional (n_users, n_items) additive score term
        (the feature bilinear component).
        """
        S = self.scores()
        if extra is not None:
            S = S + extra
        S = np.where(self._train_R > 0, -np.inf, S)
        order = np.argsort(-S, axis=1)[:, :topn]
        return {u: order[u].tolist() for u in range(self.n_users)}


def bilinear_feature_scores(
    edges: np.ndarray,
    Fu: np.ndarray,
    Fi: np.ndarray,
    *,
    n_neg: int = 3,
    l2: float = 1.0,
    seed: int = 0,
) -> np.ndarray:
    """Ridge-fit W s.t. f_u^T W f_i ≈ 1 on edges, 0 on sampled
    non-edges; returns the (n_users, n_items) score matrix Fu W Fi^T."""
    n_users, du = Fu.shape
    n_items, di = Fi.shape
    if du == 0 or di == 0 or len(edges) == 0:
        return np.zeros((n_users, n_items))
    rng = np.random.default_rng(seed)
    pos = edges
    neg_u = rng.integers(0, n_users, len(edges) * n_neg)
    neg_i = rng.integers(0, n_items, len(edges) * n_neg)
    us = np.concatenate([pos[:, 0], neg_u])
    its = np.concatenate([pos[:, 1], neg_i])
    y = np.concatenate([np.ones(len(pos)), np.zeros(len(neg_u))])
    # Design matrix of outer products, flattened: (n, du*di)
    X = (Fu[us][:, :, None] * Fi[its][:, None, :]).reshape(len(us), -1)
    A = X.T @ X + l2 * np.eye(X.shape[1])
    w = np.linalg.solve(A, X.T @ y)
    W = w.reshape(du, di)
    return Fu @ W @ Fi.T

"""Seeded numpy MLP (Adam, weighted BCE) shared by the neural matchers.

A small two-hidden-layer network stands in for the paper's deep
matchers (no torch in this container — see DESIGN.md §4). Positive
pairs can be up-weighted to cope with EM's extreme class imbalance
(§3.5), the counterpart of the loss weighting/balanced sampling the
real systems rely on.
"""
from __future__ import annotations

import numpy as np


def _relu(x: np.ndarray) -> np.ndarray:
    return np.maximum(x, 0.0)


def _sigmoid(x: np.ndarray) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(x, -30, 30)))


class MLP:
    """Binary classifier: in_dim → hidden… → 1 with sigmoid output."""

    def __init__(
        self,
        in_dim: int,
        hidden: tuple[int, ...] = (32, 16),
        *,
        seed: int = 0,
        lr: float = 5e-3,
        epochs: int = 30,
        batch_size: int = 128,
        l2: float = 1e-4,
    ):
        self.dims = [in_dim, *hidden, 1]
        self.seed = seed
        self.lr = lr
        self.epochs = epochs
        self.batch_size = batch_size
        self.l2 = l2
        g = np.random.default_rng(seed)
        self.W = [
            g.standard_normal((a, b)) * np.sqrt(2.0 / a)
            for a, b in zip(self.dims[:-1], self.dims[1:])
        ]
        self.b = [np.zeros(b) for b in self.dims[1:]]
        self.mu = np.zeros(in_dim)
        self.sd = np.ones(in_dim)

    # ------------------------------------------------------------- forward
    def _forward(self, X: np.ndarray):
        acts = [X]
        h = X
        for i, (W, b) in enumerate(zip(self.W, self.b)):
            z = h @ W + b
            h = _sigmoid(z) if i == len(self.W) - 1 else _relu(z)
            acts.append(h)
        return acts

    def predict(self, X: np.ndarray) -> np.ndarray:
        X = (np.asarray(X, dtype=float) - self.mu) / self.sd
        return self._forward(X)[-1].ravel()

    # ------------------------------------------------------------- training
    def fit(
        self, X: np.ndarray, y: np.ndarray, *, pos_weight: float | None = None
    ) -> "MLP":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y, dtype=float).ravel()
        self.mu = X.mean(axis=0)
        self.sd = X.std(axis=0)
        self.sd[self.sd < 1e-9] = 1.0
        Xs = (X - self.mu) / self.sd
        n = len(y)
        if pos_weight is None:
            n_pos = max(1.0, float(y.sum()))
            pos_weight = min(50.0, (n - y.sum()) / n_pos) if y.sum() else 1.0
        w_sample = np.where(y == 1, pos_weight, 1.0)

        g = np.random.default_rng(self.seed + 1)
        mW = [np.zeros_like(w) for w in self.W]
        vW = [np.zeros_like(w) for w in self.W]
        mB = [np.zeros_like(b) for b in self.b]
        vB = [np.zeros_like(b) for b in self.b]
        beta1, beta2, eps = 0.9, 0.999, 1e-8
        step = 0
        for _ in range(self.epochs):
            order = g.permutation(n)
            for start in range(0, n, self.batch_size):
                idx = order[start : start + self.batch_size]
                xb, yb, wb = Xs[idx], y[idx], w_sample[idx]
                acts = self._forward(xb)
                out = acts[-1].ravel()
                # dL/dz of weighted BCE with sigmoid output
                delta = (wb * (out - yb) / len(idx)).reshape(-1, 1)
                grads_W, grads_b = [], []
                for i in range(len(self.W) - 1, -1, -1):
                    a_prev = acts[i]
                    grads_W.append(a_prev.T @ delta + self.l2 * self.W[i])
                    grads_b.append(delta.sum(axis=0))
                    if i > 0:
                        delta = (delta @ self.W[i].T) * (acts[i] > 0)
                grads_W.reverse()
                grads_b.reverse()
                step += 1
                for i in range(len(self.W)):
                    mW[i] = beta1 * mW[i] + (1 - beta1) * grads_W[i]
                    vW[i] = beta2 * vW[i] + (1 - beta2) * grads_W[i] ** 2
                    mB[i] = beta1 * mB[i] + (1 - beta1) * grads_b[i]
                    vB[i] = beta2 * vB[i] + (1 - beta2) * grads_b[i] ** 2
                    mw = mW[i] / (1 - beta1**step)
                    vw = vW[i] / (1 - beta2**step)
                    mb = mB[i] / (1 - beta1**step)
                    vb = vB[i] / (1 - beta2**step)
                    self.W[i] -= self.lr * mw / (np.sqrt(vw) + eps)
                    self.b[i] -= self.lr * mb / (np.sqrt(vb) + eps)
        return self

"""From-scratch numpy CNN for spatial (heatmap) matcher features.

Reproduces the Φ_Spa networks of §IV-B1. The paper fine-tunes a
pretrained ResNet; no pretrained weights exist offline, so we train a
compact CNN from scratch on down-sampled heatmaps (DESIGN.md §2):

    conv(5x5, C filters, stride 2) → ReLU → max-pool(2x2)
    → flatten → dense K → sigmoid (one output per expertise label)

Convolution uses im2col so both passes are matrix multiplies; the
backward pass is gradient-checked in ``tests/test_ml_cnn.py``.
"""
from __future__ import annotations

import numpy as np

__all__ = ["CNNClassifier"]


def _sigmoid(z: np.ndarray) -> np.ndarray:
    return np.where(z >= 0, 1.0 / (1.0 + np.exp(-np.abs(z))), np.exp(-np.abs(z)) / (1.0 + np.exp(-np.abs(z))))


def _im2col(X: np.ndarray, k: int, stride: int) -> tuple[np.ndarray, int]:
    """(N, H, W) → (N * out*out, k*k) patch matrix (valid padding)."""
    N, H, W = X.shape
    out = (H - k) // stride + 1
    cols = np.empty((N, out, out, k * k))
    for i in range(out):
        for j in range(out):
            patch = X[:, i * stride : i * stride + k, j * stride : j * stride + k]
            cols[:, i, j, :] = patch.reshape(N, -1)
    return cols.reshape(N * out * out, k * k), out


class CNNClassifier:
    """Multi-label image classifier over single-channel square heatmaps."""

    def __init__(
        self,
        img_size: int,
        n_labels: int,
        *,
        filters: int = 8,
        kernel: int = 5,
        stride: int = 2,
        lr: float = 1e-3,
        epochs: int = 80,
        batch_size: int = 32,
        seed: int = 0,
    ) -> None:
        self.S = img_size
        self.K = n_labels
        self.C = filters
        self.k = kernel
        self.stride = stride
        self.lr = lr
        self.epochs = epochs
        self.batch_size = batch_size
        self.seed = seed
        rng = np.random.default_rng(seed)
        self.conv_out = (img_size - kernel) // stride + 1
        if self.conv_out < 2:
            raise ValueError("image too small for kernel/stride")
        self.pool_out = self.conv_out // 2
        self.Wc = rng.normal(0, 1.0 / kernel, (kernel * kernel, filters))
        self.bc = np.zeros(filters)
        flat = self.pool_out * self.pool_out * filters
        self.Wd = rng.normal(0, 1.0 / np.sqrt(flat), (flat, n_labels))
        self.bd = np.zeros(n_labels)
        self._params = ["Wc", "bc", "Wd", "bd"]
        self._adam = {p: [np.zeros_like(getattr(self, p)), np.zeros_like(getattr(self, p))] for p in self._params}
        self._adam_t = 0

    def _forward(self, X: np.ndarray):
        N = X.shape[0]
        cols, out = _im2col(X, self.k, self.stride)
        a = (cols @ self.Wc + self.bc).reshape(N, out, out, self.C)
        r = np.maximum(a, 0.0)
        P = self.pool_out
        rp = r[:, : 2 * P, : 2 * P, :].reshape(N, P, 2, P, 2, self.C)
        pooled = rp.max(axis=(2, 4))
        flat = pooled.reshape(N, -1)
        logits = flat @ self.Wd + self.bd
        p = _sigmoid(logits)
        return p, (cols, a, r, rp, pooled, flat)

    def _loss_and_grads(self, X: np.ndarray, Y: np.ndarray):
        N = X.shape[0]
        p, (cols, a, r, rp, pooled, flat) = self._forward(X)
        eps = 1e-9
        loss = -np.mean(Y * np.log(p + eps) + (1 - Y) * np.log(1 - p + eps))
        dlogits = (p - Y) / (N * self.K)
        gWd = flat.T @ dlogits
        gbd = dlogits.sum(axis=0)
        dflat = dlogits @ self.Wd.T
        P = self.pool_out
        dpooled = dflat.reshape(N, P, P, self.C)
        # route pooled grads back to the argmax positions
        drp = np.zeros_like(rp)
        is_max = rp == pooled[:, :, None, :, None, :]
        # break ties by normalizing (max positions share the gradient)
        counts = is_max.sum(axis=(2, 4), keepdims=True)
        drp = is_max * (dpooled[:, :, None, :, None, :] / counts)
        dr = np.zeros_like(r)
        dr[:, : 2 * P, : 2 * P, :] = drp.reshape(N, 2 * P, 2 * P, self.C)
        da = dr * (a > 0)
        da_flat = da.reshape(-1, self.C)
        gWc = cols.T @ da_flat
        gbc = da_flat.sum(axis=0)
        return loss, {"Wc": gWc, "bc": gbc, "Wd": gWd, "bd": gbd}

    def _adam_step(self, grads: dict[str, np.ndarray]) -> None:
        self._adam_t += 1
        b1, b2, eps = 0.9, 0.999, 1e-8
        t = self._adam_t
        for pn in self._params:
            g = np.clip(grads[pn], -5.0, 5.0)
            m, v = self._adam[pn]
            m[:] = b1 * m + (1 - b1) * g
            v[:] = b2 * v + (1 - b2) * g**2
            setattr(
                self,
                pn,
                getattr(self, pn)
                - self.lr * (m / (1 - b1**t)) / (np.sqrt(v / (1 - b2**t)) + eps),
            )

    def fit(self, X: np.ndarray, Y: np.ndarray) -> "CNNClassifier":
        X = np.asarray(X, dtype=float)
        Y = np.asarray(Y, dtype=float).reshape(X.shape[0], self.K)
        # per-image max-normalization (heatmaps have arbitrary total mass)
        mx = X.reshape(X.shape[0], -1).max(axis=1)
        mx[mx < 1e-12] = 1.0
        X = X / mx[:, None, None]
        rng = np.random.default_rng(self.seed + 1)
        N = X.shape[0]
        for _ in range(self.epochs):
            order = rng.permutation(N)
            for s in range(0, N, self.batch_size):
                idx = order[s : s + self.batch_size]
                _, grads = self._loss_and_grads(X[idx], Y[idx])
                self._adam_step(grads)
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype=float)
        mx = X.reshape(X.shape[0], -1).max(axis=1)
        mx[mx < 1e-12] = 1.0
        X = X / mx[:, None, None]
        p, _ = self._forward(X)
        return p

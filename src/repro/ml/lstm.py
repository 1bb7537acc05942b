"""From-scratch numpy LSTM for sequential matcher-behavior features.

Reproduces the Φ_Seq network of §IV-B1: an LSTM hidden layer (64 units)
→ dropout 0.5 → dense 100 + ReLU → K sigmoid outputs (one per expertise
label), trained with Adam (eta=1e-3, beta1=.9, beta2=.999) on binary
cross-entropy. Keras/TensorFlow are unavailable offline, so forward and
full BPTT are implemented here; a finite-difference gradient check in
``tests/test_ml_lstm.py`` pins the backward pass.

Sequences are padded at the tail; a mask carries (h, c) through padded
steps so the readout is each sequence's true last hidden state.
"""
from __future__ import annotations

import numpy as np

__all__ = ["LSTMClassifier", "pad_sequences"]


def pad_sequences(seqs: list[np.ndarray], max_len: int | None = None) -> tuple[np.ndarray, np.ndarray]:
    """Stack variable-length (T_i, d) sequences into (N, T, d) + mask (N, T)."""
    if not seqs:
        raise ValueError("empty sequence list")
    d = seqs[0].shape[1]
    T = max_len or max(s.shape[0] for s in seqs)
    N = len(seqs)
    X = np.zeros((N, T, d))
    M = np.zeros((N, T))
    for i, s in enumerate(seqs):
        t = min(T, s.shape[0])
        X[i, :t] = s[:t]
        M[i, :t] = 1.0
    return X, M


def _sigmoid(z: np.ndarray) -> np.ndarray:
    return np.where(z >= 0, 1.0 / (1.0 + np.exp(-np.abs(z))), np.exp(-np.abs(z)) / (1.0 + np.exp(-np.abs(z))))


class LSTMClassifier:
    """Multi-label sequence classifier (K independent sigmoid outputs)."""

    def __init__(
        self,
        input_dim: int,
        n_labels: int,
        *,
        hidden: int = 64,
        dense: int = 100,
        dropout: float = 0.5,
        lr: float = 1e-3,
        epochs: int = 60,
        batch_size: int = 32,
        seed: int = 0,
    ) -> None:
        self.d = input_dim
        self.K = n_labels
        self.H = hidden
        self.D = dense
        self.dropout = dropout
        self.lr = lr
        self.epochs = epochs
        self.batch_size = batch_size
        self.seed = seed
        rng = np.random.default_rng(seed)
        H, d, D, K = hidden, input_dim, dense, n_labels
        sc = 1.0 / np.sqrt(d + H)
        self.Wx = rng.normal(0, sc, (d, 4 * H))
        self.Wh = rng.normal(0, sc, (H, 4 * H))
        self.b = np.zeros(4 * H)
        self.b[H : 2 * H] = 1.0  # forget-gate bias init
        self.W1 = rng.normal(0, 1.0 / np.sqrt(H), (H, D))
        self.b1 = np.zeros(D)
        self.W2 = rng.normal(0, 1.0 / np.sqrt(D), (D, K))
        self.b2 = np.zeros(K)
        self._params = ["Wx", "Wh", "b", "W1", "b1", "W2", "b2"]
        self._adam = {p: [np.zeros_like(getattr(self, p)), np.zeros_like(getattr(self, p))] for p in self._params}
        self._adam_t = 0
        self.mu_: np.ndarray | None = None
        self.sd_: np.ndarray | None = None

    # ---------------- forward ----------------

    def _forward_lstm(self, X: np.ndarray, M: np.ndarray):
        """Run the recurrence; returns final h and a cache for BPTT."""
        N, T, _ = X.shape
        H = self.H
        h = np.zeros((N, H))
        c = np.zeros((N, H))
        cache = []
        for t in range(T):
            x_t = X[:, t, :]
            m = M[:, t][:, None]
            z = x_t @ self.Wx + h @ self.Wh + self.b
            i = _sigmoid(z[:, :H])
            f = _sigmoid(z[:, H : 2 * H])
            o = _sigmoid(z[:, 2 * H : 3 * H])
            g = np.tanh(z[:, 3 * H :])
            c_new = f * c + i * g
            h_new = o * np.tanh(c_new)
            # padded steps carry state through unchanged
            c_next = m * c_new + (1 - m) * c
            h_next = m * h_new + (1 - m) * h
            cache.append((x_t, h, c, i, f, o, g, c_new, m))
            h, c = h_next, c_next
        return h, cache

    def _forward_head(self, h: np.ndarray, drop_mask: np.ndarray | None):
        hd = h * drop_mask if drop_mask is not None else h
        a1 = hd @ self.W1 + self.b1
        r1 = np.maximum(a1, 0.0)
        logits = r1 @ self.W2 + self.b2
        p = _sigmoid(logits)
        return p, (hd, a1, r1)

    def _loss_and_grads(self, X, M, Y, rng):
        N = X.shape[0]
        h, cache = self._forward_lstm(X, M)
        if self.dropout > 0:
            drop = (rng.random(h.shape) >= self.dropout) / (1 - self.dropout)
        else:
            drop = None
        p, (hd, a1, r1) = self._forward_head(h, drop)
        eps = 1e-9
        loss = -np.mean(Y * np.log(p + eps) + (1 - Y) * np.log(1 - p + eps))
        # head backward
        dlogits = (p - Y) / (N * self.K)
        gW2 = r1.T @ dlogits
        gb2 = dlogits.sum(axis=0)
        dr1 = dlogits @ self.W2.T
        da1 = dr1 * (a1 > 0)
        gW1 = hd.T @ da1
        gb1 = da1.sum(axis=0)
        dh = da1 @ self.W1.T
        if drop is not None:
            dh = dh * drop
        # LSTM BPTT
        H = self.H
        dWx = np.zeros_like(self.Wx)
        dWh = np.zeros_like(self.Wh)
        db = np.zeros_like(self.b)
        dc = np.zeros((N, H))
        for t in reversed(range(X.shape[1])):
            x_t, h_prev, c_prev, i, f, o, g, c_new, m = cache[t]
            # split incoming grads between the computed step (mask=1) and
            # the carried-through path (mask=0)
            dh_step = dh * m
            dc_step = dc * m
            dh_carry = dh * (1 - m)
            dc_carry = dc * (1 - m)
            tc = np.tanh(c_new)
            do = dh_step * tc
            dc_new = dc_step + dh_step * o * (1 - tc**2)
            di = dc_new * g
            df = dc_new * c_prev
            dg = dc_new * i
            dz = np.concatenate(
                [di * i * (1 - i), df * f * (1 - f), do * o * (1 - o), dg * (1 - g**2)],
                axis=1,
            )
            dWx += x_t.T @ dz
            dWh += h_prev.T @ dz
            db += dz.sum(axis=0)
            dh = dh_carry + dz @ self.Wh.T
            dc = dc_carry + dc_new * f
        grads = {"Wx": dWx, "Wh": dWh, "b": db, "W1": gW1, "b1": gb1, "W2": gW2, "b2": gb2}
        return loss, grads

    def _adam_step(self, grads: dict[str, np.ndarray]) -> None:
        self._adam_t += 1
        b1, b2, eps = 0.9, 0.999, 1e-8
        t = self._adam_t
        for pn in self._params:
            g = np.clip(grads[pn], -5.0, 5.0)
            m, v = self._adam[pn]
            m[:] = b1 * m + (1 - b1) * g
            v[:] = b2 * v + (1 - b2) * g**2
            step = self.lr * (m / (1 - b1**t)) / (np.sqrt(v / (1 - b2**t)) + eps)
            setattr(self, pn, getattr(self, pn) - step)

    # ---------------- public API ----------------

    def fit(self, seqs: list[np.ndarray], Y: np.ndarray) -> "LSTMClassifier":
        X, M = pad_sequences(seqs)
        Y = np.asarray(Y, dtype=float).reshape(len(seqs), self.K)
        # per-dimension standardization over valid steps only
        valid = M.astype(bool)
        flat = X[valid]
        self.mu_ = flat.mean(axis=0)
        self.sd_ = flat.std(axis=0)
        self.sd_[self.sd_ < 1e-12] = 1.0
        X = np.where(valid[:, :, None], (X - self.mu_) / self.sd_, 0.0)
        rng = np.random.default_rng(self.seed + 1)
        N = X.shape[0]
        for _ in range(self.epochs):
            order = rng.permutation(N)
            for s in range(0, N, self.batch_size):
                idx = order[s : s + self.batch_size]
                _, grads = self._loss_and_grads(X[idx], M[idx], Y[idx], rng)
                self._adam_step(grads)
        return self

    def predict_proba(self, seqs: list[np.ndarray]) -> np.ndarray:
        if self.mu_ is None:
            raise RuntimeError("fit() first")
        X, M = pad_sequences(seqs)
        valid = M.astype(bool)
        X = np.where(valid[:, :, None], (X - self.mu_) / self.sd_, 0.0)
        h, _ = self._forward_lstm(X, M)
        p, _ = self._forward_head(h, None)
        return p

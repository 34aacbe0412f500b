"""LSTM-based forecaster — the paper's second model (Fig. 4).

Architecture reproduced from Section 5: one LSTM unit over a window of
the K=7 previous metric values, hidden/output dimensionality d=4, then a
d×1 fully-connected layer producing the forecast of M_t. The paper uses
Keras; this container has no deep-learning stack, so the cell, BPTT and
Adam are implemented here in numpy (same equations, same loss — MSE on
the standardized series; only the autodiff engine differs).

Training is full-batch over the (t₀ - K) sliding windows of the training
series; forecasting is iterative (each prediction is appended to the
window for the next step), matching eq. (2)'s usage. Forecast intervals
are a residual-quantile heuristic (Keras gives none either): ±z·σ̂·√h
with σ̂ the training-residual std — only used for interval-width *trend*
comparisons, never for the paper's ARIMA interval numbers.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.forecast.optim import norm_ppf


def _sigmoid(x: np.ndarray) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(x, -30, 30)))


@dataclass
class LSTMForecaster:
    """Numpy LSTM(hidden) + Dense(1) forecaster over K-length windows."""

    window: int = 7
    hidden: int = 4
    lr: float = 0.02
    epochs: int = 300
    seed: int = 0

    def __post_init__(self) -> None:
        g = np.random.default_rng(self.seed)
        H = self.hidden
        s = 1.0 / np.sqrt(H + 1)
        # Gate order in the stacked matrices: [input, forget, output, cell].
        self.Wx = g.normal(0, s, (4 * H, 1))
        self.Wh = g.normal(0, s, (4 * H, H))
        self.b = np.zeros(4 * H)
        self.b[H : 2 * H] = 1.0  # forget-gate bias init (standard practice)
        self.Wd = g.normal(0, s, H)
        self.bd = 0.0
        self._mu = 0.0
        self._sd = 1.0
        self._resid_std = 0.0
        self._train_tail: np.ndarray | None = None

    # ---------------------------------------------------------- forward
    def _forward(self, X: np.ndarray):
        """Run the cell over a batch of windows; keep caches for BPTT.

        X: (N, K) standardized inputs. Returns (pred (N,), caches).
        """
        N, K = X.shape
        H = self.hidden
        h = np.zeros((N, H))
        c = np.zeros((N, H))
        caches = []
        for t in range(K):
            x_t = X[:, t : t + 1]  # (N,1)
            z = x_t @ self.Wx.T + h @ self.Wh.T + self.b  # (N,4H)
            i = _sigmoid(z[:, :H])
            f = _sigmoid(z[:, H : 2 * H])
            o = _sigmoid(z[:, 2 * H : 3 * H])
            g = np.tanh(z[:, 3 * H :])
            c_new = f * c + i * g
            tanh_c = np.tanh(c_new)
            h_new = o * tanh_c
            caches.append((x_t, h, c, i, f, o, g, c_new, tanh_c))
            h, c = h_new, c_new
        pred = h @ self.Wd + self.bd
        return pred, h, caches

    # --------------------------------------------------------- training
    def fit(self, series: np.ndarray) -> "LSTMForecaster":
        """Train on a series (original units); returns self."""
        y_raw = np.asarray(series, dtype="float64")
        if len(y_raw) <= self.window + 2:
            raise ValueError(
                f"series of length {len(y_raw)} too short for window {self.window}"
            )
        self._mu, self._sd = float(y_raw.mean()), float(y_raw.std())
        if self._sd <= 0:
            self._sd = 1.0
        z = (y_raw - self._mu) / self._sd
        K, H = self.window, self.hidden
        N = len(z) - K
        X = np.lib.stride_tricks.sliding_window_view(z, K)[:N]
        y = z[K:]

        # Adam state.
        params = [self.Wx, self.Wh, self.b, self.Wd]
        m = [np.zeros_like(p) for p in params] + [0.0]
        v = [np.zeros_like(p) for p in params] + [0.0]
        b1, b2, eps = 0.9, 0.999, 1e-8

        for epoch in range(1, self.epochs + 1):
            pred, h_last, caches = self._forward(X)
            err = pred - y  # (N,)
            # Dense layer grads.
            gWd = h_last.T @ err / N
            gbd = float(err.mean())
            dh = np.outer(err, self.Wd) / N  # (N,H)
            dc = np.zeros_like(dh)
            gWx = np.zeros_like(self.Wx)
            gWh = np.zeros_like(self.Wh)
            gb = np.zeros_like(self.b)
            for t in range(K - 1, -1, -1):
                x_t, h_prev, c_prev, i, f, o, g, c_new, tanh_c = caches[t]
                do = dh * tanh_c
                dc = dc + dh * o * (1 - tanh_c**2)
                di = dc * g
                dg = dc * i
                df = dc * c_prev
                dzi = di * i * (1 - i)
                dzf = df * f * (1 - f)
                dzo = do * o * (1 - o)
                dzg = dg * (1 - g**2)
                dz = np.concatenate([dzi, dzf, dzo, dzg], axis=1)  # (N,4H)
                gWx += dz.T @ x_t
                gWh += dz.T @ h_prev
                gb += dz.sum(axis=0)
                dh = dz @ self.Wh
                dc = dc * f
            grads = [gWx, gWh, gb, gWd, gbd]
            tensors = [self.Wx, self.Wh, self.b, self.Wd]
            for k in range(4):
                m[k] = b1 * m[k] + (1 - b1) * grads[k]
                v[k] = b2 * v[k] + (1 - b2) * grads[k] ** 2
                mhat = m[k] / (1 - b1**epoch)
                vhat = v[k] / (1 - b2**epoch)
                tensors[k] -= self.lr * mhat / (np.sqrt(vhat) + eps)
            m[4] = b1 * m[4] + (1 - b1) * gbd
            v[4] = b2 * v[4] + (1 - b2) * gbd**2
            self.bd -= self.lr * (m[4] / (1 - b1**epoch)) / (
                np.sqrt(v[4] / (1 - b2**epoch)) + eps
            )

        pred, _, _ = self._forward(X)
        self._resid_std = float(np.std(pred - y))
        self._train_tail = z[-K:].copy()
        return self

    # ------------------------------------------------------- forecasting
    def forecast(self, h: int, *, conf: float = 0.9) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
        """Iterative h-step forecast: (point, lower, upper), original units."""
        if self._train_tail is None:
            raise RuntimeError("fit() must be called before forecast()")
        window = list(self._train_tail)
        out = np.empty(h)
        for step in range(h):
            X = np.asarray(window[-self.window:], dtype="float64")[None, :]
            pred, _, _ = self._forward(X)
            out[step] = float(pred[0])
            window.append(out[step])
        z = norm_ppf(0.5 + conf / 2)
        se = self._resid_std * np.sqrt(np.arange(1, h + 1))
        point = out * self._sd + self._mu
        return point, point - z * se * self._sd, point + z * se * self._sd

"""Uni- and bi-directional LSTM sequence encoders with full BPTT.

The paper (§2.3) composes the token vectors of an attribute value with a
*shared* LSTM-RNN and takes the last hidden state as the attribute's
distributed representation; the bidirectional variant concatenates the last
hidden states of the left-to-right and right-to-left passes.

Sequences are right-padded; a ``(B, T)`` 0/1 mask marks valid positions. At a
masked step the hidden and cell state carry through unchanged, so the "last"
hidden state of a padded sequence equals the hidden state at its true final
token.
"""
from __future__ import annotations

import numpy as np

from repro.nn.layers import sigmoid


class LSTM:
    """Single-layer unidirectional LSTM returning the final hidden state.

    ``forward(X, mask)`` consumes ``X`` of shape ``(B, T, d)`` and returns
    ``(B, h)``. ``backward(dh)`` returns ``dX`` of shape ``(B, T, d)`` for
    embedding fine-tuning and accumulates parameter gradients.
    """

    def __init__(self, d_in: int, d_hidden: int, *, rng: np.random.Generator | None = None):
        rng = rng or np.random.default_rng(0)
        s = np.sqrt(1.0 / d_hidden)
        self.d_in, self.d_hidden = d_in, d_hidden
        self.params = {
            "Wx": rng.uniform(-s, s, size=(d_in, 4 * d_hidden)),
            "Wh": rng.uniform(-s, s, size=(d_hidden, 4 * d_hidden)),
            "b": np.zeros(4 * d_hidden),
        }
        # Forget-gate bias init to 1: standard trick so early training does
        # not erase state (paper relies on LSTM's long-range memory).
        self.params["b"][d_hidden:2 * d_hidden] = 1.0
        self.grads = {k: np.zeros_like(v) for k, v in self.params.items()}
        self._cache = None

    def forward(self, X: np.ndarray, mask: np.ndarray) -> np.ndarray:
        B, T, d = X.shape
        h = self.d_hidden
        Wx, Wh, b = self.params["Wx"], self.params["Wh"], self.params["b"]
        h_t = np.zeros((B, h))
        c_t = np.zeros((B, h))
        steps = []
        for t in range(T):
            x_t = X[:, t, :]
            m = mask[:, t][:, None]
            z = x_t @ Wx + h_t @ Wh + b
            i = sigmoid(z[:, :h])
            f = sigmoid(z[:, h:2 * h])
            o = sigmoid(z[:, 2 * h:3 * h])
            g = np.tanh(z[:, 3 * h:])
            c_raw = f * c_t + i * g
            tc = np.tanh(c_raw)
            h_raw = o * tc
            h_prev, c_prev = h_t, c_t
            h_t = m * h_raw + (1.0 - m) * h_prev
            c_t = m * c_raw + (1.0 - m) * c_prev
            steps.append((x_t, h_prev, c_prev, i, f, o, g, tc, m))
        self._cache = (X.shape, steps)
        return h_t

    def backward(self, dh_last: np.ndarray) -> np.ndarray:
        (B, T, d), steps = self._cache
        h = self.d_hidden
        Wx, Wh = self.params["Wx"], self.params["Wh"]
        dX = np.zeros((B, T, d))
        dh = dh_last.copy()
        dc = np.zeros_like(dh)
        for t in range(T - 1, -1, -1):
            x_t, h_prev, c_prev, i, f, o, g, tc, m = steps[t]
            dh_raw = m * dh
            dc_raw = m * dc
            do = dh_raw * tc
            dc_raw = dc_raw + dh_raw * o * (1.0 - tc * tc)
            di = dc_raw * g
            df = dc_raw * c_prev
            dg = dc_raw * i
            dz = np.concatenate(
                [
                    di * i * (1.0 - i),
                    df * f * (1.0 - f),
                    do * o * (1.0 - o),
                    dg * (1.0 - g * g),
                ],
                axis=1,
            )
            self.grads["Wx"] += x_t.T @ dz
            self.grads["Wh"] += h_prev.T @ dz
            self.grads["b"] += dz.sum(axis=0)
            dX[:, t, :] = dz @ Wx.T
            dh = dz @ Wh.T + (1.0 - m) * dh
            dc = dc_raw * f + (1.0 - m) * dc
        return dX

    def zero_grad(self) -> None:
        for g in self.grads.values():
            g[...] = 0.0


def _reverse_padded(X: np.ndarray, mask: np.ndarray) -> np.ndarray:
    """Reverse each row's valid prefix, keeping right-padding in place."""
    out = np.zeros_like(X)
    lengths = mask.sum(axis=1).astype(int)
    for b, n in enumerate(lengths):
        if n > 0:
            out[b, :n] = X[b, n - 1::-1]
    return out


class BiLSTM:
    """Bidirectional LSTM: concatenation of both directions' final states.

    Output dimension is ``2 * d_hidden`` (the paper's ``[h_fwd, h_bwd]``).
    """

    def __init__(self, d_in: int, d_hidden: int, *, rng: np.random.Generator | None = None):
        rng = rng or np.random.default_rng(0)
        self.fwd = LSTM(d_in, d_hidden, rng=rng)
        self.bwd = LSTM(d_in, d_hidden, rng=rng)
        self.d_hidden = d_hidden
        self._mask = None

    @property
    def modules(self):
        return [self.fwd, self.bwd]

    def forward(self, X: np.ndarray, mask: np.ndarray) -> np.ndarray:
        self._mask = mask
        hf = self.fwd.forward(X, mask)
        hb = self.bwd.forward(_reverse_padded(X, mask), mask)
        return np.concatenate([hf, hb], axis=1)

    def backward(self, dh: np.ndarray) -> np.ndarray:
        h = self.d_hidden
        dXf = self.fwd.backward(dh[:, :h])
        dXb = self.bwd.backward(dh[:, h:])
        return dXf + _reverse_padded(dXb, self._mask)

    def zero_grad(self) -> None:
        self.fwd.zero_grad()
        self.bwd.zero_grad()

"""Dense layer, activations, and binary cross-entropy with explicit backward.

Conventions: every layer exposes ``forward(x)`` returning the output and
stashing a cache, and ``backward(dout)`` returning the gradient w.r.t. the
input while accumulating parameter gradients in ``.grads`` (keyed like
``.params``). Parameters are plain numpy arrays so the Adam optimizer can
update them in place.
"""
from __future__ import annotations

import numpy as np


def sigmoid(x: np.ndarray) -> np.ndarray:
    """Numerically stable logistic sigmoid."""
    out = np.empty_like(x, dtype=np.float64)
    pos = x >= 0
    out[pos] = 1.0 / (1.0 + np.exp(-x[pos]))
    ex = np.exp(x[~pos])
    out[~pos] = ex / (1.0 + ex)
    return out


def tanh(x: np.ndarray) -> np.ndarray:
    """Hyperbolic tangent (thin wrapper for symmetry with ``sigmoid``)."""
    return np.tanh(x)


class Dense:
    """Affine layer ``y = x @ W + b`` with optional activation.

    ``activation`` is one of ``None``, ``"sigmoid"``, ``"tanh"``, ``"relu"``.
    """

    def __init__(self, d_in: int, d_out: int, *, activation: str | None = None,
                 rng: np.random.Generator | None = None):
        rng = rng or np.random.default_rng(0)
        scale = np.sqrt(2.0 / (d_in + d_out))
        self.params = {
            "W": rng.normal(0.0, scale, size=(d_in, d_out)),
            "b": np.zeros(d_out),
        }
        self.grads = {k: np.zeros_like(v) for k, v in self.params.items()}
        self.activation = activation
        self._cache: tuple | None = None

    def forward(self, x: np.ndarray) -> np.ndarray:
        z = x @ self.params["W"] + self.params["b"]
        if self.activation == "sigmoid":
            a = sigmoid(z)
        elif self.activation == "tanh":
            a = np.tanh(z)
        elif self.activation == "relu":
            a = np.maximum(z, 0.0)
        elif self.activation is None:
            a = z
        else:  # pragma: no cover - guarded by constructor usage
            raise ValueError(f"unknown activation {self.activation!r}")
        self._cache = (x, z, a)
        return a

    def backward(self, dout: np.ndarray) -> np.ndarray:
        x, z, a = self._cache
        if self.activation == "sigmoid":
            dz = dout * a * (1.0 - a)
        elif self.activation == "tanh":
            dz = dout * (1.0 - a * a)
        elif self.activation == "relu":
            dz = dout * (z > 0)
        else:
            dz = dout
        self.grads["W"] += x.T @ dz
        self.grads["b"] += dz.sum(axis=0)
        return dz @ self.params["W"].T

    def zero_grad(self) -> None:
        for g in self.grads.values():
            g[...] = 0.0


def bce_loss(p: np.ndarray, y: np.ndarray, eps: float = 1e-9):
    """Mean binary cross-entropy and its gradient w.r.t. probabilities ``p``.

    Returns ``(loss, dp)`` where ``dp`` already includes the 1/N mean factor.
    """
    p = np.clip(p, eps, 1.0 - eps)
    n = p.shape[0]
    loss = -float(np.mean(y * np.log(p) + (1.0 - y) * np.log(1.0 - p)))
    dp = (p - y) / (p * (1.0 - p)) / n
    return loss, dp

"""Adam optimizer over modules exposing ``.params`` / ``.grads`` dicts.

The paper trains DeepER with Adam (lr 0.01, 20 epochs, batch 16, L2
regularization 1e-3); those defaults are mirrored here.
"""
from __future__ import annotations

import numpy as np


class Adam:
    def __init__(self, modules, *, lr: float = 0.01, beta1: float = 0.9,
                 beta2: float = 0.999, eps: float = 1e-8, weight_decay: float = 1e-3):
        self.modules = list(modules)
        self.lr, self.b1, self.b2, self.eps = lr, beta1, beta2, eps
        self.weight_decay = weight_decay
        self.t = 0
        self._m = [
            {k: np.zeros_like(v) for k, v in mod.params.items()} for mod in self.modules
        ]
        self._v = [
            {k: np.zeros_like(v) for k, v in mod.params.items()} for mod in self.modules
        ]

    def zero_grad(self) -> None:
        for mod in self.modules:
            mod.zero_grad()

    def step(self) -> None:
        self.t += 1
        bc1 = 1.0 - self.b1 ** self.t
        bc2 = 1.0 - self.b2 ** self.t
        for mod, ms, vs in zip(self.modules, self._m, self._v):
            for k, p in mod.params.items():
                g = mod.grads[k]
                if self.weight_decay and p.ndim > 1:  # no decay on biases
                    g = g + self.weight_decay * p
                ms[k] = self.b1 * ms[k] + (1.0 - self.b1) * g
                vs[k] = self.b2 * vs[k] + (1.0 - self.b2) * g * g
                p -= self.lr * (ms[k] / bc1) / (np.sqrt(vs[k] / bc2) + self.eps)

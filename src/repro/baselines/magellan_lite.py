"""Magellan-lite: the classical feature-engineering EM baseline of Table 4.

Magellan's matcher auto-generates per-attribute string-similarity features
and trains an ML classifier on labeled pairs. We reproduce that pipeline
class: five symbolic similarity functions per attribute + a logistic
regression head trained with Adam (same optimizer budget as DeepER so the
comparison isolates the *representation*, which is the paper's point —
symbolic token similarity vs distributed similarity).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.baselines import simfns
from repro.nn import Adam, Dense, bce_loss

_FEATURES = [simfns.jaccard_tokens, simfns.jaccard_trigrams,
             simfns.levenshtein_sim, simfns.exact_match, simfns.numeric_sim]


def featurize_pairs(table_a: pd.DataFrame, table_b: pd.DataFrame,
                    attrs: list[str],
                    pairs: list[tuple[str, str]]) -> np.ndarray:
    """(n_pairs, n_attrs * 5) symbolic feature matrix."""
    a = table_a.set_index("id")
    b = table_b.set_index("id")
    rows = np.empty((len(pairs), len(attrs) * len(_FEATURES)))
    for i, (ia, ib) in enumerate(pairs):
        ra, rb = a.loc[ia], b.loc[ib]
        col = 0
        for attr in attrs:
            va, vb = ra[attr], rb[attr]
            for fn in _FEATURES:
                rows[i, col] = fn(va, vb)
                col += 1
    return rows


class MagellanLite:
    """Logistic-regression matcher over symbolic similarity features."""

    def __init__(self, n_features: int, *, lr: float = 0.05,
                 epochs: int = 30, batch: int = 64, seed: int = 0):
        rng = np.random.default_rng(seed)
        self.clf = Dense(n_features, 1, activation="sigmoid", rng=rng)
        self.opt = Adam([self.clf], lr=lr, weight_decay=1e-4)
        self.epochs, self.batch = epochs, batch
        self._rng = rng

    def fit(self, X: np.ndarray, y: np.ndarray) -> "MagellanLite":
        n = len(X)
        for _ in range(self.epochs):
            order = self._rng.permutation(n)
            for s in range(0, n, self.batch):
                idx = order[s:s + self.batch]
                p = self.clf.forward(X[idx])[:, 0]
                _, dp = bce_loss(p, y[idx])
                self.opt.zero_grad()
                self.clf.backward(dp[:, None])
                self.opt.step()
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        return self.clf.forward(X)[:, 0]

    def predict(self, X: np.ndarray, threshold: float = 0.5) -> np.ndarray:
        return (self.predict_proba(X) >= threshold).astype(float)

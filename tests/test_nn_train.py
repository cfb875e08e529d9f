"""Training-dynamics tests: the substrate must actually learn.

These are end-to-end sanity checks on toy tasks that exercise the same
optimization loop DeepER uses (Adam, mini-batches, BCE).
"""
import numpy as np

from repro.nn import LSTM, Adam, Dense, bce_loss


def test_dense_learns_linearly_separable():
    rng = np.random.default_rng(0)
    X = rng.normal(size=(200, 4))
    y = (X @ np.array([1.0, -2.0, 0.5, 0.0]) > 0).astype(float)
    clf = Dense(4, 1, activation="sigmoid", rng=rng)
    opt = Adam([clf], lr=0.05, weight_decay=0.0)
    for _ in range(300):
        p = clf.forward(X)[:, 0]
        _, dp = bce_loss(p, y)
        opt.zero_grad()
        clf.backward(dp[:, None])
        opt.step()
    acc = float(np.mean((clf.forward(X)[:, 0] > 0.5) == y))
    assert acc > 0.97


def test_adam_descends_quadratic():
    class Quad:
        def __init__(self):
            self.params = {"x": np.array([5.0, -3.0])}
            self.grads = {"x": np.zeros(2)}

        def zero_grad(self):
            self.grads["x"][...] = 0.0

    q = Quad()
    opt = Adam([q], lr=0.1, weight_decay=0.0)
    for _ in range(500):
        opt.zero_grad()
        q.grads["x"] += 2.0 * q.params["x"]
        opt.step()
    assert np.abs(q.params["x"]).max() < 1e-2


def test_lstm_learns_order_sensitive_task():
    """Classify whether token A precedes token B — impossible for averaging,
    learnable by an LSTM. This is the mechanism behind the paper's claim that
    LSTM composition helps on word-order-sensitive data (§2.3, Fig. 9)."""
    rng = np.random.default_rng(2)
    d, T, n = 6, 4, 240
    tok = rng.normal(size=(3, d))  # A, B, filler
    X = np.zeros((n, T, d))
    y = np.zeros(n)
    for i in range(n):
        order = [0, 1] if i % 2 == 0 else [1, 0]
        y[i] = float(i % 2 == 0)
        pos = sorted(rng.choice(T, size=2, replace=False))
        seq = [2] * T
        seq[pos[0]], seq[pos[1]] = order
        X[i] = tok[seq]
    mask = np.ones((n, T))
    enc = LSTM(d, 8, rng=rng)
    head = Dense(8, 1, activation="sigmoid", rng=rng)
    opt = Adam([enc, head], lr=0.02, weight_decay=0.0)
    for _ in range(150):
        h = enc.forward(X, mask)
        p = head.forward(h)[:, 0]
        _, dp = bce_loss(p, y)
        opt.zero_grad()
        dh = head.backward(dp[:, None])
        enc.backward(dh)
        opt.step()
    p = head.forward(enc.forward(X, mask))[:, 0]
    acc = float(np.mean((p > 0.5) == y))
    assert acc > 0.95

    # averaging the same token vectors cannot distinguish the classes:
    avg = X.mean(axis=1)
    same = np.abs(avg[0] - avg[1]).max()
    assert same < 2.0  # averaged representations overlap across classes


def test_weight_decay_shrinks_unused_weights():
    rng = np.random.default_rng(3)
    layer = Dense(2, 1, rng=rng)
    layer.params["W"][...] = 10.0
    opt = Adam([layer], lr=0.05, weight_decay=1e-1)
    X = np.zeros((4, 2))  # no signal: only decay acts on W
    for _ in range(200):
        p = layer.forward(X)[:, 0]
        _, dp = bce_loss((p * 0) + 0.5, np.full(4, 0.5))
        opt.zero_grad()
        layer.backward(np.zeros((4, 1)))
        opt.step()
    assert np.abs(layer.params["W"]).max() < 10.0

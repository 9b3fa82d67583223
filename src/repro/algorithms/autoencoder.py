"""Two-hidden-layer AutoEncoder (H1, H2), mini-batch SGD — Table 2 row 6.

One HOP DAG per batch computes the full forward and backward pass
(sigmoid activations, reconstruction loss): matmult-heavy with long
cell-wise backprop chains (``δ ⊙ H ⊙ (1−H)``) and ``t(H) %*% δ``
col_agg_t patterns. CSEs abound (each activation is consumed by three
operators), which is exactly the materialization-point regime.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core import hop as H
from repro.lina.sparse import CSR


@dataclass
class AutoEncoderConfig:
    h1: int = 500
    h2: int = 2
    batch: int = 512
    lr: float = 0.01
    epochs: int = 1


def run(engine, X, cfg: AutoEncoderConfig | None = None, seed: int = 9) -> dict:
    cfg = cfg or AutoEncoderConfig()
    Xd = X.to_dense() if isinstance(X, CSR) else X
    n, m = Xd.shape
    g = np.random.default_rng(seed)

    def init(a, b):
        return (g.standard_normal((a, b)) * np.sqrt(2.0 / a)).astype(np.float64)

    W1, W2 = init(m, cfg.h1), init(cfg.h1, cfg.h2)
    W3, W4 = init(cfg.h2, cfg.h1), init(cfg.h1, m)
    b1 = np.zeros((1, cfg.h1)); b2 = np.zeros((1, cfg.h2))
    b3 = np.zeros((1, cfg.h1)); b4 = np.zeros((1, m))

    bsz = min(cfg.batch, n)
    Xb = H.var("Xb", bsz, m)
    W1h, W2h = H.var("W1", m, cfg.h1), H.var("W2", cfg.h1, cfg.h2)
    W3h, W4h = H.var("W3", cfg.h2, cfg.h1), H.var("W4", cfg.h1, m)
    b1h, b2h = H.var("b1", 1, cfg.h1), H.var("b2", 1, cfg.h2)
    b3h, b4h = H.var("b3", 1, cfg.h1), H.var("b4", 1, m)

    H1 = H.sigmoid(Xb @ W1h + b1h)
    H2 = H.sigmoid(H1 @ W2h + b2h)
    H3 = H.sigmoid(H2 @ W3h + b3h)
    O = H3 @ W4h + b4h
    E = O - Xb
    dW4 = H3.T @ E
    db4 = H.col_sums(E)
    d3 = (E @ W4h.T) * H3 * (1.0 - H3)
    dW3 = H2.T @ d3
    db3 = H.col_sums(d3)
    d2 = (d3 @ W3h.T) * H2 * (1.0 - H2)
    dW2 = H1.T @ d2
    db2 = H.col_sums(d2)
    d1 = (d2 @ W2h.T) * H1 * (1.0 - H1)
    dW1 = Xb.T @ d1
    db1 = H.col_sums(d1)
    obj = H.sum_(E**2.0)
    batch_dag = [dW1, dW2, dW3, dW4, db1, db2, db3, db4, obj]

    losses = []
    for _ in range(cfg.epochs):
        for lo in range(0, n - bsz + 1, bsz):
            xb = Xd[lo : lo + bsz]
            grads = engine(
                batch_dag,
                {
                    "Xb": xb, "W1": W1, "W2": W2, "W3": W3, "W4": W4,
                    "b1": b1, "b2": b2, "b3": b3, "b4": b4,
                },
            )
            gW1, gW2, gW3, gW4, gb1, gb2, gb3, gb4, lo_v = [
                np.asarray(v) if not isinstance(v, float) else v for v in grads
            ]
            lr = cfg.lr / bsz
            W1 -= lr * gW1; W2 -= lr * gW2; W3 -= lr * gW3; W4 -= lr * gW4
            b1 -= lr * gb1; b2 -= lr * gb2; b3 -= lr * gb3; b4 -= lr * gb4
            losses.append(float(lo_v))
    return {"losses": losses, "iters": len(losses)}

"""Synthetic ML datasets with the shape/sparsity character of the paper's
evaluation data (§5.1 Datasets), at configurable reduced scale.

The real datasets (Airline78, Mnist1m/8m, Netflix, Amazon) are
unavailable offline; these generators match the characteristics the
experiments depend on — density, sparsity/ultra-sparsity, aspect ratio,
and label structure — as documented in DESIGN.md.
"""
from __future__ import annotations

import numpy as np

from repro.lina.sparse import CSR


def dense_features(n: int, m: int, seed: int = 0) -> np.ndarray:
    g = np.random.default_rng(seed)
    return g.standard_normal((n, m))


def sparse_features(n: int, m: int, sparsity: float, seed: int = 0) -> CSR:
    return CSR.random(n, m, sparsity, seed=seed)


def binary_labels(X, w_seed: int = 1) -> np.ndarray:
    """Linearly separable-ish ±1 labels (L2SVM/GLM)."""
    Xd = X.to_dense() if isinstance(X, CSR) else X
    g = np.random.default_rng(w_seed)
    w = g.standard_normal((Xd.shape[1], 1))
    s = Xd @ w + 0.3 * g.standard_normal((Xd.shape[0], 1))
    return np.where(s > np.median(s), 1.0, -1.0)


def onehot_labels(n: int, k: int, seed: int = 2) -> np.ndarray:
    g = np.random.default_rng(seed)
    y = g.integers(0, k, n)
    out = np.zeros((n, k))
    out[np.arange(n), y] = 1.0
    return out


# ------------------------------------------------- dataset look-alikes
def airline_like(n: int = 200_000, seed: int = 3) -> np.ndarray:
    """Airline78 character: dense, 29 mixed-scale columns, low column
    cardinality for several columns (compresses well under CLA)."""
    g = np.random.default_rng(seed)
    cols = []
    for j in range(29):
        if j % 3 == 0:  # categorical-ish low-cardinality column
            cols.append(g.integers(0, 30, n).astype(np.float64))
        elif j % 3 == 1:
            cols.append(np.round(g.random(n) * 100, 1))
        else:
            cols.append(g.standard_normal(n))
    return np.column_stack(cols)


def mnist_like(n: int = 20_000, seed: int = 4) -> CSR:
    """Mnist8m character: 784 columns, ~25% non-zeros, values in [0,1]."""
    return CSR.random(n, 784, 0.25, seed=seed)


def netflix_like(n: int = 4_000, m: int = 1_500, seed: int = 5) -> CSR:
    """Netflix character: sparse (1.2% nnz) rating matrix, values 1-5."""
    c = CSR.random(n, m, 0.012, seed=seed)
    g = np.random.default_rng(seed + 1)
    return CSR(c.indptr, c.indices, g.integers(1, 6, c.nnz).astype(np.float64), c.shape)


def amazon_like(n: int = 20_000, m: int = 20_000, seed: int = 6) -> CSR:
    """Amazon-books character: ultra-sparse (~1e-4 at this scale, mirroring
    1.2e-6 at 8M×2.3M) with heavy-tailed row degrees."""
    g = np.random.default_rng(seed)
    nnz = int(n * m * 1e-4)
    # zipfian row degrees: few heavy users
    rows = (n * (g.random(nnz) ** 3)).astype(np.int64).clip(0, n - 1)
    cols = g.integers(0, m, nnz)
    vals = g.integers(1, 6, nnz).astype(np.float64)
    keys = rows * m + cols
    _, first = np.unique(keys, return_index=True)
    return CSR.from_coo(rows[first], cols[first], vals[first], (n, m))

"""Shared vector-primitive library used by generated fused operators.

Mirrors the paper's library of vector primitives (dotProduct,
vectMultAdd, vectMatMult, ...): generated code calls these named
primitives instead of inlining their bodies, which keeps generated
sources tiny (the §5.2 'instruction footprint' design point) and gives
one code path for dense and sparse row blocks — each primitive
dispatches on :class:`CSR` vs ``ndarray``, the closest Python analogue
of the paper's genexecDense/genexecSparse pair.
"""
from __future__ import annotations

import numpy as np

from repro.lina.sparse import CSR


def _dense(x):
    return x.to_dense() if isinstance(x, CSR) else x


# ----------------------------------------------------------- element-wise
def add(x, y): return np.add(_dense(x), _dense(y))
def sub(x, y): return np.subtract(_dense(x), _dense(y))
def mul(x, y):
    if isinstance(x, CSR) and not isinstance(y, CSR):
        y = np.asarray(y)
        if y.shape == x.shape:
            return x.mult_dense(y)
        if y.ndim == 0 or y.size == 1:
            return x.scale_values(lambda v: v * float(np.ravel(y)[0]))
    if isinstance(y, CSR) and not isinstance(x, CSR):
        return mul(y, x)
    return np.multiply(_dense(x), _dense(y))
def div(x, y): return np.divide(_dense(x), _dense(y))
def pow_(x, y):
    if isinstance(x, CSR) and np.isscalar(y):
        return x.scale_values(lambda v: v ** float(y))
    return np.power(_dense(x), _dense(y))
def min_(x, y): return np.minimum(_dense(x), _dense(y))
def max_(x, y): return np.maximum(_dense(x), _dense(y))
def neq(x, y):
    if isinstance(x, CSR) and np.isscalar(y) and float(y) == 0.0:
        return x.scale_values(lambda v: (v != 0).astype(np.float64))
    return (np.not_equal(_dense(x), _dense(y))).astype(np.float64)
def eq(x, y): return (np.equal(_dense(x), _dense(y))).astype(np.float64)
def gt(x, y): return (np.greater(_dense(x), _dense(y))).astype(np.float64)
def lt(x, y): return (np.less(_dense(x), _dense(y))).astype(np.float64)
def ge(x, y): return (np.greater_equal(_dense(x), _dense(y))).astype(np.float64)
def le(x, y): return (np.less_equal(_dense(x), _dense(y))).astype(np.float64)

# --------------------------------------------------------------- unaries
def exp(x): return np.exp(_dense(x))
def log(x): return np.log(_dense(x))
def sqrt(x):
    return x.scale_values(np.sqrt) if isinstance(x, CSR) else np.sqrt(x)
def abs_(x):
    return x.scale_values(np.abs) if isinstance(x, CSR) else np.abs(x)
def sign(x):
    return x.scale_values(np.sign) if isinstance(x, CSR) else np.sign(x)
def neg(x):
    return x.scale_values(np.negative) if isinstance(x, CSR) else np.negative(x)
def sigmoid(x): return 1.0 / (1.0 + np.exp(-_dense(x)))

# ------------------------------------------------------- row-block algebra
def mm(x, y):
    """Row-block matrix multiply: (nb×m) @ (m×k)."""
    if isinstance(x, CSR):
        return x.spmm(_dense(y))
    return _dense(x) @ _dense(y)


def tmm_acc(a, y):
    """aᵀ @ y for one row block — the per-block partial of the Row
    template's col_agg_t variant (vectOuterMultAdd across rows)."""
    if isinstance(a, CSR):
        return a.tspmm(_dense(y))
    return a.T @ _dense(y)


def row_sums(x):
    if isinstance(x, CSR):
        return x.row_sums().reshape(-1, 1)
    return x.sum(axis=1, keepdims=True)


def col_sums(x):
    if isinstance(x, CSR):
        return x.col_sums().reshape(1, -1)
    return x.sum(axis=0, keepdims=True)


def row_maxs(x): return _dense(x).max(axis=1, keepdims=True)
def row_mins(x): return _dense(x).min(axis=1, keepdims=True)
def row_imins(x): return (_dense(x).argmin(axis=1) + 1.0).reshape(-1, 1)
def row_imaxs(x): return (_dense(x).argmax(axis=1) + 1.0).reshape(-1, 1)
def sum_all(x):
    return x.sum() if isinstance(x, CSR) else float(np.sum(x))
def max_all(x): return float(np.max(_dense(x)))
def min_all(x): return float(np.min(_dense(x)))
def rix(x, c1, c2):
    return _dense(x)[:, c1:c2]


def t(x):
    """Whole-operand transpose (only emitted for non-row-aligned sides)."""
    if isinstance(x, CSR):
        return x.transpose()
    return np.transpose(np.atleast_2d(x))


# ------------------------------------------------------- outer-product ops
def dot_rows(u, v):
    """Per-nonzero inner products: u[i]·v[i] row-wise (paper dotProduct)."""
    return np.einsum("ij,ij->i", u, v)


def outer_right_acc(w, rix_, vrows, nrows, k):
    """right_mm accumulation: out[i] += w_ij * V_j (paper vectMultAdd)."""
    out = np.zeros((nrows, k), dtype=np.float64)
    np.add.at(out, rix_, w[:, None] * vrows)
    return out

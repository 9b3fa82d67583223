"""Minimal CSR sparse matrix on plain numpy (scipy is absent here).

This is the sparse substrate used by the template skeletons in
``repro.core.runtime``: sparse-safe operators iterate the non-zero
coordinate/value arrays directly, which is what gives the Outer template
its O(nnz) behaviour (paper §2.2, Figure 3(a)).

Only the operations the reproduction needs are implemented; each one is
vectorized numpy (no per-element Python loops on hot paths).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class CSR:
    """Compressed sparse row matrix: ``values[indptr[i]:indptr[i+1]]`` are
    the non-zeros of row *i* at column positions ``indices[...]``."""

    indptr: np.ndarray  # int64, shape (nrows+1,)
    indices: np.ndarray  # int64, shape (nnz,)
    values: np.ndarray  # float64, shape (nnz,)
    shape: tuple[int, int]

    # ---------------------------------------------------------- construction
    @staticmethod
    def from_dense(a: np.ndarray) -> "CSR":
        a = np.asarray(a, dtype=np.float64)
        mask = a != 0.0
        counts = mask.sum(axis=1)
        indptr = np.zeros(a.shape[0] + 1, dtype=np.int64)
        np.cumsum(counts, out=indptr[1:])
        rows, cols = np.nonzero(mask)
        return CSR(indptr, cols.astype(np.int64), a[rows, cols], a.shape)

    @staticmethod
    def from_coo(
        rows: np.ndarray, cols: np.ndarray, vals: np.ndarray, shape: tuple[int, int]
    ) -> "CSR":
        order = np.lexsort((cols, rows))
        rows, cols, vals = rows[order], cols[order], vals[order]
        counts = np.bincount(rows, minlength=shape[0])
        indptr = np.zeros(shape[0] + 1, dtype=np.int64)
        np.cumsum(counts, out=indptr[1:])
        return CSR(indptr, cols.astype(np.int64), vals.astype(np.float64), shape)

    @staticmethod
    def random(
        nrows: int, ncols: int, sparsity: float, seed: int = 0
    ) -> "CSR":
        """Uniform random sparse matrix with expected density ``sparsity``."""
        g = np.random.default_rng(seed)
        nnz = int(round(nrows * ncols * sparsity))
        # sample without replacement in flat index space (cells are unique)
        flat = g.choice(nrows * ncols, size=min(nnz, nrows * ncols), replace=False)
        rows, cols = np.divmod(flat, ncols)
        vals = g.random(len(flat)) + 0.5  # keep away from 0
        return CSR.from_coo(rows, cols, vals, (nrows, ncols))

    # ------------------------------------------------------------ properties
    @property
    def nnz(self) -> int:
        return len(self.values)

    @property
    def sparsity(self) -> float:
        n = self.shape[0] * self.shape[1]
        return self.nnz / n if n else 0.0

    def row_nnz(self) -> np.ndarray:
        return np.diff(self.indptr)

    def row_index(self) -> np.ndarray:
        """Row id per stored non-zero (COO expansion of indptr)."""
        return np.repeat(np.arange(self.shape[0], dtype=np.int64), self.row_nnz())

    # ------------------------------------------------------------ conversion
    def to_dense(self) -> np.ndarray:
        out = np.zeros(self.shape, dtype=np.float64)
        out[self.row_index(), self.indices] = self.values
        return out

    def transpose(self) -> "CSR":
        return CSR.from_coo(
            self.indices, self.row_index(), self.values, (self.shape[1], self.shape[0])
        )

    def row_slice(self, start: int, stop: int) -> "CSR":
        lo, hi = self.indptr[start], self.indptr[stop]
        return CSR(
            self.indptr[start : stop + 1] - lo,
            self.indices[lo:hi],
            self.values[lo:hi],
            (stop - start, self.shape[1]),
        )

    # ------------------------------------------------------------ arithmetic
    def spmv(self, v: np.ndarray) -> np.ndarray:
        """X @ v for a dense vector v — O(nnz)."""
        v = np.asarray(v, dtype=np.float64).reshape(-1)
        prod = self.values * v[self.indices]
        return np.add.reduceat(
            np.append(prod, 0.0), self.indptr[:-1]
        ) * (self.row_nnz() > 0) if self.nnz else np.zeros(self.shape[0])

    def spmm(self, b: np.ndarray) -> np.ndarray:
        """X @ B for a dense matrix B — O(nnz * ncol(B))."""
        b = np.atleast_2d(np.asarray(b, dtype=np.float64))
        out = np.zeros((self.shape[0], b.shape[1]), dtype=np.float64)
        np.add.at(out, self.row_index(), self.values[:, None] * b[self.indices])
        return out

    def tspmm(self, b: np.ndarray) -> np.ndarray:
        """Xᵀ @ B for a dense matrix B — O(nnz * ncol(B)), no transpose copy."""
        b = np.atleast_2d(np.asarray(b, dtype=np.float64))
        out = np.zeros((self.shape[1], b.shape[1]), dtype=np.float64)
        np.add.at(out, self.indices, self.values[:, None] * b[self.row_index()])
        return out

    def scale_values(self, f) -> "CSR":
        """Apply a sparse-safe (f(0)=0) elementwise function to the values."""
        return CSR(self.indptr, self.indices, f(self.values), self.shape)

    def mult_dense(self, d: np.ndarray) -> "CSR":
        """Sparse-safe X ⊙ D with dense D (the 'sparse driver' pattern)."""
        d = np.asarray(d, dtype=np.float64)
        return CSR(
            self.indptr,
            self.indices,
            self.values * d[self.row_index(), self.indices],
            self.shape,
        )

    def gather(self, rows: np.ndarray, cols: np.ndarray) -> np.ndarray:
        """Vectorized point lookups X[rows[i], cols[i]] (the paper's
        ``getValue`` side-input access, backed by sorted-key search
        instead of per-cell stateful iterators)."""
        if self.nnz == 0:
            return np.zeros(len(rows), dtype=np.float64)
        ncols = self.shape[1]
        keys = self.row_index() * ncols + self.indices  # globally sorted
        q = rows.astype(np.int64) * ncols + cols.astype(np.int64)
        pos = np.searchsorted(keys, q)
        pos_c = np.minimum(pos, len(keys) - 1)
        hit = keys[pos_c] == q
        out = np.zeros(len(q), dtype=np.float64)
        out[hit] = self.values[pos_c[hit]]
        return out

    # ----------------------------------------------------------- aggregation
    def sum(self) -> float:
        return float(self.values.sum())

    def row_sums(self) -> np.ndarray:
        out = np.zeros(self.shape[0], dtype=np.float64)
        np.add.at(out, self.row_index(), self.values)
        return out

    def col_sums(self) -> np.ndarray:
        out = np.zeros(self.shape[1], dtype=np.float64)
        np.add.at(out, self.indices, self.values)
        return out

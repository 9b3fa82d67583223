"""CLA-lite: column-wise dictionary-compressed matrices (paper §5.2, [28]).

Each column is DDC-encoded (dense dictionary coding): a small dictionary
of distinct values plus a per-row code array. This reproduces the
mechanism the paper's template skeletons exploit for compressed inputs:
for a *single-input, sparse-safe* fused operator, ``genexec`` is invoked
only for the distinct dictionary values and results are combined with
per-value counts — e.g. ``sum(X^2)`` over compressed data touches
#distinct values instead of #cells (Figure 9's CLA bars).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class CompressedColumn:
    dictionary: np.ndarray  # distinct values, shape (d,)
    codes: np.ndarray  # uint32 per-row code into dictionary, shape (n,)

    @property
    def counts(self) -> np.ndarray:
        return np.bincount(self.codes, minlength=len(self.dictionary))


@dataclass
class CLAMatrix:
    """Column-compressed matrix; all columns share the row count."""

    columns: list[CompressedColumn]
    shape: tuple[int, int]

    @staticmethod
    def compress(a: np.ndarray) -> "CLAMatrix":
        a = np.asarray(a, dtype=np.float64)
        cols = []
        for j in range(a.shape[1]):
            dictionary, codes = np.unique(a[:, j], return_inverse=True)
            cols.append(CompressedColumn(dictionary, codes.astype(np.uint32)))
        return CLAMatrix(cols, a.shape)

    def decompress(self) -> np.ndarray:
        out = np.empty(self.shape, dtype=np.float64)
        for j, c in enumerate(self.columns):
            out[:, j] = c.dictionary[c.codes]
        return out

    @property
    def n_distinct(self) -> int:
        return sum(len(c.dictionary) for c in self.columns)

    def compression_ratio(self) -> float:
        """Uncompressed bytes / compressed bytes (8B values, 4B codes)."""
        raw = self.shape[0] * self.shape[1] * 8
        comp = sum(len(c.dictionary) * 8 + len(c.codes) * 4 for c in self.columns)
        return raw / comp if comp else float("inf")

    # -- the CLA execution strategy used by fused sparse-safe operators ----
    def agg_cellwise_distinct(self, f) -> float:
        """sum(f(X)) for sparse-safe f, computed over dictionaries only:
        Σ_cols Σ_distinct f(value) * count(value)."""
        total = 0.0
        for c in self.columns:
            total += float(f(c.dictionary) @ c.counts)
        return total

    def col_agg_cellwise_distinct(self, f) -> np.ndarray:
        """colSums(f(X)) over dictionaries only."""
        return np.array([float(f(c.dictionary) @ c.counts) for c in self.columns])

    def scale_dictionary(self, f) -> "CLAMatrix":
        """f(X) for sparse-safe f as a shallow dictionary rewrite — the
        'shallow copy of the compressed data' special case in §5.2."""
        return CLAMatrix(
            [CompressedColumn(f(c.dictionary), c.codes) for c in self.columns],
            self.shape,
        )

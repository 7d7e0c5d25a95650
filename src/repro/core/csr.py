"""Hand-rolled CSR Boolean sparse matrix (scipy is not installed here).

The paper's sCPU/sGPU variants store per-non-terminal Boolean matrices
in CSR and multiply them with Math.Net / CUSPARSE. This module provides
the same data structure over bare numpy: ``indptr``/``indices`` arrays,
Boolean sparse-times-sparse product (:meth:`BoolCSR.spmm`) and union
(:meth:`BoolCSR.union`), all fully vectorized (no Python-level loop
over nonzeros).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

_EMPTY = np.empty(0, dtype=np.int64)


@dataclass(frozen=True)
class BoolCSR:
    """An immutable n x n Boolean sparse matrix in CSR form.

    Invariants: ``indptr`` has length n+1, is non-decreasing and starts
    at 0; ``indices[indptr[i]:indptr[i+1]]`` are the sorted, duplicate-
    free column indices of row ``i``.
    """

    n: int
    indptr: np.ndarray  # int64, shape (n+1,)
    indices: np.ndarray  # int64, shape (nnz,)

    # ---- constructors ---------------------------------------------------

    @staticmethod
    def empty(n: int) -> "BoolCSR":
        return BoolCSR(n, np.zeros(n + 1, dtype=np.int64), _EMPTY.copy())

    @staticmethod
    def from_coo(n: int, rows, cols) -> "BoolCSR":
        """Build from coordinate lists; duplicates are collapsed."""
        rows = np.asarray(rows, dtype=np.int64)
        cols = np.asarray(cols, dtype=np.int64)
        if rows.size != cols.size:
            raise ValueError("rows and cols must have equal length")
        if rows.size and (
            rows.min() < 0 or cols.min() < 0 or rows.max() >= n or cols.max() >= n
        ):
            raise ValueError("coordinate out of range")
        return BoolCSR._from_keys(n, rows * n + cols)

    @staticmethod
    def _from_keys(n: int, keys: np.ndarray) -> "BoolCSR":
        """Build from (possibly duplicated) flat keys ``row*n + col``."""
        keys = np.unique(keys)
        rows, cols = np.divmod(keys, n)
        indptr = np.zeros(n + 1, dtype=np.int64)
        np.cumsum(np.bincount(rows, minlength=n), out=indptr[1:])
        return BoolCSR(n, indptr, cols.astype(np.int64))

    @staticmethod
    def from_dense(a: np.ndarray) -> "BoolCSR":
        a = np.asarray(a, dtype=bool)
        if a.ndim != 2 or a.shape[0] != a.shape[1]:
            raise ValueError("from_dense requires a square 2-D array")
        rows, cols = np.nonzero(a)
        return BoolCSR.from_coo(a.shape[0], rows, cols)

    # ---- queries --------------------------------------------------------

    @property
    def nnz(self) -> int:
        return int(self.indices.size)

    def to_coo(self) -> tuple[np.ndarray, np.ndarray]:
        rows = np.repeat(np.arange(self.n, dtype=np.int64), np.diff(self.indptr))
        return rows, self.indices.copy()

    def to_dense(self) -> np.ndarray:
        out = np.zeros((self.n, self.n), dtype=bool)
        rows, cols = self.to_coo()
        out[rows, cols] = True
        return out

    def to_keys(self) -> np.ndarray:
        rows, cols = self.to_coo()
        return rows * self.n + cols

    def __eq__(self, other: object) -> bool:
        if not isinstance(other, BoolCSR):
            return NotImplemented
        return (
            self.n == other.n
            and np.array_equal(self.indptr, other.indptr)
            and np.array_equal(self.indices, other.indices)
        )

    # ---- algebra --------------------------------------------------------

    def spmm(self, other: "BoolCSR") -> "BoolCSR":
        """Boolean sparse product ``self @ other``.

        For every nonzero ``(i, k)`` of ``self``, gathers row ``k`` of
        ``other`` — a single vectorized multi-range gather — then
        collapses duplicates.
        """
        if self.n != other.n:
            raise ValueError("dimension mismatch")
        if self.nnz == 0 or other.nnz == 0:
            return BoolCSR.empty(self.n)
        a_rows, a_cols = self.to_coo()
        starts = other.indptr[a_cols]
        counts = other.indptr[a_cols + 1] - starts
        total = int(counts.sum())
        if total == 0:
            return BoolCSR.empty(self.n)
        # positions 0..cnt-1 within each gathered range, fully vectorized
        cum = np.cumsum(counts)
        within = np.arange(total, dtype=np.int64) - np.repeat(cum - counts, counts)
        out_cols = other.indices[np.repeat(starts, counts) + within]
        out_rows = np.repeat(a_rows, counts)
        return BoolCSR._from_keys(self.n, out_rows * self.n + out_cols)

    def union(self, other: "BoolCSR") -> "BoolCSR":
        """Element-wise Boolean OR."""
        if self.n != other.n:
            raise ValueError("dimension mismatch")
        if other.nnz == 0:
            return self
        if self.nnz == 0:
            return other
        return BoolCSR._from_keys(
            self.n, np.concatenate([self.to_keys(), other.to_keys()])
        )

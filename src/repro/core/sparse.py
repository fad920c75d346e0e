"""Sparse encoding (paper §3, first layer).

The paper's sparse encoding — drop zeros, prefix every surviving value with
its column index — is exactly the classic compressed-sparse-row layout, so
this module is also the storage core of the CSR/CVI baselines
(:mod:`repro.formats.csr`). No scipy in the container: the triplet arrays
are plain numpy.
"""
from __future__ import annotations

import numpy as np


def csr_from_dense(dense: np.ndarray) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Encode a dense 2-D float matrix as CSR triplet arrays.

    Returns ``(indptr, indices, values)`` where ``indptr`` has
    ``n_rows + 1`` entries, ``indices[indptr[r]:indptr[r+1]]`` are the
    column indexes of row ``r``'s non-zeros in ascending order, and
    ``values`` the matching values. Zero detection is exact (``!= 0.0``),
    matching the paper's lossless contract.
    """
    dense = np.asarray(dense, dtype=np.float64)
    if dense.ndim != 2:
        raise ValueError(f"expected 2-D matrix, got shape {dense.shape}")
    rows, cols = np.nonzero(dense)
    values = dense[rows, cols]
    n_rows = dense.shape[0]
    counts = np.bincount(rows, minlength=n_rows)
    indptr = np.zeros(n_rows + 1, dtype=np.int64)
    np.cumsum(counts, out=indptr[1:])
    return indptr, cols.astype(np.int64), values


def dense_from_csr(
    indptr: np.ndarray,
    indices: np.ndarray,
    values: np.ndarray,
    shape: tuple[int, int],
) -> np.ndarray:
    """Inverse of :func:`csr_from_dense`."""
    n_rows, n_cols = shape
    out = np.zeros((n_rows, n_cols), dtype=np.float64)
    row_ids = np.repeat(np.arange(n_rows), np.diff(indptr))
    out[row_ids, indices] = values
    return out


def csr_row_ids(indptr: np.ndarray) -> np.ndarray:
    """Row id per stored entry — the scatter/gather index all kernels use."""
    return np.repeat(np.arange(len(indptr) - 1), np.diff(indptr))

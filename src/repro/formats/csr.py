"""CSR and CVI baseline formats (paper §5 "Compared Methods" 2 and 3).

CSR stores per-row (column index, value) pairs with 4-byte column indexes
and 8-byte doubles — the standard layout the paper compares against. CVI
(a.k.a. CSR-VI [Kourtis et al.]) additionally dictionary-encodes the
values. Kernels are numpy scatter/gather over the triplet arrays (no
scipy in the container).
"""
from __future__ import annotations

import struct

import numpy as np

from repro.core import physical, sparse

_CSR_MAGIC = b"CSR1"
_CVI_MAGIC = b"CVI1"


class CSRBatch:
    """Compressed sparse row mini-batch."""

    name = "CSR"

    def __init__(
        self,
        indptr: np.ndarray,
        indices: np.ndarray,
        values: np.ndarray,
        shape: tuple[int, int],
    ) -> None:
        self._indptr = indptr
        self._indices = indices
        self._values = values
        self._shape = (int(shape[0]), int(shape[1]))

    @classmethod
    def encode(cls, dense: np.ndarray) -> "CSRBatch":
        dense = np.asarray(dense, dtype=np.float64)
        indptr, indices, values = sparse.csr_from_dense(dense)
        return cls(indptr, indices, values, dense.shape)

    @property
    def shape(self) -> tuple[int, int]:
        return self._shape

    # Values hook so CVIBatch can share every kernel below.
    def _vals(self) -> np.ndarray:
        return self._values

    def _row_ids(self) -> np.ndarray:
        return sparse.csr_row_ids(self._indptr)

    def decode(self) -> np.ndarray:
        return sparse.dense_from_csr(self._indptr, self._indices, self._vals(), self._shape)

    def size_bytes(self) -> int:
        # 4-byte column index + 8-byte double per nnz + 4-byte indptr
        # entries + the nnz count field; equals len(to_bytes()).
        return len(_CSR_MAGIC) + 12 + 12 * self._indices.size + 4 * self._indptr.size

    def to_bytes(self) -> bytes:
        n, m = self._shape
        return b"".join(
            (
                _CSR_MAGIC,
                struct.pack("<II", n, m),
                struct.pack("<I", self._indices.size),
                self._indptr.astype("<u4").tobytes(),
                self._indices.astype("<u4").tobytes(),
                self._values.astype("<f8").tobytes(),
            )
        )

    @classmethod
    def from_bytes(cls, buf: bytes) -> "CSRBatch":
        if buf[:4] != _CSR_MAGIC:
            raise ValueError("not a CSR blob")
        n, m = struct.unpack_from("<II", buf, 4)
        (nnz,) = struct.unpack_from("<I", buf, 12)
        off = 16
        indptr = np.frombuffer(buf, "<u4", n + 1, off).astype(np.int64)
        off += 4 * (n + 1)
        indices = np.frombuffer(buf, "<u4", nnz, off).astype(np.int64)
        off += 4 * nnz
        values = np.frombuffer(buf, "<f8", nnz, off).astype(np.float64)
        return cls(indptr, indices, values, (n, m))

    def scal(self, c: float) -> "CSRBatch":
        return CSRBatch(self._indptr, self._indices, self._values * float(c), self._shape)

    def dot_vec(self, v: np.ndarray) -> np.ndarray:
        v = np.asarray(v, dtype=np.float64)
        contrib = self._vals() * v[self._indices]
        R = np.zeros(self._shape[0], dtype=np.float64)
        np.add.at(R, self._row_ids(), contrib)
        return R

    def vec_dot(self, v: np.ndarray) -> np.ndarray:
        v = np.asarray(v, dtype=np.float64)
        return np.bincount(
            self._indices,
            weights=self._vals() * v[self._row_ids()],
            minlength=self._shape[1],
        )

    def dot_mat(self, M: np.ndarray) -> np.ndarray:
        M = np.asarray(M, dtype=np.float64)
        R = np.zeros((self._shape[0], M.shape[1]), dtype=np.float64)
        np.add.at(R, self._row_ids(), self._vals()[:, None] * M[self._indices])
        return R

    def mat_dot(self, M: np.ndarray) -> np.ndarray:
        M = np.asarray(M, dtype=np.float64)
        # R[:, col] += val * M[:, row]; accumulate transposed for row-major
        # np.add.at, then flip.
        RT = np.zeros((self._shape[1], M.shape[0]), dtype=np.float64)
        np.add.at(RT, self._indices, self._vals()[:, None] * M.T[self._row_ids()])
        return RT.T

    def add_scalar(self, c: float) -> np.ndarray:
        return self.decode() + float(c)


class CVIBatch(CSRBatch):
    """CSR with value indexing (CSR-VI): values become bit-packed
    dictionary codes; kernels gather through the dictionary once per call."""

    name = "CVI"

    def __init__(
        self,
        indptr: np.ndarray,
        indices: np.ndarray,
        vidx: np.ndarray,
        uvals: np.ndarray,
        shape: tuple[int, int],
    ) -> None:
        super().__init__(indptr, indices, uvals[vidx] if len(uvals) else vidx.astype(float), shape)
        self._vidx = vidx
        self._uvals = uvals

    @classmethod
    def encode(cls, dense: np.ndarray) -> "CVIBatch":
        dense = np.asarray(dense, dtype=np.float64)
        indptr, indices, values = sparse.csr_from_dense(dense)
        uvals, vidx = physical.value_index(values)
        return cls(indptr, indices, vidx, uvals, dense.shape)

    def _vals(self) -> np.ndarray:
        return self._uvals[self._vidx]

    def size_bytes(self) -> int:
        return (
            len(_CVI_MAGIC)
            + 12
            + 4 * self._indices.size
            + 4 * self._indptr.size
            + physical.packed_size(self._vidx)
            + 4
            + 8 * self._uvals.size
        )

    def to_bytes(self) -> bytes:
        n, m = self._shape
        return b"".join(
            (
                _CVI_MAGIC,
                struct.pack("<II", n, m),
                struct.pack("<I", self._indices.size),
                self._indptr.astype("<u4").tobytes(),
                self._indices.astype("<u4").tobytes(),
                physical.pack_uints(self._vidx),
                physical.pack_floats(self._uvals),
            )
        )

    @classmethod
    def from_bytes(cls, buf: bytes) -> "CVIBatch":
        if buf[:4] != _CVI_MAGIC:
            raise ValueError("not a CVI blob")
        n, m = struct.unpack_from("<II", buf, 4)
        (nnz,) = struct.unpack_from("<I", buf, 12)
        off = 16
        indptr = np.frombuffer(buf, "<u4", n + 1, off).astype(np.int64)
        off += 4 * (n + 1)
        indices = np.frombuffer(buf, "<u4", nnz, off).astype(np.int64)
        off += 4 * nnz
        vidx, off = physical.unpack_uints(buf, off)
        uvals, _ = physical.unpack_floats(buf, off)
        return cls(indptr, indices, vidx, uvals, (n, m))

    def scal(self, c: float) -> "CVIBatch":
        return CVIBatch(self._indptr, self._indices, self._vidx, self._uvals * float(c), self._shape)

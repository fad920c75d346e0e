"""DEN and DVI baseline formats (paper §5 "Compared Methods" 1 and 4).

DEN is the uncompressed reference: row-major IEEE-754 doubles; its size is
the numerator of every compression ratio in the paper. DVI is DEN plus
value indexing — a dense matrix of bit-packed dictionary codes over the
distinct values.
"""
from __future__ import annotations

import struct

import numpy as np

from repro.core import physical

_DEN_MAGIC = b"DEN1"
_DVI_MAGIC = b"DVI1"


def den_size_bytes(n_rows: int, n_cols: int) -> int:
    """Size of a DEN mini-batch — the paper's uncompressed reference."""
    return len(_DEN_MAGIC) + 8 + 8 * n_rows * n_cols


class DENBatch:
    """Uncompressed dense doubles; ops are plain numpy (the speed ceiling
    for dense data, the size floor for nobody)."""

    name = "DEN"

    def __init__(self, mat: np.ndarray) -> None:
        self._mat = np.ascontiguousarray(mat, dtype=np.float64)

    @classmethod
    def encode(cls, dense: np.ndarray) -> "DENBatch":
        return cls(np.array(dense, dtype=np.float64, copy=True))

    @property
    def shape(self) -> tuple[int, int]:
        return self._mat.shape

    def decode(self) -> np.ndarray:
        return self._mat.copy()

    def size_bytes(self) -> int:
        return den_size_bytes(*self._mat.shape)

    def to_bytes(self) -> bytes:
        n, m = self._mat.shape
        return _DEN_MAGIC + struct.pack("<II", n, m) + self._mat.astype("<f8").tobytes()

    @classmethod
    def from_bytes(cls, buf: bytes) -> "DENBatch":
        if buf[:4] != _DEN_MAGIC:
            raise ValueError("not a DEN blob")
        n, m = struct.unpack_from("<II", buf, 4)
        mat = np.frombuffer(buf, dtype="<f8", count=n * m, offset=12).reshape(n, m)
        return cls(mat.astype(np.float64))

    def scal(self, c: float) -> "DENBatch":
        return DENBatch(self._mat * float(c))

    def dot_vec(self, v: np.ndarray) -> np.ndarray:
        return self._mat @ np.asarray(v, dtype=np.float64)

    def vec_dot(self, v: np.ndarray) -> np.ndarray:
        return np.asarray(v, dtype=np.float64) @ self._mat

    def dot_mat(self, M: np.ndarray) -> np.ndarray:
        return self._mat @ np.asarray(M, dtype=np.float64)

    def mat_dot(self, M: np.ndarray) -> np.ndarray:
        return np.asarray(M, dtype=np.float64) @ self._mat

    def add_scalar(self, c: float) -> np.ndarray:
        return self._mat + float(c)


class DVIBatch:
    """DEN + value indexing: an n×m matrix of dictionary codes.

    Ops materialize values through one fancy-indexing gather per call
    (``dict[codes]``), mirroring why the paper finds DVI competitive on
    low-cardinality dense data (Census) but slow on sparse data (Mnist):
    it always pays O(n·m) regardless of sparsity.
    """

    name = "DVI"

    def __init__(self, codes: np.ndarray, uvals: np.ndarray, shape: tuple[int, int]) -> None:
        self._codes = codes
        self._uvals = uvals
        self._shape = (int(shape[0]), int(shape[1]))

    @classmethod
    def encode(cls, dense: np.ndarray) -> "DVIBatch":
        dense = np.asarray(dense, dtype=np.float64)
        uvals, codes = physical.value_index(dense.ravel())
        return cls(codes.reshape(dense.shape), uvals, dense.shape)

    @property
    def shape(self) -> tuple[int, int]:
        return self._shape

    def _dense(self) -> np.ndarray:
        return self._uvals[self._codes]

    def decode(self) -> np.ndarray:
        return self._dense()

    def size_bytes(self) -> int:
        return (
            len(_DVI_MAGIC)
            + 8
            + physical.packed_size(self._codes.ravel())
            + 4
            + 8 * self._uvals.size
        )

    def to_bytes(self) -> bytes:
        n, m = self._shape
        return b"".join(
            (
                _DVI_MAGIC,
                struct.pack("<II", n, m),
                physical.pack_uints(self._codes.ravel()),
                physical.pack_floats(self._uvals),
            )
        )

    @classmethod
    def from_bytes(cls, buf: bytes) -> "DVIBatch":
        if buf[:4] != _DVI_MAGIC:
            raise ValueError("not a DVI blob")
        n, m = struct.unpack_from("<II", buf, 4)
        codes, off = physical.unpack_uints(buf, 12)
        uvals, _ = physical.unpack_floats(buf, off)
        return cls(codes.reshape(n, m), uvals, (n, m))

    def scal(self, c: float) -> "DVIBatch":
        return DVIBatch(self._codes, self._uvals * float(c), self._shape)

    def dot_vec(self, v: np.ndarray) -> np.ndarray:
        return self._dense() @ np.asarray(v, dtype=np.float64)

    def vec_dot(self, v: np.ndarray) -> np.ndarray:
        return np.asarray(v, dtype=np.float64) @ self._dense()

    def dot_mat(self, M: np.ndarray) -> np.ndarray:
        return self._dense() @ np.asarray(M, dtype=np.float64)

    def mat_dot(self, M: np.ndarray) -> np.ndarray:
        return np.asarray(M, dtype=np.float64) @ self._dense()

    def add_scalar(self, c: float) -> np.ndarray:
        return self._dense() + float(c)

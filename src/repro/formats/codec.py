"""General-compression-scheme baselines (paper §5 "Compared Methods" 6–7).

The paper uses Snappy and Gzip over the serialized DEN bytes. The
container has no snappy wheel, so both are modelled with stdlib zlib at
different levels (see DESIGN.md substitution table):

- ``SnappyBatch``: zlib level 1 — fast, low ratio (Snappy's trade-off);
- ``GzipBatch``: zlib level 9 — slow, high ratio (Gzip's trade-off; gzip's
  deflate *is* zlib).

The defining behaviour either way: every matrix op must decompress the
whole mini-batch first (Figure 1B). ``decode`` is deliberately uncached so
each op call pays the decompression, like the paper's GC execution; the
MGD driver may hold one decode per model step via ``step_cache`` to model
"decompress once per mini-batch visit" (§5.3).
"""
from __future__ import annotations

import zlib

import numpy as np

from repro.formats.dense import DENBatch


class _CodecBatch:
    """Common machinery: DEN bytes behind a zlib codec."""

    name = "codec"
    _level = 6
    _magic = b"ZLB?"

    def __init__(self, compressed: bytes, shape: tuple[int, int]) -> None:
        self._compressed = compressed
        self._shape = (int(shape[0]), int(shape[1]))
        self._step_cache: np.ndarray | None = None

    @classmethod
    def encode(cls, dense: np.ndarray):
        den = DENBatch.encode(dense)
        return cls(zlib.compress(den.to_bytes(), cls._level), den.shape)

    @property
    def shape(self) -> tuple[int, int]:
        return self._shape

    def _dense(self) -> np.ndarray:
        if self._step_cache is not None:
            return self._step_cache
        return DENBatch.from_bytes(zlib.decompress(self._compressed)).decode()

    def begin_step(self) -> None:
        """Decompress once for a model-update step (a mini-batch 'visit')."""
        self._step_cache = self._dense()

    def end_step(self) -> None:
        """Drop the per-step dense copy (memory budget: compressed only)."""
        self._step_cache = None

    def decode(self) -> np.ndarray:
        return self._dense()

    def size_bytes(self) -> int:
        return len(self._magic) + 8 + len(self._compressed)

    def to_bytes(self) -> bytes:
        import struct

        return self._magic + struct.pack("<II", *self._shape) + self._compressed

    @classmethod
    def from_bytes(cls, buf: bytes):
        import struct

        if buf[:4] != cls._magic:
            raise ValueError(f"not a {cls.name} blob")
        n, m = struct.unpack_from("<II", buf, 4)
        return cls(buf[12:], (n, m))

    def scal(self, c: float):
        return type(self).encode(self._dense() * float(c))

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


class SnappyBatch(_CodecBatch):
    """Snappy surrogate: zlib level 1 over DEN bytes."""

    name = "Snappy"
    _level = 1
    _magic = b"ZLB1"


class GzipBatch(_CodecBatch):
    """Gzip surrogate: zlib level 9 over DEN bytes."""

    name = "Gzip"
    _level = 9
    _magic = b"ZLB9"

"""`TOCMatrix` — the tuple-oriented-compression facade.

Wires the three encoding layers together (Figure 3 of the paper):

  dense A --sparse--> CSR triplets --logical--> (I, D) --physical--> bytes

and exposes the compressed kernels of §4 through the uniform mini-batch
format interface shared by every baseline (see :mod:`repro.formats.base`):
``encode``/``decode``/``size_bytes``/``to_bytes``/``from_bytes`` plus the
four op classes ``scal`` (A*c), ``dot_vec`` (A·v), ``vec_dot`` (v·A),
``dot_mat`` (A·M), ``mat_dot`` (M·A) and ``add_scalar`` (the
sparse-unsafe A.+c which must decode first).

In-memory state is the *logical* layer (I, D as numpy arrays) plus the
value dictionary of the physical layer; ``size_bytes`` reports the fully
physical-encoded size, i.e. ``len(to_bytes())``.
"""
from __future__ import annotations

import struct

import numpy as np

from repro.core import ops, physical, sparse
from repro.core.logical import prefix_tree_encode
from repro.core.tree import DecodeTree, build_decode_tree

_MAGIC = b"TOC1"


class TOCMatrix:
    """A TOC-compressed mini-batch."""

    name = "TOC"

    def __init__(
        self,
        n_rows: int,
        n_cols: int,
        I_cols: np.ndarray,
        I_vidx: np.ndarray,
        uvals: np.ndarray,
        codes: np.ndarray,
        code_ptr: np.ndarray,
    ) -> None:
        self.n_rows = int(n_rows)
        self.n_cols = int(n_cols)
        self.I_cols = I_cols
        self.I_vidx = I_vidx  # value-index per first-layer node
        self.uvals = uvals  # distinct-value dictionary (value indexing)
        self.codes = codes
        self.code_ptr = code_ptr
        self._tree: DecodeTree | None = None

    # -- construction ---------------------------------------------------
    @classmethod
    def encode(cls, dense: np.ndarray) -> "TOCMatrix":
        """Full TOC encode of a dense float matrix."""
        dense = np.asarray(dense, dtype=np.float64)
        indptr, indices, values = sparse.csr_from_dense(dense)
        I_cols, I_vals, codes, code_ptr = prefix_tree_encode(indptr, indices, values)
        uvals, I_vidx = physical.value_index(I_vals)
        return cls(dense.shape[0], dense.shape[1], I_cols, I_vidx, uvals, codes, code_ptr)

    # -- properties ------------------------------------------------------
    @property
    def shape(self) -> tuple[int, int]:
        return (self.n_rows, self.n_cols)

    @property
    def I_vals(self) -> np.ndarray:
        """First-layer values materialized through the value dictionary."""
        return self.uvals[self.I_vidx]

    def decode_tree(self) -> DecodeTree:
        """C' (Algorithm 2), built lazily and cached.

        The cache must be invalidated by any op that changes values
        (``scal`` returns a new object instead, so it never is).
        """
        if self._tree is None:
            self._tree = build_decode_tree(
                self.I_cols, self.I_vals, self.codes, self.code_ptr
            )
        return self._tree

    # -- physical layer --------------------------------------------------
    def to_bytes(self) -> bytes:
        """Serialize: magic, dims, bit-packed I/D arrays, value dictionary."""
        return b"".join(
            (
                _MAGIC,
                struct.pack("<II", self.n_rows, self.n_cols),
                physical.pack_uints(self.I_cols),
                physical.pack_uints(self.I_vidx),
                physical.pack_floats(self.uvals),
                physical.pack_uints(self.codes),
                physical.pack_uints(self.code_ptr),
            )
        )

    @classmethod
    def from_bytes(cls, buf: bytes) -> "TOCMatrix":
        if buf[:4] != _MAGIC:
            raise ValueError("not a TOC blob")
        n_rows, n_cols = struct.unpack_from("<II", buf, 4)
        off = 12
        I_cols, off = physical.unpack_uints(buf, off)
        I_vidx, off = physical.unpack_uints(buf, off)
        uvals, off = physical.unpack_floats(buf, off)
        codes, off = physical.unpack_uints(buf, off)
        code_ptr, off = physical.unpack_uints(buf, off)
        return cls(n_rows, n_cols, I_cols, I_vidx, uvals, codes, code_ptr)

    def size_bytes(self) -> int:
        """Physical (bit-packed) size — the size the paper's ratios use."""
        return (
            len(_MAGIC)
            + 8
            + physical.packed_size(self.I_cols)
            + physical.packed_size(self.I_vidx)
            + 4
            + 8 * self.uvals.size
            + physical.packed_size(self.codes)
            + physical.packed_size(self.code_ptr)
        )

    # -- kernels ---------------------------------------------------------
    def decode(self) -> np.ndarray:
        return ops.decode_rows(self.decode_tree(), self.codes, self.code_ptr, self.n_cols)

    def scal(self, c: float) -> "TOCMatrix":
        """Sparse-safe A*c (Algorithm 3): touch only the value dictionary."""
        return TOCMatrix(
            self.n_rows,
            self.n_cols,
            self.I_cols,
            self.I_vidx,
            self.uvals * float(c),
            self.codes,
            self.code_ptr,
        )

    def dot_vec(self, v: np.ndarray) -> np.ndarray:
        return ops.matrix_times_vector(self.decode_tree(), self.codes, self.code_ptr, v)

    def vec_dot(self, v: np.ndarray) -> np.ndarray:
        return ops.vector_times_matrix(
            self.decode_tree(), self.codes, self.code_ptr, v, self.n_cols
        )

    def dot_mat(self, M: np.ndarray) -> np.ndarray:
        return ops.matrix_times_matrix(self.decode_tree(), self.codes, self.code_ptr, M)

    def mat_dot(self, M: np.ndarray) -> np.ndarray:
        return ops.matrix_times_compressed(
            self.decode_tree(), self.codes, self.code_ptr, M, self.n_cols
        )

    def add_scalar(self, c: float) -> np.ndarray:
        """Sparse-unsafe A.+c (Algorithm 6): full decode, then elementwise."""
        return self.decode() + float(c)

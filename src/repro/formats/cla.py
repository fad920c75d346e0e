"""Simplified CLA baseline (paper §5 "Compared Methods" 5; Elgohary et al.).

The real CLA (SystemML) co-codes column groups and encodes each group with
OLE/RLE/DDC against an explicit per-group dictionary of distinct value
tuples. This reproduction implements the DDC (dense dictionary coding)
flavour with greedy column co-coding:

- columns are sorted by distinct-value count, then greedily merged into a
  group while merging shrinks the estimated encoded size (dictionary bytes
  + bit-packed per-row codes);
- each group stores its explicit dictionary (``n_distinct × group_width``
  doubles) and one bit-packed code per row.

That preserves the two CLA behaviours the paper's comparison relies on
(§7): ops execute directly on the compressed form via per-dictionary-entry
precomputation, and the *explicit dictionary* is a fixed overhead that is
poorly amortized on small mini-batches, which is exactly why CLA's
mini-batch ratios trail TOC's.
"""
from __future__ import annotations

import pickle
import struct

import numpy as np

from repro.core import physical

_MAGIC = b"CLA1"


class _ColumnGroup:
    """One co-coded column group: dictionary of distinct tuples + row codes."""

    def __init__(self, cols: np.ndarray, dictionary: np.ndarray, codes: np.ndarray) -> None:
        self.cols = cols  # column ids in A, shape (g,)
        self.dictionary = dictionary  # (n_distinct, g) doubles
        self.codes = codes  # (n_rows,) dictionary index per row

    def size_bytes(self) -> int:
        return (
            4 * self.cols.size
            + 8 * self.dictionary.size
            + physical.packed_size(self.codes)
        )


def _group_size(sub: np.ndarray) -> tuple[int, np.ndarray, np.ndarray]:
    """Encoded size of co-coding the columns in ``sub`` (n×g) together."""
    dictionary, codes = np.unique(sub, axis=0, return_inverse=True)
    size = (
        4 * sub.shape[1]
        + 8 * dictionary.size
        + physical.packed_size(codes.astype(np.int64))
    )
    return size, dictionary, codes.astype(np.int64)


class CLABatch:
    """Simplified CLA-compressed mini-batch."""

    name = "CLA"

    def __init__(self, groups: list[_ColumnGroup], shape: tuple[int, int]) -> None:
        self._groups = groups
        self._shape = (int(shape[0]), int(shape[1]))

    @classmethod
    def encode(cls, dense: np.ndarray) -> "CLABatch":
        dense = np.asarray(dense, dtype=np.float64)
        n, m = dense.shape
        # Greedy co-coding: walk columns in ascending cardinality and keep
        # extending the current group while the merged size beats the sum
        # of the parts.
        card = [len(np.unique(dense[:, j])) for j in range(m)]
        order = np.argsort(card, kind="stable")
        groups: list[_ColumnGroup] = []
        cur_cols: list[int] = []
        cur_size = 0
        cur_dict: np.ndarray | None = None
        cur_codes: np.ndarray | None = None
        for j in order:
            cand = cur_cols + [int(j)]
            size, dictionary, codes = _group_size(dense[:, cand])
            alone, _, _ = _group_size(dense[:, [int(j)]])
            if not cur_cols or size <= cur_size + alone:
                cur_cols, cur_size, cur_dict, cur_codes = cand, size, dictionary, codes
            else:
                groups.append(_ColumnGroup(np.array(cur_cols), cur_dict, cur_codes))
                cur_cols = [int(j)]
                cur_size, cur_dict, cur_codes = alone, *_group_size(dense[:, [int(j)]])[1:]
        if cur_cols:
            groups.append(_ColumnGroup(np.array(cur_cols), cur_dict, cur_codes))
        return cls(groups, dense.shape)

    @property
    def shape(self) -> tuple[int, int]:
        return self._shape

    def decode(self) -> np.ndarray:
        out = np.zeros(self._shape, dtype=np.float64)
        for g in self._groups:
            out[:, g.cols] = g.dictionary[g.codes]
        return out

    def size_bytes(self) -> int:
        """Logical compressed size (what SystemML-CLA would report).

        ``to_bytes`` uses a pickle container and is larger; the paper's
        ratios are about the in-memory compressed representation, which
        this models.
        """
        return len(_MAGIC) + 8 + sum(g.size_bytes() for g in self._groups)

    def to_bytes(self) -> bytes:
        payload = pickle.dumps(
            [(g.cols, g.dictionary, g.codes) for g in self._groups], protocol=4
        )
        return _MAGIC + struct.pack("<II", *self._shape) + payload

    @classmethod
    def from_bytes(cls, buf: bytes) -> "CLABatch":
        if buf[:4] != _MAGIC:
            raise ValueError("not a CLA blob")
        n, m = struct.unpack_from("<II", buf, 4)
        groups = [_ColumnGroup(c, d, k) for c, d, k in pickle.loads(buf[12:])]
        return cls(groups, (n, m))

    def scal(self, c: float) -> "CLABatch":
        return CLABatch(
            [_ColumnGroup(g.cols, g.dictionary * float(c), g.codes) for g in self._groups],
            self._shape,
        )

    def dot_vec(self, v: np.ndarray) -> np.ndarray:
        v = np.asarray(v, dtype=np.float64)
        R = np.zeros(self._shape[0], dtype=np.float64)
        for g in self._groups:
            # Precompute dictionary-entry · v restricted to the group's
            # columns, then gather per row — the CLA execution strategy.
            per_entry = g.dictionary @ v[g.cols]
            R += per_entry[g.codes]
        return R

    def vec_dot(self, v: np.ndarray) -> np.ndarray:
        v = np.asarray(v, dtype=np.float64)
        R = np.zeros(self._shape[1], dtype=np.float64)
        for g in self._groups:
            weights = np.bincount(g.codes, weights=v, minlength=g.dictionary.shape[0])
            R[g.cols] += weights @ g.dictionary
        return R

    def dot_mat(self, M: np.ndarray) -> np.ndarray:
        M = np.asarray(M, dtype=np.float64)
        R = np.zeros((self._shape[0], M.shape[1]), dtype=np.float64)
        for g in self._groups:
            per_entry = g.dictionary @ M[g.cols]
            R += per_entry[g.codes]
        return R

    def mat_dot(self, M: np.ndarray) -> np.ndarray:
        M = np.asarray(M, dtype=np.float64)
        R = np.zeros((M.shape[0], self._shape[1]), dtype=np.float64)
        for g in self._groups:
            # counts[d, p] = sum over rows with code d of M[p, row]
            counts = np.zeros((g.dictionary.shape[0], M.shape[0]), dtype=np.float64)
            np.add.at(counts, g.codes, M.T)
            R[:, g.cols] += (counts.T @ g.dictionary)
        return R

    def add_scalar(self, c: float) -> np.ndarray:
        return self.decode() + float(c)

"""Decode-side prefix tree C' — Algorithm 2 (BuildPrefixTree) of the paper.

C' stores, per node, the parent index and the key (column_index:value),
but no child pointers. It is rebuilt from ``I`` and ``D`` alone: every
AddNode performed in phase II of Algorithm 1 corresponds 1:1 to an
adjacent code pair ``(D[i][j], D[i][j+1])``, in the same order, so
replaying the pairs recreates the tree. The auxiliary array ``F`` (first
pair of each node's sequence) resolves the classic LZW corner case where a
new node's key references the node being created: ``F[idx]`` is assigned
from the parent *before* the key is read (lines 12–13 of Algorithm 2).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class DecodeTree:
    """Arrays-of-struct C': node i has ``parent[i]``, key ``(key_col[i],
    key_val[i])``. Node 0 is the root with a dummy key. ``parent[i] < i``
    for every i >= 1, which is what lets the kernels evaluate the
    recurrences of Theorems 1/2 in a single index-order scan."""

    parent: np.ndarray
    key_col: np.ndarray
    key_val: np.ndarray
    _levels: list[np.ndarray] | None = field(default=None, repr=False, compare=False)
    _jumps: list[np.ndarray] | None = field(default=None, repr=False, compare=False)

    def __len__(self) -> int:
        return len(self.parent)

    def jumps(self) -> list[np.ndarray]:
        """Binary-lifting ancestor tables: ``jumps()[k][i]`` is node i's
        2^k-th ancestor (0 past the root). Cached; used by the kernels to
        evaluate the path-sum recurrences of Theorems 1/2 in
        O(log depth) vectorized rounds instead of one round per level."""
        if self._jumps is None:
            J = self.parent.copy()
            out = []
            while (J > 0).any():
                out.append(J.copy())
                J = J[J]
            self._jumps = out
        return self._jumps

    def levels(self) -> list[np.ndarray]:
        """Node index arrays grouped by tree depth, ascending, root
        excluded. A node's parent is always at a strictly smaller depth,
        so the kernels' H-recurrences vectorize level by level (computed
        once and cached per tree)."""
        if self._levels is None:
            N = len(self.parent)
            # depth[i] = depth[parent[i]] + 1, computed by pointer-chasing
            # whole frontiers at once (max-depth iterations, vectorized).
            depth = np.zeros(N, dtype=np.int64)
            cur = self.parent.copy()
            live = np.flatnonzero(np.arange(N) > 0)
            depth[live] = 1
            while live.size:
                cur_live = cur[live]
                deeper = cur_live > 0
                live = live[deeper]
                depth[live] += 1
                cur[live] = self.parent[cur_live[deeper]]
            order = np.argsort(depth[1:], kind="stable") + 1
            d_sorted = depth[order]
            splits = np.flatnonzero(np.diff(d_sorted)) + 1
            self._levels = [lvl for lvl in np.split(order, splits) if lvl.size]
        return self._levels

    def seq(self, index: int) -> list[tuple[int, float]]:
        """Root→node key sequence (the paper's C'[i].seq). For tests and
        the full-decode path; kernels never materialize sequences."""
        out: list[tuple[int, float]] = []
        while index != 0:
            out.append((int(self.key_col[index]), float(self.key_val[index])))
            index = int(self.parent[index])
        out.reverse()
        return out


def build_decode_tree(
    I_cols: np.ndarray,
    I_vals: np.ndarray,
    codes: np.ndarray,
    code_ptr: np.ndarray,
) -> DecodeTree:
    """Algorithm 2, vectorized.

    The sequential replay creates node ``L+1+k`` from the k-th adjacent
    same-row code pair ``(a, b)``: ``parent = a``, ``F = F[a]``,
    ``key = F[b]``. Since ``F`` of any node is the key of its depth-1
    ancestor and both references point at nodes created no later than the
    node itself, the whole F-resolution collapses to pointer-chasing every
    node to its first-layer ancestor — done frontier-at-a-time with numpy
    gathers instead of the per-pair Python loop (kept as
    :func:`build_decode_tree_reference` and cross-checked by tests,
    including the LZW self-reference case ``b == idx``).
    """
    L = len(I_cols)
    codes = np.asarray(codes, dtype=np.int64)
    n_codes = len(codes)
    # Valid pair starts: every code position except each row's last.
    valid = np.ones(n_codes, dtype=bool)
    lens = np.diff(code_ptr)
    last_idx = code_ptr[1:][lens > 0] - 1
    valid[last_idx] = False
    if n_codes == 0:
        a_vec = b_vec = np.empty(0, dtype=np.int64)
    else:
        starts = np.flatnonzero(valid)
        a_vec = codes[starts]
        b_vec = codes[starts + 1]
    n_new = a_vec.size
    N = 1 + L + n_new

    parent = np.zeros(N, dtype=np.int64)
    parent[1 : L + 1] = 0
    parent[L + 1 :] = a_vec

    # first_layer_ancestor[x] for x >= 1: x itself if x <= L, else the
    # chain a -> a's ref -> ... resolved by repeated gathers. ref[x] < x
    # except never both ref[x] == x and x > L, so this terminates in
    # max-chain-depth iterations.
    ref = np.concatenate(
        [np.arange(L + 1, dtype=np.int64), a_vec]
    )  # ref[0] = 0 dummy
    fla = ref.copy()
    while True:
        unresolved = fla > L
        if not unresolved.any():
            break
        fla[unresolved] = ref[fla[unresolved]]

    key_col = np.zeros(N, dtype=np.int64)
    key_val = np.zeros(N, dtype=np.float64)
    key_col[1 : L + 1] = I_cols
    key_val[1 : L + 1] = I_vals
    if n_new:
        # key of new node = key of b's first-layer ancestor. When b is the
        # node being created (self-reference), fla[b] is already correct
        # because fla[idx] only depends on the parent chain, not the key.
        b_fla = fla[b_vec]
        key_col[L + 1 :] = I_cols[b_fla - 1]
        key_val[L + 1 :] = I_vals[b_fla - 1]
    return DecodeTree(parent=parent, key_col=key_col, key_val=key_val)


def build_decode_tree_reference(
    I_cols: np.ndarray,
    I_vals: np.ndarray,
    codes: np.ndarray,
    code_ptr: np.ndarray,
) -> DecodeTree:
    """Algorithm 2 exactly as written in the paper (sequential replay).

    Kept as the correctness oracle for the vectorized builder above.
    """
    L = len(I_cols)
    lens = np.diff(code_ptr)
    n_new = int(np.maximum(lens - 1, 0).sum())
    N = 1 + L + n_new
    parent = np.zeros(N, dtype=np.int64)
    key_col = np.zeros(N, dtype=np.int64)
    key_val = np.zeros(N, dtype=np.float64)
    # F: first pair of each node's sequence. First-layer nodes are their
    # own first pair.
    f_col = np.zeros(N, dtype=np.int64)
    f_val = np.zeros(N, dtype=np.float64)
    key_col[1 : L + 1] = I_cols
    key_val[1 : L + 1] = I_vals
    f_col[1 : L + 1] = I_cols
    f_val[1 : L + 1] = I_vals

    idx = L + 1
    for r in range(len(code_ptr) - 1):
        for j in range(int(code_ptr[r]), int(code_ptr[r + 1]) - 1):
            a = int(codes[j])
            b = int(codes[j + 1])
            parent[idx] = a
            # Order matters: F[idx] first, because b may equal idx (the
            # LZW self-reference case).
            f_col[idx] = f_col[a]
            f_val[idx] = f_val[a]
            key_col[idx] = f_col[b]
            key_val[idx] = f_val[b]
            idx += 1
    assert idx == N
    return DecodeTree(parent=parent, key_col=key_col, key_val=key_val)

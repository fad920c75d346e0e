"""Compressed matrix kernels on the TOC output (paper §4, Appendix B).

All kernels consume the logical-layer arrays (``I_cols``, ``I_vals``,
``codes``, ``code_ptr``) — the physical layer is already unpacked by
:mod:`repro.core.toc` — plus the decode tree C' from
:func:`repro.core.tree.build_decode_tree`.

Implementation notes:

- Theorem 1/3 right multiplication: ``H[i] = key_i · v + H[parent[i]]`` is
  a pointer-chasing recurrence; because ``parent[i] < i`` a single
  index-order scan evaluates it. The per-node dot against ``v``/``M`` is
  vectorized up front; the scatter of ``H[codes]`` into result rows uses
  ``np.add.at`` with per-code row ids (robust to all-zero rows, which have
  empty code vectors).
- Theorem 2/4 left multiplication: ``G`` is accumulated with ``np.add.at``
  over ``codes``; the backward C' scan pushes mass to parents exactly as
  Algorithm 5/8 prescribe.
- Sparse-safe element-wise ops touch only the value dictionary / I
  (Algorithm 3) — O(|I|).
- Sparse-unsafe ops (Algorithm 6) decode first via parent-chain backtrack
  with memoization.
"""
from __future__ import annotations

import numpy as np

from repro.core.tree import DecodeTree


def code_row_ids(code_ptr: np.ndarray) -> np.ndarray:
    """Row id of each entry of the flattened encoded table D."""
    return np.repeat(np.arange(len(code_ptr) - 1), np.diff(code_ptr))


def _grouped_row_add(out: np.ndarray, idx: np.ndarray, rows: np.ndarray) -> None:
    """``out[idx[k]] += rows[k]`` with duplicate indexes — np.add.at
    semantics via group-by-sort + reduceat, which is much faster than
    np.add.at for wide row blocks."""
    order = np.argsort(idx, kind="stable")
    si = idx[order]
    sr = rows[order]
    starts = np.flatnonzero(np.r_[True, si[1:] != si[:-1]])
    if starts.size:
        out[si[starts]] += np.add.reduceat(sr, starts, axis=0)


def _row_segment_sum(values: np.ndarray, code_ptr: np.ndarray, out: np.ndarray) -> np.ndarray:
    """Sum per-code values into per-row results (Eq. 5's outer sum).

    ``values`` is H gathered at the flattened codes (1-D or 2-D, rows in
    code order); codes are stored row-major, so the per-row sums are
    contiguous segments — ``np.add.reduceat`` over the non-empty rows'
    start offsets, which is several times faster than ``np.add.at``.
    All-zero rows have empty segments and stay zero in ``out``.
    """
    nonempty = np.flatnonzero(np.diff(code_ptr) > 0)
    if nonempty.size:
        starts = code_ptr[:-1][nonempty]
        out[nonempty] = np.add.reduceat(values, starts, axis=0)
    return out


#: Above this depth, binary lifting (log-depth rounds over all nodes)
#: beats the per-level scan (depth rounds over level subsets).
_DOUBLING_DEPTH = 8


def _scan_H_vector(tree: DecodeTree, base: np.ndarray) -> np.ndarray:
    """H[i] = base[i] + H[parent[i]], root H[0] = 0 (Theorem 1 / Eq. 6).

    Two vectorized strategies, chosen by tree depth: a per-level scan
    (parents are always at strictly smaller depths), or binary lifting —
    ``S += S[J_k]`` over the cached 2^k-ancestor tables computes all
    root-path sums in O(log depth) rounds (node 0 contributes 0, so
    jumps that land past the root are no-ops).
    """
    levels = tree.levels()
    if len(levels) > _DOUBLING_DEPTH:
        S = base.copy()
        S[0] = 0.0
        for J in tree.jumps():
            S = S + S[J]
        S[0] = 0.0
        return S
    H = np.zeros(len(tree), dtype=np.float64)
    parent = tree.parent
    for lvl in levels:
        H[lvl] = base[lvl] + H[parent[lvl]]
    return H


def matrix_times_vector(
    tree: DecodeTree,
    codes: np.ndarray,
    code_ptr: np.ndarray,
    v: np.ndarray,
) -> np.ndarray:
    """Algorithm 4: A·v without decoding A."""
    v = np.asarray(v, dtype=np.float64)
    base = tree.key_val * v[tree.key_col]
    base[0] = 0.0
    H = _scan_H_vector(tree, base)
    R = np.zeros(len(code_ptr) - 1, dtype=np.float64)
    return _row_segment_sum(H[codes], code_ptr, R)


def vector_times_matrix(
    tree: DecodeTree,
    codes: np.ndarray,
    code_ptr: np.ndarray,
    v: np.ndarray,
    n_cols: int,
) -> np.ndarray:
    """Algorithm 5: v·A without decoding A."""
    v = np.asarray(v, dtype=np.float64)
    N = len(tree)
    H = np.zeros(N, dtype=np.float64)
    np.add.at(H, codes, v[code_row_ids(code_ptr)])
    parent, key_col, key_val = tree.parent, tree.key_col, tree.key_val
    levels = tree.levels()
    if len(levels) > _DOUBLING_DEPTH:
        # Algorithm 5's backward scan leaves each node holding its
        # subtree sum of the initial G weights; subtree sums are the
        # transpose of the path-sum operator, so the binary-lifting
        # rounds apply in reverse with gather replaced by scatter-add.
        for J in reversed(tree.jumps()):
            tmp = np.zeros(N, dtype=np.float64)
            np.add.at(tmp, J, H)
            H = H + tmp
        H[0] = 0.0
        return np.bincount(key_col, weights=key_val * H, minlength=n_cols)
    R = np.zeros(n_cols, dtype=np.float64)
    # Backward scan, level by level (deepest first): push each node's
    # accumulated weight into the result and onto its parent. Parents of
    # one level all live at smaller depths, so np.add.at per level is
    # exactly Algorithm 5's reverse index-order scan.
    for lvl in reversed(levels):
        h = H[lvl]
        np.add.at(R, key_col[lvl], key_val[lvl] * h)
        np.add.at(H, parent[lvl], h)
    return R


def matrix_times_matrix(
    tree: DecodeTree,
    codes: np.ndarray,
    code_ptr: np.ndarray,
    M: np.ndarray,
) -> np.ndarray:
    """Algorithm 7: A·M (M uncompressed, m×p) without decoding A."""
    M = np.asarray(M, dtype=np.float64)
    # H starts as the per-node key contribution and accumulates the parent
    # prefix in place, level by level (parents are finalized at smaller
    # depths before their children's level runs).
    H = tree.key_val[:, None] * M[tree.key_col]
    H[0, :] = 0.0
    parent = tree.parent
    for lvl in tree.levels():
        H[lvl] += H[parent[lvl]]
    R = np.zeros((len(code_ptr) - 1, M.shape[1]), dtype=np.float64)
    return _row_segment_sum(H[codes], code_ptr, R)


def matrix_times_compressed(
    tree: DecodeTree,
    codes: np.ndarray,
    code_ptr: np.ndarray,
    M: np.ndarray,
    n_cols: int,
) -> np.ndarray:
    """Algorithm 8: M·A (M uncompressed, p×n) without decoding A."""
    M = np.asarray(M, dtype=np.float64)
    p = M.shape[0]
    N = len(tree)
    H = np.zeros((N, p), dtype=np.float64)
    # For each code entry (row r, code c): H[c] += M[:, r]. Group entries
    # by code (stable sort + reduceat) instead of np.add.at — same result,
    # far less scatter cost on wide M.
    if codes.size:
        order = np.argsort(codes, kind="stable")
        sorted_codes = codes[order]
        contrib = M.T[code_row_ids(code_ptr)[order]]
        starts = np.flatnonzero(np.r_[True, sorted_codes[1:] != sorted_codes[:-1]])
        H[sorted_codes[starts]] = np.add.reduceat(contrib, starts, axis=0)
    RT = np.zeros((n_cols, p), dtype=np.float64)
    parent, key_col, key_val = tree.parent, tree.key_col, tree.key_val
    for lvl in reversed(tree.levels()):
        h = H[lvl]
        _grouped_row_add(RT, key_col[lvl], key_val[lvl][:, None] * h)
        _grouped_row_add(H, parent[lvl], h)
    return RT.T


def decode_rows(
    tree: DecodeTree,
    codes: np.ndarray,
    code_ptr: np.ndarray,
    n_cols: int,
) -> np.ndarray:
    """Algorithm 6's decode step: reconstruct the dense matrix.

    Backtracks C' for *all* code entries simultaneously: each iteration
    emits the current frontier's keys into the output and steps every
    frontier node to its parent, shrinking the frontier as chains hit the
    root. Total emitted pairs equal the matrix nnz (decode is linear, as
    §4.6 argues); within a row, emission order is irrelevant because the
    column positions are disjoint across a row's codes.
    """
    n_rows = len(code_ptr) - 1
    out = np.zeros((n_rows, n_cols), dtype=np.float64)
    parent, key_col, key_val = tree.parent, tree.key_col, tree.key_val
    cur = codes.astype(np.int64, copy=True)
    rows = code_row_ids(code_ptr)
    while cur.size:
        out[rows, key_col[cur]] = key_val[cur]
        cur = parent[cur]
        alive = cur != 0
        cur = cur[alive]
        rows = rows[alive]
    return out

"""Logical encoding — Algorithm 1 (PrefixTreeEncode) of the paper.

Input is the sparse encoded table as CSR triplet arrays; output is

- ``I_cols``, ``I_vals`` — the column_index:value pairs in the first layer
  of the prefix tree, in node-index order (node ``i`` has key
  ``(I_cols[i-1], I_vals[i-1])``), and
- ``codes``, ``code_ptr`` — the encoded table ``D`` flattened: row ``r``'s
  code vector is ``codes[code_ptr[r]:code_ptr[r+1]]``.

The algorithm is LZW with two twists the paper calls out (§3.1.3): the
encode unit is a column_index:value pair (column boundaries preserved) and
every tuple is encoded separately against the shared dictionary (row
boundaries preserved). Like LZW it is linear: each pair is read at most
twice with O(1) work.
"""
from __future__ import annotations

import numpy as np

from repro.core.prefix_tree import PrefixTree


def prefix_tree_encode(
    indptr: np.ndarray, indices: np.ndarray, values: np.ndarray
) -> tuple[np.ndarray, np.ndarray, np.ndarray, np.ndarray]:
    """Run Algorithm 1. Returns ``(I_cols, I_vals, codes, code_ptr)``."""
    n_rows = len(indptr) - 1
    tree = PrefixTree()
    # Converting to Python scalars once keeps the dict lookups off numpy
    # scalar hashing, which is several times slower.
    cols = [int(c) for c in indices]
    vals = [float(v) for v in values]

    # Phase I: all unique pairs become children of the root.
    for p in range(len(cols)):
        if tree.get_index(0, (cols[p], vals[p])) == -1:
            tree.add_node(0, (cols[p], vals[p]))
    n_first_layer = len(tree) - 1

    # Phase II: per-tuple LZW. After emitting the code of the longest
    # match ending before position j, position j starts the next match
    # (the mismatching pair is not consumed), exactly as in LZW.
    codes: list[int] = []
    code_ptr = np.zeros(n_rows + 1, dtype=np.int64)
    for r in range(n_rows):
        start, end = int(indptr[r]), int(indptr[r + 1])
        i = start
        while i < end:
            # LongestMatchFromTree(t, i, C)
            n = tree.get_index(0, (cols[i], vals[i]))
            j = i + 1
            while j < end:
                child = tree.get_index(n, (cols[j], vals[j]))
                if child == -1:
                    break
                n = child
                j += 1
            codes.append(n)
            if j < end:
                tree.add_node(n, (cols[j], vals[j]))
            i = j
        code_ptr[r + 1] = len(codes)

    first = tree.first_layer()
    assert len(first) == n_first_layer
    I_cols = np.array([c for c, _ in first], dtype=np.int64)
    I_vals = np.array([v for _, v in first], dtype=np.float64)
    return I_cols, I_vals, np.array(codes, dtype=np.int64), code_ptr

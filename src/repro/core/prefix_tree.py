"""Encode-side prefix tree (paper §3.1.1).

Each node (except the root, index 0) stores one column_index:value pair as
its key and represents the pair sequence on the root→node path. Child
lookup uses one shared hash map keyed by ``(parent_index, col, val)`` — the
"hash map per node" of the paper flattened into a single dict, which is the
standard LZW dictionary trick [Blelloch 2001] and keeps GetIndex O(1).
"""
from __future__ import annotations


class PrefixTree:
    """Prefix tree with the paper's two APIs: AddNode and GetIndex."""

    def __init__(self) -> None:
        # Root has index 0 and no key. Node indexes are assigned from a
        # sequence number starting at 1 (the paper says "from 0" counting
        # the root).
        self._children: dict[tuple[int, int, float], int] = {}
        self._keys: list[tuple[int, float]] = []  # keys[i-1] = key of node i

    def __len__(self) -> int:
        """Number of nodes including the root."""
        return len(self._keys) + 1

    def add_node(self, parent: int, key: tuple[int, float]) -> int:
        """AddNode(n, k): create a child of ``parent`` with key ``k``.

        Returns the new node's index. Duplicate (parent, key) insertion is
        a caller bug and raises.
        """
        col, val = key
        map_key = (parent, col, val)
        if map_key in self._children:
            raise ValueError(f"node {map_key} already exists")
        idx = len(self._keys) + 1
        self._children[map_key] = idx
        self._keys.append((col, val))
        return idx

    def get_index(self, parent: int, key: tuple[int, float]) -> int:
        """GetIndex(n, k): child of ``parent`` with key ``k``, or -1."""
        col, val = key
        return self._children.get((parent, col, val), -1)

    def key_of(self, index: int) -> tuple[int, float]:
        """Key (column_index, value) of a non-root node."""
        return self._keys[index - 1]

    def first_layer(self) -> list[tuple[int, float]]:
        """The paper's ``I``: keys of the root's children, in index order.

        Phase I of Algorithm 1 inserts all unique pairs as root children
        before any deeper node exists, so the first layer is exactly nodes
        ``1..len(I)``.
        """
        out = []
        for (parent, col, val), idx in self._children.items():
            if parent == 0:
                out.append((idx, (col, val)))
        out.sort()
        return [key for _, key in out]

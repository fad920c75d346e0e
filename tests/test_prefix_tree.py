"""Unit tests for the encode-side prefix tree APIs (paper §3.1.1)."""
import pytest

from repro.core.prefix_tree import PrefixTree


class TestPrefixTree:
    def test_empty_tree_has_root_only(self):
        t = PrefixTree()
        assert len(t) == 1

    def test_add_node_returns_sequential_indexes(self):
        t = PrefixTree()
        assert t.add_node(0, (1, 1.1)) == 1
        assert t.add_node(0, (2, 2.0)) == 2
        assert t.add_node(1, (2, 2.0)) == 3

    def test_get_index_found(self):
        t = PrefixTree()
        n = t.add_node(0, (3, 3.0))
        assert t.get_index(0, (3, 3.0)) == n

    def test_get_index_missing_returns_minus_one(self):
        t = PrefixTree()
        t.add_node(0, (3, 3.0))
        assert t.get_index(0, (4, 4.0)) == -1
        assert t.get_index(5, (3, 3.0)) == -1

    def test_same_key_under_different_parents(self):
        t = PrefixTree()
        a = t.add_node(0, (1, 1.0))
        b = t.add_node(0, (2, 2.0))
        c = t.add_node(a, (3, 3.0))
        d = t.add_node(b, (3, 3.0))
        assert c != d
        assert t.get_index(a, (3, 3.0)) == c
        assert t.get_index(b, (3, 3.0)) == d

    def test_duplicate_insert_raises(self):
        t = PrefixTree()
        t.add_node(0, (1, 1.0))
        with pytest.raises(ValueError):
            t.add_node(0, (1, 1.0))

    def test_key_of(self):
        t = PrefixTree()
        n = t.add_node(0, (7, 1.25))
        assert t.key_of(n) == (7, 1.25)

    def test_first_layer_in_index_order(self):
        t = PrefixTree()
        t.add_node(0, (2, 2.0))
        t.add_node(0, (1, 1.1))
        deep = t.add_node(1, (3, 3.0))  # not first layer
        assert t.first_layer() == [(2, 2.0), (1, 1.1)]
        assert deep == 3

    def test_float_keys_bit_exact(self):
        t = PrefixTree()
        import numpy as np

        a, b = 0.1, float(np.nextafter(0.1, 1.0))
        na = t.add_node(0, (1, a))
        nb = t.add_node(0, (1, b))
        assert t.get_index(0, (1, a)) == na
        assert t.get_index(0, (1, b)) == nb

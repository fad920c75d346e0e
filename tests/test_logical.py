"""Property and structural tests for the logical encoding (Algorithm 1)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.core.logical import prefix_tree_encode
from repro.core.sparse import csr_from_dense
from repro.core.tree import build_decode_tree, build_decode_tree_reference


def _encode(X):
    return prefix_tree_encode(*csr_from_dense(X))


def _decode_rows(I_cols, I_vals, codes, code_ptr, n_cols):
    tree = build_decode_tree(I_cols, I_vals, codes, code_ptr)
    n_rows = len(code_ptr) - 1
    out = np.zeros((n_rows, n_cols))
    for r in range(n_rows):
        for j in range(int(code_ptr[r]), int(code_ptr[r + 1])):
            for c, v in tree.seq(int(codes[j])):
                out[r, c] = v
    return out


MATS = {
    "identity": np.eye(6),
    "repeated_rows": np.tile([1.5, 0.0, 2.5, 2.5], (8, 1)),
    "all_same_value": np.full((5, 7), 3.25),
    "single_row": np.array([[1.0, 2.0, 0.0, 3.0]]),
    "single_col": np.array([[1.0], [0.0], [1.0], [2.0]]),
    "zero_rows_interleaved": np.array(
        [[1.0, 2.0], [0.0, 0.0], [1.0, 2.0], [0.0, 0.0]]
    ),
    "all_zero": np.zeros((3, 4)),
    "lzw_self_reference": np.ones((10, 12)),  # cScSc chains
}


class TestLogicalRoundtrip:
    @pytest.mark.parametrize("name", sorted(MATS))
    def test_named_cases(self, name):
        X = MATS[name]
        I_cols, I_vals, codes, code_ptr = _encode(X)
        np.testing.assert_array_equal(
            _decode_rows(I_cols, I_vals, codes, code_ptr, X.shape[1]), X
        )

    @pytest.mark.parametrize("seed", range(8))
    def test_random_redundant(self, seed):
        rng = np.random.default_rng(seed)
        X = rng.choice([0.0, 0.0, 1.5, 2.5, 3.5], size=(40, 25))
        I_cols, I_vals, codes, code_ptr = _encode(X)
        np.testing.assert_array_equal(
            _decode_rows(I_cols, I_vals, codes, code_ptr, 25), X
        )

    @given(
        arrays(
            np.float64,
            st.tuples(st.integers(1, 15), st.integers(1, 10)),
            elements=st.sampled_from([0.0, 0.0, 1.5, 2.5]),
        )
    )
    @settings(max_examples=60, deadline=None)
    def test_roundtrip_property(self, X):
        I_cols, I_vals, codes, code_ptr = _encode(X)
        np.testing.assert_array_equal(
            _decode_rows(I_cols, I_vals, codes, code_ptr, X.shape[1]), X
        )


class TestLogicalStructure:
    def test_first_layer_holds_all_unique_pairs(self):
        X = np.array([[1.0, 2.0, 0.0], [1.0, 0.0, 2.0], [3.0, 2.0, 0.0]])
        I_cols, I_vals, codes, code_ptr = _encode(X)
        pairs = set(zip(I_cols.tolist(), I_vals.tolist()))
        expected = {(0, 1.0), (1, 2.0), (2, 2.0), (0, 3.0)}
        assert pairs == expected

    def test_codes_reference_valid_nodes(self):
        rng = np.random.default_rng(1)
        X = rng.choice([0.0, 1.5, 2.5], size=(30, 10))
        I_cols, I_vals, codes, code_ptr = _encode(X)
        tree = build_decode_tree(I_cols, I_vals, codes, code_ptr)
        assert codes.min() >= 1
        assert codes.max() < len(tree)

    def test_identical_rows_share_codes_after_learning(self):
        # Once a full tuple's sequence is in the tree, later identical
        # tuples collapse to one code (the LZW payoff for MGD batches).
        row = [1.5, 2.5, 0.0, 3.5, 1.5]
        X = np.tile(row, (10, 1))
        _, _, codes, code_ptr = _encode(X)
        lens = np.diff(code_ptr)
        assert lens[-1] == 1  # fully learned by the last row
        assert lens[0] > lens[-1]

    def test_row_boundaries_preserved(self):
        # Encoding [A;B] row-wise never merges codes across the A|B
        # boundary: each row decodes independently.
        A = np.array([[1.0, 2.0, 3.0, 4.0]])
        B = np.array([[4.0, 3.0, 2.0, 1.0]])
        I_cols, I_vals, codes, code_ptr = _encode(np.vstack([A, B]))
        tree = build_decode_tree(I_cols, I_vals, codes, code_ptr)
        for r, expect in ((0, A[0]), (1, B[0])):
            got = np.zeros(4)
            for j in range(int(code_ptr[r]), int(code_ptr[r + 1])):
                for c, v in tree.seq(int(codes[j])):
                    got[c] = v
            np.testing.assert_array_equal(got, expect)

    def test_column_indexes_preserved(self):
        X = np.array([[0.0, 5.0, 0.0, 0.0, 7.0]])
        I_cols, I_vals, _, _ = _encode(X)
        assert set(I_cols.tolist()) == {1, 4}

    def test_empty_matrix_rows_have_empty_code_vectors(self):
        X = np.zeros((4, 3))
        _, _, codes, code_ptr = _encode(X)
        assert codes.size == 0
        np.testing.assert_array_equal(code_ptr, np.zeros(5, dtype=np.int64))

    def test_linear_output_bound(self):
        # |D| <= |B| (each code consumes >= 1 pair): LZW never expands
        # the pair count.
        rng = np.random.default_rng(3)
        X = rng.choice([0.0, 1.5, 2.5, 3.5], size=(50, 20))
        indptr, indices, values = csr_from_dense(X)
        _, _, codes, _ = prefix_tree_encode(indptr, indices, values)
        assert len(codes) <= len(indices)


class TestVectorizedTreeEquivalence:
    @pytest.mark.parametrize("seed", range(10))
    def test_matches_reference(self, seed):
        rng = np.random.default_rng(seed)
        vals = [0.0, 1.0] if seed % 2 else [0.0, 1.5, 2.5, 1.5]
        X = rng.choice(vals, size=(rng.integers(1, 40), rng.integers(1, 25)))
        I_cols, I_vals, codes, code_ptr = _encode(X)
        ref = build_decode_tree_reference(I_cols, I_vals, codes, code_ptr)
        vec = build_decode_tree(I_cols, I_vals, codes, code_ptr)
        np.testing.assert_array_equal(ref.parent, vec.parent)
        np.testing.assert_array_equal(ref.key_col, vec.key_col)
        np.testing.assert_array_equal(ref.key_val, vec.key_val)

    def test_levels_cover_all_nodes_once(self):
        X = np.tile([1.0, 2.0, 3.0], (12, 1))
        I_cols, I_vals, codes, code_ptr = _encode(X)
        tree = build_decode_tree(I_cols, I_vals, codes, code_ptr)
        seen = np.concatenate(tree.levels()) if len(tree) > 1 else np.array([])
        assert sorted(seen.tolist()) == list(range(1, len(tree)))

    def test_levels_parents_at_smaller_depths(self):
        X = np.tile([1.0, 2.0, 3.0, 4.0], (15, 1))
        I_cols, I_vals, codes, code_ptr = _encode(X)
        tree = build_decode_tree(I_cols, I_vals, codes, code_ptr)
        depth = {0: -1}
        for d, lvl in enumerate(tree.levels()):
            for i in lvl:
                depth[int(i)] = d
        for d, lvl in enumerate(tree.levels()):
            for i in lvl:
                assert depth[int(tree.parent[i])] < d

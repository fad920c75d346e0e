"""Exact reproduction of the paper's running example.

Figure 3's table **A**, the sparse table **B**, the encoded table **D**,
the first layer **I**, the Algorithm-1 trace of Table 2, and the decode
tree **C'** of Table 4 are all asserted literally. Column indexes here
are 0-based (the paper's figures are 1-based), so paper column k is our
k-1.
"""
import numpy as np
import pytest

from repro.core.logical import prefix_tree_encode
from repro.core.sparse import csr_from_dense
from repro.core.toc import TOCMatrix
from repro.core.tree import build_decode_tree, build_decode_tree_reference

#: Figure 3's original table A.
FIGURE3_A = np.array(
    [
        [1.1, 2.0, 3.0, 1.4],
        [1.1, 2.0, 3.0, 0.0],
        [0.0, 1.1, 3.0, 1.4],
        [1.1, 2.0, 0.0, 0.0],
    ]
)


@pytest.fixture(scope="module")
def encoded():
    indptr, indices, values = csr_from_dense(FIGURE3_A)
    return csr_from_dense(FIGURE3_A), prefix_tree_encode(indptr, indices, values)


class TestFigure3SparseEncoding:
    def test_sparse_table_B(self, encoded):
        (indptr, indices, values), _ = encoded
        # R1=[0:1.1,1:2,2:3,3:1.4] R2=[0:1.1,1:2,2:3] R3=[1:1.1,2:3,3:1.4] R4=[0:1.1,1:2]
        rows = [
            list(zip(indices[indptr[r] : indptr[r + 1]], values[indptr[r] : indptr[r + 1]]))
            for r in range(4)
        ]
        assert rows[0] == [(0, 1.1), (1, 2.0), (2, 3.0), (3, 1.4)]
        assert rows[1] == [(0, 1.1), (1, 2.0), (2, 3.0)]
        assert rows[2] == [(1, 1.1), (2, 3.0), (3, 1.4)]
        assert rows[3] == [(0, 1.1), (1, 2.0)]


class TestFigure3LogicalEncoding:
    def test_first_layer_I(self, encoded):
        _, (I_cols, I_vals, _, _) = encoded
        # Paper: nodes 1..5 are 1:1.1, 2:2, 3:3, 4:1.4, 2:1.1 (1-based cols).
        assert list(zip(I_cols.tolist(), I_vals.tolist())) == [
            (0, 1.1), (1, 2.0), (2, 3.0), (3, 1.4), (1, 1.1),
        ]

    def test_encoded_table_D(self, encoded):
        _, (_, _, codes, code_ptr) = encoded
        D = [codes[code_ptr[r] : code_ptr[r + 1]].tolist() for r in range(4)]
        assert D == [[1, 2, 3, 4], [6, 3], [5, 8], [6]]

    def test_table2_added_nodes_via_tree(self, encoded):
        # Table 2's AddNode column: nodes 6..10 represent the sequences
        # [1:1.1,2:2], [2:2,3:3], [3:3,4:1.4], [1:1.1,2:2,3:3], [2:1.1,3:3].
        _, (I_cols, I_vals, codes, code_ptr) = encoded
        tree = build_decode_tree(I_cols, I_vals, codes, code_ptr)
        assert tree.seq(6) == [(0, 1.1), (1, 2.0)]
        assert tree.seq(7) == [(1, 2.0), (2, 3.0)]
        assert tree.seq(8) == [(2, 3.0), (3, 1.4)]
        assert tree.seq(9) == [(0, 1.1), (1, 2.0), (2, 3.0)]
        assert tree.seq(10) == [(1, 1.1), (2, 3.0)]


class TestTable4DecodeTree:
    """Table 4: keys and parent indexes of C'."""

    @pytest.fixture(scope="class")
    def tree(self, encoded):
        _, (I_cols, I_vals, codes, code_ptr) = encoded
        return build_decode_tree(I_cols, I_vals, codes, code_ptr)

    def test_parent_row(self, tree):
        assert tree.parent.tolist() == [0, 0, 0, 0, 0, 0, 1, 2, 3, 6, 5]

    def test_key_row(self, tree):
        keys = list(zip(tree.key_col.tolist(), tree.key_val.tolist()))[1:]
        assert keys == [
            (0, 1.1), (1, 2.0), (2, 3.0), (3, 1.4), (1, 1.1),  # first layer
            (1, 2.0), (2, 3.0), (3, 1.4), (2, 3.0), (2, 3.0),  # rebuilt
        ]

    def test_reference_builder_agrees(self, encoded):
        _, (I_cols, I_vals, codes, code_ptr) = encoded
        ref = build_decode_tree_reference(I_cols, I_vals, codes, code_ptr)
        vec = build_decode_tree(I_cols, I_vals, codes, code_ptr)
        np.testing.assert_array_equal(ref.parent, vec.parent)
        np.testing.assert_array_equal(ref.key_col, vec.key_col)
        np.testing.assert_array_equal(ref.key_val, vec.key_val)


class TestFigure3EndToEnd:
    def test_decode_reconstructs_A(self):
        toc = TOCMatrix.encode(FIGURE3_A)
        np.testing.assert_array_equal(toc.decode(), FIGURE3_A)

    def test_serialization_roundtrip(self):
        toc = TOCMatrix.encode(FIGURE3_A)
        again = TOCMatrix.from_bytes(toc.to_bytes())
        np.testing.assert_array_equal(again.decode(), FIGURE3_A)

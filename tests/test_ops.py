"""Kernel tests for Algorithms 3–8 / Theorems 1–4 against numpy ground
truth, across matrix shapes chosen to stress every code path (empty rows,
self-reference chains, single row/column, high redundancy, no redundancy).
"""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.core.toc import TOCMatrix

CASES = {
    "random_sparse": np.random.default_rng(0).choice(
        [0.0, 0.0, 0.0, 1.5, 2.5, -3.25], size=(25, 18)
    ),
    "redundant_rows": np.tile([1.5, 0.0, 2.5, 3.5, 0.0], (20, 1)),
    "identity": np.eye(8),
    "with_zero_rows": np.vstack([np.zeros((1, 6)), np.ones((2, 6)), np.zeros((1, 6))]),
    "single_row": np.array([[1.0, 0.0, 2.0]]),
    "single_col": np.array([[1.0], [2.0], [0.0]]),
    "self_reference": np.ones((12, 9)),
    "dense_random": np.random.default_rng(1).random((10, 7)),
    "all_zero": np.zeros((4, 5)),
}


@pytest.fixture(scope="module", params=sorted(CASES))
def case(request):
    X = CASES[request.param]
    return X, TOCMatrix.encode(X)


class TestRightMultiplication:
    def test_dot_vec(self, case):
        X, toc = case
        v = np.random.default_rng(2).random(X.shape[1])
        np.testing.assert_allclose(toc.dot_vec(v), X @ v, atol=1e-12)

    def test_dot_vec_zero_vector(self, case):
        X, toc = case
        np.testing.assert_array_equal(toc.dot_vec(np.zeros(X.shape[1])), np.zeros(X.shape[0]))

    def test_dot_mat(self, case):
        X, toc = case
        M = np.random.default_rng(3).random((X.shape[1], 6))
        np.testing.assert_allclose(toc.dot_mat(M), X @ M, atol=1e-12)

    def test_dot_mat_single_column_equals_dot_vec(self, case):
        X, toc = case
        v = np.random.default_rng(4).random(X.shape[1])
        np.testing.assert_allclose(
            toc.dot_mat(v[:, None]).ravel(), toc.dot_vec(v), atol=1e-12
        )

    def test_dot_mat_identity_decodes(self, case):
        X, toc = case
        np.testing.assert_allclose(toc.dot_mat(np.eye(X.shape[1])), X, atol=1e-12)


class TestLeftMultiplication:
    def test_vec_dot(self, case):
        X, toc = case
        v = np.random.default_rng(5).random(X.shape[0])
        np.testing.assert_allclose(toc.vec_dot(v), v @ X, atol=1e-12)

    def test_vec_dot_negative_weights(self, case):
        X, toc = case
        v = np.random.default_rng(6).normal(size=X.shape[0])
        np.testing.assert_allclose(toc.vec_dot(v), v @ X, atol=1e-12)

    def test_mat_dot(self, case):
        X, toc = case
        M = np.random.default_rng(7).random((5, X.shape[0]))
        np.testing.assert_allclose(toc.mat_dot(M), M @ X, atol=1e-12)

    def test_mat_dot_single_row_equals_vec_dot(self, case):
        X, toc = case
        v = np.random.default_rng(8).random(X.shape[0])
        np.testing.assert_allclose(
            toc.mat_dot(v[None, :]).ravel(), toc.vec_dot(v), atol=1e-12
        )

    def test_ones_vector_gives_column_sums(self, case):
        X, toc = case
        np.testing.assert_allclose(toc.vec_dot(np.ones(X.shape[0])), X.sum(axis=0), atol=1e-12)


class TestOpComposition:
    def test_quadratic_form_consistency(self, case):
        # u·(A·v) must equal (u·A)·v — right and left kernels agree.
        X, toc = case
        rng = np.random.default_rng(9)
        u, v = rng.random(X.shape[0]), rng.random(X.shape[1])
        assert toc.dot_vec(v) @ u == pytest.approx(toc.vec_dot(u) @ v, abs=1e-9)

    def test_scal_then_dot(self, case):
        X, toc = case
        v = np.random.default_rng(10).random(X.shape[1])
        np.testing.assert_allclose(toc.scal(2.0).dot_vec(v), 2.0 * (X @ v), atol=1e-12)


class TestTheorem1Properties:
    """Structural checks of Theorem 1's decomposition."""

    def test_seq_concatenation_identity(self):
        # C'[i].seq == C'[C'[i].parent].seq + [C'[i].key]  (Eq. 6).
        X = np.tile([1.5, 2.5, 3.5, 0.0, 4.5], (10, 1))
        toc = TOCMatrix.encode(X)
        tree = toc.decode_tree()
        for i in range(1, len(tree)):
            parent_seq = tree.seq(int(tree.parent[i]))
            assert tree.seq(i) == parent_seq + [
                (int(tree.key_col[i]), float(tree.key_val[i]))
            ]

    def test_row_is_sum_of_code_sequences(self):
        # Eq. 5: row r == concat of D[r]'s node sequences.
        rng = np.random.default_rng(11)
        X = rng.choice([0.0, 1.5, 2.5], size=(15, 10))
        toc = TOCMatrix.encode(X)
        tree = toc.decode_tree()
        for r in range(X.shape[0]):
            got = np.zeros(X.shape[1])
            for j in range(int(toc.code_ptr[r]), int(toc.code_ptr[r + 1])):
                for c, v in tree.seq(int(toc.codes[j])):
                    got[c] = v
            np.testing.assert_array_equal(got, X[r])


@given(
    arrays(
        np.float64,
        st.tuples(st.integers(1, 12), st.integers(1, 10)),
        elements=st.sampled_from([0.0, 0.0, 1.5, 2.5]),
    ),
    st.integers(0, 1000),
)
@settings(max_examples=40, deadline=None)
def test_all_ops_property(X, seed):
    rng = np.random.default_rng(seed)
    toc = TOCMatrix.encode(X)
    v = rng.random(X.shape[1])
    u = rng.random(X.shape[0])
    M = rng.random((X.shape[1], 3))
    P = rng.random((2, X.shape[0]))
    np.testing.assert_allclose(toc.dot_vec(v), X @ v, atol=1e-12)
    np.testing.assert_allclose(toc.vec_dot(u), u @ X, atol=1e-12)
    np.testing.assert_allclose(toc.dot_mat(M), X @ M, atol=1e-12)
    np.testing.assert_allclose(toc.mat_dot(P), P @ X, atol=1e-12)

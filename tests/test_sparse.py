"""Unit tests for the sparse-encoding layer (CSR triplets)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.core import sparse


class TestCsrRoundtrip:
    @pytest.mark.parametrize("shape", [(1, 1), (5, 3), (3, 5), (10, 10), (1, 20), (20, 1)])
    def test_roundtrip_random(self, shape):
        rng = np.random.default_rng(sum(shape))
        X = rng.choice([0.0, 0.0, 1.5, 2.5], size=shape)
        indptr, indices, values = sparse.csr_from_dense(X)
        np.testing.assert_array_equal(sparse.dense_from_csr(indptr, indices, values, shape), X)

    def test_all_zero(self):
        X = np.zeros((4, 6))
        indptr, indices, values = sparse.csr_from_dense(X)
        assert indices.size == 0
        np.testing.assert_array_equal(indptr, np.zeros(5, dtype=np.int64))
        np.testing.assert_array_equal(sparse.dense_from_csr(indptr, indices, values, (4, 6)), X)

    def test_fully_dense(self):
        X = np.arange(1, 13, dtype=np.float64).reshape(3, 4)
        indptr, indices, values = sparse.csr_from_dense(X)
        assert indices.size == 12
        np.testing.assert_array_equal(sparse.dense_from_csr(indptr, indices, values, (3, 4)), X)

    def test_negative_values_kept(self):
        X = np.array([[0.0, -1.5], [2.5, 0.0]])
        indptr, indices, values = sparse.csr_from_dense(X)
        assert set(values) == {-1.5, 2.5}

    def test_column_order_ascending_per_row(self):
        X = np.array([[1.0, 0.0, 2.0, 3.0], [0.0, 4.0, 0.0, 5.0]])
        indptr, indices, values = sparse.csr_from_dense(X)
        for r in range(2):
            seg = indices[indptr[r] : indptr[r + 1]]
            assert np.all(np.diff(seg) > 0)

    def test_rejects_1d(self):
        with pytest.raises(ValueError):
            sparse.csr_from_dense(np.array([1.0, 2.0]))

    def test_row_ids(self):
        X = np.array([[1.0, 1.0], [0.0, 0.0], [1.0, 0.0]])
        indptr, _, _ = sparse.csr_from_dense(X)
        np.testing.assert_array_equal(sparse.csr_row_ids(indptr), [0, 0, 2])

    @given(
        arrays(
            np.float64,
            st.tuples(st.integers(1, 12), st.integers(1, 12)),
            elements=st.sampled_from([0.0, 0.0, 1.5, -2.5, 7.25]),
        )
    )
    @settings(max_examples=50, deadline=None)
    def test_roundtrip_property(self, X):
        indptr, indices, values = sparse.csr_from_dense(X)
        np.testing.assert_array_equal(
            sparse.dense_from_csr(indptr, indices, values, X.shape), X
        )

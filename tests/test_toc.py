"""TOCMatrix facade tests: lossless roundtrip, serialization, sizes."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.core.toc import TOCMatrix


def _random_matrix(seed, shape=(30, 15), values=(0.0, 0.0, 1.5, 2.5, -3.25)):
    return np.random.default_rng(seed).choice(values, size=shape)


class TestLossless:
    @pytest.mark.parametrize("seed", range(6))
    def test_decode_bit_exact(self, seed):
        X = _random_matrix(seed)
        np.testing.assert_array_equal(TOCMatrix.encode(X).decode(), X)

    def test_ulp_distinct_values_preserved(self):
        a, b = 0.1, float(np.nextafter(0.1, 1.0))
        X = np.array([[a, b], [b, a]])
        np.testing.assert_array_equal(TOCMatrix.encode(X).decode(), X)

    def test_negative_and_tiny_values(self):
        X = np.array([[-1e-300, 0.0], [1e300, -2.5]])
        np.testing.assert_array_equal(TOCMatrix.encode(X).decode(), X)

    def test_all_zero_matrix(self):
        X = np.zeros((5, 8))
        toc = TOCMatrix.encode(X)
        np.testing.assert_array_equal(toc.decode(), X)
        assert toc.codes.size == 0

    def test_single_cell(self):
        for v in (0.0, 3.5):
            X = np.array([[v]])
            np.testing.assert_array_equal(TOCMatrix.encode(X).decode(), X)

    @given(
        arrays(
            np.float64,
            st.tuples(st.integers(1, 20), st.integers(1, 12)),
            elements=st.sampled_from([0.0, 0.0, 1.5, 2.5, 7.125]),
        )
    )
    @settings(max_examples=60, deadline=None)
    def test_roundtrip_property(self, X):
        np.testing.assert_array_equal(TOCMatrix.encode(X).decode(), X)


class TestSerialization:
    @pytest.mark.parametrize("seed", range(4))
    def test_bytes_roundtrip(self, seed):
        X = _random_matrix(seed)
        toc = TOCMatrix.encode(X)
        again = TOCMatrix.from_bytes(toc.to_bytes())
        np.testing.assert_array_equal(again.decode(), X)
        assert again.shape == toc.shape

    def test_size_bytes_equals_serialized_length(self):
        toc = TOCMatrix.encode(_random_matrix(1))
        assert toc.size_bytes() == len(toc.to_bytes())

    def test_bad_magic_rejected(self):
        with pytest.raises(ValueError):
            TOCMatrix.from_bytes(b"NOPE" + b"\x00" * 32)

    def test_roundtrip_preserves_internal_arrays(self):
        toc = TOCMatrix.encode(_random_matrix(2))
        again = TOCMatrix.from_bytes(toc.to_bytes())
        np.testing.assert_array_equal(again.I_cols, toc.I_cols)
        np.testing.assert_array_equal(again.I_vidx, toc.I_vidx)
        np.testing.assert_array_equal(again.uvals, toc.uvals)
        np.testing.assert_array_equal(again.codes, toc.codes)
        np.testing.assert_array_equal(again.code_ptr, toc.code_ptr)


class TestCompressionBehaviour:
    def test_redundant_rows_compress_far_below_dense(self):
        X = np.tile([1.5, 0.0, 2.5, 2.5, 0.0, 3.5], (100, 1))
        toc = TOCMatrix.encode(X)
        dense_bytes = X.size * 8
        assert toc.size_bytes() < dense_bytes / 10

    def test_incompressible_dense_random_larger_than_csr_ish(self):
        # Dense i.i.d. doubles (Deep1Billion regime): TOC cannot win.
        X = np.random.default_rng(0).random((50, 20))
        toc = TOCMatrix.encode(X)
        assert toc.size_bytes() > X.size * 8  # pays the pair overhead

    def test_more_redundancy_smaller_output(self):
        rng = np.random.default_rng(0)
        redundant = np.tile(rng.choice([0.0, 1.5, 2.5], size=20), (40, 1))
        varied = rng.choice([0.0, 1.5, 2.5], size=(40, 20))
        assert (
            TOCMatrix.encode(redundant).size_bytes()
            < TOCMatrix.encode(varied).size_bytes()
        )

    def test_value_dictionary_deduplicates(self):
        X = np.full((10, 10), 4.25)
        toc = TOCMatrix.encode(X)
        assert toc.uvals.tolist() == [4.25]


class TestSparseSafeScalar:
    def test_scal_matches_dense(self):
        X = _random_matrix(3)
        np.testing.assert_allclose(TOCMatrix.encode(X).scal(2.5).decode(), X * 2.5)

    def test_scal_zero_only_touches_dictionary(self):
        toc = TOCMatrix.encode(_random_matrix(4))
        scaled = toc.scal(0.0)
        # Structure untouched (I, D identical); only values change.
        np.testing.assert_array_equal(scaled.codes, toc.codes)
        np.testing.assert_array_equal(scaled.I_cols, toc.I_cols)
        assert np.all(scaled.uvals == 0.0)

    def test_scal_preserves_zeros(self):
        X = np.array([[0.0, 2.0], [3.0, 0.0]])
        out = TOCMatrix.encode(X).scal(5.0).decode()
        assert out[0, 0] == 0.0 and out[1, 1] == 0.0

    def test_scal_returns_new_object(self):
        toc = TOCMatrix.encode(_random_matrix(5))
        before = toc.uvals.copy()
        toc.scal(3.0)
        np.testing.assert_array_equal(toc.uvals, before)


class TestSparseUnsafe:
    def test_add_scalar_matches_dense(self):
        X = _random_matrix(6)
        np.testing.assert_allclose(TOCMatrix.encode(X).add_scalar(1.5), X + 1.5)

    def test_add_scalar_fills_zeros(self):
        X = np.zeros((3, 3))
        np.testing.assert_array_equal(TOCMatrix.encode(X).add_scalar(2.0), np.full((3, 3), 2.0))

"""Codec-surrogate tests (§5.4 behaviour): ratio/speed trade-off and the
decompress-before-compute access pattern."""
import time

import numpy as np
import pytest

from repro import datasets
from repro.core.toc import TOCMatrix
from repro.formats.codec import GzipBatch, SnappyBatch


@pytest.fixture(scope="module")
def batch_data():
    X, _ = datasets.generate("census", 250, seed=0)
    return X


class TestRatioSpeedTradeoff:
    def test_gzip_at_least_as_small_as_snappy(self, batch_data):
        assert (
            GzipBatch.encode(batch_data).size_bytes()
            <= SnappyBatch.encode(batch_data).size_bytes()
        )

    def test_snappy_compresses_faster_than_gzip(self, batch_data):
        # §5.4's ordering; averaged to dodge scheduler noise.
        def t(fn, reps=5):
            fn()
            t0 = time.perf_counter()
            for _ in range(reps):
                fn()
            return time.perf_counter() - t0

        snappy_t = t(lambda: SnappyBatch.encode(batch_data))
        gzip_t = t(lambda: GzipBatch.encode(batch_data))
        assert snappy_t < gzip_t

    def test_toc_decode_not_slower_than_gzip_order_of_magnitude(self, batch_data):
        # §5.4: TOC decompression is fast (faster than Gzip in the paper;
        # here we only require the same order of magnitude, since the
        # substrates differ).
        toc = TOCMatrix.encode(batch_data)
        gz = GzipBatch.encode(batch_data)

        def t(fn, reps=3):
            fn()
            t0 = time.perf_counter()
            for _ in range(reps):
                fn()
            return time.perf_counter() - t0

        assert t(toc.decode) < 20 * t(gz.decode)


class TestAccessPattern:
    def test_every_op_decompresses_without_step_cache(self, batch_data):
        batch = GzipBatch.encode(batch_data)
        # No cache: decode() twice must not share state.
        a = batch.decode()
        b = batch.decode()
        assert a is not b
        np.testing.assert_array_equal(a, b)

    def test_step_cache_shares_one_decompression(self, batch_data):
        batch = SnappyBatch.encode(batch_data)
        batch.begin_step()
        a = batch._dense()
        b = batch._dense()
        assert a is b
        batch.end_step()

    def test_scal_recompresses(self, batch_data):
        batch = GzipBatch.encode(batch_data)
        scaled = batch.scal(2.0)
        assert isinstance(scaled, GzipBatch)
        np.testing.assert_allclose(scaled.decode(), batch_data * 2.0)

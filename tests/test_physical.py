"""Unit tests for bit packing and value indexing (paper §3.2)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import physical


class TestByteWidth:
    @pytest.mark.parametrize(
        "value,width",
        [(0, 1), (1, 1), (255, 1), (256, 2), (65535, 2), (65536, 3),
         (2**24 - 1, 3), (2**24, 4), (2**32 - 1, 4)],
    )
    def test_boundaries(self, value, width):
        assert physical.byte_width(value) == width

    def test_negative_rejected(self):
        with pytest.raises(ValueError):
            physical.byte_width(-1)


class TestPackUints:
    @pytest.mark.parametrize("width,maxval", [(1, 255), (2, 65535), (3, 2**24 - 1), (4, 2**32 - 1)])
    def test_roundtrip_each_width(self, width, maxval):
        rng = np.random.default_rng(width)
        arr = rng.integers(0, maxval + 1, size=100, dtype=np.uint64).astype(np.int64)
        arr[0] = maxval  # force the width
        buf = physical.pack_uints(arr)
        out, end = physical.unpack_uints(buf)
        assert end == len(buf)
        np.testing.assert_array_equal(out, arr)

    def test_empty(self):
        buf = physical.pack_uints(np.array([], dtype=np.int64))
        out, end = physical.unpack_uints(buf)
        assert out.size == 0 and end == len(buf)

    def test_all_zeros_one_byte_wide(self):
        buf = physical.pack_uints(np.zeros(50, dtype=np.int64))
        # header (5) + 50 * 1 byte
        assert len(buf) == 5 + 50

    def test_negative_rejected(self):
        with pytest.raises(ValueError):
            physical.pack_uints(np.array([-1]))

    def test_packed_size_matches_pack(self):
        for arr in (np.array([3, 5]), np.array([1000]), np.arange(70000, 70004)):
            assert physical.packed_size(arr) == len(physical.pack_uints(arr))

    def test_offset_walk(self):
        a = np.array([1, 2, 3])
        b = np.array([70000, 5])
        buf = physical.pack_uints(a) + physical.pack_uints(b)
        out_a, off = physical.unpack_uints(buf, 0)
        out_b, end = physical.unpack_uints(buf, off)
        np.testing.assert_array_equal(out_a, a)
        np.testing.assert_array_equal(out_b, b)
        assert end == len(buf)

    @given(st.lists(st.integers(min_value=0, max_value=2**32 - 1), max_size=200))
    @settings(max_examples=50, deadline=None)
    def test_roundtrip_property(self, xs):
        arr = np.array(xs, dtype=np.int64)
        out, _ = physical.unpack_uints(physical.pack_uints(arr))
        np.testing.assert_array_equal(out, arr)


class TestValueIndex:
    def test_roundtrip(self):
        vals = np.array([1.5, 2.5, 1.5, 0.25, 2.5, 1.5])
        uniques, idx = physical.value_index(vals)
        np.testing.assert_array_equal(uniques[idx], vals)

    def test_uniques_are_unique_and_sorted(self):
        uniques, _ = physical.value_index(np.array([3.0, 1.0, 3.0, 2.0]))
        np.testing.assert_array_equal(uniques, [1.0, 2.0, 3.0])

    def test_bit_exact_doubles(self):
        # Values that differ in the last ulp must stay distinct (lossless).
        a = 0.1
        b = np.nextafter(0.1, 1.0)
        uniques, idx = physical.value_index(np.array([a, b, a]))
        assert len(uniques) == 2
        np.testing.assert_array_equal(uniques[idx], [a, b, a])

    def test_empty(self):
        uniques, idx = physical.value_index(np.array([]))
        assert uniques.size == 0 and idx.size == 0

    @given(st.lists(st.sampled_from([0.5, 1.25, 3.75, 9.125, -2.5]), max_size=100))
    @settings(max_examples=30, deadline=None)
    def test_roundtrip_property(self, xs):
        vals = np.array(xs)
        uniques, idx = physical.value_index(vals)
        np.testing.assert_array_equal(uniques[idx] if vals.size else vals, vals)


class TestPackFloats:
    def test_roundtrip(self):
        arr = np.array([1.5, -2.25, 1e300, 5e-324])
        out, end = physical.unpack_floats(physical.pack_floats(arr))
        np.testing.assert_array_equal(out, arr)

    def test_empty(self):
        out, end = physical.unpack_floats(physical.pack_floats(np.array([])))
        assert out.size == 0

"""Physical encoding (paper §3.2): bit packing and value indexing.

Bit packing stores each non-negative integer of an array in
``ceil(log2(max+1) / 8)`` bytes (1, 2, 3, or 4), little-endian, behind a
header recording the count and the byte width — exactly the scheme the
paper describes, including the uint_24 case handled by masking the top
byte of a uint_32.

Value indexing is dictionary encoding for doubles: distinct values in an
array plus a bit-packed index array.
"""
from __future__ import annotations

import struct

import numpy as np

_HEADER = struct.Struct("<IB")  # count:uint32, width:uint8


def byte_width(max_value: int) -> int:
    """Bytes needed to store ``max_value`` (non-negative) — 1, 2, 3 or 4."""
    if max_value < 0:
        raise ValueError("bit packing requires non-negative integers")
    return max(1, (int(max_value).bit_length() + 7) // 8)


def pack_uints(arr: np.ndarray) -> bytes:
    """Bit-pack a non-negative integer array into header + payload bytes."""
    a = np.asarray(arr)
    if a.size and int(a.min()) < 0:
        raise ValueError("bit packing requires non-negative integers")
    width = byte_width(int(a.max())) if a.size else 1
    a32 = np.ascontiguousarray(a, dtype="<u4")
    payload = a32.view(np.uint8).reshape(-1, 4)[:, :width].tobytes()
    return _HEADER.pack(a32.size, width) + payload


def unpack_uints(buf: bytes, offset: int = 0) -> tuple[np.ndarray, int]:
    """Inverse of :func:`pack_uints`.

    Returns ``(array, next_offset)`` so callers can walk a concatenated
    byte stream.
    """
    n, width = _HEADER.unpack_from(buf, offset)
    start = offset + _HEADER.size
    end = start + n * width
    raw = np.frombuffer(buf, dtype=np.uint8, count=n * width, offset=start)
    padded = np.zeros((n, 4), dtype=np.uint8)
    padded[:, :width] = raw.reshape(n, width)
    return padded.view("<u4").ravel().astype(np.int64), end


def packed_size(arr: np.ndarray) -> int:
    """Size in bytes :func:`pack_uints` would produce, without packing."""
    a = np.asarray(arr)
    width = byte_width(int(a.max())) if a.size else 1
    return _HEADER.size + a.size * width


def value_index(values: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Dictionary-encode doubles: ``(unique_values, indexes)``.

    ``unique_values[indexes]`` reconstructs ``values`` bit-exactly
    (np.unique compares doubles exactly; NaNs do not occur in feature
    matrices here).
    """
    values = np.asarray(values, dtype=np.float64)
    uniques, idx = np.unique(values, return_inverse=True)
    return uniques, idx.astype(np.int64)


def pack_floats(arr: np.ndarray) -> bytes:
    """Serialize a float64 array: uint32 count + raw IEEE-754 bytes."""
    a = np.ascontiguousarray(arr, dtype="<f8")
    return struct.pack("<I", a.size) + a.tobytes()


def unpack_floats(buf: bytes, offset: int = 0) -> tuple[np.ndarray, int]:
    """Inverse of :func:`pack_floats`."""
    (n,) = struct.unpack_from("<I", buf, offset)
    start = offset + 4
    end = start + 8 * n
    return np.frombuffer(buf, dtype="<f8", count=n, offset=start).astype(np.float64), end

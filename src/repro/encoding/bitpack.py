"""Bit-packing of unsigned integers (Parquet's BIT_PACKED building block).

Values are packed little-endian-in-bit-order into ``ceil(n*w/8)`` bytes via
numpy (no Python-level loops).
"""
from __future__ import annotations

import numpy as np


def width_for(max_value: int) -> int:
    """Smallest bit width that can hold ``max_value`` (>=0); 0 if all zero."""
    return int(max_value).bit_length()


def pack(values: np.ndarray, width: int) -> bytes:
    """Pack ``values`` (non-negative ints) into ``width`` bits each."""
    if width == 0:
        return b""
    v = np.asarray(values, dtype=np.uint64)
    n = len(v)
    if n == 0:
        return b""
    # bits[i, j] = bit j of value i (LSB first), then flatten and pack.
    shifts = np.arange(width, dtype=np.uint64)
    bits = ((v[:, None] >> shifts[None, :]) & 1).astype(np.uint8)
    return np.packbits(bits.reshape(-1), bitorder="little").tobytes()


def unpack(data: bytes, width: int, n: int) -> np.ndarray:
    """Inverse of :func:`pack`; returns ``n`` values as uint64."""
    if width == 0 or n == 0:
        return np.zeros(n, dtype=np.uint64)
    bits = np.unpackbits(
        np.frombuffer(data, dtype=np.uint8), count=n * width, bitorder="little"
    )
    bits = bits.reshape(n, width).astype(np.uint64)
    shifts = np.arange(width, dtype=np.uint64)
    return (bits << shifts[None, :]).sum(axis=1, dtype=np.uint64)

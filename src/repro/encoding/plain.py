"""PLAIN encodings per atomic type (numpy-vectorized)."""
from __future__ import annotations

from typing import List

import numpy as np

from .varint import read_uvarint, write_uvarint


def encode_i64(values) -> bytes:
    return np.asarray(values, dtype=np.int64).tobytes()


def decode_i64(data: bytes) -> np.ndarray:
    return np.frombuffer(data, dtype=np.int64)


def encode_f64(values) -> bytes:
    return np.asarray(values, dtype=np.float64).tobytes()


def decode_f64(data: bytes) -> np.ndarray:
    return np.frombuffer(data, dtype=np.float64)


def encode_bool(values) -> bytes:
    v = np.asarray(values, dtype=np.uint8)
    out = bytearray()
    write_uvarint(out, len(v))
    out.extend(np.packbits(v, bitorder="little").tobytes())
    return bytes(out)


def decode_bool(data: bytes) -> np.ndarray:
    n, pos = read_uvarint(data, 0)
    return np.unpackbits(
        np.frombuffer(data[pos:], dtype=np.uint8), count=n, bitorder="little"
    ).astype(bool)


def encode_str(values: List[str]) -> bytes:
    encoded = [s.encode("utf-8") for s in values]
    lens = np.fromiter((len(b) for b in encoded), dtype=np.int64, count=len(encoded))
    out = bytearray()
    write_uvarint(out, len(encoded))
    out.extend(lens.astype(np.uint32).tobytes())
    out.extend(b"".join(encoded))
    return bytes(out)


def decode_str(data: bytes) -> List[str]:
    n, pos = read_uvarint(data, 0)
    lens = np.frombuffer(data[pos : pos + 4 * n], dtype=np.uint32)
    pos += 4 * n
    out: List[str] = []
    blob = data
    for ln in lens:
        out.append(blob[pos : pos + int(ln)].decode("utf-8"))
        pos += int(ln)
    return out

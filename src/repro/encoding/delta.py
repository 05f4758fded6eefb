"""DELTA_BINARY_PACKED-style integer encoding (Parquet encodings doc).

Single-block simplification of Parquet's miniblock scheme: store the first
value and the minimum delta as zigzag uvarints, then bit-pack
``delta - min_delta`` for the remaining ``n-1`` values.  Excellent for
monotone keys/timestamps, good for clustered ints.
"""
from __future__ import annotations

import numpy as np

from .bitpack import pack, unpack, width_for
from .varint import read_uvarint, write_uvarint, unzigzag, zigzag


def encode(values) -> bytes:
    v = np.asarray(values, dtype=np.int64)
    n = len(v)
    out = bytearray()
    write_uvarint(out, n)
    if n == 0:
        return bytes(out)
    write_uvarint(out, zigzag(int(v[0])))
    if n == 1:
        return bytes(out)
    deltas = np.diff(v)
    mind = int(deltas.min())
    adj = (deltas - mind).astype(np.uint64)
    width = width_for(int(adj.max()))
    write_uvarint(out, zigzag(mind))
    out.append(width)
    out.extend(pack(adj, width))
    return bytes(out)


def decode(data: bytes) -> np.ndarray:
    n, pos = read_uvarint(data, 0)
    if n == 0:
        return np.empty(0, dtype=np.int64)
    zz, pos = read_uvarint(data, pos)
    first = unzigzag(zz)
    out = np.empty(n, dtype=np.int64)
    out[0] = first
    if n == 1:
        return out
    zz, pos = read_uvarint(data, pos)
    mind = unzigzag(zz)
    width = data[pos]
    pos += 1
    adj = unpack(data[pos:], width, n - 1).astype(np.int64)
    out[1:] = adj + mind
    np.cumsum(out, out=out)
    return out

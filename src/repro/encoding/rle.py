"""Parquet-style RLE / bit-packed hybrid for small non-negative integers.

Used for definition-level streams (incl. delimiters) and booleans.  The
stream is a sequence of runs: header ``h`` (uvarint) with

* ``h & 1 == 0``: RLE run — ``h >> 1`` repeats of one bit-packed value;
* ``h & 1 == 1``: bit-packed run — ``h >> 1`` literal values.

Layout: ``[width:1B][n:uvarint][runs...]``.  Run detection is vectorized.
"""
from __future__ import annotations

import numpy as np

from .bitpack import pack, unpack, width_for
from .varint import read_uvarint, write_uvarint

_MIN_RLE_RUN = 8  # shorter repeats go into bit-packed literal runs


def encode(values) -> bytes:
    v = np.asarray(values, dtype=np.uint64)
    n = len(v)
    out = bytearray()
    width = width_for(int(v.max())) if n else 0
    out.append(width)
    write_uvarint(out, n)
    if n == 0 or width == 0:
        return bytes(out)
    # run boundaries
    change = np.flatnonzero(np.diff(v)) + 1
    starts = np.concatenate(([0], change))
    ends = np.concatenate((change, [n]))
    lit_start: int | None = None

    def flush_literals(upto: int) -> None:
        nonlocal lit_start
        if lit_start is None:
            return
        lits = v[lit_start:upto]
        write_uvarint(out, (len(lits) << 1) | 1)
        out.extend(pack(lits, width))
        lit_start = None

    for s, e in zip(starts, ends):
        if e - s >= _MIN_RLE_RUN:
            flush_literals(s)
            write_uvarint(out, int(e - s) << 1)
            out.extend(pack(v[s : s + 1], width))
        elif lit_start is None:
            lit_start = int(s)
    flush_literals(n)
    return bytes(out)


def decode(data: bytes) -> np.ndarray:
    width = data[0]
    n, pos = read_uvarint(data, 1)
    out = np.empty(n, dtype=np.uint64)
    if n == 0 or width == 0:
        out[:] = 0
        return out
    filled = 0
    nbytes_one = (width + 7) // 8
    while filled < n:
        h, pos = read_uvarint(data, pos)
        count = h >> 1
        if h & 1:
            nb = (count * width + 7) // 8
            out[filled : filled + count] = unpack(data[pos : pos + nb], width, count)
            pos += nb
        else:
            val = unpack(data[pos : pos + nbytes_one], width, 1)[0]
            out[filled : filled + count] = val
            pos += nbytes_one
        filled += count
    return out

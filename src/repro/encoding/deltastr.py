"""DELTA_BYTE_ARRAY-style string encoding ("delta strings", paper §4.1).

Each string stores the length of the prefix it shares with its predecessor
plus its suffix.  Prefix and suffix length streams use the integer delta
codec; suffix bytes are concatenated.  Wins on sorted or templated strings
(URLs, IDs); roughly plain-cost otherwise.
"""
from __future__ import annotations

import os
from typing import List

import numpy as np

from . import delta
from .varint import read_uvarint, write_uvarint


def encode(values: List[str]) -> bytes:
    n = len(values)
    prefix_lens = np.zeros(n, dtype=np.int64)
    suffixes = []
    prev = b""
    for i, s in enumerate(values):
        b = s.encode("utf-8")
        p = len(os.path.commonprefix((prev, b)))
        prefix_lens[i] = p
        suffixes.append(b[p:])
        prev = b
    suffix_lens = np.fromiter((len(s) for s in suffixes), dtype=np.int64, count=n)
    blob = b"".join(suffixes)
    p_enc = delta.encode(prefix_lens)
    s_enc = delta.encode(suffix_lens)
    out = bytearray()
    write_uvarint(out, len(p_enc))
    out.extend(p_enc)
    write_uvarint(out, len(s_enc))
    out.extend(s_enc)
    out.extend(blob)
    return bytes(out)


def decode(data: bytes) -> List[str]:
    lp, pos = read_uvarint(data, 0)
    prefix_lens = delta.decode(data[pos : pos + lp])
    pos += lp
    ls, pos2 = read_uvarint(data, pos)
    suffix_lens = delta.decode(data[pos2 : pos2 + ls])
    pos = pos2 + ls
    out: List[str] = []
    prev = b""
    for p, sl in zip(prefix_lens, suffix_lens):
        b = prev[: int(p)] + data[pos : pos + int(sl)]
        pos += int(sl)
        out.append(b.decode("utf-8"))
        prev = b
    return out

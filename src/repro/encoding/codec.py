"""Column codec: picks an encoding per type (paper §4.1 — "all of
Parquet's encoding algorithms except for dictionary encoding").

Encoded value blob layout: ``[enc_id:1B][payload]``.  Definition-level
streams always use the RLE/bit-packed hybrid.
"""
from __future__ import annotations

from typing import Any, List

import numpy as np

from ..dremel.schema import BIGINT, BOOLEAN, DOUBLE, STRING
from . import delta, deltastr, plain, rle

ENC_PLAIN_I64 = 0
ENC_PLAIN_F64 = 1
ENC_PLAIN_STR = 2
ENC_BOOL_RLE = 3
ENC_DELTA_I64 = 4
ENC_DELTA_STR = 5


def encode_values(kind: str, values: List[Any]) -> bytes:
    """Encode a column's present values according to its atomic type."""
    if kind == BIGINT:
        return bytes([ENC_DELTA_I64]) + delta.encode(values)
    if kind == DOUBLE:
        return bytes([ENC_PLAIN_F64]) + plain.encode_f64(
            [float(v) for v in values]
        )
    if kind == BOOLEAN:
        return bytes([ENC_BOOL_RLE]) + rle.encode(
            np.asarray(values, dtype=np.uint8)
        )
    if kind == STRING:
        if _delta_str_wins(values):
            return bytes([ENC_DELTA_STR]) + deltastr.encode(values)
        return bytes([ENC_PLAIN_STR]) + plain.encode_str(values)
    raise ValueError(f"not an atomic kind: {kind}")


def decode_values(data: bytes):
    enc = data[0]
    body = data[1:]
    if enc == ENC_DELTA_I64:
        return delta.decode(body)
    if enc == ENC_PLAIN_F64:
        return plain.decode_f64(body)
    if enc == ENC_BOOL_RLE:
        return rle.decode(body).astype(bool)
    if enc == ENC_DELTA_STR:
        return deltastr.decode(body)
    if enc == ENC_PLAIN_STR:
        return plain.decode_str(body)
    if enc == ENC_PLAIN_I64:
        return plain.decode_i64(body)
    raise ValueError(f"unknown encoding id {enc}")


def encode_defs(defs) -> bytes:
    """Definition-level stream (values + delimiters) — RLE hybrid."""
    return rle.encode(np.asarray(defs, dtype=np.uint64))


def decode_defs(data: bytes) -> np.ndarray:
    return rle.decode(data)


def _delta_str_wins(values: List[str], sample: int = 64) -> bool:
    """Cheap heuristic: delta strings pay off when adjacent values share
    sizable prefixes (sorted keys, templated strings)."""
    if len(values) < 2:
        return False
    import os

    step = max(1, len(values) // sample)
    shared = total = 0
    prev = values[0]
    for i in range(step, len(values), step):
        cur = values[i]
        shared += len(os.path.commonprefix((prev, cur)))
        total += max(len(cur), 1)
        prev = cur
    return total > 0 and shared / total > 0.4

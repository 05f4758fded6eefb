"""The ``Open`` layout — AsterixDB's schemaless recursive row format.

Per the paper (§6.2 and [23]): every record embeds its own field names, and
every nested value is reached via 4-byte relative pointers per nesting
level.  Construction copies child buffers into parents (leaf-to-root),
which is exactly the cost the paper blames for Open's slow ingestion
(§6.3.1) — our serializer reproduces that copy pattern.

Record frame: ``[pk:int64][antimatter:1B][value bytes...]``.
"""
from __future__ import annotations

import struct
from typing import Any, Iterator, Optional

from ..encoding.varint import read_uvarint, write_uvarint

_T_OBJ, _T_ARR, _T_STR, _T_INT, _T_DBL, _T_TRUE, _T_FALSE = range(7)


def encode_value(v: Any) -> bytes:
    """Recursive Open encoding (child buffers copied into the parent)."""
    if isinstance(v, bool):
        return bytes([_T_TRUE if v else _T_FALSE])
    if isinstance(v, int):
        return bytes([_T_INT]) + struct.pack("<q", v)
    if isinstance(v, float):
        return bytes([_T_DBL]) + struct.pack("<d", v)
    if isinstance(v, str):
        b = v.encode("utf-8")
        out = bytearray([_T_STR])
        write_uvarint(out, len(b))
        out.extend(b)
        return bytes(out)
    if isinstance(v, dict):
        out = bytearray([_T_OBJ])
        items = [(k, x) for k, x in v.items() if x is not None]
        write_uvarint(out, len(items))
        for k, x in items:
            kb = k.encode("utf-8")  # field name embedded in EVERY record
            write_uvarint(out, len(kb))
            out.extend(kb)
            child = encode_value(x)  # built separately, then copied up
            out.extend(struct.pack("<I", len(child)))  # 4-byte pointer
            out.extend(child)
        return bytes(out)
    if isinstance(v, list):
        out = bytearray([_T_ARR])
        write_uvarint(out, len(v))
        for x in v:
            child = encode_value(x if x is not None else {})
            out.extend(struct.pack("<I", len(child)))
            out.extend(child)
        return bytes(out)
    raise TypeError(type(v))


def decode_value(buf: bytes, pos: int = 0) -> tuple[Any, int]:
    tag = buf[pos]
    pos += 1
    if tag == _T_TRUE:
        return True, pos
    if tag == _T_FALSE:
        return False, pos
    if tag == _T_INT:
        return struct.unpack_from("<q", buf, pos)[0], pos + 8
    if tag == _T_DBL:
        return struct.unpack_from("<d", buf, pos)[0], pos + 8
    if tag == _T_STR:
        n, pos = read_uvarint(buf, pos)
        return buf[pos : pos + n].decode("utf-8"), pos + n
    if tag == _T_OBJ:
        n, pos = read_uvarint(buf, pos)
        obj = {}
        for _ in range(n):
            kl, pos = read_uvarint(buf, pos)
            k = buf[pos : pos + kl].decode("utf-8")
            pos += kl
            (clen,) = struct.unpack_from("<I", buf, pos)
            pos += 4
            obj[k], _ = decode_value(buf, pos)
            pos += clen
        return obj, pos
    if tag == _T_ARR:
        n, pos = read_uvarint(buf, pos)
        arr = []
        for _ in range(n):
            (clen,) = struct.unpack_from("<I", buf, pos)
            pos += 4
            item, _ = decode_value(buf, pos)
            pos += clen
            arr.append(item)
        return arr, pos
    raise ValueError(f"bad tag {tag}")


def encode_record(pk: int, doc: Optional[dict]) -> bytes:
    """Open record frame; ``doc is None`` encodes anti-matter."""
    head = struct.pack("<qB", pk, 1 if doc is None else 0)
    return head if doc is None else head + encode_value(doc)


def decode_record(b: bytes) -> tuple[int, bool, Optional[dict]]:
    pk, am = struct.unpack_from("<qB", b, 0)
    if am:
        return pk, True, None
    v, _ = decode_value(b, 9)
    return pk, False, v

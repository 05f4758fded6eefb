"""The ``VB`` (vector-based) layout from [23] — the paper's compacted
row-major baseline.

Field names live once per component (a name dictionary in the component
metadata, built by the tuple-compactor schema inference), records reference
them by id; values are written once, in a single preorder pass, into one
buffer (no per-level copies, no relative pointers) — which is why VB
construction is ~2x cheaper than Open (§6.3.1).

Record frame: ``[pk:int64][antimatter:1B][value bytes...]``; objects encode
``(field_id, value)`` pairs and decode with a single sequential pass.
"""
from __future__ import annotations

import struct
from typing import Any, Optional

from ..encoding.varint import read_uvarint, write_uvarint

_T_OBJ, _T_ARR, _T_STR, _T_INT, _T_DBL, _T_TRUE, _T_FALSE = range(7)


class FieldDict:
    """Component-level field-name dictionary (name -> id)."""

    def __init__(self, names: Optional[list[str]] = None) -> None:
        self.names: list[str] = list(names or [])
        self.ids: dict[str, int] = {n: i for i, n in enumerate(self.names)}

    def id_of(self, name: str) -> int:
        i = self.ids.get(name)
        if i is None:
            i = len(self.names)
            self.names.append(name)
            self.ids[name] = i
        return i


def _encode_into(out: bytearray, v: Any, fd: FieldDict) -> None:
    if isinstance(v, bool):
        out.append(_T_TRUE if v else _T_FALSE)
    elif isinstance(v, int):
        out.append(_T_INT)
        out.extend(struct.pack("<q", v))
    elif isinstance(v, float):
        out.append(_T_DBL)
        out.extend(struct.pack("<d", v))
    elif isinstance(v, str):
        b = v.encode("utf-8")
        out.append(_T_STR)
        write_uvarint(out, len(b))
        out.extend(b)
    elif isinstance(v, dict):
        out.append(_T_OBJ)
        items = [(k, x) for k, x in v.items() if x is not None]
        write_uvarint(out, len(items))
        for k, x in items:
            write_uvarint(out, fd.id_of(k))
            _encode_into(out, x, fd)  # single pass, values written once
    elif isinstance(v, list):
        out.append(_T_ARR)
        write_uvarint(out, len(v))
        for x in v:
            _encode_into(out, x if x is not None else {}, fd)
    else:
        raise TypeError(type(v))


def encode_record(pk: int, doc: Optional[dict], fd: FieldDict) -> bytes:
    out = bytearray(struct.pack("<qB", pk, 1 if doc is None else 0))
    if doc is not None:
        _encode_into(out, doc, fd)
    return bytes(out)


def _decode(buf: bytes, pos: int, names: list[str]) -> tuple[Any, int]:
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
            fid, pos = read_uvarint(buf, pos)
            obj[names[fid]], pos = _decode(buf, pos, names)
        return obj, pos
    if tag == _T_ARR:
        n, pos = read_uvarint(buf, pos)
        arr = []
        for _ in range(n):
            item, pos = _decode(buf, pos, names)
            arr.append(item)
        return arr, pos
    raise ValueError(f"bad tag {tag}")


def decode_record(b: bytes, names: list[str]) -> tuple[int, bool, Optional[dict]]:
    pk, am = struct.unpack_from("<qB", b, 0)
    if am:
        return pk, True, None
    v, _ = _decode(b, 9, names)
    return pk, False, v

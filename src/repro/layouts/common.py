"""Shared building blocks for the four on-disk layouts.

A *component* (one immutable LSM on-disk component, §2.1.1) is a directory:

``pages.bin`` / ``pages.bin.idx``
    physical pages via :class:`repro.storage.pagefile.PageFile`;
``meta.json``
    layout kind, record count, inferred schema (VB/APAX/AMAX), min/max PK,
    and layout-specific page maps.

All our datasets use BIGINT primary keys (as do the paper's), so PK streams
are delta-encoded int64 + an RLE def-level stream whose value 0 marks
anti-matter (§3.2.3).
"""
from __future__ import annotations

import json
import os
from dataclasses import dataclass
from typing import Any, Optional

import numpy as np

from ..dremel.schema import BIGINT, BOOLEAN, DOUBLE, STRING, Schema
from ..dremel.shred import ColumnData, ShreddedBatch
from ..encoding import codec
from ..encoding.varint import read_uvarint, write_uvarint
from ..storage.pagefile import BufferCache, PageFile

OPEN, VB, APAX, AMAX = "open", "vb", "apax", "amax"
ROW_LAYOUTS = (OPEN, VB)
COLUMNAR_LAYOUTS = (APAX, AMAX)


# --------------------------------------------------------------- value size
def value_size(kind: str, v: Any) -> int:
    """Raw-size estimate used by the page-cutting heuristics."""
    if kind == STRING:
        return len(v) + 4
    if kind == BOOLEAN:
        return 1
    return 8


def column_raw_size(col: ColumnData, r0: int, r1: int) -> int:
    """Estimated raw bytes of records [r0, r1) in one column."""
    ndefs = col.def_pos[r1] - col.def_pos[r0]
    v0, v1 = col.val_pos[r0], col.val_pos[r1]
    if col.info.kind == STRING:
        vbytes = sum(len(s) + 4 for s in col.values[v0:v1])
    else:
        vbytes = 8 * (v1 - v0)
    return ndefs + vbytes


# ------------------------------------------------------------- column blobs
def encode_column_slice(col: ColumnData, r0: int, r1: int) -> bytes:
    """Encode records [r0, r1) of a column: [defs_len][defs][values]."""
    defs = col.defs[col.def_pos[r0] : col.def_pos[r1]]
    vals = col.values[col.val_pos[r0] : col.val_pos[r1]]
    d = codec.encode_defs(defs)
    out = bytearray()
    write_uvarint(out, len(d))
    out.extend(d)
    if vals:
        out.extend(codec.encode_values(col.info.kind, vals))
    return bytes(out)


def decode_column_blob(blob: bytes, kind: str):
    """Inverse of :func:`encode_column_slice` -> (defs ndarray, values)."""
    dlen, pos = read_uvarint(blob, 0)
    defs = codec.decode_defs(blob[pos : pos + dlen])
    pos += dlen
    if pos < len(blob):
        values = codec.decode_values(blob[pos:])
        if isinstance(values, np.ndarray):
            values = values.tolist()  # native Python values downstream
    else:
        values = []
    return defs, values


def encode_pk_slice(batch_defs, batch_values, r0: int, r1: int) -> bytes:
    from ..encoding import delta, rle

    d = rle.encode(np.asarray(batch_defs[r0:r1], dtype=np.uint64))
    v = delta.encode(np.asarray(batch_values[r0:r1], dtype=np.int64))
    out = bytearray()
    write_uvarint(out, len(d))
    out.extend(d)
    out.extend(v)
    return bytes(out)


def decode_pk_blob(blob: bytes):
    from ..encoding import delta, rle

    dlen, pos = read_uvarint(blob, 0)
    defs = rle.decode(blob[pos : pos + dlen])
    values = delta.decode(blob[pos + dlen :])
    return defs, values


# ------------------------------------------------------------- slotted page
def pack_slotted(records: list[bytes]) -> bytes:
    """Row-store page: [n][offsets:uint32...][record bytes...] (NSM)."""
    out = bytearray()
    write_uvarint(out, len(records))
    offs = np.zeros(len(records), dtype=np.uint32)
    pos = 0
    for i, r in enumerate(records):
        offs[i] = pos
        pos += len(r)
    out.extend(offs.tobytes())
    for r in records:
        out.extend(r)
    return bytes(out)


def unpack_slotted(payload: bytes) -> list[bytes]:
    n, pos = read_uvarint(payload, 0)
    offs = np.frombuffer(payload[pos : pos + 4 * n], dtype=np.uint32)
    base = pos + 4 * n
    out = []
    for i in range(n):
        end = base + int(offs[i + 1]) if i + 1 < n else len(payload)
        out.append(payload[base + int(offs[i]) : end])
    return out


# ---------------------------------------------------------------- component
@dataclass
class ComponentMeta:
    layout: str
    n_records: int
    min_pk: int
    max_pk: int
    schema_json: Optional[str] = None
    extra: Optional[dict] = None  # layout-specific (leaf maps, page counts)

    def save(self, path: str) -> None:
        with open(os.path.join(path, "meta.json"), "w") as f:
            json.dump(self.__dict__, f)

    @classmethod
    def load(cls, path: str) -> "ComponentMeta":
        with open(os.path.join(path, "meta.json")) as f:
            return cls(**json.load(f))


class Component:
    """Handle to one immutable on-disk component."""

    def __init__(self, path: str, cache: BufferCache) -> None:
        self.path = path
        self.cache = cache
        self.meta = ComponentMeta.load(path)
        self.pages = PageFile(os.path.join(path, "pages.bin"), cache)
        self.pages.open_read()
        self._schema: Optional[Schema] = None

    @property
    def layout(self) -> str:
        return self.meta.layout

    @property
    def n_records(self) -> int:
        return self.meta.n_records

    @property
    def schema(self) -> Schema:
        if self._schema is None:
            self._schema = Schema.from_json(self.meta.schema_json)
        return self._schema

    def size_bytes(self) -> int:
        return self.pages.size_bytes() + os.path.getsize(
            os.path.join(self.path, "meta.json")
        )

    def delete(self) -> None:
        self.pages.delete()
        mp = os.path.join(self.path, "meta.json")
        if os.path.exists(mp):
            os.remove(mp)
        try:
            os.rmdir(self.path)
        except OSError:
            pass

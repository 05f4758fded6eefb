"""AMAX — mega leaf nodes whose columns span physical pages (paper §4.3).

A mega leaf covers up to ``record_limit`` (default 15,000, §4.5.2) records:

* **Page 0**: header (record/column counts, min/max PK), 16-byte min/max
  prefix pair per column (zone maps for predicate skipping), and the
  encoded primary keys (+ anti-matter def levels);
* **data pages**: each column's encoded blob (*megapage*) laid out
  largest-first into fixed-size physical pages; a following column shares
  the current page's tail unless the tail is smaller than
  ``empty_page_tolerance`` x page_size and the column does not fit in it
  (§4.3).  Variable-length columns carry their *actual* min/max in the
  megapage's first bytes, because 8-byte prefixes are not decisive.

Reading a column touches only Page 0 plus that column's pages — the
defining AMAX I/O advantage (§4.4).
"""
from __future__ import annotations

import os
import struct
from typing import Iterator, Optional

import numpy as np

from ..dremel.schema import BIGINT, BOOLEAN, DOUBLE, STRING
from ..dremel.shred import ShreddedBatch
from ..encoding.varint import read_uvarint, write_uvarint
from ..storage.pagefile import BufferCache, PageFile
from .common import (
    AMAX,
    ComponentMeta,
    decode_column_blob,
    decode_pk_blob,
    encode_column_slice,
    encode_pk_slice,
)

DEFAULT_RECORD_LIMIT = 15_000
DEFAULT_EMPTY_PAGE_TOLERANCE = 0.15


def _min_max_prefix(kind: str, values) -> tuple[bytes, bytes, int]:
    """(min8, max8, n_values) zone-map entry for Page 0."""
    if not values:
        return b"\x00" * 8, b"\x00" * 8, 0
    if kind == BIGINT:
        return (
            struct.pack("<q", int(min(values))),
            struct.pack("<q", int(max(values))),
            len(values),
        )
    if kind == DOUBLE:
        return (
            struct.pack("<d", float(min(values))),
            struct.pack("<d", float(max(values))),
            len(values),
        )
    if kind == STRING:
        mn = min(values).encode("utf-8")[:8]
        mx = max(values).encode("utf-8")[:8]
        return mn.ljust(8, b"\x00"), mx.ljust(8, b"\xff"), len(values)
    return b"\x00" * 8, b"\x00" * 8, len(values)  # boolean: unused


def write_component(
    path: str,
    batch: ShreddedBatch,
    cache: BufferCache,
    page_size: int = 32 * 1024,
    record_limit: int = DEFAULT_RECORD_LIMIT,
    empty_page_tolerance: float = DEFAULT_EMPTY_PAGE_TOLERANCE,
) -> ComponentMeta:
    os.makedirs(path, exist_ok=True)
    pf = PageFile(os.path.join(path, "pages.bin"), cache)
    pf.open_write()
    leaves = []
    for r0 in range(0, max(batch.n_records, 1), record_limit):
        r1 = min(r0 + record_limit, batch.n_records)
        if r1 <= r0:
            break
        leaves.append(
            _write_leaf(pf, batch, r0, r1, page_size, empty_page_tolerance)
        )
    pf.close_write()
    meta = ComponentMeta(
        layout=AMAX,
        n_records=batch.n_records,
        min_pk=int(min(batch.pk_values)) if batch.n_records else 0,
        max_pk=int(max(batch.pk_values)) if batch.n_records else 0,
        schema_json=batch.schema.to_json(),
        extra={"leaves": leaves, "page_size": page_size},
    )
    meta.save(path)
    return meta


def _write_leaf(
    pf: PageFile,
    batch: ShreddedBatch,
    r0: int,
    r1: int,
    page_size: int,
    tol: float,
) -> dict:
    ncols = len(batch.columns)
    # encode every column blob (variable-length columns prepend actual
    # min/max for zone-map verification, §4.3)
    blobs: list[bytes] = []
    zone: list[tuple[bytes, bytes, int]] = []
    for col in batch.columns:
        body = encode_column_slice(col, r0, r1)
        vals = col.values[col.val_pos[r0] : col.val_pos[r1]]
        zone.append(_min_max_prefix(col.info.kind, vals))
        if col.info.kind == STRING and vals:
            mn = min(vals).encode("utf-8")
            mx = max(vals).encode("utf-8")
            hdr = bytearray([1])
            write_uvarint(hdr, len(mn))
            hdr.extend(mn)
            write_uvarint(hdr, len(mx))
            hdr.extend(mx)
            blobs.append(bytes(hdr) + body)
        else:
            blobs.append(b"\x00" + body)
    # megapages written largest -> smallest (§4.3)
    order = sorted(range(ncols), key=lambda i: -len(blobs[i]))
    stream = bytearray()
    extents: list[tuple[int, int]] = [(0, 0)] * ncols
    for cid in order:
        b = blobs[cid]
        rem = (-len(stream)) % page_size
        if 0 < rem < page_size and len(b) > rem and rem <= tol * page_size:
            stream.extend(b"\x00" * rem)  # tolerate the empty tail
        extents[cid] = (len(stream), len(b))
        stream.extend(b)
    # Page 0
    p0 = bytearray()
    write_uvarint(p0, r1 - r0)
    write_uvarint(p0, ncols)
    keys = batch.pk_values[r0:r1]
    p0.extend(struct.pack("<qq", int(min(keys)), int(max(keys))))
    pk_blob = encode_pk_slice(batch.pk_defs, batch.pk_values, r0, r1)
    write_uvarint(p0, len(pk_blob))
    p0.extend(pk_blob)
    for cid in range(ncols):
        mn8, mx8, nv = zone[cid]
        p0.extend(mn8)
        p0.extend(mx8)
        start, length = extents[cid]
        write_uvarint(p0, start)
        write_uvarint(p0, length)
        write_uvarint(p0, nv)
    page0_id = pf.write_page(bytes(p0))
    ndata = (len(stream) + page_size - 1) // page_size
    for p in range(ndata):
        pf.write_page(bytes(stream[p * page_size : (p + 1) * page_size]))
    return {
        "page0": page0_id,
        "data0": page0_id + 1,
        "ndata": ndata,
        "n_records": r1 - r0,
        "min_pk": int(min(keys)),
        "max_pk": int(max(keys)),
    }


class AMAXLeaf:
    """Decoded Page 0 of one mega leaf; megapages read/decode on demand."""

    def __init__(self, reader: "AMAXReader", leaf_meta: dict) -> None:
        self.reader = reader
        self.meta = leaf_meta
        payload = reader.component.pages.read_page(leaf_meta["page0"])
        n, pos = read_uvarint(payload, 0)
        ncols, pos = read_uvarint(payload, pos)
        self.n_records = n
        self.n_cols = ncols
        self.min_pk, self.max_pk = struct.unpack_from("<qq", payload, pos)
        pos += 16
        pklen, pos = read_uvarint(payload, pos)
        self._pk_blob = payload[pos : pos + pklen]
        pos += pklen
        self.zone: list[tuple[bytes, bytes, int, int, int]] = []
        for _ in range(ncols):
            mn8 = payload[pos : pos + 8]
            mx8 = payload[pos + 8 : pos + 16]
            pos += 16
            start, pos = read_uvarint(payload, pos)
            length, pos = read_uvarint(payload, pos)
            nv, pos = read_uvarint(payload, pos)
            self.zone.append((mn8, mx8, start, length, nv))
        self._pk = None

    def pks(self):
        if self._pk is None:
            self._pk = decode_pk_blob(self._pk_blob)
            self.reader.cache.stats.pages_decoded += 1
        return self._pk

    def n_values(self, col: int) -> int:
        return self.zone[col][4] if col < self.n_cols else 0

    def zone_range(self, col: int):
        """Decoded (min, max) from the 8-byte prefixes; None if no values.

        For BIGINT/DOUBLE these are decisive; for STRING they are prefix
        bounds only — use :meth:`verified_range` to consult the actual
        min/max stored at the megapage head.
        """
        if col >= self.n_cols:
            return None
        mn8, mx8, _s, _l, nv = self.zone[col]
        if nv == 0:
            return None
        kind = self.reader.schema.columns[col].kind
        if kind == BIGINT:
            return struct.unpack("<q", mn8)[0], struct.unpack("<q", mx8)[0]
        if kind == DOUBLE:
            return struct.unpack("<d", mn8)[0], struct.unpack("<d", mx8)[0]
        if kind == STRING:
            return (
                mn8.rstrip(b"\x00").decode("utf-8", "ignore"),
                mx8.rstrip(b"\xff").decode("utf-8", "ignore"),
            )
        return None

    def verified_range(self, col: int):
        """Actual min/max for a STRING column — reads the megapage's first
        physical page only (§4.3)."""
        kind = self.reader.schema.columns[col].kind
        if kind != STRING or col >= self.n_cols:
            return self.zone_range(col)
        mn8, mx8, start, length, nv = self.zone[col]
        if nv == 0:
            return None
        ps = self.reader.page_size
        first = self.meta["data0"] + start // ps
        payload = self.reader.component.pages.read_page(first)
        # blob head may straddle a page boundary; extend if needed
        buf = payload[start % ps :]
        pos = 1
        nmin, pos = read_uvarint(buf, pos)
        while len(buf) < pos + nmin + 5:
            first += 1
            buf += self.reader.component.pages.read_page(first)
        mn = buf[pos : pos + nmin].decode("utf-8")
        pos += nmin
        nmax, pos = read_uvarint(buf, pos)
        while len(buf) < pos + nmax:
            first += 1
            buf += self.reader.component.pages.read_page(first)
        mx = buf[pos : pos + nmax].decode("utf-8")
        return mn, mx

    def column_pages(self, col: int) -> range:
        """Physical data-page numbers the column's megapage occupies."""
        if col >= self.n_cols:
            return range(0)
        _mn, _mx, start, length, _nv = self.zone[col]
        if length == 0:
            return range(0)
        ps = self.reader.page_size
        return range(start // ps, (start + length - 1) // ps + 1)

    def column(self, col: int):
        """Read + decode one column -> (defs, values)."""
        if col >= self.n_cols:
            return np.zeros(self.n_records, dtype=np.uint64), []
        _mn, _mx, start, length, _nv = self.zone[col]
        ps = self.reader.page_size
        chunks = []
        for p in self.column_pages(col):
            payload = self.reader.component.pages.read_page(self.meta["data0"] + p)
            lo = max(start - p * ps, 0)
            hi = min(start + length - p * ps, len(payload))
            chunks.append(payload[lo:hi])
        blob = b"".join(chunks)
        # strip the min/max verification head
        pos = 1
        if blob[0] == 1:
            nmin, pos = read_uvarint(blob, pos)
            pos += nmin
            nmax, pos = read_uvarint(blob, pos)
            pos += nmax
        kind = self.reader.schema.columns[col].kind
        self.reader.cache.stats.pages_decoded += 1
        return decode_column_blob(blob[pos:], kind)


class AMAXReader:
    """Reads an AMAX component mega-leaf by mega-leaf."""

    def __init__(self, component) -> None:
        self.component = component
        self.cache = component.cache
        self.schema = component.schema
        self.page_size = component.meta.extra.get("page_size", 32 * 1024)
        self.leaf_metas = component.meta.extra["leaves"]

    @property
    def n_leaves(self) -> int:
        return len(self.leaf_metas)

    def leaf(self, i: int) -> AMAXLeaf:
        return AMAXLeaf(self, self.leaf_metas[i])

    def iter_leaves(self) -> Iterator[AMAXLeaf]:
        for i in range(self.n_leaves):
            yield self.leaf(i)

"""APAX — PAX-like columnar leaf pages (paper §4.2).

Each leaf page stores *all* columns of a run of records as encoded
minipages reached via a relative-pointer array in the page header; the
header also carries min/max primary keys so B+-tree operations never
decode the PK minipage.  A scan must read every page regardless of the
projected columns (the page is the I/O unit) — the defining APAX cost.

Page payload:
``[n_records][n_cols][minpk:8B][maxpk:8B][pk_len][pk_blob]
  [offsets: n_cols x uint32][minipage blobs ...]``
"""
from __future__ import annotations

import os
import struct
from typing import Iterator, Optional

import numpy as np

from ..dremel.shred import ShreddedBatch
from ..encoding.varint import read_uvarint, write_uvarint
from ..storage.pagefile import BufferCache, PageFile
from .common import (
    APAX,
    ComponentMeta,
    column_raw_size,
    decode_column_blob,
    decode_pk_blob,
    encode_column_slice,
    encode_pk_slice,
)


def write_component(
    path: str,
    batch: ShreddedBatch,
    cache: BufferCache,
    page_size: int = 32 * 1024,
) -> ComponentMeta:
    """Write a shredded batch as an APAX component.

    Mirrors §4.5.1: columns' values go to per-column temporary buffers;
    once a page's-worth accumulates, the buffers are copied and aligned
    into one APAX page.  The page cut uses a raw-size estimate, then each
    page is encoded column-by-column (iterating over *all* column buffers
    per page — the cost that §6.3.1 blames for APAX's slow ingestion of
    many-column datasets).
    """
    os.makedirs(path, exist_ok=True)
    pf = PageFile(os.path.join(path, "pages.bin"), cache)
    pf.open_write()
    n = batch.n_records
    cuts = _page_cuts(batch, page_size)
    page_minmax: list[tuple[int, int]] = []
    for r0, r1 in cuts:
        payload = _encode_page(batch, r0, r1)
        pf.write_page(payload)
        keys = batch.pk_values[r0:r1]
        page_minmax.append((int(min(keys)), int(max(keys))))
    pf.close_write()
    meta = ComponentMeta(
        layout=APAX,
        n_records=n,
        min_pk=int(min(batch.pk_values)) if n else 0,
        max_pk=int(max(batch.pk_values)) if n else 0,
        schema_json=batch.schema.to_json(),
        extra={"page_minmax": page_minmax},
    )
    meta.save(path)
    return meta


def record_raw_sizes(batch: ShreddedBatch) -> np.ndarray:
    """Vectorized per-record raw-size estimate across all columns."""
    n = batch.n_records
    sizes = np.full(n, 9.0)  # pk + def
    for col in batch.columns:
        dp = np.asarray(col.def_pos, dtype=np.int64)
        sizes += np.diff(dp)  # one byte per def entry
        vp = np.asarray(col.val_pos, dtype=np.int64)
        if col.info.kind == "string":
            lens = np.fromiter(
                (len(s) + 4 for s in col.values), dtype=np.int64, count=len(col.values)
            )
            cum = np.concatenate(([0], np.cumsum(lens)))
            sizes += cum[vp[1:]] - cum[vp[:-1]]
        else:
            sizes += 8 * np.diff(vp)
    return sizes


def _page_cuts(batch: ShreddedBatch, page_size: int) -> list[tuple[int, int]]:
    """Greedy record ranges whose raw size ~ fills one page."""
    n = batch.n_records
    if n == 0:
        return []
    sizes = record_raw_sizes(batch)
    target = page_size * 0.9
    cuts = []
    r0 = 0
    cum = np.cumsum(sizes)
    base = 0.0
    while r0 < n:
        r1 = int(np.searchsorted(cum, base + target)) + 1
        r1 = min(max(r1, r0 + 1), n)
        cuts.append((r0, r1))
        base = cum[r1 - 1]
        r0 = r1
    return cuts


def _encode_page(batch: ShreddedBatch, r0: int, r1: int) -> bytes:
    out = bytearray()
    write_uvarint(out, r1 - r0)
    write_uvarint(out, len(batch.columns))
    keys = batch.pk_values[r0:r1]
    out.extend(struct.pack("<qq", int(min(keys)), int(max(keys))))
    pk_blob = encode_pk_slice(batch.pk_defs, batch.pk_values, r0, r1)
    write_uvarint(out, len(pk_blob))
    out.extend(pk_blob)
    # minipage blobs + relative-pointer table
    blobs = [encode_column_slice(c, r0, r1) for c in batch.columns]
    offs = np.zeros(len(blobs), dtype=np.uint32)
    pos = 0
    for i, b in enumerate(blobs):
        offs[i] = pos
        pos += len(b)
    out.extend(offs.tobytes())
    for b in blobs:
        out.extend(b)
    return bytes(out)


class APAXPage:
    """Decoded view of one APAX page; minipages decode on demand."""

    def __init__(self, payload: bytes, reader: "APAXReader") -> None:
        self._payload = payload
        self._reader = reader
        n, pos = read_uvarint(payload, 0)
        ncols, pos = read_uvarint(payload, pos)
        self.n_records = n
        self.n_cols = ncols
        self.min_pk, self.max_pk = struct.unpack_from("<qq", payload, pos)
        pos += 16
        pklen, pos = read_uvarint(payload, pos)
        self._pk_span = (pos, pklen)
        pos += pklen
        self._off_table = np.frombuffer(
            payload[pos : pos + 4 * ncols], dtype=np.uint32
        )
        self._blob_base = pos + 4 * ncols
        self._pk = None

    def pks(self):
        """(defs, keys): defs==0 marks anti-matter (§3.2.3)."""
        if self._pk is None:
            s, ln = self._pk_span
            self._pk = decode_pk_blob(self._payload[s : s + ln])
            self._reader.cache.stats.pages_decoded += 1
        return self._pk

    def column(self, col: int):
        """Decode one minipage -> (defs, values); all-null if the column
        postdates this component's schema."""
        if col >= self.n_cols:
            return np.zeros(self.n_records, dtype=np.uint64), []
        start = self._blob_base + int(self._off_table[col])
        end = (
            self._blob_base + int(self._off_table[col + 1])
            if col + 1 < self.n_cols
            else len(self._payload)
        )
        kind = self._reader.schema.columns[col].kind
        self._reader.cache.stats.pages_decoded += 1
        return decode_column_blob(self._payload[start:end], kind)


class APAXReader:
    """Reads an APAX component page by page."""

    def __init__(self, component) -> None:
        self.component = component
        self.cache = component.cache
        self.schema = component.schema
        self.page_minmax = component.meta.extra["page_minmax"]

    @property
    def n_pages(self) -> int:
        return self.component.pages.n_pages

    def page(self, i: int) -> APAXPage:
        return APAXPage(self.component.pages.read_page(i), self)

    def iter_pages(self) -> Iterator[APAXPage]:
        for i in range(self.n_pages):
            yield self.page(i)

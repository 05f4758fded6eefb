"""Row-major component writer/reader shared by Open and VB.

Records (sorted by PK) are packed into slotted pages; per-page min/max
PKs live in the component metadata (standing in for B+-tree interior
nodes) so point lookups touch one page and search it — logarithmically
over the slot directory, vs. APAX/AMAX's decode-then-linear-search
(§4.6).
"""
from __future__ import annotations

import os
from typing import Iterator, Optional

from ..dremel.schema import Schema
from ..storage.pagefile import BufferCache, PageFile
from . import open_fmt, vb
from .common import OPEN, VB, ComponentMeta, pack_slotted, unpack_slotted


def write_component(
    path: str,
    layout: str,
    entries: list[tuple[int, Optional[dict]]],
    cache: BufferCache,
    page_size: int = 32 * 1024,
    schema: Optional[Schema] = None,
    field_names: Optional[list[str]] = None,
) -> ComponentMeta:
    """``entries`` is a PK-sorted list of (pk, doc|None); None = delete.

    For VB, ``field_names`` seeds the component's name dictionary (names
    accumulate across flushes like the inferred schema does)."""
    os.makedirs(path, exist_ok=True)
    pf = PageFile(os.path.join(path, "pages.bin"), cache)
    pf.open_write()
    fd = vb.FieldDict(field_names) if layout == VB else None
    page_minmax: list[tuple[int, int]] = []
    buf: list[bytes] = []
    buf_keys: list[int] = []
    buf_bytes = 0

    def flush_page() -> None:
        nonlocal buf, buf_keys, buf_bytes
        if not buf:
            return
        pf.write_page(pack_slotted(buf))
        page_minmax.append((buf_keys[0], buf_keys[-1]))
        buf, buf_keys, buf_bytes = [], [], 0

    for pk, doc in entries:
        rb = (
            open_fmt.encode_record(pk, doc)
            if layout == OPEN
            else vb.encode_record(pk, doc, fd)
        )
        if buf_bytes + len(rb) > page_size and buf:
            flush_page()
        buf.append(rb)
        buf_keys.append(pk)
        buf_bytes += len(rb)
    flush_page()
    pf.close_write()
    meta = ComponentMeta(
        layout=layout,
        n_records=len(entries),
        min_pk=entries[0][0] if entries else 0,
        max_pk=entries[-1][0] if entries else 0,
        schema_json=schema.to_json() if schema is not None else None,
        extra={
            "page_minmax": page_minmax,
            "field_names": fd.names if fd is not None else None,
        },
    )
    meta.save(path)
    return meta


class RowReader:
    """Sequential / point access over an Open or VB component."""

    def __init__(self, component) -> None:
        self.component = component
        self.layout = component.layout
        self.names = (component.meta.extra or {}).get("field_names")
        self.page_minmax = component.meta.extra["page_minmax"]

    @property
    def n_pages(self) -> int:
        return self.component.pages.n_pages

    def _decode(self, rb: bytes):
        if self.layout == OPEN:
            return open_fmt.decode_record(rb)
        return vb.decode_record(rb, self.names)

    def iter_records(self) -> Iterator[tuple[int, bool, Optional[dict]]]:
        """Full scan: reads every page (the row-layout I/O cost)."""
        for i in range(self.n_pages):
            payload = self.component.pages.read_page(i)
            self.component.cache.stats.pages_decoded += 1
            for rb in unpack_slotted(payload):
                yield self._decode(rb)

    def point_lookup(self, pk: int):
        """Binary search pages via min/max, then the slotted page (§4.6:
        logarithmic, no decode of non-matching records)."""
        lo, hi = 0, len(self.page_minmax) - 1
        while lo <= hi:
            mid = (lo + hi) // 2
            mn, mx = self.page_minmax[mid]
            if pk < mn:
                hi = mid - 1
            elif pk > mx:
                lo = mid + 1
            else:
                payload = self.component.pages.read_page(mid)
                recs = unpack_slotted(payload)
                a, b = 0, len(recs) - 1
                while a <= b:
                    m = (a + b) // 2
                    rpk, am, doc = self._decode(recs[m])
                    if rpk == pk:
                        return am, doc
                    if rpk < pk:
                        a = m + 1
                    else:
                        b = m - 1
                return None
        return None

"""Physical pages, Snappy page-level compression, LRU buffer cache.

The paper's experiments hinge on *which pages a layout must touch*: scans
of Open/VB/APAX read every page of a component; AMAX reads Page 0 plus the
pages of the projected columns only (§4.3-4.4).  This module provides the
substrate those costs are measured on:

* ``PageFile`` — one append-only file of variable-length *compressed* page
  blobs (AsterixDB's page-level Snappy compression, §6 setup) with a
  sidecar page table; on-disk footprint is the compressed size;
* ``BufferCache`` — an LRU cache of decompressed pages shared by all
  components of a store, with hit/miss/byte counters (``IOStats``).
"""
from __future__ import annotations

import os
from collections import OrderedDict
from dataclasses import dataclass, field

import numpy as np
import pyarrow as pa

_SNAPPY = pa.Codec("snappy")

DEFAULT_PAGE_SIZE = 32 * 1024  # scaled from the paper's 128 KB (DESIGN §5.5)


@dataclass
class IOStats:
    """Counters surfaced in every experiment table."""

    disk_reads: int = 0
    disk_writes: int = 0
    cache_hits: int = 0
    bytes_read: int = 0  # compressed bytes fetched from disk
    bytes_written: int = 0  # compressed bytes written to disk
    pages_decoded: int = 0  # decode calls (CPU-cost proxy, §6.3.2)

    def snapshot(self) -> "IOStats":
        return IOStats(**self.__dict__)

    def delta(self, before: "IOStats") -> "IOStats":
        return IOStats(
            **{k: getattr(self, k) - getattr(before, k) for k in self.__dict__}
        )


class BufferCache:
    """LRU cache of decompressed page payloads keyed by (path, page_no)."""

    def __init__(self, capacity_pages: int = 2048) -> None:
        self.capacity = capacity_pages
        self._pages: OrderedDict[tuple[str, int], bytes] = OrderedDict()
        self.stats = IOStats()

    def get(self, key: tuple[str, int]):
        page = self._pages.get(key)
        if page is not None:
            self._pages.move_to_end(key)
            self.stats.cache_hits += 1
        return page

    def put(self, key: tuple[str, int], payload: bytes) -> None:
        self._pages[key] = payload
        self._pages.move_to_end(key)
        while len(self._pages) > self.capacity:
            self._pages.popitem(last=False)

    def invalidate_file(self, path: str) -> None:
        for k in [k for k in self._pages if k[0] == path]:
            del self._pages[k]


class PageFile:
    """Variable-length compressed page blobs + sidecar page table.

    Write side is append-only (LSM components are immutable).  The page
    table rows are ``(offset, compressed_len, uncompressed_len)``.
    """

    def __init__(self, path: str, cache: BufferCache) -> None:
        self.path = path
        self.cache = cache
        self._table: list[tuple[int, int, int]] = []
        self._fh = None
        self._offset = 0

    # -------------------------------------------------------------- write
    def open_write(self) -> None:
        self._fh = open(self.path, "wb")
        self._offset = 0
        self._table = []

    def write_page(self, payload: bytes) -> int:
        """Compress + append one page; returns its page number."""
        comp = _SNAPPY.compress(payload, asbytes=True)
        self._fh.write(comp)
        self._table.append((self._offset, len(comp), len(payload)))
        self._offset += len(comp)
        self.cache.stats.disk_writes += 1
        self.cache.stats.bytes_written += len(comp)
        return len(self._table) - 1

    def close_write(self) -> None:
        self._fh.close()
        self._fh = None
        np.asarray(self._table, dtype=np.int64).tofile(self.path + ".idx")

    # --------------------------------------------------------------- read
    def open_read(self) -> None:
        t = np.fromfile(self.path + ".idx", dtype=np.int64).reshape(-1, 3)
        self._table = [tuple(r) for r in t]

    @property
    def n_pages(self) -> int:
        return len(self._table)

    def read_page(self, page_no: int) -> bytes:
        key = (self.path, page_no)
        cached = self.cache.get(key)
        if cached is not None:
            return cached
        off, clen, ulen = self._table[page_no]
        with open(self.path, "rb") as fh:
            fh.seek(off)
            comp = fh.read(clen)
        payload = _SNAPPY.decompress(comp, decompressed_size=ulen, asbytes=True)
        self.cache.stats.disk_reads += 1
        self.cache.stats.bytes_read += clen
        self.cache.put(key, payload)
        return payload

    def size_bytes(self) -> int:
        return os.path.getsize(self.path) + os.path.getsize(self.path + ".idx")

    def delete(self) -> None:
        self.cache.invalidate_file(self.path)
        for p in (self.path, self.path + ".idx"):
            if os.path.exists(p):
                os.remove(p)

"""Secondary and primary-key indexes as small LSM trees (paper §4.6).

Entries are ``(key, pk, antimatter)`` triples sorted by ``(key, pk)``;
maintenance follows the paper: updating a record first point-looks-up the
old record in the primary index to emit an anti-matter entry for the old
key (that primary-index lookup is the dominant update cost measured in
§6.3.2).  The *primary-key index* is the same structure keyed by pk alone
(used to skip primary-index lookups for brand-new keys).
"""
from __future__ import annotations

import os
from typing import Optional

import numpy as np

from ..storage.pagefile import BufferCache, PageFile


class _IndexComponent:
    """One immutable sorted run of (key, pk, am) persisted via PageFile."""

    def __init__(self, path: str, cache: BufferCache) -> None:
        self.path = path
        self.pages = PageFile(path, cache)

    @classmethod
    def write(
        cls,
        path: str,
        keys: np.ndarray,
        pks: np.ndarray,
        ams: np.ndarray,
        cache: BufferCache,
        page_size: int,
    ) -> "_IndexComponent":
        blob = (
            np.asarray(keys, dtype=np.int64).tobytes()
            + np.asarray(pks, dtype=np.int64).tobytes()
            + np.asarray(ams, dtype=np.uint8).tobytes()
        )
        c = cls(path, cache)
        c.pages.open_write()
        # length header page, then fixed-size data pages
        c.pages.write_page(np.asarray([len(keys)], dtype=np.int64).tobytes())
        for off in range(0, len(blob), page_size):
            c.pages.write_page(blob[off : off + page_size])
        c.pages.close_write()
        c.pages.open_read()
        return c

    def load(self) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
        n = int(np.frombuffer(self.pages.read_page(0), dtype=np.int64)[0])
        blob = b"".join(
            self.pages.read_page(i) for i in range(1, self.pages.n_pages)
        )
        keys = np.frombuffer(blob[: 8 * n], dtype=np.int64)
        pks = np.frombuffer(blob[8 * n : 16 * n], dtype=np.int64)
        ams = np.frombuffer(blob[16 * n : 17 * n], dtype=np.uint8)
        return keys, pks, ams

    def size_bytes(self) -> int:
        return self.pages.size_bytes()

    def delete(self) -> None:
        self.pages.delete()


class LSMIndex:
    """LSM of (key, pk) pairs with anti-matter reconciliation."""

    def __init__(
        self,
        path: str,
        cache: BufferCache,
        page_size: int = 32 * 1024,
        max_components: int = 5,
    ) -> None:
        self.path = path
        self.cache = cache
        self.page_size = page_size
        self.max_components = max_components
        os.makedirs(path, exist_ok=True)
        self.mem: list[tuple[int, int, int]] = []  # (key, pk, am)
        self.components: list[_IndexComponent] = []  # newest first
        self._lsn = 0

    def insert(self, key: int, pk: int) -> None:
        self.mem.append((int(key), int(pk), 0))

    def delete(self, key: int, pk: int) -> None:
        self.mem.append((int(key), int(pk), 1))

    def flush(self) -> None:
        if not self.mem:
            return
        arr = np.asarray(self.mem, dtype=np.int64)
        arrival = np.arange(len(arr), dtype=np.int64)
        order = np.lexsort((arrival, arr[:, 1], arr[:, 0]))
        arr = arr[order]
        # within the memtable, the last op per (key, pk) wins: keep it
        same = (arr[1:, 0] == arr[:-1, 0]) & (arr[1:, 1] == arr[:-1, 1])
        keep = np.concatenate((~same, [True]))
        arr = arr[keep]
        self._lsn += 1
        c = _IndexComponent.write(
            os.path.join(self.path, f"run_{self._lsn:06d}.bin"),
            arr[:, 0],
            arr[:, 1],
            arr[:, 2].astype(np.uint8),
            self.cache,
            self.page_size,
        )
        self.components.insert(0, c)
        self.mem = []
        if len(self.components) > self.max_components:
            self._merge_all()

    def _merge_all(self) -> None:
        runs = [c.load() for c in self.components]
        keys = np.concatenate([r[0] for r in runs])
        pks = np.concatenate([r[1] for r in runs])
        ams = np.concatenate([r[2] for r in runs])
        rank = np.concatenate(
            [np.full(len(r[0]), i, dtype=np.int32) for i, r in enumerate(runs)]
        )
        order = np.lexsort((rank, pks, keys))
        keys, pks, ams, rank = keys[order], pks[order], ams[order], rank[order]
        kp_same = (keys[1:] == keys[:-1]) & (pks[1:] == pks[:-1])
        keep = np.concatenate(([True], ~kp_same))
        keys, pks, ams = keys[keep], pks[keep], ams[keep]
        alive = ams == 0  # bottom merge: drop anti-matter
        self._lsn += 1
        merged = _IndexComponent.write(
            os.path.join(self.path, f"run_{self._lsn:06d}.bin"),
            keys[alive],
            pks[alive],
            ams[alive],
            self.cache,
            self.page_size,
        )
        for c in self.components:
            c.delete()
        self.components = [merged]

    # ---------------------------------------------------------------- read
    def range_pks(self, lo: int, hi: int) -> np.ndarray:
        """PKs whose key is in [lo, hi], reconciled across components and
        the memtable; returned sorted ascending (§4.6: sort before the
        primary-index batch lookup)."""
        parts: list[np.ndarray] = []  # (key, pk, am, rank)
        rank0 = 0
        if self.mem:
            arr = np.asarray(self.mem, dtype=np.int64)
            m = (arr[:, 0] >= lo) & (arr[:, 0] <= hi)
            sel = arr[m]
            # last memtable op per pair wins -> rank by recency
            parts.append(
                np.column_stack(
                    (sel, np.arange(len(sel), 0, -1, dtype=np.int64))
                )
            )
            rank0 = len(sel) + 1
        for i, c in enumerate(self.components):
            keys, pks, ams = c.load()
            a = np.searchsorted(keys, lo, "left")
            b = np.searchsorted(keys, hi, "right")
            sel = np.column_stack(
                (
                    keys[a:b],
                    pks[a:b],
                    ams[a:b].astype(np.int64),
                    np.full(b - a, rank0 + i, dtype=np.int64),
                )
            )
            parts.append(sel)
        if not parts:
            return np.empty(0, dtype=np.int64)
        all_ = np.concatenate(parts)
        if len(all_) == 0:
            return np.empty(0, dtype=np.int64)
        order = np.lexsort((all_[:, 3], all_[:, 1], all_[:, 0]))
        all_ = all_[order]
        same = (all_[1:, 0] == all_[:-1, 0]) & (all_[1:, 1] == all_[:-1, 1])
        keep = np.concatenate(([True], ~same))
        all_ = all_[keep]
        alive = all_[:, 2] == 0
        return np.sort(all_[alive, 1])

    def contains_pk(self, pk: int) -> bool:
        """Primary-key-index membership probe (key == pk entries)."""
        for key, p, am in reversed(self.mem):
            if key == pk:
                return am == 0
        for c in self.components:
            keys, pks, ams = c.load()
            i = np.searchsorted(keys, pk, "left")
            if i < len(keys) and keys[i] == pk:
                return bool(ams[i] == 0)
        return False

    def size_bytes(self) -> int:
        return sum(c.size_bytes() for c in self.components)

    def reopen(self) -> None:
        """Rediscover persisted runs (newest first) after a process swap."""
        runs = sorted(
            (f for f in os.listdir(self.path) if f.endswith(".bin")),
            reverse=True,
        )
        self.components = []
        for f in runs:
            c = _IndexComponent(os.path.join(self.path, f), self.cache)
            c.pages.open_read()
            self.components.append(c)
        if runs:
            self._lsn = int(runs[0].split("_")[1].split(".")[0])

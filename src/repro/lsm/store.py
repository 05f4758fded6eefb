"""The LSM-based document store (paper §2.1, §4.4-4.6).

One ``LSMStore`` is one *data partition* (AsterixDB: hash-partitioned
primary LSM B+-tree).  Records enter the in-memory component in the
layout's in-memory format (Open bytes for Open; VB bytes for VB/APAX/AMAX
— §4.5: "we first insert the records into the in-memory component in our
vector-based format"); a full memtable flushes to a new immutable on-disk
component, at which point APAX/AMAX infer the schema and columnize
(tuple-compactor piggy-backing, §2.2).  Tiering merges (ratio 1.2, <= 5
components) compact components; columnar merges are *vertical* (§4.5.3).

Secondary indexes are maintained exactly as §4.6 prescribes: every upsert
point-looks-up the old record (via the primary-key index fast path when
present) to anti-matter the old secondary entry.
"""
from __future__ import annotations

import os
import shutil
from typing import Any, Iterator, Optional

import numpy as np

from ..dremel.schema import Schema
from ..dremel.shred import ShreddedBatch, Shredder
from ..layouts import amax as amax_mod
from ..layouts import apax as apax_mod
from ..layouts import open_fmt, rows, vb
from ..layouts.amax import AMAXReader
from ..layouts.apax import APAXReader
from ..layouts.common import AMAX, APAX, COLUMNAR_LAYOUTS, OPEN, VB, Component
from ..layouts.rows import RowReader
from ..storage.pagefile import BufferCache
from . import merge as merge_mod
from .secondary import LSMIndex


def get_path(doc: dict, path: str) -> Any:
    """Dotted-path accessor used for secondary index keys."""
    cur: Any = doc
    for part in path.split("."):
        if not isinstance(cur, dict):
            return None
        cur = cur.get(part)
    return cur


class LSMStore:
    def __init__(
        self,
        path: str,
        layout: str,
        *,
        cache: Optional[BufferCache] = None,
        page_size: int = 32 * 1024,
        mem_budget: int = 4 * 1024 * 1024,
        merge_ratio: float = 1.2,
        max_components: int = 5,
        record_limit: int = amax_mod.DEFAULT_RECORD_LIMIT,
        empty_page_tolerance: float = amax_mod.DEFAULT_EMPTY_PAGE_TOLERANCE,
        pk_index: bool = False,
        secondary: Optional[dict[str, str]] = None,  # index name -> doc path
    ) -> None:
        assert layout in (OPEN, VB, APAX, AMAX)
        self.path = path
        self.layout = layout
        self.cache = cache or BufferCache()
        self.page_size = page_size
        self.mem_budget = mem_budget
        self.merge_ratio = merge_ratio
        self.max_components = max_components
        self.record_limit = record_limit
        self.empty_page_tolerance = empty_page_tolerance
        os.makedirs(path, exist_ok=True)
        # in-memory component: pk -> encoded record bytes (None = delete)
        self.mem: dict[int, Optional[bytes]] = {}
        self.mem_bytes = 0
        self.mem_fd = vb.FieldDict()  # VB in-memory encoding dictionary
        self.schema = Schema()  # latest inferred schema (superset, §2.2)
        self.field_names: list[str] = []  # VB on-disk name dictionary
        self.components: list[Component] = []  # newest first
        self._readers: dict[str, Any] = {}
        self._lsn = 0
        self.n_flushes = 0
        self.n_merges = 0
        self.pk_index = (
            LSMIndex(os.path.join(path, "pk_idx"), self.cache, page_size)
            if pk_index
            else None
        )
        self.secondary: dict[str, tuple[str, LSMIndex]] = {}
        for name, p in (secondary or {}).items():
            self.secondary[name] = (
                p,
                LSMIndex(os.path.join(path, f"sec_{name}"), self.cache, page_size),
            )

    # ------------------------------------------------------------ ingest
    def upsert(self, pk: int, doc: dict) -> None:
        if self.secondary:
            self._maintain_secondaries(pk, doc)
        if self.layout == OPEN:
            rb = open_fmt.encode_record(pk, doc)
        else:
            rb = vb.encode_record(pk, doc, self.mem_fd)
        old = self.mem.get(pk)
        self.mem_bytes += len(rb) - (len(old) if old else 0)
        self.mem[pk] = rb
        if self.pk_index is not None:
            self.pk_index.insert(pk, pk)
        if self.mem_bytes >= self.mem_budget:
            self.flush()

    def delete(self, pk: int) -> None:
        if self.secondary:
            old = self._lookup_values(pk, [p for p, _ in self.secondary.values()])
            if old is not None:
                for name, (p, idx) in self.secondary.items():
                    k = old.get(p)
                    if k is not None:
                        idx.delete(int(k), pk)
        if self.pk_index is not None:
            self.pk_index.delete(pk, pk)
        self.mem[pk] = None
        self.mem_bytes += 16
        if self.mem_bytes >= self.mem_budget:
            self.flush()

    def _maintain_secondaries(self, pk: int, new_doc: dict) -> None:
        """§4.6: fetch old record (if any) to anti-matter old index keys.
        The primary-key index short-circuits lookups for new keys."""
        exists = True
        if self.pk_index is not None:
            exists = self.pk_index.contains_pk(pk)
        if exists:
            old = self._lookup_values(pk, [p for p, _ in self.secondary.values()])
            if old is not None:
                for name, (p, idx) in self.secondary.items():
                    k = old.get(p)
                    if k is not None:
                        idx.delete(int(k), pk)
        for name, (p, idx) in self.secondary.items():
            k = get_path(new_doc, p)
            if k is not None:
                idx.insert(int(k), pk)

    def _lookup_values(self, pk: int, paths: list[str]) -> Optional[dict]:
        """Point lookup of the given paths' old values, memtable + all
        components newest-first (§4.6).  For columnar components only the
        needed columns are decoded — still the decode-heavy path the
        paper measures for update-intensive ingestion (§6.3.2)."""
        if pk in self.mem:
            rb = self.mem[pk]
            if rb is None:
                return None
            if self.layout == OPEN:
                _pk, am, doc = open_fmt.decode_record(rb)
            else:
                _pk, am, doc = vb.decode_record(rb, self.mem_fd.names)
            if am:
                return None
            from ..dremel.assemble import MISSING
            from ..query.sources import doc_extract

            return {
                p: (None if (v := doc_extract(doc, p)) is MISSING else v)
                for p in paths
            }
        from ..query.engine import component_point_lookup

        for comp in self.components:
            hit = component_point_lookup(self.reader(comp), pk, paths)
            if hit is not None:
                am, values = hit
                return None if am else values
        return None

    # ------------------------------------------------------------- flush
    def flush(self) -> None:
        if not self.mem:
            return
        entries: list[tuple[int, Optional[dict]]] = []
        for pk in sorted(self.mem):
            rb = self.mem[pk]
            if rb is None:
                entries.append((pk, None))
            elif self.layout == OPEN:
                entries.append((pk, open_fmt.decode_record(rb)[2]))
            else:
                entries.append((pk, vb.decode_record(rb, self.mem_fd.names)[2]))
        self._lsn += 1
        cpath = os.path.join(self.path, f"comp_{self._lsn:06d}")
        self._write_component(cpath, entries)
        self.components.insert(0, Component(cpath, self.cache))
        self.mem = {}
        self.mem_bytes = 0
        self.n_flushes += 1
        if self.pk_index is not None:
            self.pk_index.flush()
        for _name, (_p, idx) in self.secondary.items():
            idx.flush()
        self._maybe_merge()

    def _write_component(
        self, cpath: str, entries: list[tuple[int, Optional[dict]]]
    ) -> None:
        if self.layout in (OPEN, VB):
            if self.layout == VB:
                # tuple compactor: infer schema at flush time too (§2.2)
                for _pk, doc in entries:
                    if doc is not None:
                        self.schema._merge_into(self.schema.root, doc, ())
            rows.write_component(
                cpath,
                self.layout,
                entries,
                self.cache,
                self.page_size,
                schema=self.schema if self.layout == VB else None,
                field_names=self.field_names if self.layout == VB else None,
            )
            if self.layout == VB:
                # the on-disk dictionary accumulates (like the schema)
                fd = vb.FieldDict(self.field_names)
                for _pk, doc in entries:
                    if doc is not None:
                        _collect_names(doc, fd)
                self.field_names = fd.names
            return
        shredder = Shredder(self.schema)
        for pk, doc in entries:
            if doc is None:
                shredder.add_antimatter(pk)
            else:
                shredder.add(doc, pk)
        batch = shredder.finish()
        self._write_columnar(cpath, batch)

    def _write_columnar(self, cpath: str, batch: ShreddedBatch) -> None:
        if self.layout == APAX:
            apax_mod.write_component(cpath, batch, self.cache, self.page_size)
        else:
            amax_mod.write_component(
                cpath,
                batch,
                self.cache,
                self.page_size,
                self.record_limit,
                self.empty_page_tolerance,
            )

    # ------------------------------------------------------------- merge
    def _maybe_merge(self) -> None:
        while True:
            sizes = [c.size_bytes() for c in self.components]
            pick = merge_mod.pick_merge(sizes, self.merge_ratio, self.max_components)
            if pick is None:
                return
            self._merge(pick)

    def _merge(self, idxs: list[int]) -> None:
        to_merge = [self.components[i] for i in idxs]
        bottom = idxs[-1] == len(self.components) - 1
        self._lsn += 1
        cpath = os.path.join(self.path, f"comp_{self._lsn:06d}")
        if self.layout in (OPEN, VB):
            self._merge_rows(to_merge, cpath, bottom)
        else:
            self._merge_columnar(to_merge, cpath, bottom)
        merged = Component(cpath, self.cache)
        for c in to_merge:
            self._readers.pop(c.path, None)
            c.delete()
            shutil.rmtree(c.path, ignore_errors=True)
        kept = [c for i, c in enumerate(self.components) if i not in idxs]
        pos = min(idxs)
        kept.insert(pos, merged)
        self.components = kept
        self.n_merges += 1

    def _merge_rows(self, comps, cpath: str, bottom: bool) -> None:
        per = [list(self.reader(c).iter_records()) for c in comps]
        pk_arrays = [np.asarray([r[0] for r in p], dtype=np.int64) for p in per]
        def_arrays = [
            np.asarray([0 if r[1] else 1 for r in p], dtype=np.int64) for p in per
        ]
        ci, ri, _pks, _defs = merge_mod.merge_pk_sequence(
            pk_arrays, def_arrays, drop_antimatter=bottom
        )
        entries = []
        for c, r in zip(ci, ri):
            pk, am, doc = per[c][r]
            entries.append((pk, None if am else doc))
        rows.write_component(
            cpath,
            self.layout,
            entries,
            self.cache,
            self.page_size,
            schema=self.schema if self.layout == VB else None,
            field_names=self.field_names if self.layout == VB else None,
        )

    def _merge_columnar(self, comps, cpath: str, bottom: bool) -> None:
        """Vertical merge (§4.5.3): PKs first, then column by column."""
        readers = [self.reader(c) for c in comps]
        pk_arrays, def_arrays = [], []
        for rd in readers:
            ds, ks = [], []
            for unit in _columnar_units(rd):
                d, k = unit.pks()
                ds.append(np.asarray(d, dtype=np.int64))
                ks.append(np.asarray(k, dtype=np.int64))
            def_arrays.append(np.concatenate(ds) if ds else np.empty(0, np.int64))
            pk_arrays.append(np.concatenate(ks) if ks else np.empty(0, np.int64))
        ci, ri, pks, dfs = merge_mod.merge_pk_sequence(
            pk_arrays, def_arrays, drop_antimatter=bottom
        )
        schema = self.schema  # newest schema is the superset (§2.2)
        out_cols = []
        for col_idx, info in enumerate(schema.columns):
            per_comp = []
            for rd, nrec in zip(readers, (len(a) for a in pk_arrays)):
                defs_parts, vals_parts = [], []
                for unit in _columnar_units(rd):
                    d, v = unit.column(col_idx)
                    defs_parts.append(np.asarray(d, dtype=np.int64))
                    vals_parts.extend(v if not isinstance(v, np.ndarray) else list(v))
                defs = (
                    np.concatenate(defs_parts) if defs_parts else np.empty(0, np.int64)
                )
                dp, vp = merge_mod.split_positions(defs, info)
                per_comp.append((defs, vals_parts, dp, vp))
            out_cols.append(merge_mod.stitch_column(per_comp, ci, ri, info))
        batch = ShreddedBatch(
            schema=schema,
            pk_defs=dfs.tolist(),
            pk_values=pks.tolist(),
            columns=out_cols,
            n_records=len(pks),
        )
        self._write_columnar(cpath, batch)

    # ------------------------------------------------------------- access
    def reader(self, comp: Component):
        rd = self._readers.get(comp.path)
        if rd is None:
            if comp.layout in (OPEN, VB):
                rd = RowReader(comp)
            elif comp.layout == APAX:
                rd = APAXReader(comp)
            else:
                rd = AMAXReader(comp)
            self._readers[comp.path] = rd
        return rd

    def readers(self) -> list:
        """Newest-first readers over all on-disk components."""
        return [self.reader(c) for c in self.components]

    def total_size_bytes(self) -> int:
        n = sum(c.size_bytes() for c in self.components)
        if self.pk_index is not None:
            n += self.pk_index.size_bytes()
        for _name, (_p, idx) in self.secondary.items():
            n += idx.size_bytes()
        return n

    def close(self) -> None:
        """Flush and persist a manifest so the store can be reopened by a
        different process (Spark ingestion tasks write; the driver and
        datasource workers reopen for queries)."""
        self.flush()
        import json

        manifest = {
            "layout": self.layout,
            "page_size": self.page_size,
            "record_limit": self.record_limit,
            "components": [os.path.basename(c.path) for c in self.components],
            "schema_json": self.schema.to_json(),
            "field_names": self.field_names,
            "pk_index": self.pk_index is not None,
            "secondary": {n: p for n, (p, _i) in self.secondary.items()},
            "lsn": self._lsn,
            "n_flushes": self.n_flushes,
            "n_merges": self.n_merges,
        }
        with open(os.path.join(self.path, "manifest.json"), "w") as f:
            json.dump(manifest, f)

    @classmethod
    def open(cls, path: str, cache: Optional[BufferCache] = None) -> "LSMStore":
        """Reopen a store persisted by :meth:`close`."""
        import json

        with open(os.path.join(path, "manifest.json")) as f:
            m = json.load(f)
        st = cls(
            path,
            m["layout"],
            cache=cache,
            page_size=m["page_size"],
            record_limit=m["record_limit"],
            pk_index=m["pk_index"],
            secondary=m["secondary"] or None,
        )
        st.schema = Schema.from_json(m["schema_json"])
        st.field_names = m["field_names"]
        st._lsn = m["lsn"]
        st.n_flushes = m.get("n_flushes", 0)
        st.n_merges = m.get("n_merges", 0)
        st.components = [
            Component(os.path.join(path, name), st.cache)
            for name in m["components"]
        ]
        if st.pk_index is not None:
            st.pk_index.reopen()
        for _n, (_p, idx) in st.secondary.items():
            idx.reopen()
        return st


def _columnar_units(reader):
    """Uniform iteration: APAX pages / AMAX mega leaves."""
    if isinstance(reader, APAXReader):
        yield from reader.iter_pages()
    else:
        yield from reader.iter_leaves()


def _collect_names(v: Any, fd: vb.FieldDict) -> None:
    if isinstance(v, dict):
        for k, x in v.items():
            if x is None:
                continue
            fd.id_of(k)
            _collect_names(x, fd)
    elif isinstance(v, list):
        for x in v:
            _collect_names(x, fd)

"""Query driver: runs a plan over one or more LSM data partitions and
reports the I/O the layouts actually did (paper §6.4).

Also implements point lookups (per layout, §4.6) and secondary-index
query execution (sorted-PK batched lookups per Luo et al., as the paper
adopts)."""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Any, Optional

import numpy as np

from ..dremel.assemble import ColumnCursor
from ..layouts.amax import AMAXReader
from ..layouts.apax import APAXReader
from ..layouts.rows import RowReader
from ..lsm.store import LSMStore
from ..storage.pagefile import IOStats
from .codegen import compiled
from .interp import InterpPipeline
from .plan import GroupOp, Query
from .sources import (
    PathExtractor,
    _columnar_units,
    count_survivors,
    doc_extract,
    env_stream,
)


@dataclass
class QueryStats:
    wall_s: float = 0.0
    io: IOStats = field(default_factory=IOStats)

    @property
    def pages_read(self) -> int:
        return self.io.disk_reads + self.io.cache_hits


def _io_snapshot(stores) -> list[IOStats]:
    return [s.cache.stats.snapshot() for s in stores]


def _io_delta(stores, before) -> IOStats:
    total = IOStats()
    seen_caches = []
    for s, b in zip(stores, before):
        if any(s.cache is c for c in seen_caches):
            continue
        seen_caches.append(s.cache)
        d = s.cache.stats.delta(b)
        for k in total.__dict__:
            setattr(total, k, getattr(total, k) + getattr(d, k))
    return total


def run_query(
    stores: list[LSMStore] | LSMStore,
    q: Query,
    model: str = "codegen",
) -> tuple[list[tuple], QueryStats]:
    """Execute ``q`` over the partitions; returns (rows, stats)."""
    if isinstance(stores, LSMStore):
        stores = [stores]
    before = _io_snapshot(stores)
    t0 = time.perf_counter()
    if q.is_count_star:
        rows = [(count_survivors(stores),)]
    else:
        group = GroupOp(q)
        envs = env_stream(stores, q.scan.bindings, q.zone_filter)
        if model == "codegen":
            compiled(q)(envs, group)
        else:
            InterpPipeline(q).run(envs, group)
        rows = group.rows(q.order)
    stats = QueryStats(time.perf_counter() - t0, _io_delta(stores, before))
    return rows, stats


# --------------------------------------------------------------- lookups
def component_point_lookup(reader, pk: int, paths: Optional[list[str]] = None):
    """Find ``pk`` in one component.

    Returns ``(antimatter, doc_or_path_values)`` or None.  Row layouts
    binary-search a slotted page; columnar layouts must decode keys and
    the requested columns (§4.6's extra cost).  With ``paths``, columnar
    lookups decode only the needed columns and return {path: value}.
    """
    if isinstance(reader, RowReader):
        hit = reader.point_lookup(pk)
        if hit is None:
            return None
        am, doc = hit
        if am:
            return True, None
        if paths is not None:
            from ..dremel.assemble import MISSING

            return False, {
                p: (None if (v := doc_extract(doc, p)) is MISSING else v)
                for p in paths
            }
        return False, doc
    return _columnar_point_lookup(reader, pk, paths)


def _unit_ranges(reader):
    if isinstance(reader, APAXReader):
        return reader.page_minmax, reader.page
    metas = reader.leaf_metas
    return [(m["min_pk"], m["max_pk"]) for m in metas], reader.leaf


def _columnar_point_lookup(reader, pk: int, paths: Optional[list[str]]):
    ranges, get_unit = _unit_ranges(reader)
    lo, hi = 0, len(ranges) - 1
    while lo <= hi:
        mid = (lo + hi) // 2
        mn, mx = ranges[mid]
        if pk < mn:
            hi = mid - 1
        elif pk > mx:
            lo = mid + 1
        else:
            unit = get_unit(mid)
            defs, pks = unit.pks()
            i = int(np.searchsorted(pks, pk))
            if i >= len(pks) or int(pks[i]) != pk:
                return None
            if int(defs[i]) == 0:
                return True, None
            schema = reader.schema
            want = paths if paths is not None else _all_paths(schema)
            out: dict[str, Any] = {}
            for p in want:
                ex = PathExtractor(schema, p)
                cursors = {}
                for c in ex.cols:
                    d, v = unit.column(c)
                    cur = ColumnCursor(schema.columns[c], list(d), v)
                    cur.skip_records(i)  # linear positioning (§4.6)
                    cursors[c] = cur
                frags = {c: cur.parse_record() for c, cur in cursors.items()}
                from ..dremel.assemble import MISSING

                v = ex(frags)
                out[p] = None if v is MISSING else v
            return False, out  # path-keyed value dict
    return None


def _all_paths(schema) -> list[str]:
    return [c.path.lstrip("$.") for c in schema.columns]


# ------------------------------------------------- secondary-index query
def index_count_query(
    stores: list[LSMStore],
    index_name: str,
    lo: int,
    hi: int,
    count_paths: Optional[list[str]] = None,
) -> tuple[list[tuple], QueryStats]:
    """Range query answered via a secondary index (§4.6, Fig. 15/16):

    1. search the index -> matching PKs, 2. sort them, 3. batched point
    lookups against the primary index in PK order (columns decode once
    per leaf and cursors advance forward only).  Counts records and, if
    ``count_paths``, each path's non-null appearances.
    """
    from ..dremel.assemble import MISSING
    from ..layouts import open_fmt, vb

    before = _io_snapshot(stores)
    t0 = time.perf_counter()
    n = 0
    path_counts = [0] * len(count_paths or [])

    def _tally(doc) -> None:
        nonlocal n
        n += 1
        for k, p in enumerate(count_paths or []):
            v = doc_extract(doc, p)
            if v is not None and v is not MISSING:
                path_counts[k] += 1

    for store in stores:
        _p, idx = store.secondary[index_name]
        pks = idx.range_pks(lo, hi)  # sorted ascending
        resolved = np.zeros(len(pks), dtype=bool)
        for j, pk in enumerate(pks):
            pki = int(pk)
            if pki in store.mem:
                resolved[j] = True
                rb = store.mem[pki]
                if rb is not None:
                    if store.layout == "open":
                        _pk, _am, doc = open_fmt.decode_record(rb)
                    else:
                        _pk, _am, doc = vb.decode_record(rb, store.mem_fd.names)
                    _tally(doc)
        for comp in store.components:
            if resolved.all():
                break
            reader = store.reader(comp)
            if isinstance(reader, RowReader):
                for j, pk in enumerate(pks):
                    if resolved[j]:
                        continue
                    hit = reader.point_lookup(int(pk))
                    if hit is None:
                        continue
                    resolved[j] = True
                    am, doc = hit
                    if not am:
                        _tally(doc)
                continue
            n, path_counts = _columnar_index_lookup(
                store, reader, pks, resolved, n, count_paths, path_counts
            )
    rows = [(n, *path_counts)]
    stats = QueryStats(time.perf_counter() - t0, _io_delta(stores, before))
    return rows, stats


def _columnar_index_lookup(
    store, reader, pks, resolved, n, count_paths, path_counts
):
    from ..dremel.assemble import MISSING

    schema = store.schema
    extractors = [PathExtractor(schema, p) for p in (count_paths or [])]
    ranges, get_unit = _unit_ranges(reader)
    # batched, PK-ordered probing: one pass over units (Luo et al. §4.6)
    want = [(int(pk), j) for j, pk in enumerate(pks) if not resolved[j]]
    ui = 0
    k = 0
    while k < len(want) and ui < len(ranges):
        mn, mx = ranges[ui]
        if want[k][0] < mn:
            k += 1
            continue
        if want[k][0] > mx:
            ui += 1
            continue
        unit = get_unit(ui)
        defs, unit_pks = unit.pks()
        cursors = None
        last_r = 0
        while k < len(want) and want[k][0] <= mx:
            pk, j = want[k]
            k += 1
            i = int(np.searchsorted(unit_pks, pk))
            if i >= len(unit_pks) or int(unit_pks[i]) != pk:
                continue
            resolved[j] = True
            if int(defs[i]) == 0:
                continue
            n += 1
            if extractors:
                if cursors is None:
                    cursors = {}
                    for c in sorted({c for ex in extractors for c in ex.cols}):
                        d, v = unit.column(c)
                        cursors[c] = ColumnCursor(schema.columns[c], list(d), v)
                    last_r = 0
                for cur in cursors.values():
                    cur.skip_records(i - last_r)
                frags = {c: cur.parse_record() for c, cur in cursors.items()}
                last_r = i + 1
                for t, ex in enumerate(extractors):
                    v = ex(frags)
                    if v is not MISSING and v is not None:
                        path_counts[t] += 1
        ui += 1
    return n, path_counts

"""Record sources: reconciled scans over LSM components (paper §4.4).

Scans visit the memtable, then on-disk components newest -> oldest,
reconciling via a ``seen``-key set (newest version wins; anti-matter
suppresses older versions).  Because every evaluation query aggregates,
output order is irrelevant, so components stream independently.

Columnar components decode only the *needed* columns; ignored records are
skipped per column in batches (§4.4's batched iterator advance).  AMAX
additionally (a) answers PK-only scans from Page 0 alone and (b) skips
whole mega leaves via Page-0 zone maps when the query carries a pushdown
predicate — skipped leaves still contribute their PKs to reconciliation.
"""
from __future__ import annotations

from typing import Any, Iterator, Optional

import numpy as np

from ..dremel.assemble import MISSING, ColumnCursor, _extract
from ..layouts.amax import AMAXReader
from ..layouts.apax import APAXReader
from ..layouts.common import AMAX, APAX
from ..layouts.rows import RowReader
from ..lsm.store import LSMStore


# ------------------------------------------------------------ row access
def doc_extract(doc: Any, path: str):
    """Path access over a decoded document; mirrors ``extract_path``
    semantics (``[*]`` maps over arrays, absent -> MISSING)."""
    cur = doc
    for i, part in enumerate(path.split(".")):
        repeated = part.endswith("[*]")
        name = part[:-3] if repeated else part
        if not isinstance(cur, dict):
            return MISSING
        cur = cur.get(name, MISSING)
        if cur is MISSING:
            return MISSING
        if repeated:
            if not isinstance(cur, list):
                return MISSING
            rest = ".".join(path.split(".")[i + 1 :])
            if not rest:
                return cur
            out = []
            for item in cur:
                v = doc_extract(item, rest) if isinstance(item, dict) else MISSING
                out.append(None if v is MISSING else v)
            return out
    return cur


def _mem_docs(store: LSMStore):
    from ..layouts import open_fmt, vb

    for pk, rb in store.mem.items():
        if rb is None:
            yield pk, True, None
        elif store.layout == "open":
            yield open_fmt.decode_record(rb)
        else:
            yield vb.decode_record(rb, store.mem_fd.names)


# -------------------------------------------------------------- extractors
class PathExtractor:
    """Pre-resolved extraction of one bound path from column fragments."""

    def __init__(self, schema, path: str) -> None:
        self.node = schema.resolve(path)
        self.n_arrays = path.count("[*]")
        self.cols = (
            [leaf.col for leaf in self.node.leaves()] if self.node else []
        )

    def __call__(self, frags):
        if self.node is None:
            return MISSING
        return _extract(self.node, frags, self.n_arrays)


def _zone_skip(leaf, zone_cols: list[int], zf: tuple, reader) -> bool:
    """True if every value in the leaf fails the pushdown predicate."""
    _path, op, val = zf
    for col in zone_cols:
        rng = leaf.zone_range(col)
        if rng is None:
            continue
        if reader.schema.columns[col].kind == "string":
            rng = leaf.verified_range(col)
            if rng is None:
                continue
        lo, hi = rng
        if op == ">=" and hi >= val:
            return False
        if op == "<=" and lo <= val:
            return False
        if op == "between" and not (hi < val[0] or lo > val[1]):
            return False
    return True


# ------------------------------------------------------------ env streams
def env_stream(
    stores: list[LSMStore],
    bindings: dict[str, str],
    zone_filter: Optional[tuple] = None,
) -> Iterator[tuple]:
    """Yields one tuple per surviving record, values in binding order."""
    paths = list(bindings.values())
    for store in stores:
        seen: set[int] = set()
        for pk, am, doc in _mem_docs(store):
            seen.add(pk)
            if not am:
                yield tuple(doc_extract(doc, p) for p in paths)
        for comp in store.components:
            reader = store.reader(comp)
            if isinstance(reader, RowReader):
                yield from _row_envs(reader, paths, seen)
            else:
                yield from _columnar_envs(
                    store, reader, paths, seen, zone_filter
                )


def _row_envs(reader: RowReader, paths, seen: set) -> Iterator[tuple]:
    for pk, am, doc in reader.iter_records():
        if pk in seen:
            continue
        seen.add(pk)
        if not am:
            yield tuple(doc_extract(doc, p) for p in paths)


def _columnar_units(reader):
    if isinstance(reader, APAXReader):
        yield from reader.iter_pages()
    else:
        yield from reader.iter_leaves()


def _columnar_envs(
    store, reader, paths, seen: set, zone_filter: Optional[tuple]
) -> Iterator[tuple]:
    schema = store.schema
    extractors = [PathExtractor(schema, p) for p in paths]
    needed = sorted({c for ex in extractors for c in ex.cols})
    zone_cols: list[int] = []
    if zone_filter is not None and isinstance(reader, AMAXReader):
        znode = schema.resolve(zone_filter[0])
        if znode is not None:
            zone_cols = [leaf.col for leaf in znode.leaves()]
    for unit in _columnar_units(reader):
        defs, pks = unit.pks()
        keep = np.fromiter(
            (int(p) not in seen and d == 1 for p, d in zip(pks, defs)),
            dtype=bool,
            count=len(pks),
        )
        seen.update(int(p) for p in pks)
        if zone_cols and _zone_skip(unit, zone_cols, zone_filter, reader):
            continue  # zone map prunes the leaf; PKs already reconciled
        if not keep.any():
            continue
        cursors = {}
        for c in needed:
            d, v = unit.column(c)
            cursors[c] = ColumnCursor(schema.columns[c], d.tolist(), v)
        skip_run = 0
        for r in range(len(pks)):
            if not keep[r]:
                skip_run += 1
                continue
            if skip_run:
                # §4.4: advance each column's iterator in one batch
                for cur in cursors.values():
                    cur.skip_records(skip_run)
                skip_run = 0
            frags = {c: cur.parse_record() for c, cur in cursors.items()}
            yield tuple(ex(frags) for ex in extractors)


# ----------------------------------------------------------- count-only
def count_survivors(stores: list[LSMStore]) -> int:
    """COUNT(*) fast path: PKs only — Page 0 for AMAX (§6.4.1), PK
    minipages for APAX, full record scan for row layouts."""
    total = 0
    for store in stores:
        seen: set[int] = set()
        for pk, am, _doc in _mem_docs(store):
            seen.add(pk)
            if not am:
                total += 1
        for comp in store.components:
            reader = store.reader(comp)
            if isinstance(reader, RowReader):
                for pk, am, _doc in reader.iter_records():
                    if pk in seen:
                        continue
                    seen.add(pk)
                    if not am:
                        total += 1
            else:
                for unit in _columnar_units(reader):
                    defs, pks = unit.pks()
                    for p, d in zip(pks.tolist(), defs.tolist()):
                        if p in seen:
                            continue
                        seen.add(p)
                        if d == 1:
                            total += 1
    return total

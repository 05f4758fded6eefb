"""Record -> column striping for the extended Dremel format (paper §3.2).

Each record is processed in two passes:

1. the record's structure is merged into the inferred schema (new fields,
   new union alternatives).  Newly discovered columns are *backfilled* with
   one ``def = 0`` entry per previously-shredded record (paper: "we can
   write NULLs in the newly inferred columns ... for all previous records");
2. the record is walked against the (now covering) schema, emitting one
   definition-level entry per atomic column (values only at ``max_def``),
   plus delimiter entries at array ends.

Delimiters (§3.2.1): when array ``a_i`` (the i-th array on a column's path,
outermost first) finishes, delimiter ``i-1`` becomes *pending* for every
leaf column under it; coincident closes collapse to the smallest pending
value ("the delimiter 0 also encompasses the inner delimiter 1"); the
pending delimiter is flushed right before the column's next entry or at
record end.  An entry right after a delimiter is therefore never itself a
delimiter, which is what makes the encoding decodable (§3.2.1).

Anti-matter (§3.2.3): the primary-key column has ``max_def = 1``;
``def = 0`` marks an anti-matter (delete) entry.  Anti-matter records
contribute a single ``def = 0`` entry to every other column to keep the
per-record streams aligned.

Documented normalizations (the paper's scheme cannot express these; none of
its experiments exercise them): ``[]`` round-trips as a missing array, and a
JSON ``null`` field value round-trips as a missing field.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Any, Optional

from .schema import ARRAY, OBJECT, UNION, ColumnInfo, Schema, SchemaNode, type_tag


class ColumnWriter:
    """Accumulates one column's definition-level / value streams.

    ``def_pos``/``val_pos`` record the stream offsets at each record
    boundary — they let the layout writers slice a batch into APAX pages /
    AMAX mega leaves and let the vertical merge (§4.5.3) stitch per-record
    column slices without re-parsing the streams.
    """

    __slots__ = ("info", "defs", "values", "def_pos", "val_pos", "_pending")

    def __init__(self, info: ColumnInfo, backfill: int = 0) -> None:
        self.info = info
        self.defs: list[int] = [0] * backfill
        self.values: list[Any] = []
        self.def_pos: list[int] = list(range(backfill + 1))
        self.val_pos: list[int] = [0] * (backfill + 1)
        self._pending: Optional[int] = None

    def emit(self, d: int, value: Any = None) -> None:
        if self._pending is not None:
            self.defs.append(self._pending)
            self._pending = None
        self.defs.append(d)
        if d == self.info.max_def:
            self.values.append(value)

    def end_array(self, delim: int) -> None:
        self._pending = delim if self._pending is None else min(self._pending, delim)

    def end_record(self) -> None:
        if self._pending is not None:
            self.defs.append(self._pending)
            self._pending = None
        self.def_pos.append(len(self.defs))
        self.val_pos.append(len(self.values))


@dataclass
class ColumnData:
    """Immutable shredded column: def-level stream + present values.

    ``def_pos[r] : def_pos[r+1]`` (resp. ``val_pos``) is record ``r``'s
    slice of the def (resp. value) stream.
    """

    info: ColumnInfo
    defs: list[int]
    values: list[Any]
    def_pos: list[int]
    val_pos: list[int]


@dataclass
class ShreddedBatch:
    """Output of shredding a run of records (one LSM flush's worth)."""

    schema: Schema
    pk_defs: list[int]  # 1 = record, 0 = anti-matter (§3.2.3)
    pk_values: list[Any]
    columns: list[ColumnData]  # aligned with schema.columns
    n_records: int


class Shredder:
    """Single-pass (per record: infer-then-stripe) Dremel shredder.

    ``schema`` may be seeded with a previous component's schema so that the
    newest component's schema stays a superset of all previous ones (§2.2).
    """

    def __init__(self, schema: Optional[Schema] = None) -> None:
        self.schema = schema or Schema()
        self.writers: list[ColumnWriter] = [
            ColumnWriter(c) for c in self.schema.columns
        ]
        self.pk_defs: list[int] = []
        self.pk_values: list[Any] = []
        self.n_records = 0
        self.schema.on_new_column = self._on_new_column
        # leaf-column cache per node, invalidated via schema.version — the
        # null-subtree emission for wide sparse schemas (tweet_1: ~900
        # columns, most absent per record) is the shredder's hot path.
        self._leaf_cache: dict[int, tuple[int, list[int]]] = {}

    def _on_new_column(self, info: ColumnInfo) -> None:
        self.writers.append(ColumnWriter(info, backfill=self.n_records))

    def _leaf_cols(self, node: SchemaNode) -> list[int]:
        key = id(node)
        hit = self._leaf_cache.get(key)
        if hit is not None and hit[0] == self.schema.version:
            return hit[1]
        cols = [leaf.col for leaf in node.leaves()]
        self._leaf_cache[key] = (self.schema.version, cols)
        return cols

    # ------------------------------------------------------------------ api
    def add(self, doc: dict, pk: Any) -> None:
        """Shred one record keyed by ``pk``."""
        # Pass 1: schema inference (may create + backfill columns).
        self.schema._merge_into(self.schema.root, doc, ())
        # Pass 2: emit definition levels and values.
        self.pk_defs.append(1)
        self.pk_values.append(pk)
        self._walk_object(self.schema.root, doc)
        for w in self.writers:
            w.end_record()
        self.n_records += 1

    def add_antimatter(self, pk: Any) -> None:
        """Shred an anti-matter (delete) entry for ``pk`` (§3.2.3)."""
        self.pk_defs.append(0)
        self.pk_values.append(pk)
        for w in self.writers:
            w.emit(0)
            w.end_record()
        self.n_records += 1

    def finish(self) -> ShreddedBatch:
        batch = ShreddedBatch(
            schema=self.schema,
            pk_defs=self.pk_defs,
            pk_values=self.pk_values,
            columns=[
                ColumnData(w.info, w.defs, w.values, w.def_pos, w.val_pos)
                for w in self.writers
            ],
            n_records=self.n_records,
        )
        self.schema.on_new_column = None
        return batch

    # ----------------------------------------------------------- emission
    def _null_subtree(self, node: SchemaNode, d: int) -> None:
        """Every leaf column under ``node`` gets a null entry at level ``d``
        (the level of the deepest *present* node on the path)."""
        for col in self._leaf_cols(node):
            self.writers[col].emit(d)

    def _walk(self, node: SchemaNode, value: Any) -> None:
        if node.kind == UNION:
            tag = type_tag(value)
            for t, alt in node.alts.items():
                if t == tag:
                    self._walk(alt, value)
                else:
                    # Non-chosen alternatives: null at the union's parent
                    # level (union nodes are transparent, §3.2.2).
                    self._null_subtree(alt, node.level - 1)
            return
        if node.kind == OBJECT:
            for name, child in node.fields.items():
                v = value.get(name)
                if v is None:
                    self._null_subtree(child, node.level)
                else:
                    self._walk(child, v)
            return
        if node.kind == ARRAY:
            if node.element is not None:
                for item in value:
                    if item is None:
                        self._null_subtree(node.element, node.level)
                    else:
                        self._walk(node.element, item)
                for col in self._leaf_cols(node.element):
                    w = self.writers[col]
                    w.end_array(w.info.array_levels.index(node.level))
            return
        # atomic leaf
        self.writers[node.col].emit(node.level, value)

    def _walk_object(self, node: SchemaNode, doc: dict) -> None:
        self._walk(node, doc)

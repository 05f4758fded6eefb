"""Schema tree for the extended Dremel format (paper §3.2).

The schema is inferred, not declared: every record merged into it may add
fields, arrays, or *union* alternatives (heterogeneous types, §3.2.2).

Levels (paper §3.1/§3.2, reconstructed from Figures 4-7):

* every non-root, non-union node contributes one definition level:
  ``level(node) = level(parent) + 1`` where the parent is the nearest
  non-union ancestor;
* union nodes are "logical guides" — transparent for levels: a union and
  each of its alternatives occupy the level the plain value would have had;
* an array's *element* node sits one level below the array node;
* an atomic leaf is a column whose ``max_def`` is its own level; an observed
  definition level is the level of the deepest present node on the instance
  path (``max_def`` == value present).

Repeated columns (under ``k`` nested arrays) carry no repetition levels;
``max_delimiter = k - 1`` and array ends are encoded as definition-level
entries ``d <= max_delimiter`` (§3.2.1), decoded by the automaton in
``assemble.py``.
"""
from __future__ import annotations

import json
from dataclasses import dataclass, field
from typing import Any, Callable, Iterator, Optional

# Type tags double as union-alternative keys (paper: "the keys of the union
# nodes' children are their types").
STRING = "string"
BIGINT = "bigint"
DOUBLE = "double"
BOOLEAN = "boolean"
OBJECT = "object"
ARRAY = "array"
UNION = "union"

ATOMIC_KINDS = (STRING, BIGINT, DOUBLE, BOOLEAN)


def type_tag(value: Any) -> str:
    """Union-alternative key for a Python/JSON value (bool before int!)."""
    if isinstance(value, bool):
        return BOOLEAN
    if isinstance(value, int):
        return BIGINT
    if isinstance(value, float):
        return DOUBLE
    if isinstance(value, str):
        return STRING
    if isinstance(value, dict):
        return OBJECT
    if isinstance(value, list):
        return ARRAY
    raise TypeError(f"unsupported document value: {value!r} ({type(value)})")


@dataclass
class SchemaNode:
    """One node of the inferred schema tree."""

    kind: str
    level: int
    path: str
    fields: Optional[dict[str, "SchemaNode"]] = None  # kind == OBJECT
    element: Optional["SchemaNode"] = None  # kind == ARRAY
    alts: Optional[dict[str, "SchemaNode"]] = None  # kind == UNION
    col: int = -1  # atomic leaves: index into Schema.columns

    @property
    def is_atomic(self) -> bool:
        return self.kind in ATOMIC_KINDS

    def leaves(self) -> Iterator["SchemaNode"]:
        """All atomic-leaf descendants (self included if atomic)."""
        if self.is_atomic:
            yield self
        elif self.kind == OBJECT:
            for c in self.fields.values():
                yield from c.leaves()
        elif self.kind == ARRAY:
            if self.element is not None:  # []-only arrays have no type yet
                yield from self.element.leaves()
        elif self.kind == UNION:
            for c in self.alts.values():
                yield from c.leaves()


@dataclass
class ColumnInfo:
    """Static metadata of one atomic column (leaf of the schema tree)."""

    index: int
    path: str
    kind: str  # atomic type tag
    max_def: int  # leaf level
    array_levels: list[int] = field(default_factory=list)  # ancestor arrays, outer->inner

    @property
    def max_delimiter(self) -> int:
        """k-1 for k ancestor arrays; -1 when the column is not repeated."""
        return len(self.array_levels) - 1

    @property
    def is_repeated(self) -> bool:
        return bool(self.array_levels)


class Schema:
    """Mutable inferred schema: a root OBJECT node plus the column registry.

    ``on_new_column`` (if set) fires whenever inference discovers a new
    atomic leaf — the shredder uses it to backfill nulls for records that
    were written before the column existed (paper §3.2.2).
    """

    def __init__(self) -> None:
        self.root = SchemaNode(OBJECT, 0, "$", fields={})
        self.columns: list[ColumnInfo] = []
        self.on_new_column: Optional[Callable[[ColumnInfo], None]] = None
        # bumped whenever the tree gains a node — invalidates leaf caches
        self.version = 0

    # ---------------------------------------------------------- inference
    def merge_value(
        self,
        node: Optional[SchemaNode],
        value: Any,
        level: int,
        path: str,
        array_levels: tuple[int, ...],
    ) -> SchemaNode:
        """Merge ``value``'s type into ``node`` (None = new slot); return the
        node that now describes the slot (may be a newly-injected union)."""
        tag = type_tag(value)
        if node is None:
            return self._new_node(tag, value, level, path, array_levels)
        if node.kind == UNION:
            alt = node.alts.get(tag)
            if alt is None:
                alt = self._new_node(tag, value, level, f"{path}.<{tag}>", array_levels)
                node.alts[tag] = alt
            else:
                self._merge_into(alt, value, array_levels)
            return node
        if node.kind == tag:
            self._merge_into(node, value, array_levels)
            return node
        # Type conflict: inject a union above the existing node (§3.2.2).
        union = SchemaNode(UNION, level, path, alts={node.kind: node})
        old_prefix, new_prefix = node.path, f"{path}.<{node.kind}>"
        node.path = new_prefix
        for leaf in node.leaves():  # columns keep type-tagged paths
            ci = self.columns[leaf.col]
            if ci.path.startswith(old_prefix):
                ci.path = new_prefix + ci.path[len(old_prefix):]
        new_alt = self._new_node(tag, value, level, f"{path}.<{tag}>", array_levels)
        union.alts[tag] = new_alt
        return union

    def _merge_into(self, node: SchemaNode, value: Any, arrs: tuple[int, ...]) -> None:
        if node.kind == OBJECT:
            for k, v in value.items():
                if v is None:
                    continue  # JSON null == missing (documented simplification)
                node.fields[k] = self.merge_value(
                    node.fields.get(k), v, node.level + 1, f"{node.path}.{k}", arrs
                )
        elif node.kind == ARRAY:
            for item in value:
                if item is None:
                    continue  # null element needs no schema change
                node.element = self.merge_value(
                    node.element,
                    item,
                    node.level + 1,
                    f"{node.path}[*]",
                    arrs + (node.level,),
                )

    def _new_node(
        self, tag: str, value: Any, level: int, path: str, arrs: tuple[int, ...]
    ) -> SchemaNode:
        self.version += 1
        if tag == OBJECT:
            n = SchemaNode(OBJECT, level, path, fields={})
            self._merge_into(n, value, arrs)
            return n
        if tag == ARRAY:
            n = SchemaNode(ARRAY, level, path)
            self._merge_into(n, value, arrs)
            if n.element is None:
                # [] or [null,...]-only: element type unknown until a value
                # arrives; leave as a typeless hole (no columns yet).
                pass
            return n
        # atomic leaf -> register a column
        info = ColumnInfo(len(self.columns), path, tag, level, list(arrs))
        n = SchemaNode(tag, level, path, col=info.index)
        self.columns.append(info)
        if self.on_new_column is not None:
            self.on_new_column(info)
        return n

    # ------------------------------------------------------- serialization
    def to_json(self) -> str:
        def enc(n: SchemaNode) -> dict:
            d: dict[str, Any] = {"k": n.kind, "l": n.level, "p": n.path}
            if n.fields is not None:
                d["f"] = {k: enc(v) for k, v in n.fields.items()}
            if n.element is not None:
                d["e"] = enc(n.element)
            if n.alts is not None:
                d["a"] = {k: enc(v) for k, v in n.alts.items()}
            if n.col >= 0:
                d["c"] = n.col
            return d

        return json.dumps(
            {
                "root": enc(self.root),
                "columns": [
                    {
                        "i": c.index,
                        "p": c.path,
                        "k": c.kind,
                        "d": c.max_def,
                        "r": c.array_levels,
                    }
                    for c in self.columns
                ],
            }
        )

    @classmethod
    def from_json(cls, s: str) -> "Schema":
        raw = json.loads(s)

        def dec(d: dict) -> SchemaNode:
            n = SchemaNode(d["k"], d["l"], d["p"], col=d.get("c", -1))
            if "f" in d:
                n.fields = {k: dec(v) for k, v in d["f"].items()}
            if "e" in d:
                n.element = dec(d["e"])
            if "a" in d:
                n.alts = {k: dec(v) for k, v in d["a"].items()}
            return n

        sch = cls()
        sch.root = dec(raw["root"])
        sch.columns = [
            ColumnInfo(c["i"], c["p"], c["k"], c["d"], list(c["r"]))
            for c in raw["columns"]
        ]
        return sch

    # ------------------------------------------------------------ lookups
    def resolve(self, path: str) -> Optional[SchemaNode]:
        """Resolve a dotted path like ``user.name`` or ``games[*].title``
        through objects/unions/arrays; returns None if absent."""
        node: Optional[SchemaNode] = self.root
        for part in path.split("."):
            repeated = part.endswith("[*]")
            name = part[:-3] if repeated else part
            node = _child_of(node, name)
            if node is None:
                return None
            if repeated:
                node = _element_of(node)
                if node is None:
                    return None
        return node

    def columns_under(self, node: SchemaNode) -> list[ColumnInfo]:
        return [self.columns[leaf.col] for leaf in node.leaves()]


def _child_of(node: Optional[SchemaNode], name: str) -> Optional[SchemaNode]:
    if node is None:
        return None
    if node.kind == UNION:
        for alt in node.alts.values():
            c = _child_of(alt, name)
            if c is not None:
                return c
        return None
    if node.kind == OBJECT:
        return node.fields.get(name)
    return None


def _element_of(node: SchemaNode) -> Optional[SchemaNode]:
    if node.kind == ARRAY:
        return node.element
    if node.kind == UNION:
        arr = node.alts.get(ARRAY)
        return arr.element if arr is not None else None
    return None

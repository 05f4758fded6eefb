"""Columns -> records/values: the record assembly automaton (paper §3.2.4).

Dremel's record assembly is driven by repetition levels; ours is driven by
the delimiter scheme of §3.2.1.  Per record and per column, the def-level
stream is parsed by a small automaton into a *fragment*:

* non-repeated column: ``('s', d, value)`` — a single entry;
* repeated column: ``('n', d)`` when the array chain is null/missing at
  level ``d``, otherwise a (possibly nested) list whose items are
  ``('v', d, value)`` (present leaf), ``('n', d)`` (null at level ``d``) or
  a deeper list (an opened inner array).

The automaton's state is the stack of currently-open arrays.  A stream
entry is a delimiter iff ``d <= max_delimiter`` *and* the previous entry
was not itself a delimiter (and it is not the record's first entry).
Delimiter ``j`` closes every array below ancestor-array ``j``; ``j == 0``
ends the record's repeated section.

Fragments from all columns are then merged top-down along the schema tree
(objects come into existence when any leaf under them is present at their
level or deeper; union alternatives resolve to the at-most-one present
alternative, §3.2.2).
"""
from __future__ import annotations

from typing import Any, Optional

from .schema import ARRAY, OBJECT, UNION, ColumnInfo, Schema, SchemaNode

MISSING = object()  # sentinel: value absent (distinct from None == JSON null)


class ColumnCursor:
    """Forward iterator over one column's (defs, values) streams.

    ``skip_records`` supports the batched reconciliation advance of §4.4 —
    ignored records are skipped per column in one call, without touching
    the value stream except to keep it aligned.
    """

    __slots__ = ("info", "defs", "values", "di", "vi")

    def __init__(self, info: ColumnInfo, defs, values) -> None:
        self.info = info
        self.defs = defs
        self.values = values
        self.di = 0
        self.vi = 0

    def parse_record(self):
        info = self.info
        defs = self.defs
        maxd = info.max_def
        levels = info.array_levels
        k = len(levels)
        d = defs[self.di]
        self.di += 1
        if k == 0:
            if d == maxd:
                v = self.values[self.vi]
                self.vi += 1
                return ("s", d, v)
            return ("s", d, None)
        if d < levels[0]:
            return ("n", d)
        maxdelim = k - 1
        root: list = []
        stack = [root]
        fresh = True  # the first entry is never a delimiter
        while True:
            # An entry is a delimiter iff it may not directly follow another
            # delimiter, its level is in the delimiter range, AND arrays
            # deeper than it are actually open — closing arrays that are
            # not open is meaningless, so e.g. consecutive null elements of
            # an outer array (Fig. 7, column 6, record 2) stay value
            # entries even though their level is <= max_delimiter.
            if fresh or d > maxdelim or d >= len(stack):
                # value entry: open arrays down to the entry's depth
                t = 0
                for lv in levels:
                    if lv <= d:
                        t += 1
                    else:
                        break
                if t < len(stack):
                    del stack[t:]
                while len(stack) < t:
                    nl: list = []
                    stack[-1].append(nl)
                    stack.append(nl)
                if d == maxd:
                    stack[-1].append(("v", d, self.values[self.vi]))
                    self.vi += 1
                else:
                    stack[-1].append(("n", d))
                fresh = False
            else:
                # delimiter j = d closes arrays below ancestor-array j
                if d == 0:
                    return root
                del stack[d:]
                fresh = True
            d = defs[self.di]
            self.di += 1

    def skip_records(self, n: int) -> None:
        for _ in range(n):
            self.parse_record()


def _frag_level(f) -> float:
    """Deepest-present level evidenced by a fragment (for presence tests)."""
    if f is MISSING:
        return -1
    if isinstance(f, list):
        return float("inf")  # an opened array proves presence of ancestors
    return f[1]  # ('s'|'v'|'n', d, ...)


def build_value(node: SchemaNode, frags: dict[int, Any]):
    """Merge per-column fragments into the value of ``node``.

    ``frags`` maps column index -> fragment *at node's array depth* (i.e.,
    already descended through any ancestor arrays).  Returns MISSING when
    the value is absent.
    """
    if node.is_atomic:
        f = frags.get(node.col, MISSING)
        if f is MISSING or isinstance(f, list):
            return MISSING
        tag, d = f[0], f[1]
        if tag == "s" or tag == "v":
            return f[2] if d == node.level else MISSING
        return MISSING  # ('n', d): null at or above the leaf
    if node.kind == OBJECT:
        present = any(
            _frag_level(frags.get(leaf.col, MISSING)) >= node.level
            for leaf in node.leaves()
        )
        if not present:
            return MISSING
        out = {}
        for name, child in node.fields.items():
            v = build_value(child, frags)
            if v is not MISSING:
                out[name] = v
        return out
    if node.kind == UNION:
        for alt in node.alts.values():
            v = build_value(alt, frags)
            if v is not MISSING:
                return v
        return MISSING
    if node.kind == ARRAY:
        if node.element is None:
            return MISSING  # only ever saw []/[null] -> normalized away
        leaf_cols = [leaf.col for leaf in node.element.leaves()]
        lists = {c: frags.get(c, MISSING) for c in leaf_cols}
        if not any(isinstance(f, list) for f in lists.values()):
            return MISSING
        m = max(len(f) for f in lists.values() if isinstance(f, list))
        out_list = []
        for i in range(m):
            sub = {
                c: (f[i] if isinstance(f, list) and i < len(f) else MISSING)
                for c, f in lists.items()
            }
            ev = build_value(node.element, sub)
            out_list.append(None if ev is MISSING else ev)
        return out_list
    raise AssertionError(node.kind)


def assemble_record(schema: Schema, frags: dict[int, Any]) -> dict:
    """Stitch a full record back together from all columns' fragments."""
    v = build_value(schema.root, frags)
    return {} if v is MISSING else v


def extract_path(schema: Schema, frags: dict[int, Any], path: str):
    """Assemble only the value at ``path`` (projection push-down): e.g.
    ``user.name`` or ``games[*].title``.  Crossing ``[*]`` returns nested
    lists mirroring the arrays.  Returns MISSING when absent."""
    node = schema.resolve(path)
    if node is None:
        return MISSING
    n_arrays = path.count("[*]")
    return _extract(node, frags, n_arrays)


def _extract(node: SchemaNode, frags: dict[int, Any], arrays_above: int):
    if arrays_above == 0:
        return build_value(node, frags)
    leaf_cols = [leaf.col for leaf in node.leaves()]
    lists = {c: frags.get(c, MISSING) for c in leaf_cols}
    if not any(isinstance(f, list) for f in lists.values()):
        return MISSING
    m = max(len(f) for f in lists.values() if isinstance(f, list))
    out = []
    for i in range(m):
        sub = {
            c: (f[i] if isinstance(f, list) and i < len(f) else MISSING)
            for c, f in lists.items()
        }
        ev = _extract(node, sub, arrays_above - 1)
        out.append(None if ev is MISSING else ev)
    return out

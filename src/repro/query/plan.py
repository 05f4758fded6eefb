"""Tiny logical plan for the evaluation queries (paper Table 2 / App. A).

A plan is a ``Scan`` followed by pipelining operators (``Assign``,
``Unnest``, ``Select``) and terminated by a pipeline breaker (``GroupBy``
— possibly with no keys, i.e. a scalar aggregate — then optional
``OrderLimit``).  Expressions are Python source over the plan's variables
using the NULL-aware helpers of :mod:`repro.query.exprs`; the code
generator splices them into the compiled pipeline (§5), the interpreted
engine evaluates them per tuple.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Optional

from ..dremel.assemble import MISSING


@dataclass
class Scan:
    """bindings: var -> document path ('' binds nothing; count-only)."""

    bindings: dict[str, str]


@dataclass
class Assign:
    var: str
    expr: str


@dataclass
class Unnest:
    var: str
    src_expr: str  # expression producing a list (or MISSING)


@dataclass
class Select:
    expr: str


@dataclass
class Agg:
    name: str
    func: str  # 'count' | 'sum' | 'max' | 'min'
    expr: str  # ignored for count


@dataclass
class GroupBy:
    keys: list[str]  # expressions; [] = scalar aggregate
    aggs: list[Agg]


@dataclass
class OrderLimit:
    by: int  # output column index to order by
    desc: bool = True
    limit: Optional[int] = None


@dataclass
class Query:
    """One evaluation query."""

    name: str
    pipeline: list  # Scan, then Assign/Unnest/Select in order
    group: GroupBy
    order: Optional[OrderLimit] = None
    # zone-map pushdown hint: (path, op, value) with op in {'>=','<=','between'}
    zone_filter: Optional[tuple] = None

    @property
    def scan(self) -> Scan:
        return self.pipeline[0]

    @property
    def paths(self) -> list[str]:
        return [p for p in self.scan.bindings.values() if p]

    @property
    def is_count_star(self) -> bool:
        """COUNT(*) with no paths, no unnest: answerable from PKs alone
        (AMAX: Page 0 only, §6.4.1)."""
        return (
            not self.paths
            and len(self.pipeline) == 1
            and not self.group.keys
            and all(a.func == "count" for a in self.group.aggs)
        )


class GroupOp:
    """The interpreted pipeline breaker both models push into (§5: "the
    resulting values are then pushed to the system's regular GROUP
    operator")."""

    __slots__ = ("keys", "aggs", "table")

    def __init__(self, q: Query) -> None:
        self.keys = q.group.keys
        self.aggs = q.group.aggs
        self.table: dict = {}

    def add(self, key: tuple, vals: tuple) -> None:
        acc = self.table.get(key)
        if acc is None:
            acc = [None] * len(self.aggs)
            self.table[key] = acc
        for i, a in enumerate(self.aggs):
            v = vals[i]
            if a.func == "count":
                acc[i] = (acc[i] or 0) + 1
            elif a.func == "countv":  # COUNT(expr): non-null appearances
                if v is not None and v is not MISSING:
                    acc[i] = (acc[i] or 0) + 1
                elif acc[i] is None:
                    acc[i] = 0
            elif v is None or v is MISSING:
                continue
            elif a.func == "sum":
                acc[i] = (acc[i] or 0) + v
            elif a.func == "max":
                acc[i] = v if acc[i] is None or v > acc[i] else acc[i]
            elif a.func == "min":
                acc[i] = v if acc[i] is None or v < acc[i] else acc[i]

    def merge(self, other: "GroupOp") -> None:
        """Combine partial aggregates from another partition."""
        for key, acc in other.table.items():
            mine = self.table.get(key)
            if mine is None:
                self.table[key] = list(acc)
                continue
            for i, a in enumerate(self.aggs):
                v = acc[i]
                if v is None:
                    continue
                if a.func in ("count", "countv", "sum"):
                    mine[i] = (mine[i] or 0) + v
                elif a.func == "max":
                    mine[i] = v if mine[i] is None or v > mine[i] else mine[i]
                elif a.func == "min":
                    mine[i] = v if mine[i] is None or v < mine[i] else mine[i]

    def rows(self, order: Optional[OrderLimit]) -> list[tuple]:
        out = [k + tuple(v) for k, v in self.table.items()]
        if order is not None:
            out.sort(key=lambda r: r[order.by], reverse=order.desc)
            if order.limit is not None:
                out = out[: order.limit]
        return out

"""Interpreted execution model — the baseline of paper §5 / Fig. 10.

Mirrors the Hyracks batch-at-a-time model: tuples flow between operator
objects as *materialized batches* (each operator allocates a fresh batch
and copies surviving tuples into it), and every expression is evaluated
per tuple by the Python ``eval`` loop over an environment dict (dynamic
dispatch per value — the interpreted-AST cost Truffle removes)."""
from __future__ import annotations

from typing import Iterator

from .exprs import HELPERS
from .plan import Assign, GroupOp, Query, Scan, Select, Unnest

_BATCH = 1024


class InterpPipeline:
    def __init__(self, q: Query) -> None:
        self.q = q
        self.ops = q.pipeline[1:]
        self._codes = {}
        for i, op in enumerate(self.ops):
            expr = op.expr if not isinstance(op, Unnest) else op.src_expr
            self._codes[i] = compile(expr, f"<interp:{q.name}:{i}>", "eval")
        g = q.group
        self._key_codes = [compile(k, "<key>", "eval") for k in g.keys]
        self._agg_codes = [
            compile(a.expr if a.expr else "1", "<agg>", "eval") for a in g.aggs
        ]

    def run(self, rows: Iterator[tuple], group: GroupOp) -> None:
        scan: Scan = self.q.pipeline[0]
        vars_ = list(scan.bindings.keys())
        batch: list[dict] = []
        for tup in rows:
            batch.append(dict(zip(vars_, tup)))
            if len(batch) >= _BATCH:
                self._process(batch, group)
                batch = []
        if batch:
            self._process(batch, group)

    def _process(self, batch: list[dict], group: GroupOp) -> None:
        for i, op in enumerate(self.ops):
            code = self._codes[i]
            out: list[dict] = []  # fresh frame: batch materialization
            if isinstance(op, Assign):
                for env in batch:
                    env2 = dict(env)
                    env2[op.var] = eval(code, HELPERS, env)
                    out.append(env2)
            elif isinstance(op, Select):
                for env in batch:
                    if eval(code, HELPERS, env):
                        out.append(dict(env))
            elif isinstance(op, Unnest):
                for env in batch:
                    src = eval(code, HELPERS, env)
                    if isinstance(src, list):
                        for item in src:
                            env2 = dict(env)
                            env2[op.var] = item
                            out.append(env2)
            batch = out
        for env in batch:
            key = tuple(eval(c, HELPERS, env) for c in self._key_codes)
            vals = tuple(eval(c, HELPERS, env) for c in self._agg_codes)
            group.add(key, vals)

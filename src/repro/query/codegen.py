"""Code generation via produce/consume translation (paper §5).

Walking the pipeline operators produce/consume-style emits one Python
function per query: the SCAN contributes the outer loop, ASSIGN a local
binding, UNNEST a nested loop, SELECT an early ``continue``, and the
pipeline breaker a single ``group.add`` push into the interpreted GROUP
operator — exactly the shape of Figure 11's generated code.  The source
is ``compile()``d once per query (our stand-in for Truffle's AST-to-JIT
pipeline: specialization happens through the NULL-aware helper functions,
and CPython's compiled bytecode replaces per-operator virtual dispatch
and inter-operator tuple materialization).
"""
from __future__ import annotations

from typing import Callable

from .exprs import HELPERS
from .plan import Assign, Query, Scan, Select, Unnest

_cache: dict[str, Callable] = {}


def generate_source(q: Query) -> str:
    scan: Scan = q.pipeline[0]
    vars_ = list(scan.bindings.keys())
    lines: list[str] = [f"def run(rows, group):  # generated for {q.name}"]
    if vars_:
        tup = ", ".join(vars_) + ("," if len(vars_) == 1 else "")
        lines.append(f"    for ({tup}) in rows:")
    else:
        lines.append("    for _ in rows:")
    depth = 2
    for op in q.pipeline[1:]:
        pad = "    " * depth
        if isinstance(op, Assign):
            lines.append(f"{pad}{op.var} = {op.expr}")
        elif isinstance(op, Select):
            lines.append(f"{pad}if not ({op.expr}): continue")
        elif isinstance(op, Unnest):
            lines.append(f"{pad}for {op.var} in iter_list({op.src_expr}):")
            depth += 1
        else:
            raise TypeError(op)
    pad = "    " * depth
    keys = ", ".join(q.group.keys)
    key_tup = f"({keys},)" if len(q.group.keys) == 1 else f"({keys})"
    aggs = ", ".join(a.expr if a.expr else "1" for a in q.group.aggs)
    agg_tup = f"({aggs},)" if len(q.group.aggs) == 1 else f"({aggs})"
    lines.append(f"{pad}group.add({key_tup}, {agg_tup})")
    return "\n".join(lines)


def compiled(q: Query) -> Callable:
    """Compile (and cache) the generated pipeline for a query."""
    fn = _cache.get(q.name)
    if fn is None:
        src = generate_source(q)
        ns = dict(HELPERS)
        exec(compile(src, f"<codegen:{q.name}>", "exec"), ns)
        fn = ns["run"]
        _cache[q.name] = fn
    return fn

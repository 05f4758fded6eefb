"""NULL-aware expression helpers shared by both execution models.

The document data model is dynamically typed (paper §5): comparing
incompatible types yields NULL (which filters treat as false) — e.g.
``10 > "ten"`` is NULL in AsterixDB, so ``gt(10, "ten")`` is False here.
``MISSING`` (absent value) propagates the same way.
"""
from __future__ import annotations

from itertools import combinations
from typing import Any

from ..dremel.assemble import MISSING

_NUM = (int, float)


def _defined(v: Any) -> bool:
    return v is not MISSING and v is not None


def _comparable(a: Any, b: Any) -> bool:
    if not (_defined(a) and _defined(b)):
        return False
    if isinstance(a, bool) or isinstance(b, bool):
        return isinstance(a, bool) and isinstance(b, bool)
    if isinstance(a, _NUM) and isinstance(b, _NUM):
        return True
    return type(a) is type(b) and isinstance(a, str)


def gt(a, b):
    return _comparable(a, b) and a > b


def ge(a, b):
    return _comparable(a, b) and a >= b


def lt(a, b):
    return _comparable(a, b) and a < b


def le(a, b):
    return _comparable(a, b) and a <= b


def eq(a, b):
    return _comparable(a, b) and a == b


def neq(a, b):
    return _comparable(a, b) and a != b


def lower(v):
    return v.lower() if isinstance(v, str) else MISSING


def length(v):
    return len(v) if isinstance(v, (str, list)) else MISSING


def is_array(v) -> bool:
    return isinstance(v, list)


def iter_list(v):
    """UNNEST source: arrays iterate, everything else yields nothing."""
    return v if isinstance(v, list) else ()


def array_distinct(v):
    if not isinstance(v, list):
        return MISSING
    seen = []
    for x in v:
        if x is not None and x is not MISSING and x not in seen:
            seen.append(x)
    return seen


def array_contains(v, item) -> bool:
    return isinstance(v, list) and item in v


def array_count(v):
    return len(v) if isinstance(v, list) else MISSING


def array_pairs(v):
    """All unordered pairs of distinct elements (wos Q4's ARRAY_PAIRS).
    Pairs are tuples so they can serve as GROUP BY keys."""
    if not isinstance(v, list):
        return MISSING
    return [tuple(p) for p in combinations(sorted(set(v)), 2)]


def fget(obj, key: str):
    """MISSING-safe field access on an assembled object value."""
    if isinstance(obj, dict):
        v = obj.get(key, MISSING)
        return MISSING if v is None else v
    return MISSING


def fmap(v, path: str):
    """Map a dotted path over an array of objects (SQL++ ``arr[*].a.b``)."""
    if not isinstance(v, list):
        return MISSING
    out = []
    for item in v:
        cur = item
        for part in path.split("."):
            cur = cur.get(part) if isinstance(cur, dict) else None
        out.append(cur)
    return out


def some_eq_lower(arr, needle: str) -> bool:
    """SOME x IN arr SATISFIES lowercase(x) = needle (tweet_1 Q3)."""
    if not isinstance(arr, list):
        return False
    return any(isinstance(x, str) and x.lower() == needle for x in arr)


HELPERS = {
    name: obj
    for name, obj in list(globals().items())
    if callable(obj) and not name.startswith("_")
}
HELPERS["MISSING"] = MISSING

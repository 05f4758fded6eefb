"""The evaluation queries (paper Table 2, Appendix A) as logical plans.

One entry per dataset; names follow the paper (Q1..Q4).  ``zone_filter``
marks the predicate AMAX can push into Page-0 zone maps (§4.4).
Parameterized builders at the bottom serve the tweet_2 experiments
(Fig. 15 selectivity sweep, Fig. 16 column-count sweep).
"""
from __future__ import annotations

from .plan import Agg, Assign, GroupBy, OrderLimit, Query, Scan, Select, Unnest

_SENSOR_DAY = (1_556_496_000_000, 1_556_496_000_000 + 24 * 60 * 60 * 1000)


def _count(name: str) -> Query:
    return Query(name, [Scan({})], GroupBy([], [Agg("cnt", "count", "")]))


CELL = {
    "Q1": _count("cell_q1"),
    "Q2": Query(
        "cell_q2",
        [Scan({"caller": "caller", "dur": "duration"})],
        GroupBy(["caller"], [Agg("m", "max", "dur")]),
        order=OrderLimit(by=1, desc=True, limit=10),
    ),
    "Q3": Query(
        "cell_q3",
        [Scan({"dur": "duration"}), Select("ge(dur, 600)")],
        GroupBy([], [Agg("cnt", "count", "")]),
        zone_filter=("duration", ">=", 600),
    ),
}

SENSORS = {
    "Q1": Query(
        "sensors_q1",
        [Scan({"rts": "readings[*].ts"}), Unnest("r", "rts")],
        GroupBy([], [Agg("cnt", "count", "")]),
    ),
    "Q2": Query(
        "sensors_q2",
        [Scan({"temps": "readings[*].temp"}), Unnest("t", "temps")],
        GroupBy([], [Agg("mx", "max", "t"), Agg("mn", "min", "t")]),
    ),
    "Q3": Query(
        "sensors_q3",
        [
            Scan({"sid": "sensor_id", "temps": "readings[*].temp"}),
            Unnest("t", "temps"),
        ],
        GroupBy(["sid"], [Agg("max_temp", "max", "t")]),
        order=OrderLimit(by=1, desc=True, limit=10),
    ),
    "Q4": Query(
        "sensors_q4",
        [
            Scan(
                {
                    "sid": "sensor_id",
                    "rt": "report_time",
                    "temps": "readings[*].temp",
                }
            ),
            Select(f"ge(rt, {_SENSOR_DAY[0]}) and lt(rt, {_SENSOR_DAY[1]})"),
            Unnest("t", "temps"),
        ],
        GroupBy(["sid"], [Agg("max_temp", "max", "t")]),
        order=OrderLimit(by=1, desc=True, limit=10),
        zone_filter=("report_time", "between", _SENSOR_DAY),
    ),
}

TWEET_1 = {
    "Q1": _count("tweet1_q1"),
    "Q2": Query(
        "tweet1_q2",
        [Scan({"uname": "user.name", "txt": "text"})],
        GroupBy(["uname"], [Agg("a", "max", "length(txt)")]),
        order=OrderLimit(by=1, desc=True, limit=10),
    ),
    "Q3": Query(
        "tweet1_q3",
        [
            Scan({"uname": "user.name", "hts": "entities.hashtags[*].text"}),
            Select("some_eq_lower(hts, 'jobs')"),
        ],
        GroupBy(["uname"], [Agg("c", "count", "")]),
        order=OrderLimit(by=1, desc=True, limit=10),
    ),
}

_WOS_META = "static_data.fullrecord_metadata"

WOS = {
    "Q1": _count("wos_q1"),
    "Q2": Query(
        "wos_q2",
        [
            Scan({"subjects": f"{_WOS_META}.category_info.subjects.subject[*]"}),
            Unnest("s", "subjects"),
            Select("eq(fget(s, 'ascatype'), 'extended')"),
        ],
        GroupBy(["fget(s, 'value')"], [Agg("cnt", "count", "")]),
        order=OrderLimit(by=1, desc=True, limit=10),
    ),
    # Q3/Q4 exercise the heterogeneous address_name (object | array, §6.4.4)
    "Q3": Query(
        "wos_q3",
        [
            Scan({"addr": f"{_WOS_META}.addresses.address_name"}),
            Select("is_array(addr)"),
            Assign("countries", "array_distinct(fmap(addr, 'address_spec.country'))"),
            Select(
                "ge(array_count(countries), 2)"
                " and array_contains(countries, 'USA')"
            ),
            Unnest("country", "countries"),
            Select("neq(country, 'USA')"),
        ],
        GroupBy(["country"], [Agg("cnt", "count", "")]),
        order=OrderLimit(by=1, desc=True, limit=10),
    ),
    "Q4": Query(
        "wos_q4",
        [
            Scan({"addr": f"{_WOS_META}.addresses.address_name"}),
            Select("is_array(addr)"),
            Assign("countries", "array_distinct(fmap(addr, 'address_spec.country'))"),
            Select("ge(array_count(countries), 2)"),
            Unnest("pair", "array_pairs(countries)"),
        ],
        GroupBy(["pair"], [Agg("cnt", "count", "")]),
        order=OrderLimit(by=1, desc=True, limit=10),
    ),
}


def tweet2_range_count(lo: int, hi: int) -> Query:
    """Fig. 15: COUNT(*) over a timestamp range (scan flavor; the index
    flavor goes through ``engine.index_count_query``)."""
    return Query(
        f"tweet2_range_{lo}_{hi}",
        [
            Scan({"ts": "timestamp"}),
            Select(f"ge(ts, {lo}) and le(ts, {hi})"),
        ],
        GroupBy([], [Agg("cnt", "count", "")]),
        zone_filter=("timestamp", "between", (lo, hi)),
    )


def column_sweep_query(paths: list[str], lo=None, hi=None) -> Query:
    """Fig. 16: count non-NULL appearances of each of ``paths``."""
    bindings = {f"c{i}": p for i, p in enumerate(paths)}
    pipeline: list = [Scan(bindings)]
    zone = None
    if lo is not None:
        bindings["ts"] = "timestamp"
        pipeline.append(Select(f"ge(ts, {lo}) and le(ts, {hi})"))
        zone = ("timestamp", "between", (lo, hi))
    tag = abs(hash((tuple(paths), lo, hi))) % 10**8  # unique codegen cache key
    return Query(
        f"colsweep_{len(paths)}_{tag}",
        pipeline,
        GroupBy(
            [],
            [Agg(f"n{i}", "countv", f"c{i}") for i in range(len(paths))],
        ),
        zone_filter=zone,
    )


QUERIES = {
    "cell": CELL,
    "sensors": SENSORS,
    "tweet_1": TWEET_1,
    "wos": WOS,
}

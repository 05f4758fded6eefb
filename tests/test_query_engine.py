"""End-to-end query tests: every evaluation query (Table 2 / Appendix A)
on every layout, codegen vs interpreted, against independent Python
reference implementations computed from the raw documents."""
from collections import defaultdict

import pytest

from repro.docgen import DATASETS
from repro.lsm.store import LSMStore
from repro.query.engine import run_query
from repro.query.queries import QUERIES, column_sweep_query, tweet2_range_count
from repro.storage.pagefile import BufferCache

SIZES = {"cell": 400, "sensors": 60, "tweet_1": 150, "wos": 120, "tweet_2": 300}
LAYOUTS = ["open", "vb", "apax", "amax"]


@pytest.fixture(scope="module")
def stores(tmp_path_factory):
    """All datasets ingested in all four layouts (small scale)."""
    base = tmp_path_factory.mktemp("qstores")
    out = {}
    docs_by_ds = {name: list(gen(SIZES[name])) for name, gen in DATASETS.items()}
    for name, docs in docs_by_ds.items():
        for layout in LAYOUTS:
            st = LSMStore(
                str(base / f"{name}_{layout}"),
                layout,
                cache=BufferCache(),
                mem_budget=128 * 1024,
                page_size=8192,
                record_limit=100,
            )
            for pk, d in docs:
                st.upsert(pk, d)
            st.flush()
            out[(name, layout)] = st
    return out, docs_by_ds


# ------------------------------------------------- reference implementations
def ref_cell(docs, qname):
    ds = [d for _pk, d in docs]
    if qname == "Q1":
        return [(len(ds),)]
    if qname == "Q2":
        best = defaultdict(int)
        for d in ds:
            best[d["caller"]] = max(best[d["caller"]], d["duration"])
        return sorted(best.items(), key=lambda kv: -kv[1])[:10]
    if qname == "Q3":
        return [(sum(1 for d in ds if d["duration"] >= 600),)]


def ref_sensors(docs, qname):
    ds = [d for _pk, d in docs]
    if qname == "Q1":
        return [(sum(len(d["readings"]) for d in ds),)]
    temps = [r["temp"] for d in ds for r in d["readings"]]
    if qname == "Q2":
        return [(max(temps), min(temps))]
    if qname in ("Q3", "Q4"):
        lo, hi = 1_556_496_000_000, 1_556_496_000_000 + 24 * 3600 * 1000
        best = defaultdict(lambda: -1e9)
        for d in ds:
            if qname == "Q4" and not (lo <= d["report_time"] < hi):
                continue
            for r in d["readings"]:
                best[d["sensor_id"]] = max(best[d["sensor_id"]], r["temp"])
        return sorted(best.items(), key=lambda kv: -kv[1])[:10]


def ref_tweet1(docs, qname):
    ds = [d for _pk, d in docs]
    if qname == "Q1":
        return [(len(ds),)]
    if qname == "Q2":
        best = defaultdict(int)
        for d in ds:
            best[d["user"]["name"]] = max(best[d["user"]["name"]], len(d["text"]))
        return sorted(best.items(), key=lambda kv: -kv[1])[:10]
    if qname == "Q3":
        cnt = defaultdict(int)
        for d in ds:
            hts = [h["text"] for h in d["entities"]["hashtags"]]
            if any(h.lower() == "jobs" for h in hts):
                cnt[d["user"]["name"]] += 1
        return sorted(cnt.items(), key=lambda kv: -kv[1])[:10]


def ref_wos(docs, qname):
    ds = [d for _pk, d in docs]
    meta = lambda d: d["static_data"]["fullrecord_metadata"]
    if qname == "Q1":
        return [(len(ds),)]
    if qname == "Q2":
        cnt = defaultdict(int)
        for d in ds:
            for s in meta(d)["category_info"]["subjects"]["subject"]:
                if s["ascatype"] == "extended":
                    cnt[s["value"]] += 1
        return sorted(cnt.items(), key=lambda kv: -kv[1])[:10]
    def countries_of(d):
        addr = meta(d)["addresses"]["address_name"]
        if not isinstance(addr, list):
            return None
        seen = []
        for a in addr:
            c = a["address_spec"]["country"]
            if c not in seen:
                seen.append(c)
        return seen
    if qname == "Q3":
        cnt = defaultdict(int)
        for d in ds:
            cs = countries_of(d)
            if cs and len(cs) > 1 and "USA" in cs:
                for c in cs:
                    if c != "USA":
                        cnt[c] += 1
        return sorted(cnt.items(), key=lambda kv: -kv[1])[:10]
    if qname == "Q4":
        from itertools import combinations

        cnt = defaultdict(int)
        for d in ds:
            cs = countries_of(d)
            if cs and len(cs) > 1:
                for p in combinations(sorted(set(cs)), 2):
                    cnt[p] += 1
        return sorted(cnt.items(), key=lambda kv: -kv[1])[:10]


REFS = {"cell": ref_cell, "sensors": ref_sensors, "tweet_1": ref_tweet1, "wos": ref_wos}


def _canon_topk(rows, limit=10):
    """Top-k with ties at the cutoff is ambiguous; compare as sorted
    multiset of values + the full (key, value) set above the cutoff."""
    return sorted(r[-1] for r in rows)


CASES = [
    (ds, qname, layout)
    for ds, qs in QUERIES.items()
    for qname in qs
    for layout in LAYOUTS
]


@pytest.mark.parametrize("ds,qname,layout", CASES, ids=[f"{d}-{q}-{l}" for d, q, l in CASES])
class TestQueriesVsReference:
    def test_codegen_matches_reference(self, stores, ds, qname, layout):
        st_map, docs = stores
        q = QUERIES[ds][qname]
        rows, _ = run_query(st_map[(ds, layout)], q)
        expected = REFS[ds](docs[ds], qname)
        if q.order is not None:
            assert _canon_topk(rows) == _canon_topk(expected)
        else:
            assert [tuple(r) for r in rows] == [tuple(e) for e in expected]


# interpreted model agreement, one layout pair is enough per query
INTERP_CASES = [(ds, qname) for ds, qs in QUERIES.items() for qname in qs]


@pytest.mark.parametrize("ds,qname", INTERP_CASES, ids=[f"{d}-{q}" for d, q in INTERP_CASES])
class TestInterpretedAgrees:
    def test_interp_eq_codegen(self, stores, ds, qname):
        st_map, _docs = stores
        q = QUERIES[ds][qname]
        for layout in ("vb", "amax"):
            r_cg, _ = run_query(st_map[(ds, layout)], q, model="codegen")
            r_in, _ = run_query(st_map[(ds, layout)], q, model="interp")
            assert _canon_topk(r_cg) == _canon_topk(r_in)


class TestTweet2Queries:
    @pytest.mark.parametrize("layout", LAYOUTS)
    def test_range_count(self, stores, layout):
        st_map, docs = stores
        n = SIZES["tweet_2"]
        t0 = 1_460_000_000_000
        lo, hi = t0 + 50 * 1000, t0 + 99 * 1000
        q = tweet2_range_count(lo, hi)
        rows, _ = run_query(st_map[("tweet_2", layout)], q)
        assert rows[0][0] == 50

    @pytest.mark.parametrize("layout", ["apax", "amax"])
    def test_column_sweep_counts(self, stores, layout):
        st_map, docs = stores
        q = column_sweep_query(["text", "place.country"])
        rows, _ = run_query(st_map[("tweet_2", layout)], q)
        ds = [d for _pk, d in docs["tweet_2"]]
        assert rows[0][0] == len(ds)  # text always present
        assert rows[0][1] == sum(1 for d in ds if "place" in d)

    def test_amax_q1_cheaper_than_apax(self, stores):
        st_map, _docs = stores
        q = QUERIES["tweet_1"]["Q1"]
        _, s_amax = run_query(st_map[("tweet_1", "amax")], q)
        _, s_apax = run_query(st_map[("tweet_1", "apax")], q)
        assert s_amax.pages_read < s_apax.pages_read

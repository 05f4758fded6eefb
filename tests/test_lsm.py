"""LSM store tests: flush, tiering merges, anti-matter reconciliation,
vertical merge equivalence, point lookups (§2.1, §4.4-4.6)."""
import numpy as np
import pytest

from repro.dremel.shred import Shredder
from repro.lsm.merge import pick_merge, ragged_gather, split_positions
from repro.lsm.store import LSMStore
from repro.query.engine import component_point_lookup, run_query
from repro.query.plan import Agg, GroupBy, OrderLimit, Query, Scan, Select
from repro.query.sources import count_survivors, env_stream
from repro.storage.pagefile import BufferCache

LAYOUTS = ["open", "vb", "apax", "amax"]


def make_store(tmp_path, layout, **kw):
    opts = dict(
        cache=BufferCache(),
        mem_budget=32 * 1024,
        page_size=4096,
        record_limit=500,
    )
    opts.update(kw)
    return LSMStore(str(tmp_path / layout), layout, **opts)


def docs_for(n, offset=0):
    return [
        (
            i + offset,
            {
                "v": i % 100,
                "s": f"s{i % 10}",
                "arr": [i % 5, (i + 1) % 5],
                "nested": {"x": float(i % 3)},
            },
        )
        for i in range(n)
    ]


class TestPickMerge:
    def test_no_merge_small(self):
        assert pick_merge([100], 1.2, 5) is None
        assert pick_merge([100, 1000], 1.2, 5) is None

    def test_ratio_triggers(self):
        # younger total 100+100 >= 1.2 * 150
        assert pick_merge([100, 100, 150], 1.2, 5) == [0, 1, 2]

    def test_forced_merge_over_max(self):
        sizes = [100, 1000, 10000, 100000, 1000000, 10000000]
        assert pick_merge(sizes, 1.2, 5) == list(range(6))

    def test_longest_prefix_wins(self):
        # both [0,1] and [0,1,2] qualify -> the longer one
        assert pick_merge([100, 80, 100, 10**9], 1.2, 5) == [0, 1, 2]


class TestSplitPositions:
    def test_matches_writer_positions(self):
        sh = Shredder()
        for pk, d in docs_for(50):
            sh.add(d, pk)
        sh.add_antimatter(999)
        b = sh.finish()
        for c in b.columns:
            dp, vp = split_positions(np.asarray(c.defs), c.info)
            assert dp.tolist() == list(c.def_pos)
            assert vp.tolist() == list(c.val_pos)

    def test_union_columns(self):
        sh = Shredder()
        sh.add({"v": 1}, 1)
        sh.add({"v": "x"}, 2)
        sh.add({"v": [1, "y"]}, 3)
        b = sh.finish()
        for c in b.columns:
            dp, vp = split_positions(np.asarray(c.defs), c.info)
            assert dp.tolist() == list(c.def_pos)
            assert vp.tolist() == list(c.val_pos)


class TestRaggedGather:
    def test_basic(self):
        stream = np.arange(20)
        starts = np.array([0, 10, 5])
        lens = np.array([3, 2, 0])
        assert ragged_gather(stream, starts, lens).tolist() == [0, 1, 2, 10, 11]

    def test_empty(self):
        assert len(ragged_gather(np.arange(5), np.array([], dtype=int), np.array([], dtype=int))) == 0


@pytest.mark.parametrize("layout", LAYOUTS)
class TestStoreBasics:
    def test_insert_flush_count(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        for pk, d in docs_for(500):
            st.upsert(pk, d)
        st.flush()
        assert count_survivors([st]) == 500

    def test_upsert_newest_wins(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        for pk, d in docs_for(200):
            st.upsert(pk, d)
        st.flush()
        for pk in range(50):
            st.upsert(pk, {"v": 7777})
        st.flush()
        q = Query(
            "uw_" + layout,
            [Scan({"v": "v"}), Select("eq(v, 7777)")],
            GroupBy([], [Agg("c", "count", "")]),
        )
        rows, _ = run_query(st, q)
        assert rows[0][0] == 50
        assert count_survivors([st]) == 200

    def test_delete_antimatter(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        for pk, d in docs_for(100):
            st.upsert(pk, d)
        st.flush()
        for pk in range(30):
            st.delete(pk)
        st.flush()
        assert count_survivors([st]) == 70

    def test_merge_to_one_component_gc(self, layout, tmp_path):
        st = make_store(tmp_path, layout, max_components=1)
        for pk, d in docs_for(300):
            st.upsert(pk, d)
        st.flush()
        for pk in range(100, 140):
            st.delete(pk)
        st.flush()  # forces merges down to <= 1 components
        assert len(st.components) <= 2
        assert count_survivors([st]) == 260

    def test_memtable_visible_before_flush(self, layout, tmp_path):
        st = make_store(tmp_path, layout, mem_budget=10**9)
        for pk, d in docs_for(40):
            st.upsert(pk, d)
        assert count_survivors([st]) == 40  # still in memory

    def test_reopen(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        for pk, d in docs_for(120):
            st.upsert(pk, d)
        st.close()
        st2 = LSMStore.open(str(tmp_path / layout), BufferCache())
        assert count_survivors([st2]) == 120
        q = Query(
            "ro_" + layout,
            [Scan({"v": "v"}), Select("ge(v, 50)")],
            GroupBy([], [Agg("c", "count", "")]),
        )
        r1, _ = run_query(st, q)
        r2, _ = run_query(st2, q)
        assert r1 == r2

    def test_point_lookup_components(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        for pk, d in docs_for(300):
            st.upsert(pk, d)
        st.flush()
        reader = st.reader(st.components[0])
        hit = component_point_lookup(reader, st.components[0].meta.min_pk, ["v"])
        assert hit is not None and hit[0] is False

    def test_merge_preserves_query_results(self, layout, tmp_path):
        # same data, merged vs unmerged stores agree on all queries
        st_a = make_store(tmp_path, layout, max_components=1, mem_budget=8 * 1024)
        st_b = LSMStore(
            str(tmp_path / (layout + "_b")),
            layout,
            cache=BufferCache(),
            mem_budget=8 * 1024,
            page_size=4096,
            record_limit=500,
            max_components=100,  # never merges
            merge_ratio=10**9,
        )
        for pk, d in docs_for(400):
            st_a.upsert(pk, d)
            st_b.upsert(pk, d)
        for pk in range(100):
            st_a.upsert(pk, {"v": 1, "s": "upd", "arr": [9]})
            st_b.upsert(pk, {"v": 1, "s": "upd", "arr": [9]})
        for pk in range(350, 400):
            st_a.delete(pk)
            st_b.delete(pk)
        st_a.flush()
        st_b.flush()
        assert st_a.n_merges > 0 and st_b.n_merges == 0
        for q in (
            Query(f"m1{layout}", [Scan({"s": "s"})], GroupBy(["s"], [Agg("c", "count", "")]),
                  order=OrderLimit(by=0, desc=False)),
            Query(f"m2{layout}", [Scan({"v": "v"})], GroupBy([], [Agg("m", "max", "v"), Agg("s", "sum", "v")])),
        ):
            ra, _ = run_query(st_a, q)
            rb, _ = run_query(st_b, q)
            assert ra == rb


class TestColumnarSpecifics:
    def test_amax_count_reads_page0_only(self, tmp_path):
        st = make_store(tmp_path, "amax", mem_budget=10**9)
        for pk, d in docs_for(2000):
            st.upsert(pk, d)
        st.flush()
        before = st.cache.stats.snapshot()
        assert count_survivors([st]) == 2000
        d = st.cache.stats.delta(before)
        n_leaves = sum(
            len(st.reader(c).leaf_metas) for c in st.components
        )
        assert d.disk_reads + d.cache_hits == n_leaves

    def test_apax_count_reads_all_pages(self, tmp_path):
        st = make_store(tmp_path, "apax", mem_budget=10**9)
        for pk, d in docs_for(2000):
            st.upsert(pk, d)
        st.flush()
        before = st.cache.stats.snapshot()
        count_survivors([st])
        d = st.cache.stats.delta(before)
        n_pages = sum(st.reader(c).n_pages for c in st.components)
        assert d.disk_reads + d.cache_hits == n_pages

    def test_amax_projection_reads_fewer_pages(self, tmp_path):
        st = make_store(tmp_path, "amax", mem_budget=10**9)
        for pk, d in docs_for(4000):
            st.upsert(pk, d)
        st.flush()
        before = st.cache.stats.snapshot()
        list(env_stream([st], {"v": "v"}))
        one_col = st.cache.stats.delta(before).disk_reads
        st2 = make_store(tmp_path, "apax", mem_budget=10**9)
        for pk, d in docs_for(4000):
            st2.upsert(pk, d)
        st2.flush()
        before = st2.cache.stats.snapshot()
        list(env_stream([st2], {"v": "v"}))
        apax_reads = st2.cache.stats.delta(before).disk_reads
        assert one_col < apax_reads  # AMAX touches only v's megapages

    def test_schema_evolution_across_flushes(self, tmp_path):
        st = make_store(tmp_path, "amax", mem_budget=10**9)
        for i in range(50):
            st.upsert(i, {"a": i})
        st.flush()
        for i in range(50, 100):
            st.upsert(i, {"a": i, "b": f"new{i}"})
        st.flush()
        rows, _ = run_query(
            st,
            Query(
                "ev",
                [Scan({"b": "b"}), Select("neq(b, '')")],
                GroupBy([], [Agg("c", "count", "")]),
            ),
        )
        assert rows[0][0] == 50

    def test_vertical_merge_heterogeneous(self, tmp_path):
        st = make_store(tmp_path, "amax", max_components=1)
        for i in range(100):
            st.upsert(i, {"v": i} if i % 2 else {"v": str(i)})
        st.flush()
        for i in range(100, 200):
            st.upsert(i, {"v": [i, str(i)]})
        st.flush()
        assert st.n_merges > 0
        rows, _ = run_query(
            st,
            Query(
                "het",
                [Scan({"v": "v"}), Select("is_array(v)")],
                GroupBy([], [Agg("c", "count", "")]),
            ),
        )
        assert rows[0][0] == 100

    def test_zone_filter_prunes_leaves(self, tmp_path):
        st = make_store(tmp_path, "amax", mem_budget=10**9, record_limit=200)
        for i in range(2000):
            st.upsert(i, {"ts": 1000 + i, "payload": "x" * 50})
        st.flush()
        q_all = Query(
            "zf_all",
            [Scan({"ts": "ts"}), Select("ge(ts, 0)")],
            GroupBy([], [Agg("c", "count", "")]),
        )
        q_few = Query(
            "zf_few",
            [Scan({"ts": "ts"}), Select("ge(ts, 2900)")],
            GroupBy([], [Agg("c", "count", "")]),
            zone_filter=("ts", ">=", 2900),
        )
        _, s_all = run_query(st, q_all)
        r_few, s_few = run_query(st, q_few)
        assert r_few[0][0] == 100
        assert s_few.pages_read < s_all.pages_read

"""Secondary / primary-key index tests (§4.6): maintenance under updates
and deletes, range queries, batched index-to-primary lookups."""
import numpy as np
import pytest

from repro.lsm.secondary import LSMIndex
from repro.lsm.store import LSMStore
from repro.query.engine import index_count_query
from repro.query.plan import Agg, GroupBy, Query, Scan, Select
from repro.query.engine import run_query
from repro.storage.pagefile import BufferCache

LAYOUTS = ["open", "vb", "apax", "amax"]


class TestLSMIndex:
    def test_range_basic(self, tmp_path):
        idx = LSMIndex(str(tmp_path / "i"), BufferCache())
        for k in range(100):
            idx.insert(k * 10, k)
        idx.flush()
        assert idx.range_pks(100, 190).tolist() == list(range(10, 20))

    def test_memtable_visible(self, tmp_path):
        idx = LSMIndex(str(tmp_path / "i"), BufferCache())
        idx.insert(5, 1)
        assert idx.range_pks(0, 10).tolist() == [1]

    def test_antimatter_cancels(self, tmp_path):
        idx = LSMIndex(str(tmp_path / "i"), BufferCache())
        idx.insert(5, 1)
        idx.insert(6, 2)
        idx.flush()
        idx.delete(5, 1)
        idx.flush()
        assert idx.range_pks(0, 10).tolist() == [2]

    def test_update_same_pk_new_key(self, tmp_path):
        idx = LSMIndex(str(tmp_path / "i"), BufferCache())
        idx.insert(5, 1)
        idx.flush()
        idx.delete(5, 1)
        idx.insert(50, 1)
        idx.flush()
        assert idx.range_pks(0, 10).tolist() == []
        assert idx.range_pks(40, 60).tolist() == [1]

    def test_merge_all(self, tmp_path):
        idx = LSMIndex(str(tmp_path / "i"), BufferCache(), max_components=2)
        for batch in range(5):
            for k in range(10):
                idx.insert(batch * 100 + k, batch * 10 + k)
            idx.flush()
        assert len(idx.components) <= 2
        assert len(idx.range_pks(0, 10**6)) == 50

    def test_contains_pk(self, tmp_path):
        idx = LSMIndex(str(tmp_path / "i"), BufferCache())
        idx.insert(7, 7)
        idx.flush()
        assert idx.contains_pk(7)
        assert not idx.contains_pk(8)

    def test_reopen(self, tmp_path):
        idx = LSMIndex(str(tmp_path / "i"), BufferCache())
        for k in range(20):
            idx.insert(k, k)
        idx.flush()
        idx2 = LSMIndex(str(tmp_path / "i"), BufferCache())
        idx2.reopen()
        assert idx2.range_pks(5, 9).tolist() == [5, 6, 7, 8, 9]


def make_store(tmp_path, layout):
    return LSMStore(
        str(tmp_path / layout),
        layout,
        cache=BufferCache(),
        mem_budget=16 * 1024,
        page_size=4096,
        record_limit=300,
        pk_index=True,
        secondary={"ts": "timestamp"},
    )


@pytest.mark.parametrize("layout", LAYOUTS)
class TestStoreWithIndexes:
    def test_index_query_matches_scan(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        for i in range(500):
            st.upsert(i, {"timestamp": 1000 + i, "val": f"v{i}"})
        st.flush()
        lo, hi = 1100, 1199
        scan_q = Query(
            f"sq_{layout}",
            [Scan({"ts": "timestamp"}), Select(f"ge(ts, {lo}) and le(ts, {hi})")],
            GroupBy([], [Agg("c", "count", "")]),
            zone_filter=("timestamp", "between", (lo, hi)),
        )
        r_scan, _ = run_query(st, scan_q)
        r_idx, _ = index_count_query([st], "ts", lo, hi)
        assert r_scan[0][0] == r_idx[0][0] == 100

    def test_update_moves_index_entry(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        for i in range(200):
            st.upsert(i, {"timestamp": 1000 + i, "val": "x"})
        st.flush()
        # move record 50's timestamp out of its old range (the §4.6
        # point-lookup + anti-matter path)
        st.upsert(50, {"timestamp": 99999, "val": "moved"})
        st.flush()
        assert index_count_query([st], "ts", 1050, 1050)[0][0][0] == 0
        assert index_count_query([st], "ts", 99999, 99999)[0][0][0] == 1

    def test_update_in_memtable_before_flush(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        st.upsert(1, {"timestamp": 10})
        st.upsert(1, {"timestamp": 20})  # old value still in memtable
        st.flush()
        assert index_count_query([st], "ts", 10, 10)[0][0][0] == 0
        assert index_count_query([st], "ts", 20, 20)[0][0][0] == 1

    def test_delete_removes_index_entry(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        for i in range(100):
            st.upsert(i, {"timestamp": 1000 + i})
        st.flush()
        st.delete(42)
        st.flush()
        assert index_count_query([st], "ts", 1042, 1042)[0][0][0] == 0
        assert index_count_query([st], "ts", 1000, 2000)[0][0][0] == 99

    def test_index_count_paths(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        for i in range(300):
            doc = {"timestamp": 1000 + i}
            if i % 3 == 0:
                doc["opt"] = f"present{i}"
            st.upsert(i, doc)
        st.flush()
        rows, _ = index_count_query([st], "ts", 1000, 1299, ["opt"])
        assert rows[0][0] == 300
        assert rows[0][1] == 100

    def test_pk_index_sized(self, layout, tmp_path):
        st = make_store(tmp_path, layout)
        for i in range(100):
            st.upsert(i, {"timestamp": i})
        st.flush()
        assert st.pk_index.size_bytes() > 0
        assert st.total_size_bytes() > sum(c.size_bytes() for c in st.components)

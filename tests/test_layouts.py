"""On-disk layout tests: Open/VB record formats, APAX pages, AMAX mega
leaves and their structural invariants (§4.2-4.3)."""
import os

import numpy as np
import pytest

from repro.dremel.shred import Shredder
from repro.layouts import amax, apax, open_fmt, rows, vb
from repro.layouts.common import Component, pack_slotted, unpack_slotted
from repro.storage.pagefile import BufferCache, PageFile


@pytest.fixture()
def cache():
    return BufferCache()


DOCS = [
    {"a": 1, "s": "hello", "nested": {"x": 1.5}, "arr": [1, 2]},
    {"a": 2, "s": "world", "nested": {"x": 2.5}, "arr": [3]},
    {"a": 3, "s": "!", "arr": [4, 5, 6], "extra": True},
]


def make_batch(docs=None, n=None):
    sh = Shredder()
    docs = docs if docs is not None else DOCS
    if n:
        docs = [
            {"a": i, "s": f"str{i}", "nested": {"x": i * 0.5}, "arr": [i, i + 1]}
            for i in range(n)
        ]
    for i, d in enumerate(docs):
        sh.add(d, i + 1)
    return sh.finish()


class TestPageFile:
    def test_write_read(self, cache, tmp_path):
        pf = PageFile(str(tmp_path / "p.bin"), cache)
        pf.open_write()
        pages = [os.urandom(100), b"x" * 5000, b""]
        for p in pages:
            pf.write_page(p)
        pf.close_write()
        pf.open_read()
        for i, p in enumerate(pages):
            assert pf.read_page(i) == p

    def test_compression_on_disk(self, cache, tmp_path):
        pf = PageFile(str(tmp_path / "p.bin"), cache)
        pf.open_write()
        pf.write_page(b"a" * 100_000)  # snappy-friendly
        pf.close_write()
        assert pf.size_bytes() < 10_000

    def test_cache_hits(self, cache, tmp_path):
        pf = PageFile(str(tmp_path / "p.bin"), cache)
        pf.open_write()
        pf.write_page(b"data")
        pf.close_write()
        pf.open_read()
        pf.read_page(0)
        r0 = cache.stats.disk_reads
        pf.read_page(0)
        assert cache.stats.disk_reads == r0
        assert cache.stats.cache_hits == 1

    def test_lru_eviction(self, tmp_path):
        cache = BufferCache(capacity_pages=2)
        pf = PageFile(str(tmp_path / "p.bin"), cache)
        pf.open_write()
        for i in range(4):
            pf.write_page(bytes([i]) * 10)
        pf.close_write()
        pf.open_read()
        for i in range(4):
            pf.read_page(i)
        r = cache.stats.disk_reads
        pf.read_page(0)  # evicted -> disk again
        assert cache.stats.disk_reads == r + 1


class TestSlotted:
    def test_roundtrip(self):
        recs = [b"a", b"bb", b"", b"dddd"]
        assert unpack_slotted(pack_slotted(recs)) == recs

    def test_single(self):
        assert unpack_slotted(pack_slotted([b"xyz"])) == [b"xyz"]


class TestOpenFormat:
    @pytest.mark.parametrize("doc", DOCS)
    def test_record_roundtrip(self, doc):
        pk, am, got = open_fmt.decode_record(open_fmt.encode_record(7, doc))
        assert (pk, am, got) == (7, False, doc)

    def test_antimatter(self):
        pk, am, doc = open_fmt.decode_record(open_fmt.encode_record(9, None))
        assert (pk, am, doc) == (9, True, None)

    def test_field_names_embedded(self):
        # Open's defining overhead: names in EVERY record (§6.2)
        b = open_fmt.encode_record(1, {"long_field_name_here": 1})
        assert b"long_field_name_here" in b


class TestVBFormat:
    def test_record_roundtrip(self):
        fd = vb.FieldDict()
        for i, doc in enumerate(DOCS):
            pk, am, got = vb.decode_record(
                vb.encode_record(i, doc, fd), fd.names
            )
            assert got == doc

    def test_names_not_embedded(self):
        fd = vb.FieldDict()
        b = vb.encode_record(1, {"long_field_name_here": 1}, fd)
        assert b"long_field_name_here" not in b
        assert "long_field_name_here" in fd.names

    def test_vb_smaller_than_open(self):
        fd = vb.FieldDict()
        doc = {"field_one": 1, "field_two": "x", "nested_thing": {"inner": 2.0}}
        assert len(vb.encode_record(1, doc, fd)) < len(
            open_fmt.encode_record(1, doc)
        )


class TestRowComponents:
    @pytest.mark.parametrize("layout", ["open", "vb"])
    def test_write_scan(self, layout, cache, tmp_path):
        entries = [(i + 1, d) for i, d in enumerate(DOCS)] + [(10, None)]
        rows.write_component(
            str(tmp_path / "c"), layout, entries, cache, page_size=4096
        )
        comp = Component(str(tmp_path / "c"), cache)
        reader = rows.RowReader(comp)
        got = list(reader.iter_records())
        assert [(pk, am) for pk, am, _ in got] == [
            (1, False), (2, False), (3, False), (10, True)
        ]
        assert got[0][2] == DOCS[0]

    @pytest.mark.parametrize("layout", ["open", "vb"])
    def test_point_lookup(self, layout, cache, tmp_path):
        entries = [(i * 2, {"v": i}) for i in range(200)]
        rows.write_component(
            str(tmp_path / "c"), layout, entries, cache, page_size=2048
        )
        reader = rows.RowReader(Component(str(tmp_path / "c"), cache))
        assert reader.point_lookup(100) == (False, {"v": 50})
        assert reader.point_lookup(101) is None
        assert reader.point_lookup(0) == (False, {"v": 0})
        assert reader.point_lookup(398) == (False, {"v": 199})


class TestAPAX:
    def test_roundtrip_all_columns(self, cache, tmp_path):
        batch = make_batch(n=500)
        apax.write_component(str(tmp_path / "c"), batch, cache, page_size=4096)
        comp = Component(str(tmp_path / "c"), cache)
        reader = apax.APAXReader(comp)
        assert reader.n_pages > 1  # multiple pages at this page size
        total = 0
        for page in reader.iter_pages():
            defs, pks = page.pks()
            total += page.n_records
            assert len(pks) == page.n_records
        assert total == 500

    def test_page_minmax_keys(self, cache, tmp_path):
        batch = make_batch(n=300)
        apax.write_component(str(tmp_path / "c"), batch, cache, page_size=4096)
        reader = apax.APAXReader(Component(str(tmp_path / "c"), cache))
        last_max = -1
        for mn, mx in reader.page_minmax:
            assert mn > last_max  # pages partition the key space in order
            assert mx >= mn
            last_max = mx

    def test_column_decode(self, cache, tmp_path):
        batch = make_batch(n=100)
        apax.write_component(str(tmp_path / "c"), batch, cache, page_size=8192)
        reader = apax.APAXReader(Component(str(tmp_path / "c"), cache))
        scol = next(
            c.info.index for c in batch.columns if c.info.path == "$.s"
        )
        vals = []
        for page in reader.iter_pages():
            _defs, v = page.column(scol)
            vals.extend(v)
        assert vals == [f"str{i}" for i in range(100)]

    def test_unknown_column_is_null(self, cache, tmp_path):
        batch = make_batch(n=10)
        apax.write_component(str(tmp_path / "c"), batch, cache, page_size=8192)
        reader = apax.APAXReader(Component(str(tmp_path / "c"), cache))
        page = reader.page(0)
        defs, vals = page.column(999)
        assert list(defs) == [0] * page.n_records and vals == []


class TestAMAX:
    def test_record_limit_bounds_leaves(self, cache, tmp_path):
        batch = make_batch(n=2500)
        amax.write_component(
            str(tmp_path / "c"), batch, cache, page_size=4096, record_limit=1000
        )
        reader = amax.AMAXReader(Component(str(tmp_path / "c"), cache))
        assert reader.n_leaves == 3  # 1000+1000+500
        assert [l["n_records"] for l in reader.leaf_metas] == [1000, 1000, 500]

    def test_megapages_ordered_largest_first(self, cache, tmp_path):
        batch = make_batch(n=2000)
        amax.write_component(
            str(tmp_path / "c"), batch, cache, page_size=4096, record_limit=5000
        )
        reader = amax.AMAXReader(Component(str(tmp_path / "c"), cache))
        leaf = reader.leaf(0)
        extents = [
            (start, length)
            for _mn, _mx, start, length, _nv in leaf.zone
            if length
        ]
        by_start = sorted(extents)
        lengths = [l for _s, l in by_start]
        assert lengths == sorted(lengths, reverse=True)  # §4.3

    def test_column_reads_subset_of_pages(self, cache, tmp_path):
        batch = make_batch(n=2000)
        amax.write_component(
            str(tmp_path / "c"), batch, cache, page_size=2048, record_limit=5000
        )
        reader = amax.AMAXReader(Component(str(tmp_path / "c"), cache))
        leaf = reader.leaf(0)
        small_col = min(
            range(leaf.n_cols), key=lambda c: leaf.zone[c][3]
        )
        ndata = leaf.meta["ndata"]
        assert len(leaf.column_pages(small_col)) < ndata

    def test_pk_only_reads_page0(self, cache, tmp_path):
        batch = make_batch(n=2000)
        amax.write_component(
            str(tmp_path / "c"), batch, cache, page_size=2048, record_limit=5000
        )
        comp = Component(str(tmp_path / "c"), cache)
        reader = amax.AMAXReader(comp)
        before = cache.stats.disk_reads + cache.stats.cache_hits
        for leaf in reader.iter_leaves():
            leaf.pks()
        reads = cache.stats.disk_reads + cache.stats.cache_hits - before
        assert reads == reader.n_leaves  # exactly the Page 0s (§6.4.1)

    def test_zone_maps_int(self, cache, tmp_path):
        batch = make_batch(
            docs=[{"a": i, "s": "x"} for i in range(100)]
        )
        amax.write_component(
            str(tmp_path / "c"), batch, cache, page_size=4096, record_limit=5000
        )
        reader = amax.AMAXReader(Component(str(tmp_path / "c"), cache))
        leaf = reader.leaf(0)
        acol = next(
            i for i, c in enumerate(reader.schema.columns) if c.path == "$.a"
        )
        assert leaf.zone_range(acol) == (0, 99)

    def test_zone_maps_string_verified(self, cache, tmp_path):
        strs = [f"value_{i:04d}" for i in range(100)]
        batch = make_batch(docs=[{"s": s} for s in strs])
        amax.write_component(
            str(tmp_path / "c"), batch, cache, page_size=4096, record_limit=5000
        )
        reader = amax.AMAXReader(Component(str(tmp_path / "c"), cache))
        leaf = reader.leaf(0)
        scol = 0
        assert leaf.verified_range(scol) == (min(strs), max(strs))

    def test_column_values_roundtrip(self, cache, tmp_path):
        batch = make_batch(n=3000)
        amax.write_component(
            str(tmp_path / "c"), batch, cache, page_size=2048, record_limit=1000
        )
        reader = amax.AMAXReader(Component(str(tmp_path / "c"), cache))
        scol = next(
            c.info.index for c in batch.columns if c.info.path == "$.s"
        )
        vals = []
        for leaf in reader.iter_leaves():
            _d, v = leaf.column(scol)
            vals.extend(v)
        assert vals == [f"str{i}" for i in range(3000)]

    @pytest.mark.parametrize("tol", [0.0, 0.15, 0.5])
    def test_empty_page_tolerance_roundtrip(self, tol, cache, tmp_path):
        batch = make_batch(n=800)
        amax.write_component(
            str(tmp_path / f"c{tol}"), batch, cache, page_size=2048,
            record_limit=5000, empty_page_tolerance=tol,
        )
        reader = amax.AMAXReader(Component(str(tmp_path / f"c{tol}"), cache))
        leaf = reader.leaf(0)
        for ci in range(leaf.n_cols):
            defs, _vals = leaf.column(ci)
            assert len(defs) >= leaf.n_records

    def test_higher_tolerance_not_smaller(self, cache, tmp_path):
        batch = make_batch(n=800)
        sizes = {}
        for tol in (0.0, 0.9):
            p = str(tmp_path / f"t{tol}")
            amax.write_component(
                p, batch, cache, page_size=2048, record_limit=5000,
                empty_page_tolerance=tol,
            )
            sizes[tol] = Component(p, cache).meta.extra["leaves"][0]["ndata"]
        assert sizes[0.9] >= sizes[0.0]  # tolerance trades space for reads

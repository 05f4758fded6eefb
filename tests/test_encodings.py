"""Round-trip and edge-case tests for the Parquet-style codecs (§4.1)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.encoding import bitpack, delta, deltastr, plain, rle
from repro.encoding.codec import decode_defs, decode_values, encode_defs, encode_values
from repro.encoding.varint import read_uvarint, unzigzag, write_uvarint, zigzag


class TestVarint:
    @pytest.mark.parametrize("v", [0, 1, 127, 128, 300, 2**20, 2**40, 2**62])
    def test_uvarint_roundtrip(self, v):
        buf = bytearray()
        write_uvarint(buf, v)
        got, pos = read_uvarint(bytes(buf), 0)
        assert got == v and pos == len(buf)

    @pytest.mark.parametrize("v", [0, 1, -1, 2, -2, 12345, -12345, 2**40, -(2**40)])
    def test_zigzag_roundtrip(self, v):
        assert unzigzag(zigzag(v)) == v

    def test_zigzag_nonneg(self):
        for v in (-5, -1, 0, 1, 5):
            assert zigzag(v) >= 0

    def test_concatenated_varints(self):
        buf = bytearray()
        for v in (5, 500, 50000):
            write_uvarint(buf, v)
        pos = 0
        out = []
        for _ in range(3):
            v, pos = read_uvarint(bytes(buf), pos)
            out.append(v)
        assert out == [5, 500, 50000]


class TestBitpack:
    @pytest.mark.parametrize("width", [1, 2, 3, 5, 7, 8, 13, 17, 32])
    def test_roundtrip_widths(self, width):
        rng = np.random.default_rng(width)
        vals = rng.integers(0, 2**width, 100, dtype=np.uint64)
        assert np.array_equal(bitpack.unpack(bitpack.pack(vals, width), width, 100), vals)

    def test_width_for(self):
        assert bitpack.width_for(0) == 0
        assert bitpack.width_for(1) == 1
        assert bitpack.width_for(7) == 3
        assert bitpack.width_for(8) == 4

    def test_zero_width(self):
        assert bitpack.pack(np.zeros(5, dtype=np.uint64), 0) == b""
        assert np.array_equal(
            bitpack.unpack(b"", 0, 5), np.zeros(5, dtype=np.uint64)
        )

    def test_empty(self):
        assert len(bitpack.unpack(bitpack.pack(np.array([], dtype=np.uint64), 3), 3, 0)) == 0

    @given(st.lists(st.integers(0, 2**20 - 1), max_size=200))
    @settings(max_examples=30, deadline=None)
    def test_roundtrip_hypothesis(self, vals):
        arr = np.asarray(vals, dtype=np.uint64)
        w = bitpack.width_for(int(arr.max())) if len(arr) else 1
        assert np.array_equal(bitpack.unpack(bitpack.pack(arr, w), w, len(arr)), arr)


class TestRLE:
    def test_constant_run_compresses(self):
        vals = np.full(10_000, 3, dtype=np.uint64)
        enc = rle.encode(vals)
        assert len(enc) < 20
        assert np.array_equal(rle.decode(enc), vals)

    def test_alternating(self):
        vals = np.tile([0, 1], 500).astype(np.uint64)
        assert np.array_equal(rle.decode(rle.encode(vals)), vals)

    def test_mixed_runs(self):
        vals = np.concatenate(
            [np.full(100, 2), np.arange(7), np.full(3, 9), np.full(50, 0)]
        ).astype(np.uint64)
        assert np.array_equal(rle.decode(rle.encode(vals)), vals)

    def test_empty_and_single(self):
        assert len(rle.decode(rle.encode(np.array([], dtype=np.uint64)))) == 0
        assert rle.decode(rle.encode(np.array([5], dtype=np.uint64))).tolist() == [5]

    def test_all_zero(self):
        vals = np.zeros(1000, dtype=np.uint64)
        assert np.array_equal(rle.decode(rle.encode(vals)), vals)

    @given(st.lists(st.integers(0, 7), max_size=500))
    @settings(max_examples=40, deadline=None)
    def test_roundtrip_hypothesis(self, vals):
        arr = np.asarray(vals, dtype=np.uint64)
        assert np.array_equal(rle.decode(rle.encode(arr)), arr)


class TestDelta:
    def test_monotone_compresses(self):
        vals = np.arange(10_000, dtype=np.int64) * 1000  # monotone keys
        enc = delta.encode(vals)
        assert len(enc) < len(vals) * 8 / 50
        assert np.array_equal(delta.decode(enc), vals)

    def test_negatives(self):
        vals = np.array([-5, -100, 7, 0, -3], dtype=np.int64)
        assert np.array_equal(delta.decode(delta.encode(vals)), vals)

    def test_empty_single(self):
        assert len(delta.decode(delta.encode([]))) == 0
        assert delta.decode(delta.encode([42])).tolist() == [42]

    def test_constant(self):
        vals = np.full(100, 77, dtype=np.int64)
        assert np.array_equal(delta.decode(delta.encode(vals)), vals)

    @given(st.lists(st.integers(-(2**40), 2**40), max_size=300))
    @settings(max_examples=40, deadline=None)
    def test_roundtrip_hypothesis(self, vals):
        arr = np.asarray(vals, dtype=np.int64)
        assert np.array_equal(delta.decode(delta.encode(arr)), arr)


class TestDeltaStr:
    def test_shared_prefixes_compress(self):
        vals = [f"https://example.com/user/{i:08d}" for i in range(2000)]
        enc = deltastr.encode(vals)
        assert len(enc) < sum(len(v) for v in vals) / 2
        assert deltastr.decode(enc) == vals

    def test_unicode(self):
        vals = ["héllo", "héllon't", "wörld", "wörld2", ""]
        assert deltastr.decode(deltastr.encode(vals)) == vals

    def test_empty(self):
        assert deltastr.decode(deltastr.encode([])) == []

    @given(st.lists(st.text(max_size=30), max_size=100))
    @settings(max_examples=40, deadline=None)
    def test_roundtrip_hypothesis(self, vals):
        assert deltastr.decode(deltastr.encode(vals)) == vals


class TestPlain:
    def test_i64(self):
        vals = [0, -1, 2**62, -(2**62)]
        assert plain.decode_i64(plain.encode_i64(vals)).tolist() == vals

    def test_f64(self):
        vals = [0.0, -1.5, 3.14159, 1e300]
        assert plain.decode_f64(plain.encode_f64(vals)).tolist() == vals

    def test_bool(self):
        vals = [True, False, True, True, False] * 7
        assert plain.decode_bool(plain.encode_bool(vals)).tolist() == vals

    def test_str(self):
        vals = ["", "a", "longer string with spaces", "ünïcødé"]
        assert plain.decode_str(plain.encode_str(vals)) == vals

    @given(st.lists(st.text(max_size=50), max_size=100))
    @settings(max_examples=30, deadline=None)
    def test_str_hypothesis(self, vals):
        assert plain.decode_str(plain.encode_str(vals)) == vals


class TestColumnCodec:
    @pytest.mark.parametrize(
        "kind,values",
        [
            ("bigint", [1, 5, 5, 900, -3]),
            ("double", [1.5, -2.25, 0.0]),
            ("boolean", [True, False, True]),
            ("string", ["a", "b", "a really long string", ""]),
            ("string", [f"prefix/{i}" for i in range(100)]),  # delta-str path
        ],
    )
    def test_value_roundtrip(self, kind, values):
        dec = decode_values(encode_values(kind, values))
        got = dec if isinstance(dec, list) else dec.tolist()
        assert got == values

    def test_defs_roundtrip(self):
        defs = [0, 1, 2, 2, 2, 0, 0, 0, 0, 0, 0, 0, 0, 3, 1]
        assert decode_defs(encode_defs(defs)).tolist() == defs

    def test_defs_rle_compresses_sparse_column(self):
        # a sparse column (tweet-style): almost all zeros
        defs = [0] * 10_000 + [2] + [0] * 10_000
        assert len(encode_defs(defs)) < 40

"""Extended-Dremel striping + assembly tests, anchored on the paper's own
examples (Figures 4-7) and hypothesis-generated documents (§3.2)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.dremel.assemble import (
    MISSING,
    ColumnCursor,
    assemble_record,
    extract_path,
)
from repro.dremel.shred import Shredder

FIG4_RECORDS = [
    # record 1: name missing entirely (name.first def 0, §3.1)
    {"id": 1, "games": [{"title": "NFL"}]},
    # record 2: name present but first missing (def 1)
    {"id": 2, "name": {"last": "Brown"},
     "games": [{"title": "FIFA", "consoles": ["PC", "PS4"]}]},
    # record 3: full name (def 2), two games, two consoles arrays
    {"id": 3, "name": {"first": "John", "last": "Smith"},
     "games": [{"title": "NBA", "consoles": ["PS4", "PC"]},
               {"title": "NFL", "consoles": ["XBOX"]}]},
    # record 4: empty record (games NULL)
    {"id": 4},
]

FIG6_RECORDS = [
    {"id": 1, "name": "John", "games": ["NBA", ["FIFA", "PES"], "NFL"]},
    {"id": 2, "name": {"first": "Ann", "last": "Brown"}, "games": ["NFL", "NBA"]},
]


def shred(records, schema=None):
    sh = Shredder(schema)
    for r in records:
        sh.add({k: v for k, v in r.items() if k != "id"}, r["id"])
    return sh.finish()


def roundtrip(records, schema=None):
    batch = shred(records, schema)
    cursors = {
        c.info.index: ColumnCursor(c.info, c.defs, c.values)
        for c in batch.columns
    }
    docs = []
    for _ in records:
        frags = {ci: cur.parse_record() for ci, cur in cursors.items()}
        docs.append(assemble_record(batch.schema, frags))
    return batch, docs


def col(batch, suffix):
    return next(c for c in batch.columns if c.info.path.endswith(suffix))


class TestPaperFigures:
    """The exact def-level streams of Figure 5 (delimited repeated values)
    with the full schema known up front."""

    def _full_schema_batch(self):
        # two passes: first infers the full schema, second shreds with it
        pre = shred(FIG4_RECORDS)
        return shred(FIG4_RECORDS, pre.schema)

    def test_fig5_title_stream(self):
        b = self._full_schema_batch()
        # Fig 5: NFL |0| FIFA |0| NBA NFL |0| games-NULL
        assert col(b, "title").defs == [3, 0, 3, 0, 3, 3, 0, 0]
        assert col(b, "title").values == ["NFL", "FIFA", "NBA", "NFL"]

    def test_fig5_consoles_stream(self):
        b = self._full_schema_batch()
        # Fig 5: NULL(2) |0| PC PS4 |0| PS4 PC |1| XBOX |0| games-NULL
        assert col(b, "consoles[*]").defs == [2, 0, 4, 4, 0, 4, 4, 1, 4, 0, 0]
        assert col(b, "consoles[*]").values == ["PC", "PS4", "PS4", "PC", "XBOX"]

    def test_fig4_name_first(self):
        b = self._full_schema_batch()
        # §3.1: record 1 -> 0 (name missing), record 2 -> 1 (first
        # missing), record 3 -> 2 ("John"), record 4 -> 0
        assert col(b, "name.first").defs == [0, 1, 2, 0]

    def test_fig4_roundtrip(self):
        _b, docs = roundtrip(FIG4_RECORDS)
        for r, doc in zip(FIG4_RECORDS, docs):
            assert doc == {k: v for k, v in r.items() if k != "id"}

    def test_fig7_union_columns(self):
        b, docs = roundtrip(FIG6_RECORDS)
        # name union: string alternative + object alternative columns
        paths = {c.info.path for c in b.columns}
        assert "$.name.<string>" in paths
        assert "$.name.<object>.first" in paths
        # games union: string element + array-of-string element
        assert "$.games[*].<string>" in paths
        assert "$.games[*].<array>[*]" in paths
        for r, doc in zip(FIG6_RECORDS, docs):
            assert doc == {k: v for k, v in r.items() if k != "id"}

    def test_fig7_string_alt_stream(self):
        pre = shred(FIG6_RECORDS)
        b = shred(FIG6_RECORDS, pre.schema)
        # Fig 7 column 4: NBA(2) null(1) NFL(2) |0| ; NFL(2) NBA(2) |0|
        assert col(b, "games[*].<string>").defs == [2, 1, 2, 0, 2, 2, 0]
        assert col(b, "games[*].<string>").values == ["NBA", "NFL", "NFL", "NBA"]

    def test_fig7_array_alt_stream(self):
        pre = shred(FIG6_RECORDS)
        b = shred(FIG6_RECORDS, pre.schema)
        # Fig 7 column 6: null(1) FIFA PES |1| null(1) |0| ; null null |0|
        assert col(b, "games[*].<array>[*]").defs == [1, 3, 3, 1, 1, 0, 1, 1, 0]
        assert col(b, "games[*].<array>[*]").values == ["FIFA", "PES"]


class TestAntimatter:
    def test_antimatter_pk_def_levels(self):
        sh = Shredder()
        sh.add({"a": 1}, 1)
        sh.add_antimatter(2)
        sh.add({"a": 3}, 3)
        b = sh.finish()
        assert b.pk_defs == [1, 0, 1]
        assert b.pk_values == [1, 2, 3]

    def test_antimatter_aligns_columns(self):
        sh = Shredder()
        sh.add({"a": 1}, 1)
        sh.add_antimatter(2)
        sh.add({"a": 3}, 3)
        b = sh.finish()
        cur = ColumnCursor(b.columns[0].info, b.columns[0].defs, b.columns[0].values)
        assert cur.parse_record() == ("s", 1, 1)
        assert cur.parse_record() == ("s", 0, None)
        assert cur.parse_record() == ("s", 1, 3)


class TestBackfill:
    def test_late_column_backfilled(self):
        sh = Shredder()
        sh.add({"a": 1}, 1)
        sh.add({"a": 2, "b": "new"}, 2)
        b = sh.finish()
        bcol = col(b, "$.b")
        assert bcol.defs == [0, 1]

    def test_late_union_alternative(self):
        sh = Shredder()
        sh.add({"v": 1}, 1)
        sh.add({"v": "x"}, 2)
        b = sh.finish()
        scol = col(b, "<string>")
        assert scol.defs == [0, 1]
        icol = col(b, "<bigint>")
        assert icol.defs == [1, 0]


NORMALIZATIONS = [
    # (input doc, round-tripped doc) — documented in DESIGN §2: values no
    # atomic column can witness (empty arrays, null-only structures) are
    # normalized away by the delimiter encoding
    ({"a": []}, {}),
    ({"a": None}, {}),
    ({"a": {"b": None}}, {}),
    ({"a": [[]]}, {}),
    ({"a": [None]}, {}),
]


class TestRoundtrip:
    CASES = [
        {"s": "x"},
        {"i": -5},
        {"f": 2.5},
        {"b": False},
        {"o": {"a": 1, "b": {"c": "d"}}},
        {"arr": [1, 2, 3]},
        {"arr": ["a", None, "b"]},
        {"nested": [[1, 2], [3]]},
        {"mix": [1, "a", 2.5, True]},
        {"objarr": [{"x": 1}, {"y": "z"}, {}]},
        {"deep": {"a": [{"b": [{"c": [1]}]}]}},
        {"u": 1, "v": "x"},
        {},
    ]

    @pytest.mark.parametrize("doc", CASES, ids=range(len(CASES)))
    def test_single_doc(self, doc):
        _b, docs = roundtrip([{**doc, "id": 1}])
        assert docs[0] == doc

    @pytest.mark.parametrize("doc,expected", NORMALIZATIONS, ids=range(len(NORMALIZATIONS)))
    def test_normalizations(self, doc, expected):
        _b, docs = roundtrip([{**doc, "id": 1}])
        assert docs[0] == expected

    def test_heterogeneous_sequence(self):
        docs = [
            {"id": 1, "v": 1},
            {"id": 2, "v": "s"},
            {"id": 3, "v": {"k": 1}},
            {"id": 4, "v": [1, 2]},
            {"id": 5, "v": 2.5},
            {"id": 6, "v": True},
            {"id": 7},
        ]
        _b, got = roundtrip(docs)
        for r, doc in zip(docs, got):
            assert doc == {k: v for k, v in r.items() if k != "id"}


# hypothesis document strategy (avoids the documented normalizations:
# no empty arrays, no null object fields, no bare-null array elements mixed
# with nothing else)
_atomic = st.one_of(
    st.integers(-(2**40), 2**40),
    st.floats(allow_nan=False, allow_infinity=False, width=32),
    st.text(max_size=8),
    st.booleans(),
)
_value = st.recursive(
    _atomic,
    lambda children: st.one_of(
        st.lists(children, min_size=1, max_size=4),
        st.dictionaries(
            st.text(st.characters(categories=["Ll"]), min_size=1, max_size=4),
            children,
            min_size=1,
            max_size=4,
        ),
    ),
    max_leaves=12,
)
_doc = st.dictionaries(
    st.text(st.characters(categories=["Ll"]), min_size=1, max_size=5),
    _value,
    max_size=5,
)


def _strip_empty(v):
    """Remove structures the delimiter encoding normalizes away."""
    if isinstance(v, dict):
        out = {k: _strip_empty(x) for k, x in v.items()}
        return {k: x for k, x in out.items() if x is not None}
    if isinstance(v, list):
        out = [_strip_empty(x) for x in v]
        out = [x for x in out if x is not None]
        return out if out else None
    return v


class TestRoundtripHypothesis:
    @given(st.lists(_doc, min_size=1, max_size=8))
    @settings(max_examples=60, deadline=None)
    def test_many_docs(self, docs):
        docs = [_strip_empty(d) or {} for d in docs]
        recs = [{**d, "id": i} for i, d in enumerate(docs)]
        _b, got = roundtrip(recs)
        assert got == docs


class TestExtractPath:
    def _frags(self, records):
        b = shred(records)
        cursors = {
            c.info.index: ColumnCursor(c.info, c.defs, c.values)
            for c in b.columns
        }
        out = []
        for _ in records:
            out.append({ci: cur.parse_record() for ci, cur in cursors.items()})
        return b.schema, out

    def test_scalar_path(self):
        schema, frags = self._frags([{"id": 1, "a": {"b": 7}}])
        assert extract_path(schema, frags[0], "a.b") == 7

    def test_repeated_path(self):
        schema, frags = self._frags(
            [{"id": 1, "g": [{"t": "x"}, {"t": "y"}, {}]}]
        )
        assert extract_path(schema, frags[0], "g[*].t") == ["x", "y", None]

    def test_missing_path(self):
        schema, frags = self._frags([{"id": 1, "a": 1}])
        assert extract_path(schema, frags[0], "zz") is MISSING

    def test_union_path(self):
        schema, frags = self._frags(
            [{"id": 1, "v": "s"}, {"id": 2, "v": {"k": 3}}]
        )
        assert extract_path(schema, frags[0], "v") == "s"
        assert extract_path(schema, frags[1], "v") == {"k": 3}

    def test_element_objects(self):
        schema, frags = self._frags(
            [{"id": 1, "subj": [{"a": "x", "v": 1}, {"a": "y", "v": 2}]}]
        )
        assert extract_path(schema, frags[0], "subj[*]") == [
            {"a": "x", "v": 1},
            {"a": "y", "v": 2},
        ]


class TestSkipRecords:
    def test_skip_positions(self):
        records = [{"id": i, "a": [i, i + 1], "b": str(i)} for i in range(10)]
        b = shred(records)
        for c in b.columns:
            cur = ColumnCursor(c.info, c.defs, c.values)
            cur.skip_records(7)
            cur2 = ColumnCursor(c.info, c.defs, c.values)
            for _ in range(7):
                cur2.parse_record()
            assert (cur.di, cur.vi) == (cur2.di, cur2.vi)

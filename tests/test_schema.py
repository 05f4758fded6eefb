"""Schema inference tests: levels, unions, serialization (§3.2)."""
import pytest

from repro.dremel.schema import (
    ARRAY,
    BIGINT,
    BOOLEAN,
    DOUBLE,
    OBJECT,
    STRING,
    UNION,
    Schema,
    type_tag,
)
from repro.dremel.shred import Shredder


def infer(*docs) -> Schema:
    sh = Shredder()
    for i, d in enumerate(docs):
        sh.add(d, i)
    return sh.finish().schema


class TestTypeTag:
    def test_bool_before_int(self):
        assert type_tag(True) == BOOLEAN
        assert type_tag(1) == BIGINT

    def test_all_tags(self):
        assert type_tag("x") == STRING
        assert type_tag(1.5) == DOUBLE
        assert type_tag({}) == OBJECT
        assert type_tag([]) == ARRAY

    def test_unsupported(self):
        with pytest.raises(TypeError):
            type_tag(object())


class TestInference:
    def test_flat(self):
        s = infer({"a": 1, "b": "x", "c": 1.5, "d": True})
        assert {c.path: c.kind for c in s.columns} == {
            "$.a": BIGINT, "$.b": STRING, "$.c": DOUBLE, "$.d": BOOLEAN,
        }

    def test_levels_flat(self):
        s = infer({"a": 1})
        assert s.columns[0].max_def == 1

    def test_levels_nested(self):
        # paper Fig 4b: root(0) -> name(1) -> first(2)
        s = infer({"name": {"first": "John"}})
        assert s.resolve("name.first").level == 2

    def test_levels_array_of_objects(self):
        # games[*].title has max def 3; consoles[*] has max def 4 (Fig 4b)
        s = infer({"games": [{"title": "NFL", "consoles": ["PC"]}]})
        title = next(c for c in s.columns if "title" in c.path)
        cons = next(c for c in s.columns if "consoles" in c.path)
        assert title.max_def == 3
        assert cons.max_def == 4
        assert title.array_levels == [1]
        assert cons.array_levels == [1, 3]
        assert title.max_delimiter == 0
        assert cons.max_delimiter == 1

    def test_union_injection(self):
        s = infer({"v": 1}, {"v": "x"})
        node = s.root.fields["v"]
        assert node.kind == UNION
        assert set(node.alts) == {BIGINT, STRING}

    def test_union_transparent_levels(self):
        # §3.2.2: union nodes do not contribute a definition level
        s = infer({"name": "John"}, {"name": {"first": "Ann"}})
        assert s.resolve("name.first").level == 2
        string_alt = s.root.fields["name"].alts[STRING]
        assert string_alt.level == 1

    def test_union_int_vs_double_strict(self):
        s = infer({"v": 1}, {"v": 1.5})
        assert s.root.fields["v"].kind == UNION

    def test_union_array_element(self):
        # Fig 6: games elements are string | array-of-string
        s = infer({"games": ["NBA", ["FIFA"]]})
        elem = s.root.fields["games"].element
        assert elem.kind == UNION
        assert set(elem.alts) == {STRING, ARRAY}

    def test_columns_append_only(self):
        sh = Shredder()
        sh.add({"a": 1}, 1)
        first = [c.path for c in sh.schema.columns]
        sh.add({"a": 1, "b": 2}, 2)
        assert [c.path for c in sh.schema.columns][: len(first)] == first

    def test_null_field_ignored(self):
        s = infer({"a": None, "b": 1})
        assert [c.path for c in s.columns] == ["$.b"]

    def test_empty_array_no_columns(self):
        s = infer({"a": []})
        assert s.columns == []

    def test_deep_nesting_levels(self):
        s = infer({"a": {"b": {"c": {"d": 1}}}})
        assert s.columns[0].max_def == 4


class TestSerialization:
    def test_roundtrip(self):
        s = infer(
            {"name": "x", "games": ["a", ["b"]]},
            {"name": {"first": "y"}, "tags": [1, 2]},
        )
        s2 = Schema.from_json(s.to_json())
        assert [
            (c.path, c.kind, c.max_def, c.array_levels) for c in s2.columns
        ] == [(c.path, c.kind, c.max_def, c.array_levels) for c in s.columns]

    def test_resolve_after_roundtrip(self):
        s = infer({"a": {"b": [{"c": 1}]}})
        s2 = Schema.from_json(s.to_json())
        assert s2.resolve("a.b[*].c").col == s.resolve("a.b[*].c").col


class TestResolve:
    def test_simple(self):
        s = infer({"a": {"b": 1}})
        assert s.resolve("a.b").kind == BIGINT

    def test_through_union(self):
        s = infer({"name": "x"}, {"name": {"first": "y"}})
        assert s.resolve("name.first").kind == STRING

    def test_through_array(self):
        s = infer({"g": [{"t": "x"}]})
        assert s.resolve("g[*].t").kind == STRING

    def test_missing(self):
        s = infer({"a": 1})
        assert s.resolve("zz") is None
        assert s.resolve("a.b") is None

    def test_columns_under(self):
        s = infer({"u": {"a": 1, "b": "x"}, "v": 2})
        cols = s.columns_under(s.resolve("u"))
        assert sorted(c.path for c in cols) == ["$.u.a", "$.u.b"]

"""Unit tests for the NULL-aware expression helpers (§5: dynamic typing —
comparing incompatible types yields NULL, which filters treat as false)."""
import pytest

from repro.dremel.assemble import MISSING
from repro.query import exprs as E


class TestComparisons:
    def test_numeric(self):
        assert E.gt(10, 5) and E.ge(5, 5) and E.lt(3, 5) and E.le(5, 5)
        assert E.eq(5, 5.0) and E.neq(5, 6)

    def test_incompatible_types_are_false(self):
        # the paper's example: 10 > "ten" -> NULL -> filter false
        assert not E.gt(10, "ten")
        assert not E.eq("10", 10)
        assert not E.lt(True, 1)  # booleans only compare to booleans

    def test_missing_and_none(self):
        for f in (E.gt, E.ge, E.lt, E.le, E.eq, E.neq):
            assert not f(MISSING, 5)
            assert not f(5, None)
            assert not f(MISSING, MISSING)

    def test_strings(self):
        assert E.gt("b", "a") and E.eq("x", "x")

    def test_booleans(self):
        assert E.eq(True, True) and E.neq(True, False)


class TestScalarFuncs:
    def test_lower(self):
        assert E.lower("AbC") == "abc"
        assert E.lower(5) is MISSING

    def test_length(self):
        assert E.length("abc") == 3
        assert E.length([1, 2]) == 2
        assert E.length(7) is MISSING

    def test_is_array(self):
        assert E.is_array([1]) and not E.is_array("x") and not E.is_array(MISSING)

    def test_fget(self):
        assert E.fget({"a": 1}, "a") == 1
        assert E.fget({"a": None}, "a") is MISSING
        assert E.fget("notdict", "a") is MISSING

    def test_fmap(self):
        arr = [{"s": {"c": "USA"}}, {"s": {"c": "UK"}}, {"x": 1}]
        assert E.fmap(arr, "s.c") == ["USA", "UK", None]
        assert E.fmap("no", "s.c") is MISSING


class TestArrayFuncs:
    def test_iter_list(self):
        assert list(E.iter_list([1, 2])) == [1, 2]
        assert list(E.iter_list(MISSING)) == []
        assert list(E.iter_list("str")) == []

    def test_array_distinct(self):
        assert E.array_distinct([1, 2, 1, None, 3, 2]) == [1, 2, 3]
        assert E.array_distinct(5) is MISSING

    def test_array_contains(self):
        assert E.array_contains(["a", "b"], "a")
        assert not E.array_contains("ab", "a")

    def test_array_count(self):
        assert E.array_count([1, 2, 3]) == 3
        assert E.array_count(None) is MISSING

    def test_array_pairs(self):
        assert E.array_pairs(["b", "a", "c"]) == [
            ("a", "b"), ("a", "c"), ("b", "c")
        ]
        assert E.array_pairs(["x"]) == []
        assert E.array_pairs("no") is MISSING

    def test_some_eq_lower(self):
        assert E.some_eq_lower(["JOBS", "x"], "jobs")
        assert not E.some_eq_lower(["job"], "jobs")
        assert not E.some_eq_lower(MISSING, "jobs")
        assert not E.some_eq_lower([None, 3], "jobs")


class TestHelpersRegistry:
    def test_all_exported(self):
        for name in ("gt", "lower", "iter_list", "array_pairs", "fget", "MISSING"):
            assert name in E.HELPERS

"""Builtin function library tests (local evaluation)."""
import pytest

from repro.jsoniq.errors import DynamicError, StaticError, TypeError_

AGGREGATES = [
    ("count(())", [0]),
    ("count(1)", [1]),
    ("count((1, 2, 3))", [3]),
    ('count(("a", {}, []))', [3]),
    ("sum(())", [0]),
    ("sum((1, 2, 3))", [6]),
    ("sum((1.5, 2.5))", [4.0]),
    ("sum((), 99)", [99]),
    ("avg((1, 2, 3))", [2.0]),
    ("avg(())", []),
    ("min((3, 1, 2))", [1]),
    ("max((3, 1, 2))", [3]),
    ('min(("b", "a"))', ["a"]),
    ('max(("b", "a", "c"))', ["c"]),
    ("min(())", []),
    ("max(())", []),
]

SEQUENCE_FNS = [
    ("empty(())", [True]),
    ("empty((1))", [False]),
    ("exists(())", [False]),
    ("exists(1)", [True]),
    ("head((1, 2, 3))", [1]),
    ("head(())", []),
    ("tail((1, 2, 3))", [2, 3]),
    ("tail(())", []),
    ("tail(1)", []),
    ("subsequence((1, 2, 3, 4), 2)", [2, 3, 4]),
    ("subsequence((1, 2, 3, 4), 2, 2)", [2, 3]),
    ("distinct-values((1, 2, 2, 1, 3))", [1, 2, 3]),
    ('distinct-values(("a", "a"))', ["a"]),
    ("distinct-values(())", []),
    ("reverse((1, 2, 3))", [3, 2, 1]),
    ("reverse(())", []),
]

OBJECT_ARRAY_FNS = [
    ("size([1, 2, 3])", [3]),
    ("size([])", [0]),
    ("size(())", []),
    ('keys({"a": 1, "b": 2})', ["a", "b"]),
    ('keys(({"a": 1}, {"a": 2, "c": 3}))', ["a", "c"]),
    ("keys(())", []),
    ('values({"a": 1, "b": 2})', [1, 2]),
    ("members([1, 2])", [1, 2]),
    ("members(())", []),
]

CASTS = [
    ("string(42)", ["42"]),
    ("string(1.5)", ["1.5"]),
    ("string(2.0)", ["2"]),
    ("string(true)", ["true"]),
    ("string(null)", ["null"]),
    ('string("x")', ["x"]),
    ("string(())", [""]),
    ('integer("42")', [42]),
    ("integer(3.9)", [3]),
    ("integer(true)", [1]),
    ("integer(())", []),
    ('number("2.5")', [2.5]),
    ("number(7)", [7.0]),
    ("boolean(1)", [True]),
    ("boolean(())", [False]),
    ('boolean("")', [False]),
]

STRING_FNS = [
    ('string-length("hello")', [5]),
    ("string-length(())", [0]),
    ('lower-case("AbC")', ["abc"]),
    ('upper-case("AbC")', ["ABC"]),
    ('substring("hello", 2)', ["ello"]),
    ('substring("hello", 2, 3)', ["ell"]),
    ('contains("hello", "ell")', [True]),
    ('contains("hello", "xyz")', [False]),
    ('starts-with("hello", "he")', [True]),
    ('ends-with("hello", "lo")', [True]),
    ('concat("a", "b", "c")', ["abc"]),
    ('concat("a", (), 1)', ["a1"]),
    ('string-join(("a", "b", "c"), "-")', ["a-b-c"]),
    ('string-join((), "-")', [""]),
    ('string-join((1, 2))', ["12"]),
]

NUMERIC_FNS = [
    ("abs(-3)", [3]),
    ("abs(2.5)", [2.5]),
    ("abs(())", []),
    ("round(2.5)", [3]),
    ("round(-2.5)", [-2]),
    ("round(2.4)", [2]),
    ("round(2.345, 2)", [2.35]),
    ("floor(2.9)", [2]),
    ("ceiling(2.1)", [3]),
    ("floor(())", []),
]


def battery(name, cases):
    @pytest.mark.parametrize("query,expected", cases, ids=[c[0] for c in cases])
    def test(local_engine, query, expected):
        assert local_engine.run(query) == expected

    test.__name__ = f"test_{name}"
    return test


test_aggregates = battery("aggregates", AGGREGATES)
test_sequence_fns = battery("sequence_fns", SEQUENCE_FNS)
test_object_array_fns = battery("object_array_fns", OBJECT_ARRAY_FNS)
test_casts = battery("casts", CASTS)
test_string_fns = battery("string_fns", STRING_FNS)
test_numeric_fns = battery("numeric_fns", NUMERIC_FNS)


class TestFunctionErrors:
    def test_unknown_function_is_static_error(self, local_engine):
        with pytest.raises(StaticError, match="unknown function"):
            local_engine.run("no-such-fn(1)")

    def test_wrong_arity_is_static_error(self, local_engine):
        with pytest.raises(StaticError, match="argument"):
            local_engine.run("count(1, 2)")

    @pytest.mark.parametrize(
        "query",
        [
            'sum(("a", "b"))',
            "avg((1, {}))",
            'min((1, "a"))',
            "size(1)",
            "size(([1], [2]))",
            'integer("nope")',
            "distinct-values(({}, {}))",
            'lower-case(1)',
        ],
    )
    def test_dynamic_type_errors(self, local_engine, query):
        with pytest.raises((TypeError_, DynamicError)):
            local_engine.run(query)

    def test_number_of_bad_string_is_nan(self, local_engine):
        import math

        assert math.isnan(local_engine.run('number("nope")')[0])

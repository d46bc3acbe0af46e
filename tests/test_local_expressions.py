"""Local (single-threaded) evaluation of JSONiq expressions — the
engine's pull-based path (§5.5), no Spark involved. One parametrized
battery per expression family."""
import pytest

from repro.jsoniq.errors import DynamicError, TypeError_

ARITHMETIC = [
    ("1 + 2", [3]),
    ("5 - 2", [3]),
    ("3 * 4", [12]),
    ("7 div 2", [3.5]),
    ("6 div 3", [2.0]),
    ("7 idiv 2", [3]),
    ("-7 idiv 2", [-3]),
    ("7 mod 2", [1]),
    ("-7 mod 2", [-1]),
    ("7 mod -2", [1]),
    ("1.5 + 1", [2.5]),
    ("-3", [-3]),
    ("- -3", [3]),
    ("+3", [3]),
    ("() + 1", []),
    ("1 + ()", []),
    ("2 * 3 + 4", [10]),
    ("2 + 3 * 4", [14]),
    ("(2 + 3) * 4", [20]),
]

COMPARISONS = [
    ("1 eq 1", [True]),
    ("1 eq 2", [False]),
    ("1 ne 2", [True]),
    ("1 lt 2", [True]),
    ("2 le 2", [True]),
    ("3 gt 2", [True]),
    ("3 ge 4", [False]),
    ('"a" lt "b"', [True]),
    ("1 eq 1.0", [True]),
    ('1 eq "1"', [False]),  # incompatible types: eq is false
    ('1 ne "1"', [True]),
    ("null eq null", [True]),
    ("null lt 0", [True]),
    ("() eq 1", []),
    ("1 = 1", [True]),
    ("1 != 2", [True]),
    ("1 < 2", [True]),
    ("2 >= 2", [True]),
]

LOGIC = [
    ("true and true", [True]),
    ("true and false", [False]),
    ("false or true", [True]),
    ("false or false", [False]),
    ("not true", [False]),
    ("not(())", [True]),
    ("not 0", [True]),
    ('not ""', [True]),
    ('not "x"', [False]),
    ("1 and 1", [True]),
    ("() or true", [True]),
    ("true and 1 eq 1", [True]),
]

SEQUENCES = [
    ("()", []),
    ("(1, 2, 3)", [1, 2, 3]),
    ("(1, (2, 3), ())", [1, 2, 3]),  # sequences never nest
    ("1 to 3", [1, 2, 3]),
    ("3 to 1", []),
    ("() to 3", []),
    ("(1 to 3, 5)", [1, 2, 3, 5]),
]

STRINGS = [
    ('"a" || "b"', ["ab"]),
    ('"a" || ()', ["a"]),
    ("() || ()", [""]),
    ('1 || "x"', ["1x"]),
    ("true || null", ["truenull"]),
]

NAVIGATION = [
    ('{"a": 1}.a', [1]),
    ('{"a": 1}.b', []),
    ('{"a": null}.a', [None]),
    ('{"a": {"b": 2}}.a.b', [2]),
    ('(1, {"a": 1}, "x").a', [1]),  # non-objects skipped
    ("[1, 2, 3][]", [1, 2, 3]),
    ("([1, 2], [3])[]", [1, 2, 3]),
    ("(1, [2], 3)[]", [2]),  # non-arrays skipped
    ("[4, 5, 6][[2]]", [5]),
    ("[4, 5, 6][[9]]", []),
    ("[4, 5][[()]]", []),
    ('{"a": [1, 2]}.a[]', [1, 2]),
    ('{"a": [{"b": 5}]}.a[].b', [5]),
]

PREDICATES = [
    ("(1, 2, 3)[$$ gt 1]", [2, 3]),
    ("(1, 2, 3)[2]", [2]),
    ("(1, 2, 3)[9]", []),
    ('({"a": 1}, {"a": 2})[$$.a eq 2]', [{"a": 2}]),
    ("(1, 2, 3)[true]", [1, 2, 3]),
    ("(1, 2, 3)[false]", []),
    ("(1, 2, 3)[()]", []),
    # numeric predicate expression selects by position
    ("(10, 20, 30)[1 + 1]", [20]),
]

CONSTRUCTORS = [
    ('{"a": 1}', [{"a": 1}]),
    ("{}", [{}]),
    ("[]", [[]]),
    ("[1, 2]", [[1, 2]]),
    ("[()]", [[]]),
    ("[(1, 2), 3]", [[1, 2, 3]]),
    ('{"a": ()}', [{"a": None}]),  # empty value becomes null
    ('{"k" || "1": 2}', [{"k1": 2}]),
    ('{"a": [1, [2]]}', [{"a": [1, [2]]}]),
    ("[1 to 3]", [[1, 2, 3]]),
]

CONTROL = [
    ('if (1 eq 1) then "y" else "n"', ["y"]),
    ('if (()) then "y" else "n"', ["n"]),
    ('if ("") then "y" else "n"', ["n"]),
    ("if (true) then (1, 2) else ()", [1, 2]),
    ("some $x in (1, 2, 3) satisfies $x gt 2", [True]),
    ("some $x in () satisfies true", [False]),
    ("every $x in (1, 2, 3) satisfies $x gt 0", [True]),
    ("every $x in () satisfies false", [True]),
    ("some $x in (1, 2), $y in (3, 4) satisfies $x + $y eq 6", [True]),
    ("every $x in (1, 2), $y in (3, 4) satisfies $x lt $y", [True]),
]


def battery(name, cases):
    @pytest.mark.parametrize("query,expected", cases, ids=[c[0] for c in cases])
    def test(local_engine, query, expected):
        assert local_engine.run(query) == expected

    test.__name__ = f"test_{name}"
    return test


test_arithmetic = battery("arithmetic", ARITHMETIC)
test_comparisons = battery("comparisons", COMPARISONS)
test_logic = battery("logic", LOGIC)
test_sequences = battery("sequences", SEQUENCES)
test_strings = battery("strings", STRINGS)
test_navigation = battery("navigation", NAVIGATION)
test_predicates = battery("predicates", PREDICATES)
test_constructors = battery("constructors", CONSTRUCTORS)
test_control = battery("control", CONTROL)


class TestDynamicErrors:
    @pytest.mark.parametrize(
        "query",
        [
            '1 + "a"',
            '"a" - 1',
            "1 div 0",
            "1 idiv 0",
            "1 mod 0",
            '1 lt "a"',
            "(1, 2) + 1",
            "-(1, 2)",
            '-"a"',
            '{"a": (1, 2)}',   # multi-item object value
            "{(1, 2): 1}",      # non-singleton key
            "(1, 2) || 3",
            '"a" to "b"',
            "if ((1, 2)) then 1 else 2",
        ],
    )
    def test_type_errors(self, local_engine, query):
        with pytest.raises((TypeError_, DynamicError)):
            local_engine.run(query)


class TestIteratorProtocol:
    """The §5.5 pull API: open/has_next/next_item/reset/close."""

    def test_pull_protocol(self, local_engine):
        it = local_engine.compile("(1, 2, 3)")
        ctx = local_engine._ctx()
        it.open(ctx)
        out = []
        while it.has_next():
            out.append(it.next_item())
        it.close()
        assert out == [1, 2, 3]

    def test_reset(self, local_engine):
        it = local_engine.compile("(1, 2)")
        ctx = local_engine._ctx()
        it.open(ctx)
        assert it.next_item() == 1
        it.reset(ctx)
        assert it.next_item() == 1
        it.close()

    def test_next_past_end(self, local_engine):
        from repro.jsoniq.errors import RumbleError

        it = local_engine.compile("()")
        it.open(local_engine._ctx())
        with pytest.raises(RumbleError):
            it.next_item()

    def test_use_before_open(self, local_engine):
        from repro.jsoniq.errors import RumbleError

        it = local_engine.compile("1")
        with pytest.raises(RumbleError):
            it.has_next()

    def test_double_open(self, local_engine):
        from repro.jsoniq.errors import RumbleError

        it = local_engine.compile("1")
        ctx = local_engine._ctx()
        it.open(ctx)
        with pytest.raises(RumbleError):
            it.open(ctx)

    def test_explain_tree(self, local_engine):
        tree = local_engine.explain("for $x in (1,2) return $x + 1")
        assert "FLWORIterator" in tree and "ArithmeticIterator" in tree

"""Tests for the §4.7 group-by optimizations: COUNT push-down and
unused-variable pruning, plus their end-to-end equivalence."""
import pytest

from repro.core.optimizer import plan_groupby_aggregations
from repro.jsoniq import ast, parse


def plan(query: str) -> dict[str, str]:
    tree = parse(query)
    assert isinstance(tree, ast.FLWORExpr)
    gb_index = next(
        i for i, c in enumerate(tree.clauses) if isinstance(c, ast.GroupByClause)
    )
    return plan_groupby_aggregations(tree, gb_index)


class TestPlanning:
    def test_count_only_usage_pushes_down(self):
        modes = plan(
            "for $x in (1, 2) group by $k := $x return count($x)"
        )
        assert modes == {"x": "count"}

    def test_unused_variable_dropped(self):
        modes = plan("for $x in (1, 2) group by $k := $x return $k")
        assert modes == {"x": "drop"}

    def test_other_usage_materializes(self):
        modes = plan("for $x in (1, 2) group by $k := $x return sum($x)")
        assert modes == {"x": "materialize"}

    def test_mixed_count_and_other_materializes(self):
        modes = plan(
            "for $x in (1, 2) group by $k := $x return count($x) + sum($x)"
        )
        assert modes == {"x": "materialize"}

    def test_let_bound_var_never_count_mode(self):
        # let-bound sequences may hold several items per tuple; Spark's
        # COUNT would count tuples, so push-down must not fire.
        modes = plan(
            "for $x in (1, 2) let $s := ($x, $x) group by $k := $x mod 2 "
            "return (count($s), $k)"
        )
        assert modes["s"] == "materialize"
        assert modes["x"] == "drop"

    def test_usage_in_later_clause_counts(self):
        modes = plan(
            "for $x in (1, 2) group by $k := $x "
            "order by count($x) return $k"
        )
        assert modes == {"x": "count"}

    def test_usage_in_where_after_group(self):
        modes = plan(
            "for $x in (1, 2) group by $k := $x "
            "where sum($x) gt 1 return $k"
        )
        assert modes == {"x": "materialize"}

    def test_shadowed_usage_does_not_materialize(self):
        # Inner FLWOR rebinds $x; references under it are not ours.
        modes = plan(
            "for $x in (1, 2) group by $k := $x "
            "return (count($x), for $x in (9) return $x)"
        )
        assert modes == {"x": "count"}

    def test_rewrite_marks_count_call(self):
        tree = parse("for $x in (1, 2) group by $k := $x return count($x)")
        plan_groupby_aggregations(tree, 1)
        ret = tree.return_expr
        assert isinstance(ret, ast.FunctionCall)
        assert ret.name == "__identity_count"


class TestEndToEndEquivalence:
    """The optimized plans must return exactly what unoptimized local
    grouping returns."""

    @pytest.mark.parametrize(
        "query,expected",
        [
            (
                'for $x in ("a", "b", "a") group by $k := $x '
                'return {"k": $k, "n": count($x)}',
                [{"k": "a", "n": 2}, {"k": "b", "n": 1}],
            ),
            (
                "for $x in (1, 2, 3, 4, 5) group by $k := $x mod 2 "
                "order by $k return count($x)",
                [2, 3],
            ),
            (
                "for $x in (1, 2, 3) group by $k := 1 return count($x)",
                [3],
            ),
        ],
    )
    def test_count_pushdown_results(self, local_engine, query, expected):
        got = local_engine.run(query)
        key = lambda o: str(o)  # noqa: E731
        assert sorted(got, key=key) == sorted(expected, key=key)

    def test_drop_mode_still_returns_keys(self, local_engine):
        got = local_engine.run(
            'for $x in ("b", "a", "b") group by $k := $x order by $k return $k'
        )
        assert got == ["a", "b"]

    def test_explain_shows_identity_rewrite(self, local_engine):
        tree = local_engine.explain(
            "for $x in (1, 2) group by $k := $x return count($x)"
        )
        # the count() call disappeared: the return expr is a plain VarRef
        assert "FunctionCallIterator count" not in tree
        assert "VarRefIterator $x" in tree

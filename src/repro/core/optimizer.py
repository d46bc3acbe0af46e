"""Static optimizations on the expression/clause tree (paper §4.7).

The paper describes two rewrites applied to group-by clauses, both
enabled by JSONiq being a functional language:

1. **COUNT push-down** — "Rumble detects if a non-grouping variable, in
   consuming expressions, is aggregated as a count rather than
   materialized. In this case COUNT() is invoked in Spark SQL instead
   of materializing the non-grouping values."
2. **Unused-variable pruning** — "It also detects if the variable is
   not used in consuming expressions, in which case it does not create
   the column at all."

``plan_groupby_aggregations`` performs the usage analysis over the
clauses *after* a group-by plus the return expression, respecting
shadowing by nested binders, and decides a mode per non-grouping
variable: ``"materialize"`` (default), ``"count"`` or ``"drop"``.
When a variable goes to count mode, every downstream ``count($v)``
call is rewritten to ``$v`` (the aggregated column already holds the
count). Count mode additionally requires the variable to be provably
single-item per tuple (bound by a plain ``for`` or ``count`` clause),
since Spark's COUNT counts tuples, not items.
"""
from __future__ import annotations

from dataclasses import dataclass

from ..jsoniq import ast


@dataclass
class _Usage:
    counted: bool = False
    other: bool = False


def _scan(node: ast.Expr | ast.Clause, var: str, usage: _Usage,
          count_calls: list[ast.FunctionCall]) -> None:
    """Collect how ``var`` is used under ``node``; stop at shadowing
    binders. ``count_calls`` accumulates the count($var) call sites for
    the later rewrite."""
    if isinstance(node, ast.VarRef):
        if node.name == var:
            usage.other = True
        return
    if isinstance(node, ast.FunctionCall):
        if (
            node.name == "count"
            and len(node.args) == 1
            and isinstance(node.args[0], ast.VarRef)
            and node.args[0].name == var
        ):
            usage.counted = True
            count_calls.append(node)
            return
        for a in node.args:
            _scan(a, var, usage, count_calls)
        return
    if isinstance(node, ast.FLWORExpr):
        shadowed = False
        for c in node.clauses:
            if shadowed:
                break
            if isinstance(c, ast.ForClause):
                _scan(c.expr, var, usage, count_calls)
                if var in (c.var, c.position_var):
                    shadowed = True
            elif isinstance(c, ast.LetClause):
                _scan(c.expr, var, usage, count_calls)
                if c.var == var:
                    shadowed = True
            elif isinstance(c, ast.GroupByClause):
                for k in c.keys:
                    if k.expr is not None:
                        _scan(k.expr, var, usage, count_calls)
                    if k.var == var and k.expr is not None:
                        shadowed = True
            elif isinstance(c, ast.CountClause):
                if c.var == var:
                    shadowed = True
            else:
                for e in c.children():
                    _scan(e, var, usage, count_calls)
        if not shadowed:
            _scan(node.return_expr, var, usage, count_calls)
        return
    if isinstance(node, ast.QuantifiedExpr):
        shadowed = False
        for v, src in node.bindings:
            if shadowed:
                break
            _scan(src, var, usage, count_calls)
            if v == var:
                shadowed = True
        if not shadowed:
            _scan(node.satisfies, var, usage, count_calls)
        return
    if isinstance(node, ast.Clause):
        for e in node.children():
            _scan(e, var, usage, count_calls)
        return
    for child in node.children():
        _scan(child, var, usage, count_calls)


def plan_groupby_aggregations(flwor: ast.FLWORExpr, gb_index: int) -> dict[str, str]:
    """Decide the aggregation mode of every non-grouping variable of the
    group-by clause at ``flwor.clauses[gb_index]`` and rewrite downstream
    ``count($v)`` calls for count-mode variables. Returns {var: mode}."""
    gb = flwor.clauses[gb_index]
    assert isinstance(gb, ast.GroupByClause)
    key_vars = {k.var for k in gb.keys}

    # Variables in the tuple stream before the group-by, and whether
    # each is provably single-item per tuple.
    in_scope: dict[str, bool] = {}
    for c in flwor.clauses[:gb_index]:
        if isinstance(c, ast.ForClause):
            in_scope[c.var] = not c.allowing_empty
            if c.position_var:
                in_scope[c.position_var] = True
        elif isinstance(c, ast.LetClause):
            in_scope[c.var] = False
        elif isinstance(c, ast.GroupByClause):
            for k in c.keys:
                in_scope[k.var] = True  # keys are single atomics/empty
        elif isinstance(c, ast.CountClause):
            in_scope[c.var] = True

    downstream: list[ast.Expr | ast.Clause] = list(flwor.clauses[gb_index + 1 :])
    downstream.append(flwor.return_expr)

    modes: dict[str, str] = {}
    for var, single in in_scope.items():
        if var in key_vars:
            continue
        usage = _Usage()
        count_calls: list[ast.FunctionCall] = []
        for node in downstream:
            _scan(node, var, usage, count_calls)
        if not usage.counted and not usage.other:
            modes[var] = "drop"
        elif usage.counted and not usage.other and single:
            modes[var] = "count"
            # Rewrite count($v) -> $v in place: the aggregated column
            # already holds the count as a single integer item.
            for call in count_calls:
                call.name = "__identity_count"
                call.args = [ast.VarRef(var)]
        else:
            modes[var] = "materialize"
    return modes


def apply_count_rewrites(expr: ast.Expr) -> ast.Expr:
    """Replace the ``__identity_count`` markers planted by
    :func:`plan_groupby_aggregations` with plain variable references."""
    # The translator resolves __identity_count directly; nothing to do
    # at AST level. Kept as an explicit no-op hook for clarity.
    return expr

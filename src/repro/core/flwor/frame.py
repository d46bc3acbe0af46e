"""Tuple streams as DataFrames (paper §4.3).

A FLWOR tuple maps variable names to sequences of items. A tuple
*stream* is highly structured — every tuple has the same in-scope
variables — so it maps to a DataFrame with one column per variable
(§4.3). Each cell holds the JSON serialization of the variable's
sequence (`items.dumps_seq`), the PySpark stand-in for the paper's
"column type is List of Items".

:class:`TupleFrame` wraps the DataFrame with the variable→column
mapping (JSONiq variable names may contain ``-``; columns get fresh
synthetic names) and tracks which variables are guaranteed single-item
per tuple (``for``-bound) — the precondition for the §4.7 COUNT
push-down.

The `make_*_udf` builders create the paper's ``EVALUATE_EXPRESSION``
UDFs: each deserializes the in-scope variable cells into a dynamic
context, evaluates a nested runtime iterator via its local API
(executors never nest Spark jobs, §5.6), and re-serializes the result.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd

from pyspark.sql import DataFrame, functions as F
from pyspark.sql.types import (
    ArrayType,
    BooleanType,
    DoubleType,
    IntegerType,
    StringType,
    StructField,
    StructType,
)

from ..dynamic_context import DynamicContext, RumbleConfig
from ..items import dumps_seq, encode_key, loads_seq

#: Schema of one encoded grouping/ordering key (§4.7): the three native
#: columns the paper prescribes, plus the serialized original sequence
#: ("canon") used to restore the key binding after GROUP BY — a
#: lossless replacement for the paper's ARRAY_DISTINCT reconstruction.
KEY_STRUCT = StructType(
    [
        StructField("code", IntegerType(), False),
        StructField("s", StringType(), False),
        StructField("d", DoubleType(), False),
        StructField("canon", StringType(), False),
    ]
)


@dataclass
class TupleFrame:
    """A tuple stream in DataFrame form."""

    df: DataFrame
    columns: dict[str, str]  # variable name -> DataFrame column name
    single_item: set[str] = field(default_factory=set)
    _fresh: int = 0

    def fresh_col(self, hint: str = "v") -> str:
        self._fresh += 1
        # Strip characters Spark SQL would need backticks for.
        safe = "".join(ch if ch.isalnum() else "_" for ch in hint)
        return f"c{self._fresh}_{safe}"

    def var_order(self) -> list[str]:
        return list(self.columns)

    def cols(self) -> list:
        return [F.col(self.columns[v]) for v in self.var_order()]


def _context_factory(var_order: list[str], outer_vars: dict, config: RumbleConfig):
    """Build the per-row dynamic context used inside clause UDFs."""

    def make(cells) -> DynamicContext:
        variables = dict(outer_vars)
        for v, c in zip(var_order, cells):
            variables[v] = loads_seq(c)
        return DynamicContext(variables=variables, config=config)

    return make


# All clause evaluators are Arrow-batched pandas UDFs: the per-row work
# (deserialize cells → dynamic context → evaluate the nested iterator →
# re-serialize) is unavoidable in any Rumble-style engine, but batching
# removes Spark's per-row pickle dispatch — the PySpark counterpart of
# the paper's serialized-Java-closure efficiency (§5.6).


def make_sequence_udf(expr_iter, var_order, outer_vars, config):
    """``let`` evaluator: row → JSON-serialized sequence (§4.5)."""

    ctx_of = _context_factory(var_order, outer_vars, config)

    def f(*cols: pd.Series) -> pd.Series:
        return pd.Series(
            [dumps_seq(expr_iter.materialize(ctx_of(cells)))
             for cells in zip(*cols)]
        )

    return F.pandas_udf(f, StringType())


def make_explode_udf(expr_iter, var_order, outer_vars, config):
    """``for`` evaluator: row → array of single-item JSON sequences,
    ready for EXPLODE (§4.4)."""

    ctx_of = _context_factory(var_order, outer_vars, config)

    def f(*cols: pd.Series) -> pd.Series:
        out = []
        for cells in zip(*cols):
            seq = expr_iter.materialize(ctx_of(cells))
            out.append([dumps_seq([item]) for item in seq])
        return pd.Series(out)

    return F.pandas_udf(f, ArrayType(StringType()))


def make_boolean_udf(expr_iter, var_order, outer_vars, config):
    """``where`` evaluator: row → effective boolean value (§4.6)."""
    from ..items import effective_boolean_value

    ctx_of = _context_factory(var_order, outer_vars, config)

    def f(*cols: pd.Series) -> pd.Series:
        return pd.Series(
            [effective_boolean_value(expr_iter.materialize(ctx_of(cells)))
             for cells in zip(*cols)]
        )

    return F.pandas_udf(f, BooleanType())


def make_key_udf(expr_iter, var_order, outer_vars, config, *,
                 empty_greatest: bool, clause: str):
    """Grouping/ordering key evaluator: row → (code, s, d, canon) —
    the §4.7 typed encoding computed "in pure Java" in the paper,
    in batched Python here."""

    ctx_of = _context_factory(var_order, outer_vars, config)

    def f(*cols: pd.Series) -> pd.DataFrame:
        codes, ss, ds, canons = [], [], [], []
        for cells in zip(*cols):
            seq = expr_iter.materialize(ctx_of(cells))
            code, s, d = encode_key(seq, empty_greatest=empty_greatest, clause=clause)
            codes.append(code)
            ss.append(s)
            ds.append(d)
            canons.append(dumps_seq(seq))
        return pd.DataFrame({"code": codes, "s": ss, "d": ds, "canon": canons})

    return F.pandas_udf(f, KEY_STRUCT)


def merge_sequences_udf():
    """Post-GROUP-BY merge: collect_list of serialized sequences → one
    serialized concatenated sequence (the paper's SEQUENCE() UDAF,
    §4.7, expressed as collect_list + merge)."""

    def f(cells):
        out = []
        for c in cells:
            out.extend(loads_seq(c))
        return dumps_seq(out)

    return F.udf(f, StringType())

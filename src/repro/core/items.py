"""The JSONiq Data Model (JDM) as used by the engine (paper §2.3, §4.1).

Items are represented as plain Python values, which keeps them cheap to
ship through Spark closures and trivially heterogeneous (the paper's
``Item`` class hierarchy collapses onto Python's dynamic typing):

======================  =======================
JDM item                Python representation
======================  =======================
object                  ``dict[str, item]``
array                   ``list[item]``
string                  ``str``
number (int/dec/dbl)    ``int`` / ``float``
boolean                 ``bool``
null                    ``None``
======================  =======================

A *sequence of items* is a Python ``list`` (flat, never nested as a
sequence; arrays nest, sequences do not). The **empty sequence** is
``[]`` and is distinct from ``[None]`` (a sequence of one null) —
exactly the missing-vs-null distinction Spark SQL loses in Fig. 6.

For FLWOR tuple streams on DataFrames (§4.3), every variable column
holds the JSON serialization of its sequence (a JSON array). JSON
round-trips all JDM item kinds losslessly, including the int/float
distinction.

This module also implements the §4.7 *typed encoding*: three native
DataFrame columns (type code, string value, number value) per
grouping/ordering key, designed so that Spark SQL GROUP BY / ORDER BY
over the encoded columns realises JSONiq key semantics.
"""
from __future__ import annotations

import json
import math
from typing import Any

from ..jsoniq.errors import NonAtomicKeyError, TypeError_

Item = Any  # object|array|str|int|float|bool|None
Sequence = list


# --------------------------------------------------------------------------
# Sequence (de)serialization for DataFrame columns
# --------------------------------------------------------------------------

def dumps_seq(seq: Sequence) -> str:
    """Serialize a sequence of items to its JSON-array column encoding."""
    return json.dumps(seq, separators=(",", ":"))


def loads_seq(cell: str | None) -> Sequence:
    """Inverse of :func:`dumps_seq`; a SQL NULL cell (from explode_outer
    of an empty binding) decodes to the empty sequence."""
    if cell is None:
        return []
    return json.loads(cell)


# --------------------------------------------------------------------------
# Kind tests and effective boolean value
# --------------------------------------------------------------------------

def is_atomic(item: Item) -> bool:
    return not isinstance(item, (dict, list))


def is_number(item: Item) -> bool:
    # bool is an int subclass in Python but a distinct JDM type.
    return isinstance(item, (int, float)) and not isinstance(item, bool)


def kind(item: Item) -> str:
    """JDM kind name, used in error messages and type dispatch."""
    if isinstance(item, dict):
        return "object"
    if isinstance(item, list):
        return "array"
    if isinstance(item, bool):
        return "boolean"
    if item is None:
        return "null"
    if isinstance(item, str):
        return "string"
    if isinstance(item, (int, float)):
        return "number"
    raise TypeError_(f"not a JDM item: {type(item).__name__}")


def effective_boolean_value(seq: Sequence) -> bool:
    """JSONiq effective boolean value of a sequence.

    Empty → false; singleton boolean → itself; singleton null → false;
    singleton string → non-empty; singleton number → non-zero and not
    NaN; anything else (objects, arrays, longer sequences) is an error
    in JSONiq — we raise, matching spec behaviour.
    """
    if not seq:
        return False
    if len(seq) > 1:
        raise TypeError_("effective boolean value of a sequence of more than one item")
    item = seq[0]
    if isinstance(item, bool):
        return item
    if item is None:
        return False
    if isinstance(item, str):
        return len(item) > 0
    if is_number(item):
        return item != 0 and not (isinstance(item, float) and math.isnan(item))
    raise TypeError_(f"effective boolean value of a {kind(item)}")


# --------------------------------------------------------------------------
# Value comparison (eq ne lt le gt ge) — §4.8 semantics
# --------------------------------------------------------------------------

def compare_atomics(a: Item, b: Item) -> int | None:
    """Three-way comparison of two atomic items.

    Returns <0, 0, >0, or ``None`` when the items are incomparable for
    ordering (e.g. a string and a number — §4.8 requires an error,
    which the caller raises). ``null`` is smaller than any other
    atomic value.
    """
    if a is None and b is None:
        return 0
    if a is None:
        return -1
    if b is None:
        return 1
    if isinstance(a, bool) and isinstance(b, bool):
        return (a > b) - (a < b)
    if is_number(a) and is_number(b):
        return (a > b) - (a < b)
    if isinstance(a, str) and isinstance(b, str):
        return (a > b) - (a < b)
    return None


def value_compare(op: str, a_seq: Sequence, b_seq: Sequence) -> Sequence:
    """JSONiq value comparison: empty operand propagates to empty;
    singleton atomics compare; ``eq``/``ne`` across incompatible types
    are false/true; ordering across incompatible types is an error."""
    if not a_seq or not b_seq:
        return []
    if len(a_seq) > 1 or len(b_seq) > 1:
        raise TypeError_(f"comparison '{op}' requires singleton sequences")
    a, b = a_seq[0], b_seq[0]
    if not is_atomic(a) or not is_atomic(b):
        raise TypeError_(f"comparison '{op}' on non-atomic item")
    c = compare_atomics(a, b)
    if c is None:
        if op == "eq":
            return [False]
        if op == "ne":
            return [True]
        raise TypeError_(f"cannot compare {kind(a)} with {kind(b)} using '{op}'")
    return [
        {
            "eq": c == 0,
            "ne": c != 0,
            "lt": c < 0,
            "le": c <= 0,
            "gt": c > 0,
            "ge": c >= 0,
        }[op]
    ]


# --------------------------------------------------------------------------
# §4.7 typed encoding of grouping/ordering keys
# --------------------------------------------------------------------------
#
# Paper type codes: 1 empty sequence (7 when "empty greatest"), 2 null,
# then booleans, 5 string, 6 number. The paper prints "3 for the
# boolean true, 4 for false" in §4.7, where only *equality* of codes
# matters; for order-by the JSONiq spec requires false < true, so we
# use 3=false, 4=true throughout (one encoding for both clauses; the
# deviation is documented in DESIGN.md and EXPERIMENTS.md).

TYPE_EMPTY_LEAST = 1
TYPE_NULL = 2
TYPE_FALSE = 3
TYPE_TRUE = 4
TYPE_STRING = 5
TYPE_NUMBER = 6
TYPE_EMPTY_GREATEST = 7

EncodedKey = tuple[int, str, float]


def encode_key(seq: Sequence, *, empty_greatest: bool = False, clause: str = "key") -> EncodedKey:
    """Encode a key binding as (type code, string value, double value).

    Raises :class:`NonAtomicKeyError` when the binding is not a single
    atomic item or the empty sequence (§4.7/§4.8 requirement).
    """
    if not seq:
        return (TYPE_EMPTY_GREATEST if empty_greatest else TYPE_EMPTY_LEAST, "", 0.0)
    if len(seq) > 1:
        raise NonAtomicKeyError(f"{clause} bound to a sequence of {len(seq)} items")
    item = seq[0]
    if item is None:
        return (TYPE_NULL, "", 0.0)
    if isinstance(item, bool):
        return (TYPE_TRUE if item else TYPE_FALSE, "", 0.0)
    if isinstance(item, str):
        return (TYPE_STRING, item, 0.0)
    if is_number(item):
        return (TYPE_NUMBER, "", float(item))
    raise NonAtomicKeyError(f"{clause} bound to a {kind(item)}")


def check_orderable_types(codes: set[int], spec_label: str = "order-by key") -> None:
    """§4.8 first pass: values under one sort key must be mutually
    comparable. Empty/null (codes 1, 2, 7) are comparable to anything;
    the remaining codes must be all-boolean, all-string or all-number."""
    concrete = codes - {TYPE_EMPTY_LEAST, TYPE_NULL, TYPE_EMPTY_GREATEST}
    families = set()
    for c in concrete:
        families.add("boolean" if c in (TYPE_FALSE, TYPE_TRUE) else
                     "string" if c == TYPE_STRING else "number")
    if len(families) > 1:
        raise TypeError_(
            f"{spec_label}: incompatible types in tuple stream: {sorted(families)}"
        )


def decode_key(enc: EncodedKey) -> Sequence:
    """Recover the original key item sequence from its typed encoding
    (the paper's ARRAY_DISTINCT step; we invert losslessly instead)."""
    code, s, d = enc
    if code in (TYPE_EMPTY_LEAST, TYPE_EMPTY_GREATEST):
        return []
    if code == TYPE_NULL:
        return [None]
    if code == TYPE_FALSE:
        return [False]
    if code == TYPE_TRUE:
        return [True]
    if code == TYPE_STRING:
        return [s]
    if code == TYPE_NUMBER:
        return [int(d) if float(d).is_integer() else d]
    raise TypeError_(f"bad type code {code}")

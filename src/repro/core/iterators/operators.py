"""Operator iterators: arithmetic, comparison, logic, string concat,
object/array constructors."""
from __future__ import annotations

import math
from typing import Iterator

from ...jsoniq.errors import DynamicError, TypeError_
from ..dynamic_context import DynamicContext
from ..items import (
    Item,
    effective_boolean_value,
    is_atomic,
    is_number,
    kind,
    value_compare,
)
from .base import RuntimeIterator


class ArithmeticIterator(RuntimeIterator):
    """``+ - * div idiv mod`` on singleton numbers; an empty operand
    propagates to the empty sequence (XQuery/JSONiq semantics)."""

    def __init__(self, op: str, left: RuntimeIterator, right: RuntimeIterator):
        super().__init__([left, right])
        self.op = op

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        left, right = self.children
        a = left.materialize(ctx)
        b = right.materialize(ctx)
        if not a or not b:
            return
        if len(a) > 1 or len(b) > 1:
            raise TypeError_(f"arithmetic '{self.op}' requires singleton operands")
        x, y = a[0], b[0]
        if not is_number(x) or not is_number(y):
            raise TypeError_(
                f"arithmetic '{self.op}' on {kind(x)} and {kind(y)}"
            )
        yield self._apply(x, y)

    def _apply(self, x, y):
        op = self.op
        if op == "+":
            return x + y
        if op == "-":
            return x - y
        if op == "*":
            return x * y
        if op == "div":
            if y == 0:
                raise DynamicError("division by zero")
            r = x / y
            return r
        if op == "idiv":
            # XQuery idiv truncates toward zero.
            if y == 0:
                raise DynamicError("integer division by zero")
            q = abs(x) // abs(y)
            return int(q) if (x >= 0) == (y >= 0) else -int(q)
        if op == "mod":
            # XQuery mod takes the sign of the dividend (unlike Python %).
            if y == 0:
                raise DynamicError("modulus by zero")
            if isinstance(x, int) and isinstance(y, int):
                r = abs(x) % abs(y)
                return r if x >= 0 else -r
            return math.fmod(x, y)
        raise DynamicError(f"unknown arithmetic operator {op!r}")

    def _tree_label(self) -> str:
        return self.op


class UnaryMinusIterator(RuntimeIterator):
    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        (child,) = self.children
        seq = child.materialize(ctx)
        if not seq:
            return
        if len(seq) > 1 or not is_number(seq[0]):
            raise TypeError_("unary minus requires a singleton number")
        yield -seq[0]


class ComparisonIterator(RuntimeIterator):
    """Value comparison ``eq ne lt le gt ge`` (items.value_compare)."""

    def __init__(self, op: str, left: RuntimeIterator, right: RuntimeIterator):
        super().__init__([left, right])
        self.op = op

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        left, right = self.children
        yield from value_compare(self.op, left.materialize(ctx), right.materialize(ctx))

    def _tree_label(self) -> str:
        return self.op


class BoolOpIterator(RuntimeIterator):
    """``and`` / ``or`` with short-circuit over effective boolean values."""

    def __init__(self, op: str, left: RuntimeIterator, right: RuntimeIterator):
        super().__init__([left, right])
        self.op = op

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        left, right = self.children
        a = effective_boolean_value(left.materialize(ctx))
        if self.op == "and":
            yield a and effective_boolean_value(right.materialize(ctx))
        else:
            yield a or effective_boolean_value(right.materialize(ctx))

    def _tree_label(self) -> str:
        return self.op


class NotIterator(RuntimeIterator):
    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        (child,) = self.children
        yield not effective_boolean_value(child.materialize(ctx))


class StringConcatIterator(RuntimeIterator):
    """``e1 || e2`` — atomize both sides; empty becomes ''."""

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        left, right = self.children
        yield _to_concat_str(left.materialize(ctx)) + _to_concat_str(
            right.materialize(ctx)
        )


def _to_concat_str(seq) -> str:
    if not seq:
        return ""
    if len(seq) > 1:
        raise TypeError_("'||' requires singleton operands")
    return atomic_to_string(seq[0])


def atomic_to_string(item: Item) -> str:
    """JSONiq string conversion of an atomic item."""
    if item is None:
        return "null"
    if isinstance(item, bool):
        return "true" if item else "false"
    if isinstance(item, str):
        return item
    if is_number(item):
        if isinstance(item, float) and item.is_integer():
            return str(int(item))
        return str(item)
    raise TypeError_(f"cannot convert a {kind(item)} to string")


class ObjectConstructorIterator(RuntimeIterator):
    """``{"k": v, ...}`` — keys must be singleton strings; an empty
    value sequence becomes null, a multi-item value is an error (wrap
    in an array constructor, as JSONiq requires)."""

    def __init__(self, key_iters: list[RuntimeIterator], value_iters: list[RuntimeIterator]):
        super().__init__(key_iters + value_iters)
        self.key_iters = key_iters
        self.value_iters = value_iters

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        obj: dict[str, Item] = {}
        for k_it, v_it in zip(self.key_iters, self.value_iters):
            k_seq = k_it.materialize(ctx)
            if len(k_seq) != 1 or not is_atomic(k_seq[0]):
                raise TypeError_("object key must be a single atomic")
            key = atomic_to_string(k_seq[0])
            v_seq = v_it.materialize(ctx)
            if len(v_seq) > 1:
                raise TypeError_(
                    f"object value for key {key!r} is a sequence of {len(v_seq)} "
                    "items; wrap it in an array constructor [...]"
                )
            obj[key] = v_seq[0] if v_seq else None
        yield obj


class ArrayConstructorIterator(RuntimeIterator):
    """``[ e ]`` — materializes the child sequence into one array item."""

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        if not self.children:
            yield []
            return
        (child,) = self.children
        yield child.materialize(ctx)

"""Navigation iterators: object lookup, array unboxing/lookup,
predicates (paper §4.1.2, §5.6).

These are the expressions Rumble pushes down to Spark: when the target
sequence is physically an RDD of items, lookup/unbox/filter become
``flatMap``/``filter`` transformations whose closures carry the nested
runtime iterators, evaluated on executors via the local API (§5.6).
"""
from __future__ import annotations

from typing import Iterator

from ...jsoniq.errors import DynamicError, TypeError_
from ..dynamic_context import DynamicContext
from ..items import Item, effective_boolean_value, is_number
from .base import RuntimeIterator


def _lookup_one(item: Item, key: str):
    """Lenient object lookup: non-objects and missing keys yield nothing."""
    if isinstance(item, dict) and key in item:
        return [item[key]]
    return []


class ObjectLookupIterator(RuntimeIterator):
    """``e.key`` — flatMap of a per-object lookup (§4.1.2)."""

    def __init__(self, target: RuntimeIterator, key: RuntimeIterator):
        super().__init__([target, key])
        self.target = target
        self.key = key

    def _key_string(self, ctx: DynamicContext) -> str:
        seq = self.key.materialize(ctx)
        if len(seq) != 1 or not isinstance(seq[0], str):
            raise TypeError_("object lookup key must be a single string")
        return seq[0]

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        key = self._key_string(ctx)
        for item in self.target.iter_items(ctx):
            if isinstance(item, dict) and key in item:
                yield item[key]

    def supports_rdd(self, ctx: DynamicContext) -> bool:
        return self.target.supports_rdd(ctx)

    def get_rdd(self, ctx: DynamicContext):
        key = self._key_string(ctx)
        return self.target.get_rdd(ctx).flatMap(lambda it: _lookup_one(it, key))


class ArrayUnboxIterator(RuntimeIterator):
    """``e[]`` — flattens arrays into their members; skips non-arrays."""

    def __init__(self, target: RuntimeIterator):
        super().__init__([target])
        self.target = target

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        for item in self.target.iter_items(ctx):
            if isinstance(item, list):
                yield from item

    def supports_rdd(self, ctx: DynamicContext) -> bool:
        return self.target.supports_rdd(ctx)

    def get_rdd(self, ctx: DynamicContext):
        return self.target.get_rdd(ctx).flatMap(
            lambda it: it if isinstance(it, list) else []
        )


class ArrayLookupIterator(RuntimeIterator):
    """``e[[i]]`` — 1-based member lookup in each array item."""

    def __init__(self, target: RuntimeIterator, index: RuntimeIterator):
        super().__init__([target, index])
        self.target = target
        self.index = index

    def _index_int(self, ctx: DynamicContext) -> int | None:
        seq = self.index.materialize(ctx)
        if not seq:
            return None
        if len(seq) != 1 or not is_number(seq[0]):
            raise TypeError_("array lookup index must be a single number")
        return int(seq[0])

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        i = self._index_int(ctx)
        if i is None:
            return
        for item in self.target.iter_items(ctx):
            if isinstance(item, list) and 1 <= i <= len(item):
                yield item[i - 1]

    def supports_rdd(self, ctx: DynamicContext) -> bool:
        return self.target.supports_rdd(ctx)

    def get_rdd(self, ctx: DynamicContext):
        i = self._index_int(ctx)
        rdd = self.target.get_rdd(ctx)
        if i is None:
            return rdd.filter(lambda _: False)
        return rdd.flatMap(
            lambda it: [it[i - 1]]
            if isinstance(it, list) and 1 <= i <= len(it)
            else []
        )


class PredicateIterator(RuntimeIterator):
    """``e[p]`` — filter with ``$$`` bound to each candidate item.

    A numeric predicate result selects by 1-based position; any other
    result is taken as an effective boolean value. On the RDD path only
    boolean predicates are supported (position is not meaningful per
    partition without a zipWithIndex) — except the common special case
    of a *literal integer* predicate, which maps to zipWithIndex+filter.
    """

    def __init__(self, target: RuntimeIterator, pred: RuntimeIterator,
                 positional_literal: int | None = None):
        super().__init__([target, pred])
        self.target = target
        self.pred = pred
        self.positional_literal = positional_literal

    @staticmethod
    def _keep(pred: RuntimeIterator, ctx: DynamicContext, item: Item, pos: int) -> bool:
        inner = ctx.with_context_item(item, pos)
        result = pred.materialize(inner)
        if len(result) == 1 and is_number(result[0]):
            return pos == int(result[0])
        return effective_boolean_value(result)

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        pos = 0
        for item in self.target.iter_items(ctx):
            pos += 1
            if self._keep(self.pred, ctx, item, pos):
                yield item

    def supports_rdd(self, ctx: DynamicContext) -> bool:
        return self.target.supports_rdd(ctx)

    def get_rdd(self, ctx: DynamicContext):
        rdd = self.target.get_rdd(ctx)
        if self.positional_literal is not None:
            n = self.positional_literal
            return (
                rdd.zipWithIndex()
                .filter(lambda pair: pair[1] == n - 1)
                .map(lambda pair: pair[0])
            )
        pred, outer = self.pred, ctx

        def keep(item: Item) -> bool:
            inner = outer.with_context_item(item, None)
            result = pred.materialize(inner)
            if len(result) == 1 and is_number(result[0]):
                raise DynamicError(
                    "positional (numeric) predicates are not supported on the "
                    "RDD execution path; use a literal index or local execution"
                )
            return effective_boolean_value(result)

        return rdd.filter(keep)

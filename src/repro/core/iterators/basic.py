"""Basic expression iterators: literals, variables, sequences, ranges,
the context item, and control flow (if / quantified expressions)."""
from __future__ import annotations

from typing import Iterator

from ...jsoniq.errors import DynamicError, TypeError_
from ..dynamic_context import DynamicContext
from ..items import Item, effective_boolean_value, is_number
from .base import RuntimeIterator


class LiteralIterator(RuntimeIterator):
    """A single atomic literal."""

    def __init__(self, value: Item):
        super().__init__()
        self.value = value

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        yield self.value

    def _tree_label(self) -> str:
        return repr(self.value)


class EmptySequenceIterator(RuntimeIterator):
    """``()``."""

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        return iter(())


class VarRefIterator(RuntimeIterator):
    """``$name`` — streams the sequence bound in the dynamic context."""

    def __init__(self, name: str):
        super().__init__()
        self.name = name

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        yield from ctx.lookup(self.name)

    def _tree_label(self) -> str:
        return f"${self.name}"


class ContextItemIterator(RuntimeIterator):
    """``$$`` — the context item bound by the enclosing predicate."""

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        if not ctx.has_context_item:
            raise DynamicError("'$$' evaluated with no context item")
        yield ctx.context_item


class SequenceConcatIterator(RuntimeIterator):
    """Comma expression — concatenates child sequences (sequences are
    flat and never nest, §2.3)."""

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        for child in self.children:
            yield from child.iter_items(ctx)


class RangeIterator(RuntimeIterator):
    """``a to b`` — the integer range, empty when an operand is empty
    or a > b."""

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        left, right = self.children
        lo = left.materialize(ctx)
        hi = right.materialize(ctx)
        if not lo or not hi:
            return
        if len(lo) > 1 or len(hi) > 1 or not is_number(lo[0]) or not is_number(hi[0]):
            raise TypeError_("'to' requires singleton numbers")
        yield from range(int(lo[0]), int(hi[0]) + 1)


class IfIterator(RuntimeIterator):
    """``if (c) then e1 else e2`` over the effective boolean value of c."""

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        cond, then, else_ = self.children
        branch = then if effective_boolean_value(cond.materialize(ctx)) else else_
        yield from branch.iter_items(ctx)


class QuantifiedIterator(RuntimeIterator):
    """``some/every $v in e ... satisfies p`` — nested iteration binding
    each variable to one item at a time."""

    def __init__(self, kind: str, var_names: list[str],
                 sources: list[RuntimeIterator], satisfies: RuntimeIterator):
        super().__init__(sources + [satisfies])
        self.kind = kind
        self.var_names = var_names
        self.sources = sources
        self.satisfies = satisfies

    def _iterate_local(self, ctx: DynamicContext) -> Iterator[Item]:
        yield self._holds(ctx, 0)

    def _holds(self, ctx: DynamicContext, depth: int) -> bool:
        if depth == len(self.sources):
            return effective_boolean_value(self.satisfies.materialize(ctx))
        src = self.sources[depth]
        for item in src.iter_items(ctx):
            inner = ctx.bind(self.var_names[depth], [item])
            holds = self._holds(inner, depth + 1)
            if self.kind == "some" and holds:
                return True
            if self.kind == "every" and not holds:
                return False
        return self.kind == "every"

    def _tree_label(self) -> str:
        return self.kind

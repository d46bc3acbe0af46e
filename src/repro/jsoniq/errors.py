"""Error hierarchy for the JSONiq engine.

Mirrors the paper's split between *static* errors (detected at
compile/translate time, e.g. an unbound variable, §5.3) and *dynamic*
errors (raised while evaluating, e.g. ordering incompatible types,
§4.8). Resource errors model the behaviour of the single-threaded
baseline engines in Fig. 12, which die on memory/time budgets.
"""
from __future__ import annotations


class RumbleError(Exception):
    """Base class for every error raised by the reproduction engine."""


class ParseError(RumbleError):
    """Raised by the lexer/parser on malformed query text."""

    def __init__(self, message: str, line: int = 0, column: int = 0):
        super().__init__(f"{message} (line {line}, column {column})")
        self.line = line
        self.column = column


class StaticError(RumbleError):
    """Static (compile-time) error, e.g. reference to an unbound variable."""


class DynamicError(RumbleError):
    """Dynamic (runtime) error raised while evaluating an expression."""


class TypeError_(DynamicError):
    """JSONiq type error (e.g. arithmetic on non-numbers, incomparable
    order-by keys per §4.8). Named with a trailing underscore to avoid
    shadowing the Python builtin."""


class NonAtomicKeyError(DynamicError):
    """A group-by/order-by key was bound to an object, an array, or a
    sequence of more than one item (§4.7/§4.8)."""


class ResourceCapExceeded(RumbleError):
    """Base for the simulated resource limits of single-threaded engines."""


class DeadlineExceeded(ResourceCapExceeded):
    """Wall-clock budget exhausted (Fig. 12's 600-second cap, scaled)."""


class MaterializationCapExceeded(ResourceCapExceeded):
    """An engine tried to materialize more items than its configured cap —
    the stand-in for Zorba/Xidel running out of memory in Fig. 12."""

"""Dynamic contexts (paper §5.5) and the engine configuration.

A dynamic context binds in-scope variables to (materialized) sequences
of items, plus the context item/position set by predicates. Contexts
are small plain objects so that Spark closures carrying runtime
iterators + their opening contexts pickle cheaply (§5.6).

:class:`RumbleConfig` carries the knobs the paper describes: the
materialization cap with warning (§5.5), plus the simulated resource
budgets used by the single-threaded baseline engines of Fig. 12
(deadline, item cap) — see DESIGN.md §4.
"""
from __future__ import annotations

import time
import warnings
from dataclasses import dataclass, field

from ..jsoniq.errors import DeadlineExceeded, MaterializationCapExceeded
from .items import Item, Sequence


@dataclass
class RumbleConfig:
    """Engine-wide execution knobs. Picklable; shipped inside closures."""

    #: Max items materialized when an RDD-backed sequence is consumed
    #: through the local API (§5.5: "a maximum number of items to
    #: materialize can be specified and a warning is issued").
    materialization_cap: int = 10_000_000
    #: Emit a warning (vs raise) when the cap is hit.
    warn_on_cap: bool = True
    #: Disable Spark entirely: every iterator reports no RDD support and
    #: sources read locally. Used by the Zorba-like baseline.
    force_local: bool = False
    #: Wall-clock deadline (epoch seconds) for local evaluation — the
    #: scaled version of Fig. 12's 600 s cap. None = no deadline.
    deadline_epoch: float | None = None
    #: Hard cap on items held by any single local materialization — the
    #: stand-in for a single-threaded engine's memory limit (Fig. 12).
    local_item_cap: int | None = None
    #: Default number of input partitions for json-file() (None = Spark
    #: default). The T4 speedup sweep sets this.
    default_input_partitions: int | None = None
    #: Naive-engine mode (the Xidel-like baseline of Fig. 12): fully
    #: materialize the input and every FLWOR tuple stream instead of
    #: streaming, so memory grows with every intermediate.
    eager: bool = False
    #: Enable the §4.7 group-by rewrites (COUNT push-down, unused-column
    #: pruning). The single-threaded baseline engines disable them to
    #: model Zorba/Xidel, which materialize non-grouping variables and
    #: therefore run out of memory on the grouping query (Fig. 12).
    enable_optimizations: bool = True

    def check_deadline(self) -> None:
        if self.deadline_epoch is not None and time.time() > self.deadline_epoch:
            raise DeadlineExceeded("local evaluation exceeded its wall-clock budget")

    def check_item_cap(self, n: int) -> None:
        if self.local_item_cap is not None and n > self.local_item_cap:
            raise MaterializationCapExceeded(
                f"materialized {n} items, cap is {self.local_item_cap}"
            )

    def on_materialization_cap(self, cap: int) -> None:
        msg = f"RDD materialized through the local API was truncated at {cap} items"
        if self.warn_on_cap:
            warnings.warn(msg, RuntimeWarning, stacklevel=3)
        else:
            raise MaterializationCapExceeded(msg)


@dataclass
class DynamicContext:
    """Variable bindings + context item for one evaluation (§5.5).

    ``variables`` maps variable name → materialized sequence. The
    context item (``$$``) and its 1-based position are set by predicate
    iterators. Contexts are copied on extension (bindings are small —
    they live inside FLWOR tuples)."""

    variables: dict[str, Sequence] = field(default_factory=dict)
    context_item: Item = None
    context_position: int | None = None
    has_context_item: bool = False
    config: RumbleConfig = field(default_factory=RumbleConfig)

    def bind(self, name: str, seq: Sequence) -> "DynamicContext":
        """Return a new context with ``name`` (re)bound to ``seq``."""
        vs = dict(self.variables)
        vs[name] = seq
        return DynamicContext(vs, self.context_item, self.context_position,
                              self.has_context_item, self.config)

    def with_context_item(self, item: Item, position: int | None = None) -> "DynamicContext":
        return DynamicContext(self.variables, item, position, True, self.config)

    def lookup(self, name: str) -> Sequence:
        try:
            return self.variables[name]
        except KeyError:  # scoping should have caught this statically
            raise KeyError(f"variable ${name} not bound in dynamic context") from None

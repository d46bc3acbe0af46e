"""Single-threaded JSONiq engines — the Fig. 12 comparison points.

The paper compares Rumble with **Zorba** (the reference C++ JSONiq
engine) and **Xidel** (a Pascal implementation), both single-threaded
and memory-bound: Zorba could not group/sort more than 4 M objects in
16 GB, Xidel ran out of memory on a *filter* at 8 M objects, and both
were capped at 600 s. Neither binary is available offline, so we build
behaviour-preserving stand-ins on our own runtime iterators
(DESIGN.md §4):

* :func:`zorba_like` — a correct, *streaming* single-threaded engine:
  Spark is disabled (``force_local``); filters stream, but group-by /
  order-by must materialize the tuple stream in one process — exactly
  the operation that killed Zorba at scale.
* :func:`xidel_like` — a *naive* single-threaded engine
  (``eager=True``): the input and every intermediate tuple stream are
  fully materialized, so even the filter query holds the whole dataset
  in memory — matching Xidel's earlier failure.

Both accept a wall-clock budget (the paper's 600 s cap, scaled) and an
item cap standing in for the 16 GB memory limit; exceeding either
raises :class:`~repro.jsoniq.errors.ResourceCapExceeded`, which the
harness reports as DNF, as the paper's figures do.
"""
from __future__ import annotations

import time

from ..core import Rumble, RumbleConfig


def _engine(*, eager: bool, budget_s: float | None, item_cap: int | None) -> Rumble:
    deadline = time.time() + budget_s if budget_s is not None else None
    return Rumble(
        spark=None,
        config=RumbleConfig(
            force_local=True,
            eager=eager,
            deadline_epoch=deadline,
            local_item_cap=item_cap,
            # Zorba/Xidel materialize non-grouping variables (no §4.7
            # COUNT push-down) — that is what makes the grouping query
            # blow their memory in Fig. 12.
            enable_optimizations=False,
        ),
    )


def zorba_like(query: str, *, budget_s: float | None = None,
               item_cap: int | None = None, cap: int | None = None):
    """Run ``query`` on the streaming single-threaded engine."""
    return _engine(eager=False, budget_s=budget_s, item_cap=item_cap).run(query, cap)


def xidel_like(query: str, *, budget_s: float | None = None,
               item_cap: int | None = None, cap: int | None = None):
    """Run ``query`` on the naive fully-materializing engine."""
    return _engine(eager=True, budget_s=budget_s, item_cap=item_cap).run(query, cap)

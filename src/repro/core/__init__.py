"""The paper's primary contribution: the Rumble JSONiq-on-Spark engine.

Layers (paper §5): ``translator`` turns the parsed expression/clause
tree into runtime iterators (``iterators/`` for expressions → sequences
of items, ``flwor/`` for clauses → tuple streams); ``engine`` is the
user-facing facade; ``optimizer`` holds the §4.7 group-by rewrites.
"""
from .dynamic_context import DynamicContext, RumbleConfig  # noqa: F401
from .engine import Rumble  # noqa: F401

"""FLWOR clause runtime iterators (tuple streams, paper §4.2–§4.10)."""

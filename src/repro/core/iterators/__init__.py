"""Expression runtime iterators (sequences of items, paper §5.4–§5.6)."""

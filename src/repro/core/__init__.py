"""DBSP core: streams, circuits, incrementalization, recursion (§2-§6)."""

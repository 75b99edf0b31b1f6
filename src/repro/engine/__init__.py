"""Spark execution substrate: broadcast state + mapInPandas fan-out of
the paper's shared-memory parallel loops (see DESIGN.md §3)."""

"""Attributed-graph substrate: PropertyGraph, the Pregel-style walk
engine, and BFS primitives — all DataFrame-based."""
from repro.graph.property_graph import PropertyGraph  # noqa: F401

"""Shared dataset plumbing.

A generator returns a :class:`Dataset` holding both the PropertyGraph
(what the framework consumes) and the flat pandas tables it was built
from (what the DuckDB oracle consumes in tests).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Mapping

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.graph.property_graph import PropertyGraph


@dataclass
class Dataset:
    """A named attributed graph plus its flat source tables."""

    name: str
    graph: PropertyGraph
    node_tables: Mapping[str, pd.DataFrame]
    edge_tables: Mapping[str, pd.DataFrame]

    @staticmethod
    def build(
        spark: SparkSession,
        name: str,
        node_tables: Mapping[str, pd.DataFrame],
        edge_tables: Mapping[str, pd.DataFrame],
    ) -> "Dataset":
        graph = PropertyGraph.from_tables(spark, node_tables, edge_tables)
        return Dataset(name, graph, node_tables, edge_tables)


def ensure_covered(
    rng: np.random.Generator, col: np.ndarray, n_targets: int, lo: int
) -> np.ndarray:
    """Ensure every target id in [lo, lo + n_targets) appears at least
    once in ``col`` (so no node is isolated, per the paper's
    connectedness assumption). Missing ids overwrite random positions."""
    col = col.copy()
    want = np.arange(lo, lo + n_targets)
    missing = np.setdiff1d(want, np.unique(col))
    if len(missing) == 0:
        return col
    # Only overwrite duplicate occurrences, so no currently-covered id
    # loses its last slot (first occurrence of every value is kept).
    _, first_idx = np.unique(col, return_index=True)
    mask = np.ones(len(col), dtype=bool)
    mask[first_idx] = False
    eligible = np.flatnonzero(mask)
    if len(missing) > len(eligible):
        raise ValueError("edge list too small to cover all targets")
    pos = rng.choice(eligible, size=len(missing), replace=False)
    col[pos] = missing
    return col

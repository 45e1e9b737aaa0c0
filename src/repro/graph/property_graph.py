"""Attributed (property) graph over Spark DataFrames.

Schema (paper Def. 1):

- ``nodes``: ``id BIGINT, ntype STRING, attrs MAP<STRING, STRING>``
- ``edges``: ``src BIGINT, dst BIGINT, etype STRING, attrs MAP<STRING, STRING>``

Attribute values are stored as strings and cast at use sites (the
hypothesis layer knows which attributes are numeric). Edges are directed;
per Def. 1 every relation ``r`` implies its inverse ``r^-1``, so the
*adjacency* view materializes both directions, suffixing the inverse
type with ``{INV_SUFFIX}``.
"""
from __future__ import annotations

from functools import cached_property
from typing import Mapping

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

INV_SUFFIX = "_inv"


def inverse_etype(etype: str) -> str:
    """Name of the inverse relation of ``etype`` (involutive)."""
    if etype.endswith(INV_SUFFIX):
        return etype[: -len(INV_SUFFIX)]
    return etype + INV_SUFFIX


class PropertyGraph:
    """An attributed graph held as cached Spark DataFrames.

    Construct via :meth:`from_tables` (flat pandas/Spark tables per node
    and edge type — the generator-friendly path, also what the DuckDB
    oracle consumes) or directly from conforming ``nodes``/``edges``
    DataFrames.
    """

    def __init__(self, nodes: DataFrame, edges: DataFrame, *, cache: bool = True):
        self.nodes = nodes
        self.edges = edges
        if cache:
            self.nodes = self.nodes.cache()
            self.edges = self.edges.cache()

    # ------------------------------------------------------------------
    # Construction
    # ------------------------------------------------------------------
    @staticmethod
    def from_tables(
        spark: SparkSession,
        node_tables: Mapping[str, pd.DataFrame],
        edge_tables: Mapping[str, pd.DataFrame],
        *,
        cache: bool = True,
    ) -> "PropertyGraph":
        """Build from flat tables.

        ``node_tables[ntype]`` must have an ``id`` column; every other
        column becomes an attribute. ``edge_tables[etype]`` must have
        ``src``/``dst`` columns; every other column becomes an edge
        attribute. Node ids must be globally unique across types.
        """
        spark_nodes = []
        for ntype, pdf in node_tables.items():
            attr_cols = [c for c in pdf.columns if c != "id"]
            df = spark.createDataFrame(pdf)
            df = df.select(
                F.col("id").cast("bigint").alias("id"),
                F.lit(ntype).alias("ntype"),
                F.map_from_arrays(
                    F.array(*[F.lit(c) for c in attr_cols]),
                    F.array(*[F.col(c).cast("string") for c in attr_cols]),
                ).alias("attrs")
                if attr_cols
                else F.create_map().cast("map<string,string>").alias("attrs"),
            )
            spark_nodes.append(df)
        spark_edges = []
        for etype, pdf in edge_tables.items():
            attr_cols = [c for c in pdf.columns if c not in ("src", "dst")]
            df = spark.createDataFrame(pdf)
            df = df.select(
                F.col("src").cast("bigint").alias("src"),
                F.col("dst").cast("bigint").alias("dst"),
                F.lit(etype).alias("etype"),
                F.map_from_arrays(
                    F.array(*[F.lit(c) for c in attr_cols]),
                    F.array(*[F.col(c).cast("string") for c in attr_cols]),
                ).alias("attrs")
                if attr_cols
                else F.create_map().cast("map<string,string>").alias("attrs"),
            )
            spark_edges.append(df)
        if not spark_nodes or not spark_edges:
            raise ValueError("need at least one node table and one edge table")
        nodes = spark_nodes[0]
        for df in spark_nodes[1:]:
            nodes = nodes.unionByName(df)
        edges = spark_edges[0]
        for df in spark_edges[1:]:
            edges = edges.unionByName(df)
        return PropertyGraph(nodes, edges, cache=cache)

    # ------------------------------------------------------------------
    # Views
    # ------------------------------------------------------------------
    @cached_property
    def adjacency(self) -> DataFrame:
        """Symmetric adjacency: each stored edge plus its inverse.

        Columns: ``src, dst, etype, attrs`` — the inverse direction keeps
        the edge attributes and carries ``etype_inv`` as its type.
        """
        fwd = self.edges
        rev = self.edges.select(
            F.col("dst").alias("src"),
            F.col("src").alias("dst"),
            F.concat(F.col("etype"), F.lit(INV_SUFFIX)).alias("etype"),
            "attrs",
        )
        return fwd.unionByName(rev).cache()

    @cached_property
    def degrees(self) -> DataFrame:
        """Total (in+out) degree per node: ``id, degree``. Every node has
        degree >= 1 by the paper's connectedness assumption; nodes absent
        from the edge list get degree 0 here (generators avoid them)."""
        deg = self.adjacency.groupBy(F.col("src").alias("id")).agg(
            F.count(F.lit(1)).alias("degree")
        )
        return (
            self.nodes.select("id")
            .join(deg, "id", "left")
            .select("id", F.coalesce("degree", F.lit(0)).alias("degree"))
            .cache()
        )

    # ------------------------------------------------------------------
    # Statistics (Table 1)
    # ------------------------------------------------------------------
    def num_nodes(self) -> int:
        return self.nodes.count()

    def num_edges(self) -> int:
        return self.edges.count()

    def stats(self) -> dict:
        """Table-1 style statistics for a directed graph."""
        n, m = self.num_nodes(), self.num_edges()
        ntypes = self.nodes.select("ntype").distinct().count()
        etypes = self.edges.select("etype").distinct().count()
        density = m / (n * (n - 1)) if n > 1 else 0.0
        return {
            "nodes": n,
            "edges": m,
            "density": density,
            "node_types": ntypes,
            "edge_types": etypes,
        }

    # ------------------------------------------------------------------
    # Subgraphs
    # ------------------------------------------------------------------
    def induced_subgraph(self, node_ids: DataFrame) -> "PropertyGraph":
        """Induced subgraph on ``node_ids`` (a DataFrame with an ``id``
        column). Paper §3.2.1: "The resulting sampled graph S is the
        induced subgraph from V_S"."""
        ids = F.broadcast(node_ids.select("id").distinct())
        nodes = self.nodes.join(ids, "id", "semi")
        edges = (
            self.edges.join(ids.withColumnRenamed("id", "src"), "src", "semi")
            .join(ids.withColumnRenamed("id", "dst"), "dst", "semi")
            .select("src", "dst", "etype", "attrs")
        )
        return PropertyGraph(nodes, edges, cache=False)

    def unpersist(self) -> None:
        """Release cached DataFrames (graphs built per-test/per-run)."""
        for df in (self.nodes, self.edges):
            df.unpersist()
        for name in ("adjacency", "degrees"):
            if name in self.__dict__:
                self.__dict__[name].unpersist()

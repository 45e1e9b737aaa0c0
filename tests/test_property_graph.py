"""Tests for the PropertyGraph substrate on the hand-checkable toy graph."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graph.property_graph import PropertyGraph, inverse_etype


class TestInverseEtype:
    def test_forward(self):
        assert inverse_etype("Rates") == "Rates_inv"

    def test_involutive(self):
        assert inverse_etype(inverse_etype("Rates")) == "Rates"


class TestConstruction:
    def test_schema(self, toy_graph):
        assert set(toy_graph.nodes.columns) == {"id", "ntype", "attrs"}
        assert set(toy_graph.edges.columns) == {"src", "dst", "etype", "attrs"}

    def test_node_count_by_type(self, toy_graph):
        counts = dict(
            toy_graph.nodes.groupBy("ntype").count().rdd.map(tuple).collect()
        )
        assert counts == {"a": 2, "b": 3}

    def test_attrs_are_string_map(self, toy_graph):
        row = toy_graph.nodes.where(F.col("id") == 1).first()
        assert row["attrs"]["x"] == "10.0"

    def test_edge_attrs(self, toy_graph):
        row = toy_graph.edges.where(
            (F.col("src") == 2) & (F.col("dst") == 5)
        ).first()
        assert float(row["attrs"]["w"]) == 3.5

    def test_requires_tables(self, spark):
        with pytest.raises(ValueError):
            PropertyGraph.from_tables(spark, {}, {})


class TestAdjacency:
    def test_doubles_edges(self, toy_graph):
        assert toy_graph.adjacency.count() == 2 * toy_graph.edges.count()

    def test_inverse_direction_and_type(self, toy_graph):
        inv = toy_graph.adjacency.where(F.col("etype") == "r_inv")
        pairs = {(r["src"], r["dst"]) for r in inv.collect()}
        assert pairs == {(3, 1), (4, 1), (4, 2), (5, 2)}

    def test_inverse_keeps_attrs(self, toy_graph):
        row = toy_graph.adjacency.where(
            (F.col("src") == 5) & (F.col("dst") == 2)
        ).first()
        assert float(row["attrs"]["w"]) == 3.5


class TestDegrees:
    def test_values(self, toy_graph):
        # Total (in+out) degree: 1:2, 2:2, 3:1, 4:2, 5:1.
        deg = {r["id"]: r["degree"] for r in toy_graph.degrees.collect()}
        assert deg == {1: 2, 2: 2, 3: 1, 4: 2, 5: 1}

    def test_every_node_present(self, toy_graph):
        assert toy_graph.degrees.count() == toy_graph.num_nodes()


class TestStats:
    def test_toy_stats(self, toy_graph):
        st = toy_graph.stats()
        assert st["nodes"] == 5
        assert st["edges"] == 4
        assert st["node_types"] == 2
        assert st["edge_types"] == 1
        assert st["density"] == pytest.approx(4 / 20)


class TestInducedSubgraph:
    def test_keeps_internal_edges_only(self, spark, toy_graph):
        ids = spark.createDataFrame(pd.DataFrame({"id": [1, 3, 4]}))
        sub = toy_graph.induced_subgraph(ids)
        assert sub.num_nodes() == 3
        pairs = {(r["src"], r["dst"]) for r in sub.edges.collect()}
        assert pairs == {(1, 3), (1, 4)}  # (2,4),(2,5) dropped with node 2

    def test_empty_selection(self, spark, toy_graph):
        ids = spark.createDataFrame(pd.DataFrame({"id": [99]}))
        sub = toy_graph.induced_subgraph(ids)
        assert sub.num_nodes() == 0
        assert sub.num_edges() == 0

    def test_full_selection_is_identity(self, spark, toy_graph):
        ids = toy_graph.nodes.select("id")
        sub = toy_graph.induced_subgraph(ids)
        assert sub.num_nodes() == toy_graph.num_nodes()
        assert sub.num_edges() == toy_graph.num_edges()

    def test_duplicate_ids_deduped(self, spark, toy_graph):
        ids = spark.createDataFrame(pd.DataFrame({"id": [1, 1, 3, 3]}))
        assert toy_graph.induced_subgraph(ids).num_nodes() == 2

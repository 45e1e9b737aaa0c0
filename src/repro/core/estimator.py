"""Hypothesis estimators: relevant-instance extraction and aggregation.

Paper §3.1/§3.2.3: "we extract all relevant nodes, edges, or paths from
S and compute the required aggregated values". Extraction is a chain of
Catalyst joins along the hypothesis path — nodes filtered by modifier
M_1, joined through the (symmetric, typed) adjacency for each edge type
r_i, each hop filtered by modifier M_{i+1}. Works identically on the
full graph G (ground truth θ) and on a sampled graph S (estimator θ̂,
Eq. 2).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Optional

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.hypothesis import Agg, Hypothesis
from repro.graph.property_graph import PropertyGraph


def relevant_instances(graph: PropertyGraph, hyp: Hypothesis) -> DataFrame:
    """All relevant path instances of ``hyp`` in ``graph``.

    Returns a DataFrame with node-id columns ``n0 .. nl`` (one per path
    position) and a double column ``f`` holding f_P for that instance
    (null-filtered). Instances are ordered node sequences; a stored edge
    contributes both its forward type and its ``_inv`` type to matching.
    """
    f_col = None

    n0 = graph.nodes.where(
        hyp.start.to_column(F.col("ntype"), F.col("attrs"))
    )
    if hyp.f.kind == "node" and hyp.f.position == 0 and hyp.f.attr is not None:
        f_col = F.col("attrs").getItem(hyp.f.attr).cast("double")
    cur = n0.select(
        F.col("id").alias("n0"),
        *( [f_col.alias("f")] if f_col is not None else [] ),
    )

    for i, step in enumerate(hyp.steps, start=1):
        adj = graph.adjacency.where(F.col("etype") == F.lit(step.etype))
        edge_f = (
            hyp.f.kind == "edge"
            and hyp.f.position == i - 1
            and hyp.f.attr is not None
        )
        adj = adj.select(
            F.col("src").alias(f"n{i-1}"),
            F.col("dst").alias(f"n{i}"),
            *(
                [F.col("attrs").getItem(hyp.f.attr).cast("double").alias("f")]
                if edge_f
                else []
            ),
        )
        cur = cur.join(adj, on=f"n{i-1}", how="inner")

        nxt = graph.nodes.where(
            step.modifier.to_column(F.col("ntype"), F.col("attrs"))
        )
        node_f = (
            hyp.f.kind == "node" and hyp.f.position == i and hyp.f.attr is not None
        )
        nxt = nxt.select(
            F.col("id").alias(f"n{i}"),
            *(
                [F.col("attrs").getItem(hyp.f.attr).cast("double").alias("f")]
                if node_f
                else []
            ),
        )
        cur = cur.join(nxt, on=f"n{i}", how="inner")

    # Path *instances* are simple: the same node may not appear at two
    # positions (the co-author path needs two distinct authors). Node
    # ids are globally unique, so cross-type pairs pass trivially.
    l = hyp.length
    for i in range(l + 1):
        for j in range(i + 1, l + 1):
            cur = cur.where(F.col(f"n{i}") != F.col(f"n{j}"))

    if hyp.f.attr is None:
        cur = cur.withColumn("f", F.lit(1.0))
    return cur.where(F.col("f").isNotNull())


@dataclass(frozen=True)
class Estimate:
    """Aggregate over relevant instances plus the summary statistics the
    t-test needs (n, mean, std of the per-instance f values)."""

    n_instances: int
    value: Optional[float]  # the agg result; None when n_instances == 0
    mean: Optional[float]
    std: Optional[float]


def estimate(graph: PropertyGraph, hyp: Hypothesis) -> Estimate:
    """Compute the hypothesis estimator θ̂ (Eq. 2) on ``graph``."""
    inst = relevant_instances(graph, hyp)
    row = inst.agg(
        F.count(F.lit(1)).alias("n"),
        F.avg("f").alias("avg"),
        F.sum("f").alias("sum"),
        F.min("f").alias("min"),
        F.max("f").alias("max"),
        F.stddev_samp("f").alias("std"),
    ).first()
    n = int(row["n"])
    if n == 0:
        return Estimate(0, None, None, None)
    value = {
        Agg.AVG: row["avg"],
        Agg.SUM: row["sum"],
        Agg.COUNT: float(n),
        Agg.MIN: row["min"],
        Agg.MAX: row["max"],
    }[hyp.agg]
    std = float(row["std"]) if row["std"] is not None else 0.0
    return Estimate(n, float(value), float(row["avg"]), std)

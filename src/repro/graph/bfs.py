"""BFS primitives over the symmetric adjacency.

Substrate for the expansion samplers (SBS, FFS) and ShortestPathS. The
frontier lives on the driver (sampled graphs are budget-bounded, so
frontiers stay small); each level is one distributed join against the
cached adjacency.
"""
from __future__ import annotations

from typing import Iterable, Optional

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.graph.walk_engine import urand


def expand_frontier(
    spark: SparkSession,
    adj: DataFrame,
    frontier: Iterable[int],
    visited: Iterable[int],
    *,
    per_parent_cap: Optional[dict[int, int]] = None,
    step: int = 0,
    seed: int = 0,
) -> list:
    """One BFS level: neighbors of ``frontier`` not in ``visited``.

    ``per_parent_cap`` limits how many (uniform-random) neighbors each
    parent may contribute — the snowball fan-out k or the forest-fire
    geometric burn count. Returns collected rows ``(src, dst)``; a dst
    reachable from several parents appears once per parent (callers
    dedupe).
    """
    f_pdf = pd.DataFrame({"src": sorted(set(int(x) for x in frontier))})
    if f_pdf.empty:
        return []
    cand = adj.join(F.broadcast(spark.createDataFrame(f_pdf)), "src")
    vis = sorted(set(int(x) for x in visited))
    if vis:
        vdf = F.broadcast(spark.createDataFrame(pd.DataFrame({"dst": vis})))
        cand = cand.join(vdf, "dst", "anti")
    if per_parent_cap is not None:
        cap_pdf = pd.DataFrame(
            {"src": list(per_parent_cap), "cap": list(per_parent_cap.values())}
        )
        cand = cand.join(F.broadcast(spark.createDataFrame(cap_pdf)), "src")
        u = urand(F.col("src"), F.col("dst"), F.lit(step), seed=seed, tag="bfs")
        w = Window.partitionBy("src").orderBy(u)
        cand = (
            cand.withColumn("_rn", F.row_number().over(w))
            .where(F.col("_rn") <= F.col("cap"))
        )
    return cand.select("src", "dst").collect()


def bfs_parents(
    spark: SparkSession,
    adj: DataFrame,
    sources: list[int],
    *,
    max_depth: int,
    seed: int = 0,
) -> dict[int, dict[int, int]]:
    """Multi-source BFS with parent pointers, driver-held.

    Returns ``{source: {node: parent}}`` for every node reached within
    ``max_depth`` levels of its source. Each level is one distributed
    join over a (root, node) frontier.
    """
    roots = sorted(set(int(s) for s in sources))
    parents: dict[int, dict[int, int]] = {r: {r: r} for r in roots}
    frontier = pd.DataFrame({"root": roots, "src": roots})
    for depth in range(max_depth):
        if frontier.empty:
            break
        fdf = F.broadcast(spark.createDataFrame(frontier))
        rows = (
            adj.join(fdf, "src")
            .groupBy("root", "dst")
            .agg(F.min("src").alias("parent"))
            .collect()
        )
        nxt: list[tuple[int, int]] = []
        for row in rows:
            r, d, p = int(row["root"]), int(row["dst"]), int(row["parent"])
            if d not in parents[r]:
                parents[r][d] = p
                nxt.append((r, d))
        frontier = pd.DataFrame(nxt, columns=["root", "src"])
    return parents


def backtrack(parents: dict[int, int], source: int, target: int) -> Optional[list[int]]:
    """Path source→target from a parent map, or None if unreached."""
    if target not in parents:
        return None
    path = [target]
    while path[-1] != source:
        path.append(parents[path[-1]])
        if len(path) > len(parents) + 1:
            raise RuntimeError("parent-pointer cycle")
    path.reverse()
    return path

"""Pregel-style batched multi-walker random-walk engine.

This is the distributed-dataflow substrate every random-walk sampler
(SRW, NBRW, RWR, MHRW, FrontierS, PHASE, PHASE_opt) is configured from
— the "GraphX vertex-program iterative message passing" of the repro
brief, expressed in DataFrame terms:

- The *graph side* (adjacency augmented with per-destination degree and
  modifier-satisfaction flags) is a cached, partitioned DataFrame.
- The *walker side* (m rows of per-walker state) is broadcast into the
  adjacency each superstep; candidate moves are filtered (backtracking /
  visited-node exclusion, neighbor cap) and resolved by a weighted
  choice entirely in Catalyst (exponential-race keys + ``min_by``), and
  only the m chosen moves are collected back.

One superstep advances every gated walker at once. The paper's
sequential walker-selection weights (degree for FrontierS, L_w for
PHASE) become per-superstep advancement probabilities with the same
expected advancement rates (DESIGN.md §3). Randomness is deterministic
in ``seed``: Spark-side uniforms derive from ``xxhash64`` over (walker,
candidate, superstep, seed), driver-side draws from a seeded numpy
Generator.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Optional

import numpy as np
import pandas as pd
from pyspark.sql import Column, DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.core.hypothesis import Hypothesis
from repro.graph.property_graph import PropertyGraph

_M = 1_000_000_007


def urand(*cols: Column, seed: int, tag: str) -> Column:
    """Deterministic uniform in (0, 1) from hashed columns + seed + tag."""
    h = F.xxhash64(*cols, F.lit(int(seed)), F.lit(tag))
    return (F.pmod(h, F.lit(_M)).cast("double") + 0.5) / float(_M)


@dataclass(frozen=True)
class WalkConfig:
    """Configuration that turns the engine into a specific sampler."""

    m: int = 50  # number of dependent walkers (paper's m)
    non_backtracking: bool = False  # NBRW: never step back to prev
    exclude_visited: bool = False  # PHASE_opt Optim 2: N[v] - V_S
    neighbor_cap: Optional[int] = None  # PHASE_opt Optim 1: n candidates
    restart_prob: float = 0.0  # RWR: jump back to the walker's seed
    metropolis_hastings: bool = False  # MHRW degree-ratio accept/reject
    advancement: str = "always"  # always | degree | phase (the L_w gate)
    transition: str = "uniform"  # uniform | phase (Fig. 3 matrices)
    w_h: float = 10.0
    w_l: float = 0.1
    max_supersteps: int = 400


class WalkContext:
    """Per-(graph, hypothesis) state shared by all walk-based samplers.

    Holds the augmented adjacency (cached, distributed) and a small
    driver-side node table (id, degree, sat flags) used for seeding,
    teleports, advancement gating, and MH acceptance.
    """

    def __init__(
        self,
        spark: SparkSession,
        graph: PropertyGraph,
        hyp: Optional[Hypothesis] = None,
    ):
        self.spark = spark
        self.graph = graph
        self.hyp = hyp
        mods = hyp.modifiers if hyp is not None else ()
        self.n_modifiers = len(mods)

        sat_cols = [
            m.to_column(F.col("ntype"), F.col("attrs")).alias(f"sat{i}")
            for i, m in enumerate(mods)
        ]
        flags = graph.nodes.select("id", *sat_cols).join(graph.degrees, "id")
        sat_arr = (
            F.array(*[F.col(f"sat{i}") for i in range(len(mods))])
            if mods
            else F.array().cast("array<boolean>")
        )
        node_side = flags.select(
            F.col("id").alias("dst"),
            F.col("degree").alias("dst_deg"),
            sat_arr.alias("dst_sat"),
        )
        self.adj_aug: DataFrame = (
            graph.adjacency.select("src", "dst").join(node_side, "dst").cache()
        )
        self.adj_aug.count()  # materialize once so every superstep is a hot join

        pdf = flags.toPandas()
        self._ids = pdf["id"].to_numpy()
        self._deg = dict(zip(pdf["id"], pdf["degree"]))
        if mods:
            self._sat1 = dict(zip(pdf["id"], pdf["sat0"].astype(bool)))
        else:
            self._sat1 = {}

    # -- driver-side lookups ------------------------------------------
    def degree(self, node: int) -> int:
        return int(self._deg.get(node, 0))

    def sat1(self, node: int) -> bool:
        return bool(self._sat1.get(node, False))

    @property
    def node_ids(self) -> np.ndarray:
        return self._ids

    def unpersist(self) -> None:
        self.adj_aug.unpersist()


def _advancement_probs(cfg: WalkConfig, ctx: WalkContext, cur: np.ndarray) -> np.ndarray:
    """Per-walker advancement probability min(1, m * w_i / sum(w))."""
    m = len(cur)
    if cfg.advancement == "always":
        return np.ones(m)
    if cfg.advancement == "degree":
        w = np.array([max(ctx.degree(int(v)), 1) for v in cur], dtype=float)
    elif cfg.advancement == "phase":
        w = np.array(
            [cfg.w_h if ctx.sat1(int(v)) else cfg.w_l for v in cur], dtype=float
        )
    else:
        raise ValueError(f"unknown advancement mode {cfg.advancement!r}")
    return np.minimum(1.0, m * w / w.sum())


def _initial_k(ctx: WalkContext, node: int) -> int:
    """Matched-prefix length of a walker freshly placed on ``node``."""
    return 1 if ctx.n_modifiers > 0 and ctx.sat1(node) else 0


@dataclass
class WalkResult:
    """Output of one engine run: the sampled node set V_S and counters."""

    node_ids: list[int]
    supersteps: int
    teleports: int


def run_walk(
    ctx: WalkContext, cfg: WalkConfig, budget: int, *, seed: int
) -> WalkResult:
    """Run the configured walk until ``budget`` distinct nodes are
    sampled (or ``max_supersteps`` is hit — dead graphs teleport, so in
    practice the budget is always reached)."""
    rng = np.random.default_rng(seed)
    # Keep enough steps per walker for trajectories to preserve paths:
    # the paper's setting has B/m ~= 65; at our reduced absolute budgets
    # m=50 would leave ~3-step fragments that hold no length-2 path, so
    # m scales with the budget (~6+ steps per walker — enough for the
    # l<=4 paths of the bank while keeping superstep counts bounded).
    m = min(cfg.m, max(2, budget // 6))
    L = ctx.n_modifiers

    seeds = rng.choice(ctx.node_ids, size=m, replace=False)
    cur = seeds.astype(np.int64).copy()
    prev = np.full(m, -1, dtype=np.int64)
    k = np.array([_initial_k(ctx, int(v)) for v in cur], dtype=np.int64)
    seed_node = cur.copy()

    visited: set[int] = set(int(v) for v in cur)
    teleports = 0
    step = 0

    while len(visited) < budget and step < cfg.max_supersteps:
        step += 1
        adv_p = _advancement_probs(cfg, ctx, cur)
        adv = rng.random(m) < adv_p
        if not adv.any():
            adv[int(rng.integers(m))] = True
        adv_idx = np.flatnonzero(adv)

        # RWR restarts resolve driver-side before the Spark superstep.
        if cfg.restart_prob > 0.0:
            restart = rng.random(len(adv_idx)) < cfg.restart_prob
            for j, i in enumerate(adv_idx):
                if restart[j]:
                    prev[i] = cur[i]
                    cur[i] = seed_node[i]
                    k[i] = _initial_k(ctx, int(cur[i]))
                    visited.add(int(cur[i]))
            adv_idx = adv_idx[~restart]
            if len(adv_idx) == 0:
                continue

        walkers_pdf = pd.DataFrame(
            {
                "wid": adv_idx.astype(np.int64),
                "cur": cur[adv_idx],
                "prev": prev[adv_idx],
                "k": k[adv_idx],
            }
        )
        moves = _superstep(ctx, cfg, walkers_pdf, visited, step, seed)

        moved = set()
        for row in moves:
            i = int(row["wid"])
            dst, dst_deg = int(row["dst"]), int(row["dst_deg"])
            if cfg.metropolis_hastings:
                accept = min(1.0, max(ctx.degree(int(cur[i])), 1) / max(dst_deg, 1))
                if rng.random() >= accept:
                    moved.add(i)  # rejected: consume the step, stay put
                    continue
            prev[i] = cur[i]
            cur[i] = dst
            k[i] = int(row["new_k"]) if L else 0
            visited.add(dst)
            moved.add(i)

        # Dead ends (no candidate survived the filters): teleport to a
        # fresh random node so the walk keeps covering the graph.
        for i in adv_idx:
            if int(i) in moved:
                continue
            t = int(rng.choice(ctx.node_ids))
            prev[i] = cur[i]
            cur[i] = t
            k[i] = _initial_k(ctx, t)
            visited.add(t)
            teleports += 1

    out = list(visited)
    if len(out) > budget:
        # Trim overshoot from the final superstep for exact-budget S.
        out = [int(x) for x in rng.choice(np.array(out), size=budget, replace=False)]
    return WalkResult(out, step, teleports)


def _superstep(
    ctx: WalkContext,
    cfg: WalkConfig,
    walkers_pdf: pd.DataFrame,
    visited: set[int],
    step: int,
    seed: int,
) -> list:
    """One message-passing round: broadcast walkers into the adjacency,
    filter candidates, weighted-choose one move per walker, collect."""
    spark = ctx.spark
    walkers = F.broadcast(spark.createDataFrame(walkers_pdf))
    cand = ctx.adj_aug.join(walkers, ctx.adj_aug["src"] == walkers["cur"])

    if cfg.non_backtracking:
        cand = cand.where(F.col("dst") != F.col("prev"))
    if cfg.exclude_visited and visited:
        vis = F.broadcast(
            spark.createDataFrame(pd.DataFrame({"dst": sorted(visited)}))
        )
        cand = cand.join(vis, "dst", "anti")

    if cfg.neighbor_cap is not None:
        u_cap = urand(F.col("wid"), F.col("dst"), F.lit(step), seed=seed, tag="cap")
        w_cap = Window.partitionBy("wid").orderBy(u_cap)
        cand = (
            cand.withColumn("_rn", F.row_number().over(w_cap))
            .where(F.col("_rn") <= cfg.neighbor_cap)
            .drop("_rn")
        )

    L = ctx.n_modifiers
    if cfg.transition == "uniform" or L == 0:
        w = F.lit(1.0)
        new_k = F.lit(0)
    elif cfg.transition == "phase":
        # Fig. 3 generalized: w_h if the candidate continues the matched
        # modifier prefix (or restarts a match at M_1), else w_l. The
        # walker's k realizes the 2nd/higher-order dependence for paths.
        continues = F.when(
            F.col("k") < F.lit(L), F.element_at("dst_sat", F.col("k").cast("int") + 1)
        ).otherwise(F.lit(False))
        restarts = F.element_at("dst_sat", F.lit(1))
        w = (
            F.when(continues | F.coalesce(restarts, F.lit(False)), F.lit(cfg.w_h))
            .otherwise(F.lit(cfg.w_l))
        )
        new_k = (
            F.when(continues, F.col("k") + 1)
            .when(F.coalesce(restarts, F.lit(False)), F.lit(1))
            .otherwise(F.lit(0))
        )
    else:
        raise ValueError(f"unknown transition mode {cfg.transition!r}")

    u_race = urand(F.col("wid"), F.col("dst"), F.lit(step), seed=seed, tag="race")
    race = -F.log(u_race) / w  # exponential race: P(argmin = i) ∝ w_i
    chosen = (
        cand.withColumn("new_k", new_k)
        .groupBy("wid")
        .agg(
            F.min_by(
                F.struct(
                    F.col("dst"), F.col("dst_deg"), F.col("new_k")
                ),
                race,
            ).alias("mv")
        )
        .select("wid", "mv.dst", "mv.dst_deg", "mv.new_k")
    )
    return chosen.collect()

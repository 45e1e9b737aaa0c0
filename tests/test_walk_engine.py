"""Tests for the Pregel-style walk engine (the distributed substrate)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.datasets.bank import bank
from repro.graph.walk_engine import (
    WalkConfig,
    WalkContext,
    _advancement_probs,
    run_walk,
    urand,
)


class TestUrand:
    def test_range_and_determinism(self, spark):
        df = spark.range(1000).select(
            urand(F.col("id"), seed=7, tag="t").alias("u")
        )
        row = df.agg(
            F.min("u").alias("lo"), F.max("u").alias("hi"), F.avg("u").alias("mu")
        ).first()
        assert 0.0 < row["lo"] and row["hi"] < 1.0
        assert row["mu"] == pytest.approx(0.5, abs=0.05)  # roughly uniform

    def test_seed_changes_stream(self, spark):
        a = spark.range(100).select(urand(F.col("id"), seed=1, tag="t").alias("u"))
        b = spark.range(100).select(urand(F.col("id"), seed=2, tag="t").alias("u"))
        assert a.collect() != b.collect()

    def test_tag_changes_stream(self, spark):
        a = spark.range(100).select(urand(F.col("id"), seed=1, tag="x").alias("u"))
        b = spark.range(100).select(urand(F.col("id"), seed=1, tag="y").alias("u"))
        assert a.collect() != b.collect()


class TestWalkContext:
    def test_agnostic_context_has_no_flags(self, spark, toy_graph):
        ctx = WalkContext(spark, toy_graph, None)
        assert ctx.n_modifiers == 0
        assert not ctx.sat1(1)
        ctx.unpersist()

    def test_hypothesis_flags(self, spark, toy_graph, toy_hyps):
        ctx = WalkContext(spark, toy_graph, toy_hyps["edge"])  # M_1 = a[]
        assert ctx.sat1(1) and ctx.sat1(2)
        assert not ctx.sat1(3)
        ctx.unpersist()

    def test_degrees_exposed(self, spark, toy_graph):
        ctx = WalkContext(spark, toy_graph, None)
        assert ctx.degree(1) == 2
        assert ctx.degree(5) == 1
        ctx.unpersist()

    def test_adj_aug_rowcount(self, spark, toy_graph):
        ctx = WalkContext(spark, toy_graph, None)
        assert ctx.adj_aug.count() == 8  # both directions of 4 edges
        ctx.unpersist()


class TestAdvancementProbs:
    def _ctx(self, spark, toy_graph, hyp=None):
        return WalkContext(spark, toy_graph, hyp)

    def test_always_mode(self, spark, toy_graph):
        ctx = self._ctx(spark, toy_graph)
        p = _advancement_probs(WalkConfig(advancement="always"), ctx, np.array([1, 3]))
        assert (p == 1.0).all()
        ctx.unpersist()

    def test_degree_mode_proportional(self, spark, toy_graph):
        ctx = self._ctx(spark, toy_graph)
        p = _advancement_probs(
            WalkConfig(advancement="degree"), ctx, np.array([1, 3])
        )
        # degrees 2 and 1 -> weights 2/3, 1/3 -> probs min(1, 2*w).
        assert p[0] == pytest.approx(min(1.0, 2 * 2 / 3))
        assert p[1] == pytest.approx(min(1.0, 2 * 1 / 3))
        ctx.unpersist()

    def test_phase_mode_uses_sat1(self, spark, toy_graph, toy_hyps):
        ctx = self._ctx(spark, toy_graph, toy_hyps["edge"])
        p = _advancement_probs(
            WalkConfig(advancement="phase", w_h=10, w_l=0.1), ctx, np.array([1, 3])
        )
        assert p[0] > p[1]  # node 1 satisfies M_1, node 3 does not
        ctx.unpersist()

    def test_unknown_mode(self, spark, toy_graph):
        ctx = self._ctx(spark, toy_graph)
        with pytest.raises(ValueError):
            _advancement_probs(WalkConfig(advancement="bogus"), ctx, np.array([1]))
        ctx.unpersist()


class TestRunWalk:
    def test_reaches_budget_exactly(self, ml_edge_ctx):
        res = run_walk(ml_edge_ctx, WalkConfig(m=10), 25, seed=3)
        assert len(res.node_ids) == 25
        assert len(set(res.node_ids)) == 25

    def test_sampled_ids_are_graph_nodes(self, ml_edge_ctx):
        res = run_walk(ml_edge_ctx, WalkConfig(m=10), 25, seed=3)
        assert set(res.node_ids) <= set(int(i) for i in ml_edge_ctx.node_ids)

    def test_deterministic_in_seed(self, ml_edge_ctx):
        a = run_walk(ml_edge_ctx, WalkConfig(m=10), 20, seed=5)
        b = run_walk(ml_edge_ctx, WalkConfig(m=10), 20, seed=5)
        assert sorted(a.node_ids) == sorted(b.node_ids)

    def test_seed_matters(self, ml_edge_ctx):
        a = run_walk(ml_edge_ctx, WalkConfig(m=10), 20, seed=5)
        b = run_walk(ml_edge_ctx, WalkConfig(m=10), 20, seed=6)
        assert sorted(a.node_ids) != sorted(b.node_ids)

    def test_m_capped_by_budget(self, ml_edge_ctx):
        # m=50 with budget 10 must not blow past the budget on step one.
        res = run_walk(ml_edge_ctx, WalkConfig(m=50), 10, seed=1)
        assert len(res.node_ids) == 10

    def test_phase_transition_biases_sample(self, spark, ml):
        # With the ML-E1 hypothesis (Comedy movies as M_2), the PHASE
        # transition must oversample relevant nodes vs a uniform walk.
        hyp = bank("MovieLens")["edge"][0]
        ctx = WalkContext(spark, ml.graph, hyp)
        unif = run_walk(ctx, WalkConfig(m=10), 60, seed=9)
        aware = run_walk(
            ctx,
            WalkConfig(m=10, advancement="phase", transition="phase"),
            60,
            seed=9,
        )

        def frac_relevant(ids):
            rows = ml.node_tables["movie"]
            comedy = set(rows[rows["genre"] == "Comedy"]["id"])
            return len(set(ids) & comedy) / len(ids)

        assert frac_relevant(aware.node_ids) > frac_relevant(unif.node_ids)
        ctx.unpersist()

    def test_exclude_visited_reduces_supersteps(self, ml_edge_ctx):
        plain = run_walk(ml_edge_ctx, WalkConfig(m=5), 30, seed=2)
        opt = run_walk(
            ml_edge_ctx, WalkConfig(m=5, exclude_visited=True), 30, seed=2
        )
        assert opt.supersteps <= plain.supersteps

    def test_neighbor_cap_still_reaches_budget(self, ml_edge_ctx):
        res = run_walk(ml_edge_ctx, WalkConfig(m=10, neighbor_cap=3), 25, seed=4)
        assert len(res.node_ids) == 25

    def test_restart_prob_runs(self, ml_edge_ctx):
        res = run_walk(ml_edge_ctx, WalkConfig(m=10, restart_prob=0.3), 25, seed=4)
        assert len(res.node_ids) == 25

    def test_mh_runs(self, ml_edge_ctx):
        res = run_walk(
            ml_edge_ctx, WalkConfig(m=10, metropolis_hastings=True), 25, seed=4
        )
        assert len(res.node_ids) == 25

    def test_bad_transition_mode(self, ml_edge_ctx):
        with pytest.raises(ValueError):
            run_walk(ml_edge_ctx, WalkConfig(m=5, transition="bogus"), 10, seed=1)

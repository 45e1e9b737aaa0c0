"""PHASE / PHASE_opt specifics (Algorithms 1 and 2)."""
import pytest

from repro.core.phase import Phase, PhaseOpt
from repro.datasets.bank import bank
from repro.graph.walk_engine import WalkContext, run_walk


class TestConfigs:
    def test_phase_paper_parameters(self):
        cfg = Phase().config()
        # §4.1: m=50, w_h=10, w_l=0.1.
        assert cfg.m == 50
        assert cfg.w_h == 10.0
        assert cfg.w_l == 0.1
        assert cfg.advancement == "phase"
        assert cfg.transition == "phase"
        assert cfg.neighbor_cap is None
        assert not cfg.exclude_visited

    def test_phase_opt_adds_both_optimizations(self):
        cfg = PhaseOpt().config()
        assert cfg.neighbor_cap == 30  # Optim 1, n=30
        assert cfg.exclude_visited  # Optim 2, N[v] - V_S
        # The weight functions are unchanged from PHASE.
        assert cfg.advancement == "phase"
        assert cfg.transition == "phase"


class TestBehaviour:
    @pytest.mark.parametrize("name", ["PHASE", "PHASE_opt"])
    def test_reaches_budget(self, ml_edge_ctx, name):
        from repro.samplers import get_sampler

        ids = get_sampler(name).sample(ml_edge_ctx, 25, seed=17)
        assert len(ids) == 25

    def test_second_order_state_on_path_hypothesis(self, spark, dblp):
        # A path hypothesis (l=2) exercises the k-state (2nd-order walk).
        hyp = bank("DBLP")["path"][0]
        ctx = WalkContext(spark, dblp.graph, hyp)
        from repro.core.phase import PhaseOpt

        res = run_walk(ctx, PhaseOpt().config(), 40, seed=3)
        assert len(res.node_ids) == 40
        ctx.unpersist()

    def test_phase_opt_faster_in_supersteps(self, ml_edge_ctx):
        # Optim 2 stops the walk from circling inside already-visited
        # relevant clusters, so distinct-node coverage needs fewer
        # supersteps — the source of the Table-2 speedup on our substrate.
        plain = run_walk(ml_edge_ctx, Phase().config(), 30, seed=5)
        opt = run_walk(ml_edge_ctx, PhaseOpt().config(), 30, seed=5)
        assert opt.supersteps <= plain.supersteps

    def test_relevant_fraction_beats_uniform_walk(self, spark, ml):
        from repro.graph.walk_engine import WalkConfig

        hyp = bank("MovieLens")["edge"][2]  # ML-E3: rare Documentary
        ctx = WalkContext(spark, ml.graph, hyp)
        doc = set(
            ml.node_tables["movie"]
            .query("genre == 'Documentary'")["id"]
        )
        aware = run_walk(ctx, PhaseOpt().config(), 50, seed=21)
        unif = run_walk(ctx, WalkConfig(m=50), 50, seed=21)
        assert len(set(aware.node_ids) & doc) >= len(set(unif.node_ids) & doc)
        ctx.unpersist()

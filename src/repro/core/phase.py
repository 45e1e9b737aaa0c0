"""PHASE and PHASE_opt — the paper's hypothesis-aware samplers.

PHASE (Algorithm 1) is an m-dimensional FrontierS-style random walk with
two weight functions:

1. Walker-selection weights L_w: walkers sitting on a node satisfying
   the first modifier M_1 get weight ``w_h``, others ``w_l`` (engine
   advancement mode ``phase``).
2. Hypothesis-aware transition weights (Fig. 3): neighbors that continue
   the path's modifier sequence (tracked per-walker as the matched
   prefix length k — the 2nd/higher-order state for l >= 2) get ``w_h``,
   others ``w_l`` (engine transition mode ``phase``).

PHASE_opt (Algorithm 2) adds the two optimizations, both applied to the
candidate set *before* the weighted choice:

1. Optim 1 — examine only min(|N'|, n) uniformly sampled neighbors
   (``neighbor_cap``), making per-step cost O(1) instead of O(avg deg).
2. Optim 2 — non-backtracking over the whole sample: N' = N[v] - V_S
   (``exclude_visited``).

Paper defaults: m=50, n=30, w_h=10, w_l=0.1 (§4.1).
"""
from __future__ import annotations

from repro.graph.walk_engine import WalkConfig, WalkContext, run_walk
from repro.samplers.base import register


class _PhaseBase:
    """Shared PHASE plumbing; subclasses define the engine config."""

    m = 50
    w_h = 10.0
    w_l = 0.1

    def config(self) -> WalkConfig:  # pragma: no cover - overridden
        raise NotImplementedError

    def sample(self, ctx: WalkContext, budget: int, *, seed: int) -> list[int]:
        if ctx.hyp is None:
            raise ValueError(f"{self.name} is hypothesis-aware: WalkContext "
                             "must be built with a hypothesis")
        return run_walk(ctx, self.config(), budget, seed=seed).node_ids


@register
class Phase(_PhaseBase):
    """PHASE (Algorithm 1): full neighbor scan, no visited exclusion."""

    name = "PHASE"

    def config(self) -> WalkConfig:
        return WalkConfig(
            m=self.m,
            advancement="phase",
            transition="phase",
            w_h=self.w_h,
            w_l=self.w_l,
        )


@register
class PhaseOpt(_PhaseBase):
    """PHASE_opt (Algorithm 2): neighbor cap n=30 + V_S exclusion."""

    name = "PHASE_opt"
    n = 30

    def config(self) -> WalkConfig:
        return WalkConfig(
            m=self.m,
            advancement="phase",
            transition="phase",
            w_h=self.w_h,
            w_l=self.w_l,
            neighbor_cap=self.n,
            exclude_visited=True,
        )

"""Random-walk based samplers as walk-engine configurations.

- SRW  [Gjoka et al. 2010]: uniform-neighbor walks.
- NBRW [Lee et al. 2012]: never revisit the immediately previous node.
- RWR: restart to the walker's seed with probability 0.15.
- MHRW [Hübler et al. 2008]: uniform proposal, accept with
  min(1, d(cur)/d(next)) — targets the uniform node distribution.
- FrontierS [Ribeiro & Towsley 2010]: m dependent walkers, the advancing
  walker chosen with degree-proportional probability, uniform neighbor.

All share the engine's multi-walker batching (DESIGN.md §3); they stay
hypothesis-agnostic because their transition mode is ``uniform``.
"""
from __future__ import annotations

from repro.graph.walk_engine import WalkConfig, WalkContext, run_walk
from repro.samplers.base import register

_DEFAULT_M = 50


class _WalkSampler:
    """Shared plumbing: build the config, run the engine."""

    name = "?"

    def config(self) -> WalkConfig:  # pragma: no cover - overridden
        raise NotImplementedError

    def sample(self, ctx: WalkContext, budget: int, *, seed: int) -> list[int]:
        return run_walk(ctx, self.config(), budget, seed=seed).node_ids


@register
class SimpleRandomWalk(_WalkSampler):
    name = "SRW"

    def config(self) -> WalkConfig:
        return WalkConfig(m=_DEFAULT_M)


@register
class NonBacktrackingRandomWalk(_WalkSampler):
    name = "NBRW"

    def config(self) -> WalkConfig:
        return WalkConfig(m=_DEFAULT_M, non_backtracking=True)


@register
class RandomWalkWithRestart(_WalkSampler):
    name = "RWR"

    def config(self) -> WalkConfig:
        return WalkConfig(m=_DEFAULT_M, restart_prob=0.15)


@register
class MetropolisHastingsRandomWalk(_WalkSampler):
    name = "MHRW"

    def config(self) -> WalkConfig:
        return WalkConfig(m=_DEFAULT_M, metropolis_hastings=True)


@register
class FrontierSampler(_WalkSampler):
    name = "FrontierS"

    def config(self) -> WalkConfig:
        return WalkConfig(m=_DEFAULT_M, advancement="degree")

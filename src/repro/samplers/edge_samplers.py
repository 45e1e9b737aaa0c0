"""Edge sampler: RES (uniform random edges).

RES [Krishnamurthy et al. 2005] draws B *edges* uniformly (the budget is
counted in edges per §2.3); V_S is the set of their endpoints and S is
the induced subgraph, as for every other sampler.
"""
from __future__ import annotations

from pyspark.sql import functions as F

from repro.graph.walk_engine import WalkContext, urand
from repro.samplers.base import register


@register
class RandomEdgeSampler:
    """RES: endpoints of B uniformly sampled stored edges."""

    name = "RES"

    def sample(self, ctx: WalkContext, budget: int, *, seed: int) -> list[int]:
        u = urand(F.col("src"), F.col("dst"), F.col("etype"), seed=seed, tag="res")
        rows = (
            ctx.graph.edges.select("src", "dst")
            .orderBy(u)
            .limit(budget)
            .collect()
        )
        ids = {int(r["src"]) for r in rows} | {int(r["dst"]) for r in rows}
        return list(ids)

"""Yelp-lite: 2 node types (user, business), 1 edge type (Review with a
``stars`` attribute) — the paper's largest, sparsest network (real Yelp:
2.1M nodes, 6.7M edges, density 1.5e-6).

We keep the 2/1 type structure and sparsity (avg degree ~5 at sf=1).
Category populations are sized for the bank: fast_food 5% (reviews mean
~4.3, making the paper's "fast food average ratings exceed 4" example
true), coffee 12% (~3.9), vegan 2% (~4.4, the rare case).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.common import Dataset, ensure_covered

CATS = ["restaurant", "coffee", "bars", "fast_food", "shopping", "beauty", "vegan"]
CAT_P = [0.33, 0.12, 0.14, 0.05, 0.17, 0.14, 0.05]
CAT_MEAN = {
    "restaurant": 3.6,
    "coffee": 3.9,
    "bars": 3.5,
    "fast_food": 4.3,
    "shopping": 3.4,
    "beauty": 3.7,
    "vegan": 4.4,
}


def yelp_lite(spark: SparkSession, *, sf: float = 1.0, seed: int = 13) -> Dataset:
    """Generate Yelp-lite at scale factor ``sf`` (sf=1 → ~7.8k nodes,
    ~17k review edges — more nodes and lower density than DBLP-lite at
    the same sf, matching the paper's Table-1 ordering)."""
    rng = np.random.default_rng(seed)
    n_user = max(60, int(6000 * sf))
    n_biz = max(30, int(1800 * sf))
    u_lo, b_lo = 1, 1 + n_user

    users = pd.DataFrame(
        {
            "id": np.arange(u_lo, u_lo + n_user),
            "elite": rng.choice(["yes", "no"], n_user, p=[0.1, 0.9]),
            "review_count": rng.integers(1, 300, n_user),
        }
    )
    category = rng.choice(CATS, n_biz, p=CAT_P)
    businesses = pd.DataFrame(
        {
            "id": np.arange(b_lo, b_lo + n_biz),
            "category": category,
            "city": rng.choice(["SF", "LA", "NYC", "CHI", "PHX"], n_biz),
            "checkins": rng.integers(0, 1001, n_biz),
        }
    )

    n_edges = int(2.2 * (n_user + n_biz))
    ranks = np.arange(1, n_biz + 1)
    pop = 1.0 / ranks**0.9
    pop /= pop.sum()
    e_user = rng.integers(u_lo, u_lo + n_user, n_edges)
    e_user = ensure_covered(rng, e_user, n_user, u_lo)
    e_biz = rng.choice(np.arange(b_lo, b_lo + n_biz), size=n_edges, p=pop)
    e_biz = ensure_covered(rng, e_biz, n_biz, b_lo)
    cmean = np.array([CAT_MEAN[category[b - b_lo]] for b in e_biz])
    stars = np.clip(np.round(cmean + rng.normal(0, 0.8, n_edges)), 1, 5)
    reviews = pd.DataFrame(
        {"src": e_user, "dst": e_biz, "stars": stars}
    ).drop_duplicates(subset=["src", "dst"])

    return Dataset.build(
        spark, "Yelp", {"user": users, "business": businesses}, {"Review": reviews}
    )

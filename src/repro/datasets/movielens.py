"""MovieLens-lite: 2 node types (user, movie), 1 edge type (Rates with a
``rating`` attribute) — the paper's densest, smallest network (real ML:
9.7k nodes, 997k edges, density 1e-2).

We keep it small and *dense* (avg degree ~90 at sf=1) with zipfian movie
popularity. Ratings are genre- and age-dependent so the hypothesis bank
has controlled ground truths: Comedy rated ~3.8, Documentary ~4.2 (rare
genre, 3%), Horror ~2.9.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.common import Dataset, ensure_covered

GENRES = ["Action", "Comedy", "Drama", "Thriller", "Romance", "Horror", "Documentary"]
GENRE_P = [0.22, 0.22, 0.25, 0.12, 0.09, 0.07, 0.03]
GENRE_MEAN = {
    "Action": 3.4,
    "Comedy": 3.8,
    "Drama": 3.6,
    "Thriller": 3.3,
    "Romance": 3.5,
    "Horror": 2.9,
    "Documentary": 4.2,
}


def movielens_lite(spark: SparkSession, *, sf: float = 1.0, seed: int = 11) -> Dataset:
    """Generate MovieLens-lite at scale factor ``sf`` (sf=1 → 1k nodes,
    ~45k rating edges)."""
    rng = np.random.default_rng(seed)
    n_user = max(40, int(600 * sf))
    n_movie = max(30, int(400 * sf))
    u_lo, m_lo = 1, 1 + n_user

    users = pd.DataFrame(
        {
            "id": np.arange(u_lo, u_lo + n_user),
            "age": rng.integers(16, 70, n_user),
            "gender": rng.choice(["F", "M"], n_user, p=[0.45, 0.55]),
            "occupation": rng.choice(
                ["student", "engineer", "artist", "educator", "other"], n_user
            ),
        }
    )
    genre = rng.choice(GENRES, n_movie, p=GENRE_P)
    movies = pd.DataFrame(
        {
            "id": np.arange(m_lo, m_lo + n_movie),
            "genre": genre,
            "myear": rng.integers(1960, 2024, n_movie),
        }
    )

    # Dense rating matrix with zipfian movie popularity.
    n_edges = int(45 * (n_user + n_movie))
    ranks = np.arange(1, n_movie + 1)
    pop = 1.0 / ranks**0.7
    pop /= pop.sum()
    e_user = rng.integers(u_lo, u_lo + n_user, n_edges)
    e_user = ensure_covered(rng, e_user, n_user, u_lo)
    e_movie = rng.choice(np.arange(m_lo, m_lo + n_movie), size=n_edges, p=pop)
    e_movie = ensure_covered(rng, e_movie, n_movie, m_lo)
    gmean = np.array([GENRE_MEAN[genre[m - m_lo]] for m in e_movie])
    age = users["age"].to_numpy()
    # Older users rate slightly higher — gives the path bank signal.
    abump = (age[e_user - u_lo] - 40.0) / 100.0
    rating = np.clip(np.round((gmean + abump + rng.normal(0, 0.9, n_edges)) * 2) / 2, 0.5, 5.0)
    rates = pd.DataFrame(
        {"src": e_user, "dst": e_movie, "rating": rating}
    ).drop_duplicates(subset=["src", "dst"])

    return Dataset.build(
        spark, "MovieLens", {"user": users, "movie": movies}, {"Rates": rates}
    )

"""Synthetic attributed-graph datasets mirroring the paper's three
evaluation networks (MovieLens, DBLP, Yelp) in schema and shape."""
from repro.datasets.common import Dataset  # noqa: F401
from repro.datasets.dblp import dblp_lite  # noqa: F401
from repro.datasets.movielens import movielens_lite  # noqa: F401
from repro.datasets.yelp import yelp_lite  # noqa: F401

GENERATORS = {
    "MovieLens": movielens_lite,
    "DBLP": dblp_lite,
    "Yelp": yelp_lite,
}

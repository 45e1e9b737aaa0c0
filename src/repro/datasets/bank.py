"""The hypothesis bank: three hypotheses per (dataset, type), ordered —
as in the paper (§4.5) — from abundant to progressively fewer relevant
nodes/edges/paths in G, plus the DBLP length-3 and length-4 path
hypotheses of Figures 5/6. Names follow the paper's DB-N1 convention.

Ground truths are fixed by the generators' attribute distributions (see
each generator's module docstring); thresholds keep a comfortable margin
so accuracy is driven by sampling, not by razor-thin aggregates.
"""
from __future__ import annotations

from repro.core.hypothesis import (
    Agg,
    AttrRef,
    Hypothesis,
    Modifier,
    Op,
    Predicate,
    path_hypothesis,
)


def _m(ntype: str, *preds: Predicate) -> Modifier:
    return Modifier(ntype, tuple(preds))


def _num(attr: str, op: str, value: float) -> Predicate:
    return Predicate(attr, op, value, numeric=True)


def _cat(attr: str, value: str) -> Predicate:
    return Predicate(attr, "==", value)


def _node(name, mod, attr, op, c):
    return path_hypothesis(name, [mod], [], AttrRef("node", 0, attr), Agg.AVG, op, c)


# ---------------------------------------------------------------------
# MovieLens
# ---------------------------------------------------------------------
def movielens_bank() -> dict[str, list[Hypothesis]]:
    user, movie = "user", "movie"
    node = [
        _node("ML-N1", _m(movie, _cat("genre", "Action")), "myear", Op.GT, 1975),
        _node("ML-N2", _m(user, _cat("occupation", "student")), "age", Op.GT, 35),
        _node("ML-N3", _m(movie, _cat("genre", "Documentary")), "myear", Op.GT, 1975),
    ]
    f_edge0 = AttrRef("edge", 0, "rating")
    edge = [
        path_hypothesis(
            "ML-E1", [_m(user), _m(movie, _cat("genre", "Comedy"))], ["Rates"],
            f_edge0, Agg.AVG, Op.GT, 3.4,
        ),
        path_hypothesis(
            "ML-E2", [_m(user, _num("age", ">=", 40)), _m(movie)], ["Rates"],
            f_edge0, Agg.AVG, Op.GT, 3.2,
        ),
        path_hypothesis(
            "ML-E3", [_m(user), _m(movie, _cat("genre", "Documentary"))], ["Rates"],
            f_edge0, Agg.AVG, Op.GT, 3.9,
        ),
    ]
    f_edge1 = AttrRef("edge", 1, "rating")
    path = [
        path_hypothesis(
            "ML-P1",
            [_m(movie, _cat("genre", "Action")), _m(user), _m(movie, _cat("genre", "Comedy"))],
            ["Rates_inv", "Rates"], f_edge1, Agg.AVG, Op.GT, 3.4,
        ),
        path_hypothesis(
            "ML-P2",
            [_m(movie, _cat("genre", "Horror")), _m(user, _num("age", "<", 25)),
             _m(movie, _cat("genre", "Horror"))],
            ["Rates_inv", "Rates"], f_edge1, Agg.AVG, Op.GT, 3.2,
        ),
        path_hypothesis(
            "ML-P3",
            [_m(movie, _cat("genre", "Documentary")), _m(user),
             _m(movie, _cat("genre", "Documentary"))],
            ["Rates_inv", "Rates"], f_edge1, Agg.AVG, Op.GT, 3.9,
        ),
    ]
    return {"node": node, "edge": edge, "path": path}


# ---------------------------------------------------------------------
# DBLP
# ---------------------------------------------------------------------
def dblp_bank() -> dict[str, list[Hypothesis]]:
    author, paper, fos = "author", "paper", "fos"
    node = [
        _node("DB-N1", _m(paper, _cat("ctype", "conference")), "citation", Op.GT, 45),
        _node("DB-N2", _m(paper, _num("year", ">=", 2015)), "citation", Op.GT, 38),
        _node("DB-N3", _m(author, _cat("org", "MSR")), "h_index", Op.GT, 20),
    ]
    f_cit1 = AttrRef("node", 1, "citation")
    edge = [
        path_hypothesis(
            "DB-E1",
            [_m(paper, _cat("ctype", "conference")), _m(fos, _cat("fname", "DM"))],
            ["WithDomain"], AttrRef("edge", 0, "FOS_weight"), Agg.AVG, Op.GT, 0.55,
        ),
        path_hypothesis(
            "DB-E2", [_m(paper), _m(fos, _cat("fname", "DM"))], ["WithDomain"],
            AttrRef("node", 0, "citation"), Agg.AVG, Op.GT, 38,
        ),
        path_hypothesis(
            "DB-E3",
            [_m(paper, _num("year", ">=", 2018)), _m(fos, _cat("fname", "SEC"))],
            ["WithDomain"], AttrRef("edge", 0, "FOS_weight"), Agg.AVG, Op.GT, 0.55,
        ),
    ]
    cn, msr = _cat("org", "CN_INST"), _cat("org", "MSR")
    conf = _cat("ctype", "conference")
    dm = _cat("fname", "DM")
    path = [
        # The paper's running example: "papers co-authored by Chinese
        # institutes on data mining have over c citations".
        path_hypothesis(
            "DB-P1", [_m(author, cn), _m(paper), _m(fos, dm)],
            ["Authorship_inv", "WithDomain"], f_cit1, Agg.AVG, Op.GT, 20,
        ),
        path_hypothesis(
            "DB-P2", [_m(author, cn), _m(paper, conf), _m(author, cn)],
            ["Authorship_inv", "Authorship"], f_cit1, Agg.AVG, Op.GT, 25,
        ),
        path_hypothesis(
            "DB-P3", [_m(author, msr), _m(paper, conf), _m(fos, dm)],
            ["Authorship_inv", "WithDomain"], f_cit1, Agg.AVG, Op.GT, 25,
        ),
    ]
    return {"node": node, "edge": edge, "path": path}


def dblp_long_paths() -> dict[int, Hypothesis]:
    """The DBLP length-3 and length-4 path hypotheses (Figures 5/6)."""
    author, paper, fos = "author", "paper", "fos"
    cn = _cat("org", "CN_INST")
    conf = _cat("ctype", "conference")
    dm = _cat("fname", "DM")
    l3 = path_hypothesis(
        "DB-P-L3",
        [_m(author, cn), _m(paper), _m(author), _m(paper, conf)],
        ["Authorship_inv", "Authorship", "Authorship_inv"],
        AttrRef("node", 3, "citation"), Agg.AVG, Op.GT, 25,
    )
    l4 = path_hypothesis(
        "DB-P-L4",
        [_m(author, cn), _m(paper), _m(fos, dm), _m(paper, conf), _m(author)],
        ["Authorship_inv", "WithDomain", "WithDomain_inv", "Authorship"],
        AttrRef("node", 3, "citation"), Agg.AVG, Op.GT, 25,
    )
    return {3: l3, 4: l4}


# ---------------------------------------------------------------------
# Yelp
# ---------------------------------------------------------------------
def yelp_bank() -> dict[str, list[Hypothesis]]:
    user, biz = "user", "business"
    node = [
        _node("YP-N1", _m(user), "review_count", Op.GT, 120),
        _node("YP-N2", _m(user, _cat("elite", "yes")), "review_count", Op.GT, 120),
        _node("YP-N3", _m(biz, _cat("category", "vegan")), "checkins", Op.GT, 400),
    ]
    f_edge0 = AttrRef("edge", 0, "stars")
    edge = [
        # The paper's Yelp example: "fast food average ratings exceed 4".
        path_hypothesis(
            "YP-E1", [_m(user), _m(biz, _cat("category", "fast_food"))], ["Review"],
            f_edge0, Agg.AVG, Op.GT, 4.0,
        ),
        path_hypothesis(
            "YP-E2", [_m(user, _cat("elite", "yes")), _m(biz)], ["Review"],
            f_edge0, Agg.AVG, Op.GT, 3.3,
        ),
        path_hypothesis(
            "YP-E3", [_m(user), _m(biz, _cat("category", "vegan"))], ["Review"],
            f_edge0, Agg.AVG, Op.GT, 4.0,
        ),
    ]
    f_edge1 = AttrRef("edge", 1, "stars")
    ff, vegan, coffee = (
        _cat("category", "fast_food"),
        _cat("category", "vegan"),
        _cat("category", "coffee"),
    )
    path = [
        path_hypothesis(
            "YP-P1", [_m(biz, coffee), _m(user), _m(biz, ff)],
            ["Review_inv", "Review"], f_edge1, Agg.AVG, Op.GT, 3.5,
        ),
        path_hypothesis(
            "YP-P2", [_m(biz, ff), _m(user, _cat("elite", "yes")), _m(biz, ff)],
            ["Review_inv", "Review"], f_edge1, Agg.AVG, Op.GT, 3.5,
        ),
        path_hypothesis(
            "YP-P3", [_m(biz, vegan), _m(user), _m(biz, vegan)],
            ["Review_inv", "Review"], f_edge1, Agg.AVG, Op.GT, 3.5,
        ),
    ]
    return {"node": node, "edge": edge, "path": path}


BANKS = {
    "MovieLens": movielens_bank,
    "DBLP": dblp_bank,
    "Yelp": yelp_bank,
}


def bank(dataset: str) -> dict[str, list[Hypothesis]]:
    """Hypotheses for ``dataset``, keyed by type (node/edge/path)."""
    return BANKS[dataset]()

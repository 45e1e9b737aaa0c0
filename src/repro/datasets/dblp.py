"""DBLP-lite: synthetic bibliographic network with the paper's Fig. 1a
schema — 4 node types (author, paper, venue, fos) and 4 edge types
(Authorship: paper→author, PublishedIn: paper→venue, WithDomain:
paper→fos with a FOS_weight attribute, Cite: paper→paper).

Shape mirrors the real DBLP's salient properties at reduced scale:
skewed author productivity (zipfian authorship), sparse overall density,
and attribute populations sized so the hypothesis bank spans abundant →
rare relevant sets (conference papers ~45%, MSR authors ~3%, Chinese
institutes ~8%, DM domain ~12%). Citation counts are lognormal with a
conference premium, which fixes the ground truth of the bank's
hypotheses by a comfortable margin.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datasets.common import Dataset, ensure_covered

ORGS = ["MSR", "CN_INST", "US_UNIV", "EU_UNIV", "OTHER"]
ORG_P = [0.03, 0.08, 0.30, 0.25, 0.34]
DOMAINS = ["DM", "DB", "ML", "AI", "SE", "HCI", "NET", "SEC"]
DOMAIN_P = [0.12, 0.12, 0.20, 0.18, 0.12, 0.08, 0.09, 0.09]


def dblp_lite(spark: SparkSession, *, sf: float = 1.0, seed: int = 7) -> Dataset:
    """Generate DBLP-lite at scale factor ``sf`` (sf=1 → ~7.1k nodes)."""
    rng = np.random.default_rng(seed)
    n_pap = max(60, int(4000 * sf))
    n_auth = max(50, int(3000 * sf))
    n_ven = max(8, int(60 * sf))
    n_fos = len(DOMAINS)

    # Globally unique id ranges: authors, then papers, venues, fos.
    a_lo, p_lo = 1, 1 + n_auth
    v_lo, f_lo = p_lo + n_pap, p_lo + n_pap + n_ven

    authors = pd.DataFrame(
        {
            "id": np.arange(a_lo, a_lo + n_auth),
            "org": rng.choice(ORGS, n_auth, p=ORG_P),
            "h_index": rng.integers(1, 60, n_auth),
        }
    )
    venues = pd.DataFrame(
        {
            "id": np.arange(v_lo, v_lo + n_ven),
            "vtype": rng.choice(["conference", "journal"], n_ven, p=[0.6, 0.4]),
        }
    )
    fos = pd.DataFrame({"id": np.arange(f_lo, f_lo + n_fos), "fname": DOMAINS})

    pap_venue = rng.integers(v_lo, v_lo + n_ven, n_pap)
    pap_venue = ensure_covered(rng, pap_venue, n_ven, v_lo)
    vtype_of = dict(zip(venues["id"], venues["vtype"]))
    ctype = np.array([vtype_of[v] for v in pap_venue])
    year = rng.integers(1990, 2024, n_pap)
    # Conference premium keeps DB-N1 ("conference citations > 45") true
    # with margin; journal mean ~34.
    citation = np.where(
        ctype == "conference",
        np.round(np.exp(rng.normal(np.log(52), 0.55, n_pap))),
        np.round(np.exp(rng.normal(np.log(30), 0.55, n_pap))),
    ).astype(int)
    papers = pd.DataFrame(
        {
            "id": np.arange(p_lo, p_lo + n_pap),
            "ctype": ctype,
            "year": year,
            "citation": citation,
        }
    )

    # Authorship: 1-4 authors per paper, zipfian over authors for skew.
    n_auth_edges = int(n_pap * 2.4)
    ranks = np.arange(1, n_auth + 1)
    w = 1.0 / ranks**0.8
    w /= w.sum()
    au = rng.choice(np.arange(a_lo, a_lo + n_auth), size=n_auth_edges, p=w)
    au = ensure_covered(rng, au, n_auth, a_lo)
    ap = rng.integers(p_lo, p_lo + n_pap, n_auth_edges)
    ap = ensure_covered(rng, ap, n_pap, p_lo)
    authorship = pd.DataFrame({"src": ap, "dst": au}).drop_duplicates()

    published_in = pd.DataFrame(
        {"src": papers["id"].to_numpy(), "dst": pap_venue}
    )

    # WithDomain: 1-2 domains per paper, weighted relevance attribute.
    n_dom_edges = int(n_pap * 1.5)
    dp = rng.integers(p_lo, p_lo + n_pap, n_dom_edges)
    dp = ensure_covered(rng, dp, n_pap, p_lo)
    dd = rng.choice(np.arange(f_lo, f_lo + n_fos), size=n_dom_edges, p=DOMAIN_P)
    dd = ensure_covered(rng, dd, n_fos, f_lo)
    with_domain = pd.DataFrame(
        {
            "src": dp,
            "dst": dd,
            "FOS_weight": np.round(rng.beta(5, 2.2, n_dom_edges), 3),
        }
    ).drop_duplicates(subset=["src", "dst"])

    # Cite: sparse paper→paper, newer papers cite older ones mostly.
    n_cite = int(n_pap * 1.2)
    cs = rng.integers(p_lo, p_lo + n_pap, n_cite)
    cd = rng.integers(p_lo, p_lo + n_pap, n_cite)
    keep = cs != cd
    cite = pd.DataFrame({"src": cs[keep], "dst": cd[keep]}).drop_duplicates()

    return Dataset.build(
        spark,
        "DBLP",
        {"author": authors, "paper": papers, "venue": venues, "fos": fos},
        {
            "Authorship": authorship,
            "PublishedIn": published_in,
            "WithDomain": with_domain,
            "Cite": cite,
        },
    )

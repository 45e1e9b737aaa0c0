"""Table runners for the evaluation section (shared by jobs/ and
benchmarks/).

Each function reproduces one table of the paper at a configurable scale
(see EXPERIMENTS.md for paper-vs-measured): Table 1 dataset statistics,
Table 2 PHASE vs PHASE_opt timing, Tables 3/4 accuracy and time of the
12 samplers over the 3 datasets × 3 hypothesis types grid.

Scale knobs (env-overridable in the jobs): ``sf`` per dataset, sampling
proportions per (dataset, type) mirroring the paper's column three —
scaled up because our graphs are ~100× smaller (a 0.2% sample of a 7k-
node graph would hold 14 nodes), and ``runs`` (paper: 30).
"""
from __future__ import annotations

import time
from typing import Iterable, Optional

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.framework import Experiment
from repro.datasets import GENERATORS, Dataset
from repro.datasets.bank import bank, dblp_long_paths
from repro.samplers import ALL as ALL_SAMPLERS

# Paper Table 3/4 column three, scaled ~10x for graphs ~100x smaller:
# the *ordering* across rows (path needs a larger proportion than node
# on MovieLens; DBLP/Yelp run at small proportions) is preserved.
PROPORTIONS = {
    ("MovieLens", "node"): 0.10,
    ("MovieLens", "edge"): 0.15,
    ("MovieLens", "path"): 0.25,
    ("DBLP", "node"): 0.04,
    ("DBLP", "edge"): 0.04,
    ("DBLP", "path"): 0.04,
    ("Yelp", "node"): 0.02,
    ("Yelp", "edge"): 0.05,
    ("Yelp", "path"): 0.05,
}

DEFAULT_SF = {"MovieLens": 1.0, "DBLP": 1.0, "Yelp": 1.0}


def load_dataset(spark: SparkSession, name: str, sf: Optional[float] = None) -> Dataset:
    return GENERATORS[name](spark, sf=sf if sf is not None else DEFAULT_SF[name])


# ---------------------------------------------------------------------
# Table 1
# ---------------------------------------------------------------------
def table1(spark: SparkSession, *, sfs: Optional[dict] = None) -> pd.DataFrame:
    """Dataset statistics (paper Table 1)."""
    rows = []
    for name in GENERATORS:
        ds = load_dataset(spark, name, (sfs or {}).get(name))
        st = ds.graph.stats()
        rows.append({"Dataset": name, **st})
        ds.graph.unpersist()
    return pd.DataFrame(rows)


# ---------------------------------------------------------------------
# Table 2
# ---------------------------------------------------------------------
def table2(
    spark: SparkSession,
    *,
    sf: float = 1.0,
    proportion: float = 0.02,
    runs: int = 3,
    seed: int = 0,
) -> pd.DataFrame:
    """PHASE vs PHASE_opt average execution time on DBLP node/edge/path
    hypotheses (paper Table 2). Uses the first hypothesis of each type."""
    ds = load_dataset(spark, "DBLP", sf)
    n_nodes = ds.graph.num_nodes()
    budget = max(20, int(proportion * n_nodes))
    hyps = bank("DBLP")
    rows = {}
    for sampler in ("PHASE", "PHASE_opt"):
        rec = {}
        for htype in ("node", "edge", "path"):
            exp = Experiment(spark, ds.graph, hyps[htype][0])
            times = [
                exp.run_once(sampler, budget, seed=seed + r).total_seconds
                for r in range(runs)
            ]
            rec[htype.capitalize()] = sum(times) / runs
            exp.close()
        rows[sampler] = rec
    ds.graph.unpersist()
    out = pd.DataFrame(rows).T.reset_index(names="Sampler")
    out["Budget"] = budget
    return out


# ---------------------------------------------------------------------
# Tables 3 and 4 (one grid run yields both)
# ---------------------------------------------------------------------
def accuracy_time_grid(
    spark: SparkSession,
    *,
    datasets: Iterable[str] = ("MovieLens", "DBLP", "Yelp"),
    samplers: Iterable[str] = tuple(ALL_SAMPLERS),
    runs: int = 3,
    sfs: Optional[dict] = None,
    seed: int = 0,
) -> pd.DataFrame:
    """Run the full sampler × dataset × hypothesis-type grid.

    Returns one row per (dataset, type, sampler) with the averaged
    accuracy (Table 3) and total execution time (Table 4); per the
    paper, each cell averages the bank's three hypotheses of that type,
    each averaged over ``runs`` runs.
    """
    rows = []
    for dname in datasets:
        ds = load_dataset(spark, dname, (sfs or {}).get(dname))
        n_nodes = ds.graph.num_nodes()
        hyps = bank(dname)
        for htype in ("node", "edge", "path"):
            prop = PROPORTIONS[(dname, htype)]
            budget = max(20, int(prop * n_nodes))
            for hyp in hyps[htype]:
                exp = Experiment(spark, ds.graph, hyp)
                truth = exp.truth()
                print(
                    f"[grid] {dname}/{htype} {hyp.name}: truth="
                    f"{truth.decision} (n={truth.estimate.n_instances}, "
                    f"value={truth.estimate.value}) budget={budget}",
                    flush=True,
                )
                for sname in samplers:
                    res = exp.accuracy(sname, budget, runs=runs, seed=seed)
                    print(
                        f"[grid]   {sname:14s} acc={res['accuracy']:.2f} "
                        f"t={res['avg_total_seconds']:.2f}s",
                        flush=True,
                    )
                    rows.append(
                        {
                            "Dataset": dname,
                            "Type": htype,
                            "Proportion": prop,
                            "Hypothesis": hyp.name,
                            "Sampler": sname,
                            "Accuracy": res["accuracy"],
                            "Time": res["avg_total_seconds"],
                        }
                    )
                exp.close()
        ds.graph.unpersist()
    return pd.DataFrame(rows)


def pivot_table3(grid: pd.DataFrame) -> pd.DataFrame:
    """Paper Table 3 layout: rows = (dataset, type), cols = samplers,
    cells = accuracy averaged over the three hypotheses of the row."""
    return (
        grid.pivot_table(
            index=["Dataset", "Type", "Proportion"],
            columns="Sampler",
            values="Accuracy",
            aggfunc="mean",
        )
        .round(2)
        .reset_index()
    )


def pivot_table4(grid: pd.DataFrame) -> pd.DataFrame:
    """Paper Table 4 layout: same grid, cells = avg execution time (s)."""
    return (
        grid.pivot_table(
            index=["Dataset", "Type", "Proportion"],
            columns="Sampler",
            values="Time",
            aggfunc="mean",
        )
        .round(2)
        .reset_index()
    )


# ---------------------------------------------------------------------
# Path-length sweep (Figures 5/6 machinery; numbers land in EXPERIMENTS.md)
# ---------------------------------------------------------------------
def path_length_sweep(
    spark: SparkSession,
    *,
    samplers: Iterable[str] = ("PHASE_opt", "NBRW", "SRW"),
    proportion: float = 0.02,
    runs: int = 3,
    sf: float = 1.0,
    seed: int = 0,
) -> pd.DataFrame:
    """Accuracy/time for the DBLP length-3 and length-4 path hypotheses."""
    ds = load_dataset(spark, "DBLP", sf)
    budget = max(20, int(proportion * ds.graph.num_nodes()))
    rows = []
    for length, hyp in dblp_long_paths().items():
        exp = Experiment(spark, ds.graph, hyp)
        for sname in samplers:
            res = exp.accuracy(sname, budget, runs=runs, seed=seed)
            rows.append(
                {
                    "Length": length,
                    "Sampler": sname,
                    "Accuracy": res["accuracy"],
                    "Time": res["avg_total_seconds"],
                }
            )
        exp.close()
    ds.graph.unpersist()
    return pd.DataFrame(rows)

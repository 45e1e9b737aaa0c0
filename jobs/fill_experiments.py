"""Insert measured tables from results/*.csv into EXPERIMENTS.md.

Replaces the ``<!-- XXX_MEASURED -->`` placeholder comments with
markdown tables. Idempotent: placeholders are kept as section anchors
and the generated block between an anchor and the next ``---``/heading
is rewritten on each run.
"""
from __future__ import annotations

import os
import re

import pandas as pd

HERE = os.path.dirname(os.path.dirname(os.path.abspath(__file__)))
EXP = os.path.join(HERE, "EXPERIMENTS.md")
RESULTS = os.path.join(HERE, "results")

SAMPLER_ORDER = [
    "PHASE_opt", "RES", "RNS", "DBS", "SRW", "NBRW", "RWR", "MHRW",
    "ShortestPathS", "FrontierS", "FFS", "SBS",
]


def _md(df: pd.DataFrame) -> str:
    head = "| " + " | ".join(str(c) for c in df.columns) + " |"
    sep = "|" + "---|" * len(df.columns)
    rows = [
        "| " + " | ".join(str(v) for v in rec) + " |"
        for rec in df.itertuples(index=False)
    ]
    return "\n".join([head, sep, *rows])


def _grid_table(path: str) -> str:
    df = pd.read_csv(path)
    cols = ["Dataset", "Type", "Proportion"] + [
        s for s in SAMPLER_ORDER if s in df.columns
    ]
    df = df[cols]
    df["Proportion"] = (df["Proportion"] * 100).map(lambda p: f"{p:g}")
    order = {"node": 0, "edge": 1, "path": 2}
    dorder = {"MovieLens": 0, "DBLP": 1, "Yelp": 2}
    df = df.sort_values(
        ["Dataset", "Type"],
        key=lambda s: s.map(order) if s.name == "Type" else s.map(dorder),
    )
    return _md(df)


def fill(anchor: str, table_md: str, text: str) -> str:
    tag = f"<!-- {anchor} -->"
    pattern = re.compile(re.escape(tag) + r".*?(?=\n---|\n## |\Z)", re.S)
    return pattern.sub(tag + "\n\n" + table_md + "\n", text)


def main() -> None:
    text = open(EXP).read()
    t2 = os.path.join(RESULTS, "table2.csv")
    if os.path.exists(t2):
        df = pd.read_csv(t2)
        for c in ("Node", "Edge", "Path"):
            df[c] = df[c].round(2)
        text = fill("TABLE2_MEASURED", _md(df), text)
    t3 = os.path.join(RESULTS, "table3.csv")
    if os.path.exists(t3):
        text = fill("TABLE3_MEASURED", _grid_table(t3), text)
    t4 = os.path.join(RESULTS, "table4.csv")
    if os.path.exists(t4):
        text = fill("TABLE4_MEASURED", _grid_table(t4), text)
    pl = os.path.join(RESULTS, "path_length.csv")
    if os.path.exists(pl):
        df = pd.read_csv(pl)
        df["Accuracy"] = df["Accuracy"].round(2)
        df["Time"] = df["Time"].round(2)
        text = fill("PATHLEN_MEASURED", _md(df), text)
    open(EXP, "w").write(text)
    print("EXPERIMENTS.md updated")


if __name__ == "__main__":
    main()

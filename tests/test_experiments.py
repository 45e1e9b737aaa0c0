"""Tests for the table runners (pivots are pure pandas; the grid itself
is exercised end-to-end on a reduced sampler set)."""
import pandas as pd
import pytest

from repro.experiments import (
    PROPORTIONS,
    pivot_table3,
    pivot_table4,
    table1,
)
from repro.samplers import ALL


class TestProportions:
    def test_full_grid_covered(self):
        for ds in ("MovieLens", "DBLP", "Yelp"):
            for ht in ("node", "edge", "path"):
                assert 0 < PROPORTIONS[(ds, ht)] < 1

    def test_movielens_path_needs_largest_proportion(self):
        # Mirrors the paper's Table-3 column three: 1% < 2.5% < 5%.
        assert (
            PROPORTIONS[("MovieLens", "node")]
            < PROPORTIONS[("MovieLens", "edge")]
            < PROPORTIONS[("MovieLens", "path")]
        )


def _fake_grid() -> pd.DataFrame:
    rows = []
    for h in ("H1", "H2"):
        for s, acc, t in (("A", 1.0, 2.0), ("B", 0.5, 4.0)):
            rows.append(
                {
                    "Dataset": "D",
                    "Type": "node",
                    "Proportion": 0.1,
                    "Hypothesis": h,
                    "Sampler": s,
                    "Accuracy": acc,
                    "Time": t,
                }
            )
    rows[2]["Accuracy"] = 0.0  # H2/A
    return pd.DataFrame(rows)


class TestPivots:
    def test_table3_averages_hypotheses(self):
        t3 = pivot_table3(_fake_grid())
        assert t3.loc[0, "A"] == pytest.approx(0.5)  # (1.0 + 0.0) / 2
        assert t3.loc[0, "B"] == pytest.approx(0.5)

    def test_table4_averages_time(self):
        t4 = pivot_table4(_fake_grid())
        assert t4.loc[0, "A"] == pytest.approx(2.0)
        assert t4.loc[0, "B"] == pytest.approx(4.0)

    def test_layout_columns(self):
        t3 = pivot_table3(_fake_grid())
        assert list(t3.columns[:3]) == ["Dataset", "Type", "Proportion"]


class TestTable1:
    def test_shape_matches_paper(self, spark):
        df = table1(spark, sfs={n: 0.1 for n in ("MovieLens", "DBLP", "Yelp")})
        assert list(df["Dataset"]) == ["MovieLens", "DBLP", "Yelp"]
        by = df.set_index("Dataset")
        assert (by.loc["MovieLens", ["node_types", "edge_types"]] == [2, 1]).all()
        assert (by.loc["DBLP", ["node_types", "edge_types"]] == [4, 4]).all()
        assert (by.loc["Yelp", ["node_types", "edge_types"]] == [2, 1]).all()
        # Density ordering of paper Table 1.
        assert by.loc["MovieLens", "density"] > by.loc["DBLP", "density"]


class TestSamplerColumns:
    def test_all_matches_paper_table_columns(self):
        assert set(ALL) == {
            "PHASE_opt", "RES", "RNS", "DBS", "SRW", "NBRW", "RWR",
            "MHRW", "ShortestPathS", "FrontierS", "FFS", "SBS",
        }

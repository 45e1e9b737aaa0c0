"""Benchmark for Table 2: PHASE vs PHASE_opt execution time (DBLP).

The benchmark's own timings are the table's content: compare the
``test_bench_phase[...]`` rows against ``test_bench_phase_opt[...]`` in
bench_output.txt (full-scale numbers: jobs/table2_phase_vs_opt.py)."""
import pytest

from repro.core.framework import Experiment
from repro.datasets.bank import bank

BUDGET_PROP = 0.02
HYPS = [("node", 0), ("edge", 0), ("path", 0)]


@pytest.fixture(scope="module", params=HYPS, ids=[h[0] for h in HYPS])
def dblp_exp(request, spark, bench_dblp):
    htype, idx = request.param
    exp = Experiment(spark, bench_dblp.graph, bank("DBLP")[htype][idx])
    exp.context()  # build the shared adjacency outside the timed region
    yield exp
    exp.close()


def _budget(exp):
    return max(20, int(BUDGET_PROP * exp.graph.num_nodes()))


def test_bench_phase(benchmark, dblp_exp):
    r = benchmark.pedantic(
        dblp_exp.run_once, args=("PHASE", _budget(dblp_exp)),
        kwargs={"seed": 1}, rounds=1, iterations=1,
    )
    assert r.outcome is not None


def test_bench_phase_opt(benchmark, dblp_exp):
    r = benchmark.pedantic(
        dblp_exp.run_once, args=("PHASE_opt", _budget(dblp_exp)),
        kwargs={"seed": 1}, rounds=1, iterations=1,
    )
    assert r.outcome is not None

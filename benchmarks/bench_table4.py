"""Benchmark for Table 4: per-sampler execution time (sampling + test)
on a DBLP node hypothesis — the benchmark timing of each parametrized
row is the table's cell; full grid via jobs/table3_accuracy.py."""
import pytest

from repro.core.framework import Experiment
from repro.datasets.bank import bank
from repro.samplers import ALL


@pytest.fixture(scope="module")
def dblp_node_exp(spark, bench_dblp):
    exp = Experiment(spark, bench_dblp.graph, bank("DBLP")["node"][0])
    exp.context()
    yield exp
    exp.close()


@pytest.mark.parametrize("sampler", ALL)
def test_bench_table4_sampler(benchmark, dblp_node_exp, sampler):
    budget = max(20, int(0.02 * dblp_node_exp.graph.num_nodes()))
    r = benchmark.pedantic(
        dblp_node_exp.run_once, args=(sampler, budget),
        kwargs={"seed": 2}, rounds=1, iterations=1,
    )
    assert r.n_sampled > 0

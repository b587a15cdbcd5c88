"""Benchmark for Table 5: bid-history learning + a welfare point under
the learned real utilities (non-supermodular pair-table path)."""
import pytest

from repro.alloc.greedy_wm import greedy_wm
from repro.core import configs
from repro.diffusion.epic import simulate_welfare
from repro.experiments.tables import table5
from repro.graphs.generator import power_law_graph


@pytest.mark.benchmark(group="table5")
def test_bench_table5_learning(benchmark):
    df = benchmark.pedantic(lambda: table5(n_auctions=400), rounds=1, iterations=1)
    rel = (df["learned_value"] - df["paper_value"]).abs() / df["paper_value"]
    assert (rel < 0.02).all()


@pytest.mark.benchmark(group="table5")
def test_bench_table5_real_welfare_point(benchmark, spark):
    g = power_law_graph(spark, name="bench-real", n=800, m_target=5600, seed=47)
    model = configs.real_model()

    def pipeline():
        gw = greedy_wm(g, [6, 6, 4, 2, 2], seed=1)
        return simulate_welfare(g, model, gw.allocation, n_worlds=4, seed=2)

    res = benchmark.pedantic(pipeline, rounds=1, iterations=1)
    assert res.adoptions > 0

"""Benchmark for Table 4: the 10-item configurations — generation +
structural verification + a greedyWM allocation/welfare point under the
additive configuration (the Fig. 5 machinery at one budget)."""
import pytest

from repro.alloc.greedy_wm import greedy_wm
from repro.core import configs
from repro.diffusion.epic import simulate_welfare
from repro.experiments.tables import table4
from repro.graphs.generator import power_law_graph


@pytest.mark.benchmark(group="table4")
def test_bench_table4_config_generation(benchmark):
    df = benchmark.pedantic(lambda: table4(n_items=10), rounds=1, iterations=1)
    assert df["supermodular_value"].all()


@pytest.mark.benchmark(group="table4")
def test_bench_table4_multi_item_point(benchmark, spark):
    g = power_law_graph(spark, name="bench-multi", n=800, m_target=5600, seed=43)
    model = configs.additive_model(10)

    def pipeline():
        gw = greedy_wm(g, [3] * 10, seed=1)
        return simulate_welfare(g, model, gw.allocation, n_worlds=4, seed=2)

    res = benchmark.pedantic(pipeline, rounds=1, iterations=1)
    assert res.welfare > 0

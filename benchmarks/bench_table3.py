"""Benchmark for Table 3: two-item pipeline at one budget point —
allocation by greedyWM / item-disj / bundle-disj under configuration 3
plus the shared-world EPIC welfare evaluation (the Fig. 3 machinery)."""
import pytest

from repro.alloc.baselines import bundle_disj, item_disj
from repro.alloc.greedy_wm import greedy_wm
from repro.core import configs
from repro.diffusion.epic import simulate_welfare_multi
from repro.experiments.tables import table3
from repro.graphs.generator import power_law_graph


@pytest.mark.benchmark(group="table3")
def test_bench_table3_gap_derivation(benchmark):
    df = benchmark.pedantic(table3, rounds=1, iterations=1)
    assert (df["derived"] - df["paper"]).abs().max() <= 0.005


@pytest.mark.benchmark(group="table3")
def test_bench_table3_two_item_pipeline(benchmark, spark):
    g = power_law_graph(spark, name="bench-2item", n=800, m_target=5600, seed=41)
    model = configs.two_item_model(3)

    def pipeline():
        gw = greedy_wm(g, [6, 6], seed=1)
        idj = item_disj(g, [6, 6], seed=1)
        bdj = bundle_disj(g, model, [6, 6], seed=1)
        return simulate_welfare_multi(
            g,
            model,
            {"gw": gw.allocation, "idj": idj.allocation, "bdj": bdj.allocation},
            n_worlds=4,
            seed=2,
        )

    res = benchmark.pedantic(pipeline, rounds=1, iterations=1)
    assert res["gw"].welfare >= res["idj"].welfare - 1e-9

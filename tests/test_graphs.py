"""Tests for the graph substrate, oracle-checked against DuckDB."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graphs.generator import (
    FIG1_EDGES,
    er_graph,
    fig1_graph,
    from_edge_pairs,
    power_law_graph,
)
from repro.graphs.stats import degree_table, network_stats
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def small_graph(spark):
    return power_law_graph(spark, name="pl-small", n=200, m_target=1200, seed=3)


def test_fig1_structure(spark):
    g = fig1_graph(spark)
    got = {(r.src, r.dst) for r in g.edges.collect()}
    assert got == set(FIG1_EDGES)
    assert g.edges.where(F.col("p") != 1.0).count() == 0


def test_weighted_cascade_probabilities(small_graph):
    """p(u,v) = 1/d_in(v) (§6.1.3): per-node incoming p's sum to 1."""
    sums = (
        small_graph.edges.groupBy("dst")
        .agg(F.sum("p").alias("s"))
        .toPandas()
    )
    assert np.allclose(sums["s"], 1.0)


def test_degree_table_matches_duckdb(small_graph):
    """Spark degree aggregation vs DuckDB SQL over the same edge list."""
    spark_df = degree_table(small_graph).select("node", "in_degree", "out_degree")
    edges = small_graph.edges.select("src", "dst")
    assert_equivalent(
        spark_df,
        """
        WITH nodes AS (SELECT src AS node FROM edges UNION SELECT dst FROM edges)
        SELECT n.node,
               (SELECT count(*) FROM edges e WHERE e.dst = n.node) AS in_degree,
               (SELECT count(*) FROM edges e WHERE e.src = n.node) AS out_degree
        FROM nodes n
        """,
        edges=edges,
    )


def test_edge_count_matches_duckdb(small_graph):
    spark_df = small_graph.edges.agg(F.count("*").alias("m"))
    assert_equivalent(
        spark_df, "SELECT count(*) AS m FROM edges", edges=small_graph.edges
    )


def test_undirected_graph_symmetrized(spark):
    pairs = np.array([[0, 1], [1, 2], [2, 0]])
    g = from_edge_pairs(spark, pairs, name="tri", n=3, directed=False)
    got = {(r.src, r.dst) for r in g.edges.collect()}
    assert got == {(0, 1), (1, 0), (1, 2), (2, 1), (2, 0), (0, 2)}
    assert network_stats(g)["edges"] == 3  # undirected pairs


def test_no_self_loops_or_duplicates(small_graph):
    e = small_graph.edges
    assert e.where(F.col("src") == F.col("dst")).count() == 0
    assert e.count() == e.select("src", "dst").distinct().count()


def test_generator_deterministic(spark):
    a = power_law_graph(spark, name="a", n=100, m_target=400, seed=9)
    b = power_law_graph(spark, name="b", n=100, m_target=400, seed=9)
    pa = sorted(map(tuple, a.edges.select("src", "dst").collect()))
    pb = sorted(map(tuple, b.edges.select("src", "dst").collect()))
    assert pa == pb


def test_power_law_has_hubs(small_graph):
    """Heavy-tailed: max degree far above average (social-network shape)."""
    deg = degree_table(small_graph).toPandas()
    assert deg["out_degree"].max() > 5 * deg["out_degree"].mean()


def test_network_stats_fields(spark):
    g = er_graph(spark, name="er", n=50, m_target=200, seed=1)
    s = network_stats(g)
    assert s["nodes"] == 50
    assert s["type"] == "directed"
    assert s["avg_degree"] == pytest.approx(s["edges"] / 50, abs=0.1)

"""Figs. 3 + 8(a,b) as a table: welfare of 5 algorithms, configs 1-6."""
from repro.experiments.figures import two_item_welfare
from repro.experiments.session import get_spark
from repro.graphs.generator import load_network

if __name__ == "__main__":
    spark = get_spark("fig3")
    g = load_network(spark, "douban-movie-lite")
    df = two_item_welfare(
        g,
        config_ids=[1, 2, 3, 4, 5, 6],
        uniform_ks=[5, 15],
        nonuniform_b1=14,
        nonuniform_b2s=[6, 22],
    )
    print("== Fig. 3 / Fig. 8(a,b): expected social welfare (2 items) ==")
    print(df.to_string(index=False))
    spark.stop()

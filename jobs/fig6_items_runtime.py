"""Fig. 6 as a table: allocation time vs number of items (config 7)."""
from repro.experiments.figures import items_vs_runtime
from repro.experiments.session import get_spark
from repro.graphs.generator import load_network

if __name__ == "__main__":
    spark = get_spark("fig6")
    g = load_network(spark, "twitter-lite")
    df = items_vs_runtime(g, item_counts=[1, 5, 10], k=15)
    print("== Fig. 6: running time vs number of items (twitter-lite) ==")
    print(df.to_string(index=False))
    spark.stop()

"""Fig. 7(a,b) as a table: learned real utilities, greedyWM vs bundle-disj."""
from repro.experiments.figures import real_params_welfare
from repro.experiments.session import get_spark
from repro.graphs.generator import load_network

if __name__ == "__main__":
    spark = get_spark("fig7")
    g = load_network(spark, "douban-movie-lite")
    df = real_params_welfare(g, totals=[20, 80])
    print("== Fig. 7(a,b): welfare + time under Table 5 utilities ==")
    print(df.to_string(index=False))
    spark.stop()

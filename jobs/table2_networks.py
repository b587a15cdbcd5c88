"""Table 2: statistics of the four stand-in networks."""
from repro.experiments.session import get_spark
from repro.experiments.tables import PAPER_TABLE2, table2

if __name__ == "__main__":
    spark = get_spark("table2")
    print("== Table 2 (ours, stand-in networks) ==")
    print(table2(spark).to_string(index=False))
    print("\n== Table 2 (paper) ==")
    print(PAPER_TABLE2.to_string(index=False))
    spark.stop()

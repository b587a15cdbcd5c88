"""Table 4: multi-item configurations + verified structural properties."""
from repro.experiments.tables import table4

if __name__ == "__main__":
    print("== Table 4: multi-item configurations ==")
    print(table4().to_string(index=False))

"""Table 3: two-item configurations; GAP column derived via Eq. (5)."""
from repro.experiments.tables import table3

if __name__ == "__main__":
    print("== Table 3: derived GAP parameters vs paper ==")
    print(table3().to_string(index=False))

"""Table III job: print dataset statistics (ours vs paper)."""
from repro.experiments.table3 import PAPER_TABLE3, dataset_stats, format_table3

if __name__ == "__main__":
    print("== Table III (ours, ~1000x reduced lite lakes) ==")
    print(format_table3(dataset_stats()))
    print("\n== Table III (paper) ==")
    print(format_table3(PAPER_TABLE3))

"""Table VI job: |P| × m parameter-tuning grid + §VI-D cost model."""
from repro.experiments.table6 import (
    PAPER_OPTIMA,
    cost_model_optimal_m,
    empirical_optimal,
    format_table6,
    run_table6,
)

if __name__ == "__main__":
    rows = run_table6()
    print("== Table VI: parameter tuning (ours) ==")
    print(format_table6(rows))
    for kind, paper_key in (("open", "OPEN"), ("swdc", "SWDC")):
        ds = kind.upper() + "-lite"
        emp = empirical_optimal(rows, ds)
        ana, costs = cost_model_optimal_m(kind=kind)
        print(
            f"\n{ds}: empirical optimum (|P|,m)={emp}, cost-model m*={ana} "
            f"(paper: empirical {PAPER_OPTIMA[paper_key]['empirical']}, "
            f"analytic m*={PAPER_OPTIMA[paper_key]['analytic_m']})"
        )

"""Table IV job: precision & recall of joinable table search."""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark

from repro.experiments.table4 import format_table4, run_table4

if __name__ == "__main__":
    spark = get_spark("table4")
    results = run_table4(spark)
    print("== Table IV: precision & recall (ours vs paper) ==")
    print(format_table4(results))
    spark.stop()

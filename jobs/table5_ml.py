"""Table V job: ML-task performance per discovery method."""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark

from repro.experiments.table5 import format_table5, run_table5

if __name__ == "__main__":
    spark = get_spark("table5")
    results = run_table5(spark)
    print("== Table V: ML tasks (ours, paper in parens) ==")
    print(format_table5(results))
    spark.stop()

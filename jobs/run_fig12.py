"""Reproduce Figure 12 shape (runtime vs #R2 columns). Usage:
python jobs/run_fig12.py"""
from _session import get_spark

from repro.experiments import format_table, run_fig12

if __name__ == "__main__":
    spark = get_spark("fig12")
    print(format_table(run_fig12(spark), "Figure 12: runtime vs R2 columns"))
    spark.stop()

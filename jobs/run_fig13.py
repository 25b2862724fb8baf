"""Reproduce Figure 13 (hybrid runtime breakdown). Usage: python jobs/run_fig13.py"""
from _session import get_spark

from repro.experiments import format_table, run_fig13

if __name__ == "__main__":
    spark = get_spark("fig13")
    print(format_table(run_fig13(spark), "Figure 13: runtime breakdown"))
    spark.stop()

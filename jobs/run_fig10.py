"""Reproduce Figure 10 (good/bad DC × CC table). Usage: python jobs/run_fig10.py"""
from _session import get_spark

from repro.experiments import format_table, run_fig10

if __name__ == "__main__":
    spark = get_spark("fig10")
    print(format_table(run_fig10(spark), "Figure 10: DC/CC combos at 10x"))
    spark.stop()

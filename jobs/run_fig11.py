"""Reproduce Figure 11b shape (hybrid runtime vs scale). Usage:
python jobs/run_fig11.py [max_scale]"""
import sys

from _session import get_spark

from repro.experiments import format_table, run_fig11

if __name__ == "__main__":
    max_scale = float(sys.argv[1]) if len(sys.argv) > 1 else 40
    scales = tuple(s for s in (10, 20, 40, 80, 160) if s <= max_scale)
    spark = get_spark("fig11")
    print(format_table(run_fig11(spark, scales=scales), "Figure 11b: hybrid runtime vs scale"))
    spark.stop()

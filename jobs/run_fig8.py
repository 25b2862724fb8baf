"""Reproduce Figures 8a/8b (error-rate tables).

Usage: python jobs/run_fig8.py [good|bad] [max_scale]
"""
import sys

from _session import get_spark

from repro.experiments import format_table, run_fig8

if __name__ == "__main__":
    flavor = sys.argv[1] if len(sys.argv) > 1 else "good"
    scales = (1, 2, 5, 10)
    if len(sys.argv) > 2:
        scales = tuple(s for s in (1, 2, 5, 10, 40) if s <= float(sys.argv[2]))
    spark = get_spark(f"fig8-{flavor}")
    df = run_fig8(spark, flavor, scales=scales)
    print(format_table(df, f"Figure 8{'a' if flavor == 'good' else 'b'}"))
    spark.stop()

"""Reproduce Table 1 (data scales). Usage: python jobs/run_table1.py"""
from repro.experiments import format_table, run_table1

if __name__ == "__main__":
    print(format_table(run_table1(), "Table 1: data scales (ours vs paper)"))

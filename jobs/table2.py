"""Reproduce Table 2 of the Evaporate paper: SWDE Movie/University vs in-domain SoTA baselines."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit cwd safety
from _common import run_table
from repro.harness.tables import table2

if __name__ == "__main__":
    run_table(table2, "table2", "SWDE Movie/University vs in-domain SoTA baselines")

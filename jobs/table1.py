"""Reproduce Table 1 of the Evaporate paper: EVAPORATE-CODE+ quality per source (ClosedIE Text F1, OpenIE R/P/F1)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit cwd safety
from _common import run_table
from repro.harness.tables import table1

if __name__ == "__main__":
    run_table(table1, "table1", "EVAPORATE-CODE+ quality per source (ClosedIE Text F1, OpenIE R/P/F1)")

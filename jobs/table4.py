"""Reproduce Table 4 of the Evaporate paper: Aggregation ablation: MV / WS / WS+Filter / WS+Abstain+Filter."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit cwd safety
from _common import run_table
from repro.harness.tables import table4

if __name__ == "__main__":
    run_table(table4, "table4", "Aggregation ablation: MV / WS / WS+Filter / WS+Abstain+Filter")

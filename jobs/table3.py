"""Reproduce Table 3 of the Evaporate paper: Direct vs Code+ quality and token cost per 10k documents."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit cwd safety
from _common import run_table
from repro.harness.tables import table3

if __name__ == "__main__":
    run_table(table3, "table3", "Direct vs Code+ quality and token cost per 10k documents")

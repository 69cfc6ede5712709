"""Reproduce Table 5 of the Evaporate paper: Alternate LLMs (GPT-4, Claude, Jumbo) + schema identification F1@k."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit cwd safety
from _common import run_table
from repro.harness.tables import table5

if __name__ == "__main__":
    run_table(table5, "table5", "Alternate LLMs (GPT-4, Claude, Jumbo) + schema identification F1@k")

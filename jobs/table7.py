"""Reproduce Table 7 of the Evaporate paper: Direct LLM ClosedIE quality and cost (Appendix C.2)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit cwd safety
from _common import run_table
from repro.harness.tables import table7

if __name__ == "__main__":
    run_table(table7, "table7", "Direct LLM ClosedIE quality and cost (Appendix C.2)")

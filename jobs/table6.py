"""Reproduce Table 6 of the Evaporate paper: QA span-extractor ClosedIE baseline (Appendix C.1)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit cwd safety
from _common import run_table
from repro.harness.tables import table6

if __name__ == "__main__":
    run_table(table6, "table6", "QA span-extractor ClosedIE baseline (Appendix C.1)")

#!/usr/bin/env python
"""spark-submit entrypoint for table T3 (accuracy_tails) — see the experiment
module's docstring for the claim being reproduced."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import run_table

from repro.experiments import t3_accuracy_tails as table_module

if __name__ == "__main__":
    run_table(table_module, needs_spark=False, app="repro-table3")

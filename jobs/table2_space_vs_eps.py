#!/usr/bin/env python
"""spark-submit entrypoint for table T2 (space_vs_eps) — see the experiment
module's docstring for the claim being reproduced."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import run_table

from repro.experiments import t2_space_vs_eps as table_module

if __name__ == "__main__":
    run_table(table_module, needs_spark=False, app="repro-table2")

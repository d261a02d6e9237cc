"""spark-submit entrypoint reproducing paper Table5 (see repro.tables.table5)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import run_table

if __name__ == "__main__":
    run_table("table5", ('day',))

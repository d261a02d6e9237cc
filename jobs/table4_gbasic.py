"""spark-submit entrypoint reproducing paper Table4 (see repro.tables.table4)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import run_table

if __name__ == "__main__":
    run_table("table4", ('basic',))

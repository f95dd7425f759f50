"""spark-submit entrypoint reproducing table T2 (btc fixed).

Usage: spark-submit jobs/table2_btc_fixed.py  (or: python jobs/table2_btc_fixed.py)
"""

import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _session import run_table

if __name__ == "__main__":
    run_table("T2")

"""spark-submit entrypoint reproducing table T4 (btc sliding).

Usage: spark-submit jobs/table4_btc_sliding.py  (or: python jobs/table4_btc_sliding.py)
"""

import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _session import run_table

if __name__ == "__main__":
    run_table("T4")

"""spark-submit entrypoint reproducing table T8 (cross interval).

Usage: spark-submit jobs/table8_cross_interval.py  (or: python jobs/table8_cross_interval.py)
"""

import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _session import run_table

if __name__ == "__main__":
    run_table("T8")

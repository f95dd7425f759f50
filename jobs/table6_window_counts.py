"""spark-submit entrypoint reproducing table T6 (window counts).

Usage: spark-submit jobs/table6_window_counts.py  (or: python jobs/table6_window_counts.py)
"""

import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _session import run_table

if __name__ == "__main__":
    run_table("T6")

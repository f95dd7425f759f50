"""spark-submit entrypoint reproducing table T1 (dataset).

Usage: spark-submit jobs/table1_dataset.py  (or: python jobs/table1_dataset.py)
"""

import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _session import run_table

if __name__ == "__main__":
    run_table("T1")

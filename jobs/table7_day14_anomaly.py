"""spark-submit entrypoint reproducing table T7 (day14 anomaly).

Usage: spark-submit jobs/table7_day14_anomaly.py  (or: python jobs/table7_day14_anomaly.py)
"""

import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _session import run_table

if __name__ == "__main__":
    run_table("T7")

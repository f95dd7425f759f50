"""Reproduce every table (T1–T8) in one Spark session.

Usage:
    spark-submit jobs/run_all.py [output.md]

Prints each table as markdown; with an output path, also writes the
combined report there (this is how the numbers in EXPERIMENTS.md were
generated). One session is reused so the chain DataFrames and collected
series are generated once and shared across tables.
"""

import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _session import get_session

from repro.core.tables import ALL_TABLES, to_markdown


def main(out_path: str | None = None) -> None:
    spark = get_session("repro-all-tables")
    spark.sparkContext.setLogLevel("ERROR")
    chunks = []
    try:
        for name, builder in ALL_TABLES.items():
            pdf = builder(spark)
            chunk = f"\n## Table {builder.__doc__.splitlines()[0].rstrip('.')}\n\n{to_markdown(pdf)}\n"
            print(chunk)
            chunks.append(chunk)
    finally:
        spark.stop()
    if out_path:
        pathlib.Path(out_path).write_text("".join(chunks))
        print(f"wrote {out_path}")


if __name__ == "__main__":
    main(sys.argv[1] if len(sys.argv) > 1 else None)

"""Decentralization metrics (paper §II.B, Eqs. 1–4).

``reference`` holds numpy ground-truth implementations; the Spark
versions in ``spark_metrics`` compute all three metrics per window with
DataFrame aggregations and window functions; ``sql`` carries the
engine-portable SQL used to cross-check Spark against DuckDB.
"""

from repro.metrics.reference import gini, nakamoto, shannon_entropy
from repro.metrics.spark_metrics import (
    NAKAMOTO_THRESHOLD_PCT,
    decentralization_by_window,
    per_window_counts,
)

__all__ = [
    "gini",
    "shannon_entropy",
    "nakamoto",
    "per_window_counts",
    "decentralization_by_window",
    "NAKAMOTO_THRESHOLD_PCT",
]

"""T4 benchmark: Bitcoin sliding-window measurement (explode + 3-metric
aggregation, N ∈ {144, 1008, 4320}, M = N/2)."""

import pytest

from repro.chain.params import BITCOIN_2019
from repro.core.pipeline import collect_series, measure_sliding
from repro.windows.sliding import num_windows


@pytest.mark.parametrize("granularity", ["day", "week", "month"])
def test_btc_sliding_metrics(benchmark, btc_df, granularity):
    n = BITCOIN_2019.sliding_sizes[granularity]
    expected = num_windows(BITCOIN_2019.total_blocks, n, n // 2)

    def run():
        return collect_series(measure_sliding(btc_df, BITCOIN_2019, granularity))

    out = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(out) == expected

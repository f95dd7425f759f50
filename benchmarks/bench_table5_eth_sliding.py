"""T5 benchmark: Ethereum sliding-window measurement — the heaviest
dataflow in the paper (2.2 M credits explode to ~4.4 M window-member
rows before the per-window aggregation)."""

import pytest

from repro.chain.params import ETHEREUM_2019
from repro.core.pipeline import collect_series, measure_sliding
from repro.windows.sliding import num_windows


@pytest.mark.parametrize("granularity", ["day", "week", "month"])
def test_eth_sliding_metrics(benchmark, eth_df, granularity):
    n = ETHEREUM_2019.sliding_sizes[granularity]
    expected = num_windows(ETHEREUM_2019.total_blocks, n, n // 2)

    def run():
        return collect_series(measure_sliding(eth_df, ETHEREUM_2019, granularity))

    out = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(out) == expected

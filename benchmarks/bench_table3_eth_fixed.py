"""T3 benchmark: Ethereum fixed-window measurement (3 metrics over
2,204,650 producer credits)."""

import pytest

from repro.core.pipeline import collect_series, measure_fixed


@pytest.mark.parametrize("granularity", ["day", "week", "month"])
def test_eth_fixed_metrics(benchmark, eth_df, granularity):
    expected = {"day": 365, "week": 53, "month": 12}[granularity]

    def run():
        return collect_series(measure_fixed(eth_df, granularity))

    out = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(out) == expected

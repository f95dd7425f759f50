"""T2 benchmark: Bitcoin fixed-window measurement (3 metrics ×
day/week/month over the 54,945-credit 2019 stream)."""

import pytest

from repro.core.pipeline import collect_series, measure_fixed


@pytest.mark.parametrize("granularity", ["day", "week", "month"])
def test_btc_fixed_metrics(benchmark, btc_df, granularity):
    expected = {"day": 365, "week": 53, "month": 12}[granularity]

    def run():
        return collect_series(measure_fixed(btc_df, granularity))

    out = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(out) == expected

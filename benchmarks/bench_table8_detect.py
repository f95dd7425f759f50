"""T8 benchmark: cross-interval surge detection — sliding-window
measurement plus per-window miner-share computation and spike scan."""

from repro.chain.params import BITCOIN_2019
from repro.core.pipeline import collect_series, measure_sliding, miner_share_series
from repro.windows.sliding import with_sliding_window


def test_surge_detection(benchmark, btc_df):
    surge = BITCOIN_2019.surges[0]

    def run():
        sday = collect_series(measure_sliding(btc_df, BITCOIN_2019, "day"))
        shares = miner_share_series(
            with_sliding_window(
                btc_df, BITCOIN_2019.total_blocks, BITCOIN_2019.sliding_sizes["day"]
            ),
            surge.miner,
        )
        return sday, shares

    sday, shares = benchmark.pedantic(run, rounds=3, iterations=1)
    assert sday["nakamoto"].min() <= 2
    assert shares["share"].max() >= 0.45

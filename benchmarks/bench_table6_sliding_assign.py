"""T6 benchmark: sliding-window membership assignment alone (the
explode(sequence(...)) dataflow of Eq. 5) on the Ethereum stream."""

from repro.chain.params import ETHEREUM_2019
from repro.windows.sliding import num_windows, with_sliding_window


def test_eth_sliding_assignment(benchmark, eth_df):
    n = ETHEREUM_2019.sliding_sizes["day"]

    def run():
        return (
            with_sliding_window(eth_df, ETHEREUM_2019.total_blocks, n)
            .select("window_id")
            .distinct()
            .count()
        )

    got = benchmark.pedantic(run, rounds=3, iterations=1)
    assert got == num_windows(ETHEREUM_2019.total_blocks, n, n // 2)

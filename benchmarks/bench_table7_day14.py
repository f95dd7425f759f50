"""T7 benchmark: the day-14 anomaly drill-down (daily measurement plus
per-block credit counts for the two multi-coinbase blocks)."""

from pyspark.sql import functions as F

from repro.core.pipeline import collect_series, measure_fixed


def test_day14_drilldown(benchmark, btc_df):
    def run():
        day = collect_series(measure_fixed(btc_df, "day"))
        blocks = (
            btc_df.where(F.col("block_number").isin(558_473, 558_545))
            .groupBy("block_number")
            .agg(F.count("*").alias("cnt"))
            .collect()
        )
        return day, blocks

    day, blocks = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(blocks) == 2
    assert float(day[day.window_id == 14]["entropy"].iloc[0]) > 5.5

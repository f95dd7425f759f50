"""Benchmark fixtures: full-scale chain DataFrames, generated once."""

import pytest

from repro.chain.params import BITCOIN_2019, ETHEREUM_2019
from repro.core import pipeline


@pytest.fixture(scope="session")
def btc_df(spark):
    return pipeline.producers(spark, BITCOIN_2019)


@pytest.fixture(scope="session")
def eth_df(spark):
    return pipeline.producers(spark, ETHEREUM_2019)

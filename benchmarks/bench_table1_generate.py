"""T1 benchmark: full-year synthetic chain generation (the BigQuery
substitute). Ethereum is the heavy case: 2,204,650 producer credits."""

from repro.chain.generator import block_producers_pdf
from repro.chain.params import BITCOIN_2019, ETHEREUM_2019


def test_generate_bitcoin_2019(benchmark):
    pdf = benchmark.pedantic(
        block_producers_pdf, args=(BITCOIN_2019,), rounds=3, iterations=1
    )
    assert pdf.block_number.nunique() == BITCOIN_2019.total_blocks


def test_generate_ethereum_2019(benchmark):
    pdf = benchmark.pedantic(
        block_producers_pdf, args=(ETHEREUM_2019,), rounds=3, iterations=1
    )
    assert len(pdf) == ETHEREUM_2019.total_blocks

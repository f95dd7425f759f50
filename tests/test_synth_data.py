"""Sanity tests of the provided synth_data generators (used as metric
test distributions in this reproduction)."""

import pytest

from repro import synth_data


@pytest.mark.parametrize("gen", [synth_data.lineitem, synth_data.orders,
                                 synth_data.customer, synth_data.part])
def test_generators_deterministic(spark, gen):
    a = gen(spark, sf=0.001).toPandas()
    b = gen(spark, sf=0.001).toPandas()
    assert a.equals(b)


def test_lineitem_row_count(spark):
    assert synth_data.lineitem(spark, sf=0.001).count() == 6_000


def test_orders_keys_sequential(spark):
    pdf = synth_data.orders(spark, sf=0.001).toPandas()
    assert pdf.o_orderkey.min() == 1
    assert pdf.o_orderkey.is_unique


def test_zipf_keys_are_skewed(spark):
    z = synth_data.zipf_keys(spark, n=10_000, n_keys=100, alpha=1.5).toPandas()
    u = synth_data.uniform_keys(spark, n=10_000, n_keys=100).toPandas()
    z_top = z.k.value_counts(normalize=True).iloc[0]
    u_top = u.k.value_counts(normalize=True).iloc[0]
    assert z_top > 3 * u_top


def test_key_generators_respect_n(spark):
    assert synth_data.zipf_keys(spark, n=500, n_keys=10).count() == 500
    assert synth_data.uniform_keys(spark, n=500, n_keys=10).count() == 500

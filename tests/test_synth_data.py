"""Tests for the provided TPC-H-lite generators (repro.synth_data)."""
import pytest

from repro import synth_data


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0)


def test_lineitem_size_and_schema(li):
    assert li.count() == 6000
    assert {"l_orderkey", "l_partkey", "l_quantity", "l_shipdate"} <= set(li.columns)


def test_lineitem_deterministic(spark, li):
    again = synth_data.lineitem(spark, sf=0.001, seed=0)
    assert again.toPandas().equals(li.toPandas())


def test_orders_keys_dense(spark):
    o = synth_data.orders(spark, sf=0.001).toPandas()
    assert list(o["o_orderkey"]) == list(range(1, len(o) + 1))


def test_customer_part_sizes(spark):
    assert synth_data.customer(spark, sf=0.001).count() == 150
    assert synth_data.part(spark, sf=0.001).count() == 200


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20000, n_keys=100, alpha=1.2).toPandas()
    top_share = df["k"].value_counts().iloc[0] / len(df)
    assert top_share > 0.05


def test_uniform_keys_cover_domain(spark):
    df = synth_data.uniform_keys(spark, n=5000, n_keys=10).toPandas()
    assert set(df["k"]) == set(range(1, 11))

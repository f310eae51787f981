"""Tests for the synthetic data generators (TPC-H-lite + Nexmark)."""
import pytest

from repro import synth_data


@pytest.fixture(scope="module")
def tiny(spark):
    return {
        "bids": synth_data.bids(spark, sf=0.002),
        "auctions": synth_data.auctions(spark, sf=0.002),
        "persons": synth_data.persons(spark, sf=0.002),
    }


class TestNexmarkGenerators:
    def test_bids_schema(self, tiny):
        assert set(tiny["bids"].columns) == {"auction", "bidder", "price", "date_time"}

    def test_auctions_schema(self, tiny):
        cols = set(tiny["auctions"].columns)
        assert {"id", "seller", "category", "date_time", "expires"} <= cols

    def test_persons_schema(self, tiny):
        cols = set(tiny["persons"].columns)
        assert {"id", "name", "state", "city", "date_time"} <= cols

    def test_scale_factor(self, spark):
        small = synth_data.bids(spark, sf=0.001).count()
        large = synth_data.bids(spark, sf=0.002).count()
        assert large == 2 * small

    def test_deterministic(self, spark):
        a = synth_data.bids(spark, sf=0.001, seed=5).toPandas()
        b = synth_data.bids(spark, sf=0.001, seed=5).toPandas()
        assert a.equals(b)

    def test_referential_keys_in_range(self, tiny):
        n_auc = tiny["auctions"].count()
        mx = tiny["bids"].agg({"auction": "max"}).collect()[0][0]
        assert mx <= n_auc

    def test_states_from_catalogue(self, tiny):
        states = {r.state for r in tiny["persons"].select("state").distinct().collect()}
        assert states <= set(synth_data._US_STATES)


class TestTpchLite:
    def test_lineitem_orders_keys_align(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        n_orders = o.count()
        assert li.agg({"l_orderkey": "max"}).collect()[0][0] <= n_orders

    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.3).toPandas()
        counts = df["k"].value_counts()
        # the hottest key should dominate under zipf
        assert counts.iloc[0] > 5 * counts.iloc[min(20, len(counts) - 1)]

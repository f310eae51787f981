"""Oracle-checked correctness of the PQP template pipelines over
TPC-H-lite."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent
from repro.queries import pqp

SF = 0.005


@pytest.fixture(scope="module")
def data(spark):
    return {
        "lineitem": synth_data.lineitem(spark, sf=SF),
        "orders": synth_data.orders(spark, sf=SF),
        "customer": synth_data.customer(spark, sf=SF),
    }


class TestLinear:
    def test_oracle(self, data):
        assert_equivalent(
            pqp.linear(data["lineitem"]), pqp.LINEAR_SQL, lineitem=data["lineitem"]
        )

    def test_window_buckets_nonnegative(self, data):
        out = pqp.linear(data["lineitem"]).toPandas()
        assert (out["w"] >= 0).all()
        assert (out["n"] > 0).all()


class TestTwoWay:
    def test_oracle(self, data):
        assert_equivalent(
            pqp.two_way_join(data["lineitem"], data["orders"]),
            pqp.TWO_WAY_SQL,
            lineitem=data["lineitem"],
            orders=data["orders"],
        )


class TestThreeWay:
    def test_oracle(self, data):
        assert_equivalent(
            pqp.three_way_join(data["lineitem"], data["orders"], data["customer"]),
            pqp.THREE_WAY_SQL,
            lineitem=data["lineitem"],
            orders=data["orders"],
            customer=data["customer"],
        )

    def test_segments_complete(self, data):
        out = pqp.three_way_join(
            data["lineitem"], data["orders"], data["customer"]
        ).toPandas()
        assert out["segment"].nunique() >= 3

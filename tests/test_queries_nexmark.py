"""Oracle-checked correctness of the Nexmark query pipelines: every
Spark DataFrame result is diffed against DuckDB running the reference
SQL over identical inputs."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent
from repro.queries import nexmark as q

SF = 0.005


@pytest.fixture(scope="module")
def data(spark):
    return {
        "bids": synth_data.bids(spark, sf=SF),
        "auctions": synth_data.auctions(spark, sf=SF),
        "persons": synth_data.persons(spark, sf=SF),
    }


class TestQ1:
    def test_oracle(self, data):
        assert_equivalent(q.q1(data["bids"]), q.Q1_SQL, bids=data["bids"])

    def test_row_count_preserved(self, data):
        assert q.q1(data["bids"]).count() == data["bids"].count()


class TestQ2:
    def test_oracle(self, data):
        assert_equivalent(q.q2(data["bids"]), q.Q2_SQL, bids=data["bids"])

    def test_is_subset(self, data):
        assert q.q2(data["bids"]).count() < data["bids"].count()


class TestQ3:
    def test_oracle(self, data):
        assert_equivalent(
            q.q3(data["auctions"], data["persons"]),
            q.Q3_SQL,
            auctions=data["auctions"],
            persons=data["persons"],
        )

    def test_filters_applied(self, data):
        out = q.q3(data["auctions"], data["persons"]).toPandas()
        assert set(out["state"].unique()) <= {"OR", "ID", "CA"}


class TestQ5:
    def test_oracle(self, data):
        assert_equivalent(q.q5(data["bids"]), q.Q5_SQL, bids=data["bids"])

    def test_one_winner_count_per_window(self, data):
        out = q.q5(data["bids"]).toPandas()
        # ties allowed, but every row of a window carries that window's max
        per_w = out.groupby("window_slide")["cnt"].nunique()
        assert (per_w == 1).all()


class TestQ8:
    def test_oracle(self, data):
        assert_equivalent(
            q.q8(data["persons"], data["auctions"]),
            q.Q8_SQL,
            persons=data["persons"],
            auctions=data["auctions"],
        )

    def test_window_semantics(self, data, spark):
        out = q.q8(data["persons"], data["auctions"]).toPandas()
        persons = data["persons"].toPandas().set_index("id")
        for row in out.head(20).itertuples():
            assert persons.loc[row.person_id, "date_time"] // 10 == row.window_start

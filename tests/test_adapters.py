"""Tests for the Flink / Timely adapter modules."""
import numpy as np
import pytest

from repro.graphs.dag import DataflowDAG, Operator
from repro.sim import flink, timely
from repro.sim.engine import epoch_latencies, simulate, unit_rate


def _chain():
    return DataflowDAG(
        "chain",
        [
            Operator("src", "source"),
            Operator("f", "filter", selectivity=0.5),
            Operator("w", "window_agg"),
            Operator("k", "sink"),
        ],
        [("src", "f"), ("f", "w"), ("w", "k")],
        {"src": "in"},
    )


class TestFlinkAdapter:
    def test_state_metrics_sum_to_1000ms(self):
        dag = _chain()
        res = simulate(dag, {"f": 2, "w": 2}, {"in": unit_rate(dag.op("f"))}, seed=0)
        for m in res.metrics.values():
            ms = flink.state_metrics_ms(m)
            assert sum(ms.values()) == pytest.approx(1000.0, abs=1.0)

    def test_10pct_rule_matches_engine_flag(self):
        dag = _chain()
        rate = unit_rate(dag.op("w")) * 6
        res = simulate(dag, {"f": 100, "w": 1}, {"in": rate}, seed=0)
        for oid, m in res.metrics.items():
            assert flink.is_backpressured(m) == m.under_backpressure

    def test_job_level_rule(self):
        dag = _chain()
        rate = unit_rate(dag.op("w")) * 6
        res = simulate(dag, {"f": 100, "w": 1}, {"in": rate}, seed=0)
        assert flink.job_backpressured(res) == res.job_backpressure


class TestTimelyAdapter:
    def test_85pct_rule(self):
        dag = _chain()
        rate = unit_rate(dag.op("w"), "timely") * 6
        res = simulate(dag, {"f": 12, "w": 1}, {"in": rate}, system="timely", seed=0)
        assert timely.is_bottleneck(dag, res, "w")
        assert timely.job_bottlenecked(dag, res)

    def test_healthy_no_bottleneck(self):
        dag = _chain()
        rate = unit_rate(dag.op("w"), "timely") * 0.3
        res = simulate(dag, {"f": 2, "w": 2}, {"in": rate}, system="timely", seed=0)
        assert not timely.job_bottlenecked(dag, res)

    def test_source_never_bottleneck(self):
        dag = _chain()
        res = simulate(dag, {"f": 1, "w": 1}, {"in": 1e9}, system="timely", seed=0)
        assert not timely.is_bottleneck(dag, res, "src")

    def test_latency_percentiles(self):
        lat = np.array([0.1, 0.2, 0.3, 0.4, 1.0])
        pct = timely.latency_percentiles(lat)
        assert pct["p50"] == pytest.approx(0.3)
        assert pct["p99"] <= 1.0
        assert pct["p50"] <= pct["p95"] <= pct["p99"]

    def test_latencies_match_provisioning(self):
        dag = _chain()
        rate = unit_rate(dag.op("w"), "timely") * 2
        bad = epoch_latencies(dag, {"f": 4, "w": 1}, {"in": rate}, n_epochs=60, seed=0)
        good = epoch_latencies(dag, {"f": 4, "w": 4}, {"in": rate}, n_epochs=60, seed=0)
        assert timely.latency_percentiles(bad)["p99"] > timely.latency_percentiles(good)["p99"]

"""Flink adapter (paper §V-B, "Implementation — Apache Flink").

The engine (`repro.sim.engine`) natively models both systems; this module
exposes the Flink-specific vocabulary: the three operator-state metrics
(busy / idle / backPressured, in ms-per-second form) and the 10 % rule
for classifying an operator as a bottleneck.
"""
from __future__ import annotations

from repro.sim.engine import FLINK_BP_DETECT, OpMetrics, SimResult


def state_metrics_ms(m: OpMetrics) -> dict[str, float]:
    """Flink's three built-in per-operator state metrics, in milliseconds
    per second: busyTimeMsPerSecond + idleTimeMsPerSecond +
    backPressuredTimeMsPerSecond = 1000."""
    return {
        "busyTimeMsPerSecond": 1000.0 * m.busy,
        "idleTimeMsPerSecond": 1000.0 * m.idle,
        "backPressuredTimeMsPerSecond": 1000.0 * m.backpressured,
    }


def is_backpressured(m: OpMetrics) -> bool:
    """Paper's Flink rule: backPressuredTimeMsPerSecond exceeds 10 % of
    the cumulative sum of the three state metrics."""
    ms = state_metrics_ms(m)
    total = sum(ms.values())
    return total > 0 and ms["backPressuredTimeMsPerSecond"] / total > FLINK_BP_DETECT


def job_backpressured(result: SimResult) -> bool:
    """Dataflow-level backpressure: any operator trips the 10 % rule."""
    return any(is_backpressured(m) for m in result.metrics.values())

"""Timely Dataflow adapter (paper §V-B, "Implementation — Timely").

Timely has no built-in backpressure: sources never throttle and
non-blocking operators spin (which is why its observed busy time is
useless for DS2/ContTune-style useful-time estimation — see
``TIMELY_SPIN`` in the engine). The paper's bottleneck rule instead
compares an operator's processed input rate against the combined output
rate of its upstream operators: below 85 % → bottleneck. Per-epoch
latency (Fig. 8b–d) comes from ``repro.sim.engine.epoch_latencies``.
"""
from __future__ import annotations

import numpy as np

from repro.graphs.dag import DataflowDAG
from repro.sim.engine import TIMELY_DEFICIT, SimResult


def is_bottleneck(dag: DataflowDAG, result: SimResult, op_id: str) -> bool:
    """Paper's Timely rule: the operator's processed rate is below 85 %
    of the combined output rates of all its upstream operators."""
    upstream_out = sum(
        result.metrics[u].output_rate for u in dag.upstream(op_id)
    )
    if upstream_out <= 0:
        return False
    return result.metrics[op_id].processed_rate < TIMELY_DEFICIT * upstream_out


def job_bottlenecked(dag: DataflowDAG, result: SimResult) -> bool:
    return any(
        is_bottleneck(dag, result, o.op_id)
        for o in dag.operators
        if o.op_type != "source"
    )


def latency_percentiles(latencies: np.ndarray) -> dict[str, float]:
    """Summary of a per-epoch latency CDF (we report the distribution's
    p50/p95/p99 instead of plotting Fig. 8's curves)."""
    return {
        "p50": float(np.percentile(latencies, 50)),
        "p95": float(np.percentile(latencies, 95)),
        "p99": float(np.percentile(latencies, 99)),
        "mean": float(np.mean(latencies)),
    }

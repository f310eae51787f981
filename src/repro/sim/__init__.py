"""Dataflow execution substrate: a discrete-time simulator of Flink-like
and Timely-like stream engines (backpressure physics, metrics, virtual
clock), the Nexmark/PQP workload catalogue, the periodic source-rate
pattern, and real-Spark operator cost calibration."""

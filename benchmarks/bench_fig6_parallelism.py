"""Benchmark: reproduce Fig. 6 (as a table) — final total parallelism
per method at 10·W_u on the Flink simulator.

Paper's shape: StreamTune lowest overall, ZeroTune highest on PQP
(performance-only objective), DS2/ContTune in between; Q1–Q3 roughly
similar across DS2/ContTune/StreamTune."""
from repro.tables import fig6_parallelism


def test_bench_fig6(benchmark, eval_run):
    df = benchmark.pedantic(fig6_parallelism, args=(eval_run,), rounds=3, iterations=1)
    print("\nFig. 6 — total operator parallelism @10·W_u:")
    print(df.to_string(index=False))
    row = df.set_index("Method")
    for col in ("Linear", "2-way-join", "3-way-join"):
        assert row.loc["ZeroTune", col] > row.loc["StreamTune", col]
        assert row.loc["ZeroTune", col] > row.loc["DS2", col]
"""Benchmark: reproduce Fig. 7a/7b (as tables) — average number of
reconfigurations per tuning process, and StreamTune's tuning-time
distribution (virtual minutes; paper reports ~10–40 min, avg ~27)."""
from repro.tables import fig7_reconfigurations, fig7b_tuning_minutes


def test_bench_fig7(benchmark, eval_run):
    df = benchmark.pedantic(
        fig7_reconfigurations, args=(eval_run,), rounds=3, iterations=1
    )
    print("\nFig. 7a — average reconfigurations per tuning process:")
    print(df.to_string(index=False))
    print("\nFig. 7b — StreamTune tuning time (virtual minutes per process):")
    print(fig7b_tuning_minutes(eval_run).to_string(index=False))
    row = df.set_index("Method")
    # DS2 needs the most adjustments (no historical knowledge).
    for col in ("Q5", "Q8", "3-way-join"):
        assert row.loc["DS2", col] > row.loc["ContTune", col]

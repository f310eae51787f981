"""Benchmark: regenerate Table II (source-rate units) and the full
workload catalogue (fitted DAGs for both engines)."""
from repro.sim.workloads import full_catalogue
from repro.tables import table2_source_rates


def test_bench_table2(benchmark):
    def build():
        df = table2_source_rates()
        cat = full_catalogue("flink") | {
            f"timely:{k}": v for k, v in full_catalogue("timely").items()
        }
        return df, cat

    df, cat = benchmark(build)
    assert len(cat) == 66
    print("\nTable II — source-rate units:")
    print(df.to_string(index=False))

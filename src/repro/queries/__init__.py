"""Workload queries as Spark DataFrame pipelines (batch analogues of the
streaming jobs), each paired with DuckDB oracle SQL for result-equality
checking."""

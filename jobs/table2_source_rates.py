"""Print Table II — source-rate units of the evaluated streaming jobs.

Usage: python jobs/table2_source_rates.py
"""
from repro.tables import table2_source_rates

if __name__ == "__main__":
    print(table2_source_rates().to_string(index=False))

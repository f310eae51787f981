"""Baseline parallelism tuners reproduced from their papers: DS2
(OSDI'18), ContTune (VLDB'23), and ZeroTune (ICDE'24)."""

"""Benchmark t21_drift_tput: Fig 13b — throughput under distribution drift.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t21_drift_tput.py``.
"""
from repro.bench import tables_parallel


def test_t21_drift_tput(benchmark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_drift_throughput("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

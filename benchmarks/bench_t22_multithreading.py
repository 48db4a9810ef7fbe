"""Benchmark t22_multithreading: Fig 13c — multithreading efficiency.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t22_multithreading.py``.
"""
from repro.bench import tables_parallel


def test_t22_multithreading(benchmark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_multithreading_efficiency("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

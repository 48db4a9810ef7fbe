"""Benchmark t11_task_size: Fig 10c — throughput vs task size.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t11_task_size.py``.
"""
from repro.bench import tables_parallel


def test_t11_task_size(benchmark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_task_size("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

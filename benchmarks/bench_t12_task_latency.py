"""Benchmark t12_task_latency: Fig 10d — latency vs task size.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t12_task_latency.py``.
"""
from repro.bench import tables_parallel


def test_t12_task_latency(benchmark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_task_size("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

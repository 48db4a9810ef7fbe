"""Benchmark t17_scalability: Fig 12a — scalability vs thread count, CC overhead.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t17_scalability.py``.
"""
from repro.bench import tables_parallel


def test_t17_scalability(benchmark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_scalability("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

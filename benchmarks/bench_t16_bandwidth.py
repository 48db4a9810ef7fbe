"""Benchmark t16_bandwidth: Fig 11d — effective memory bandwidth proxy.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t16_bandwidth.py``.
"""
from repro.bench import tables_parallel


def test_t16_bandwidth(benchmark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_memory_bandwidth("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

"""Benchmark t19_selfjoin: Fig 12c — self-join single vs multithreaded.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t19_selfjoin.py``.
"""
from repro.bench import tables_parallel


def test_t19_selfjoin(benchmark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_selfjoin("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

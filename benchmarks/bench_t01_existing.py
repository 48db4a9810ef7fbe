"""Benchmark t01_existing: Fig 8a — existing approaches (NLWJ/B+/round-robin/Bw).

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t01_existing.py``.
"""
from repro.bench import tables_parallel


def test_t01_existing(benchmark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_existing_approaches("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

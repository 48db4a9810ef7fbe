"""Benchmark t05_merge_parallel: Fig 9a — parallel PIM vs merge ratio.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t05_merge_parallel.py``.
"""
from repro.bench import tables_parallel


def test_t05_merge_parallel(benchmark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_merge_ratio_parallel("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

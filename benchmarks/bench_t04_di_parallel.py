"""Benchmark t04_di_parallel: Fig 8d — parallel PIM vs insertion depth.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t04_di_parallel.py``.
"""
from repro.bench import tables_parallel


def test_t04_di_parallel(benchmark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_insertion_depth_parallel("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

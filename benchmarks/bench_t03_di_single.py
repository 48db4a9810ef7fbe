"""Benchmark t03_di_single: Fig 8c — single-threaded PIM vs insertion depth.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t03_di_single.py``.
"""
from repro.bench import tables_single


def test_t03_di_single(benchmark):
    df = benchmark.pedantic(
        lambda: tables_single.table_insertion_depth_single("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

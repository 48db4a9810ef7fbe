"""Benchmark t13_memory: Fig 11a — memory footprint PIM vs B+.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t13_memory.py``.
"""
from repro.bench import tables_single


def test_t13_memory(benchmark):
    df = benchmark.pedantic(
        lambda: tables_single.table_memory_footprint("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

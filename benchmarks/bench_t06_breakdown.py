"""Benchmark t06_breakdown: Fig 9b — per-step cost breakdown.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t06_breakdown.py``.
"""
from repro.bench import tables_single


def test_t06_breakdown(benchmark):
    df = benchmark.pedantic(
        lambda: tables_single.table_cost_breakdown("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

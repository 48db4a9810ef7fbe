"""Benchmark t23_merge_cost: Fig 14 — merge cost linearity.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t23_merge_cost.py``.
"""
from repro.bench import tables_single


def test_t23_merge_cost(benchmark):
    df = benchmark.pedantic(
        lambda: tables_single.table_merge_cost("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

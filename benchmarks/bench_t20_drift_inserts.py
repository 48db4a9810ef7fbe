"""Benchmark t20_drift_inserts: Fig 13a — insert distribution under drift.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t20_drift_inserts.py``.
"""
from repro.bench import tables_single


def test_t20_drift_inserts(benchmark):
    df = benchmark.pedantic(
        lambda: tables_single.table_drift_insert_distribution("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

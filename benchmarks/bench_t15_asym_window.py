"""Benchmark t15_asym_window: Fig 11c — asymmetric window sizes (Spark).

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t15_asym_window.py``.
"""
from repro.bench import tables_parallel


def test_t15_asym_window(benchmark, spark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_asymmetric_windows(spark, "smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

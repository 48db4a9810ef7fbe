"""Benchmark t18_skew: Fig 12b — skewed key distributions (Spark).

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t18_skew.py``.
"""
from repro.bench import tables_parallel


def test_t18_skew(benchmark, spark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_distributions(spark, "smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

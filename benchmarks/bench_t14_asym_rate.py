"""Benchmark t14_asym_rate: Fig 11b — asymmetric input rates (Spark).

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t14_asym_rate.py``.
"""
from repro.bench import tables_parallel


def test_t14_asym_rate(benchmark, spark):
    df = benchmark.pedantic(
        lambda: tables_parallel.table_asymmetric_rates(spark, "smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

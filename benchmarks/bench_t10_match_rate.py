"""Benchmark t10_match_rate: Fig 10b — throughput vs match rate (single-threaded lines).

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t10_match_rate.py``.
"""
from repro.bench import tables_single


def test_t10_match_rate(benchmark):
    df = benchmark.pedantic(
        lambda: tables_single.table_match_rate("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

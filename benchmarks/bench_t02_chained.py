"""Benchmark t02_chained: Fig 8b — chained index (B-chain vs IB-chain) vs L.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t02_chained.py``.
"""
from repro.bench import tables_single


def test_t02_chained(benchmark):
    df = benchmark.pedantic(
        lambda: tables_single.table_chained_index("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

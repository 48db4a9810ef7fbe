"""Benchmark t09_single_compare: Fig 10a — single-threaded B+/IM/PIM.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t09_single_compare.py``.
"""
from repro.bench import tables_single


def test_t09_single_compare(benchmark):
    df = benchmark.pedantic(
        lambda: tables_single.table_single_threaded_compare("smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

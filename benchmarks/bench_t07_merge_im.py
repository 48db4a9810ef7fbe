"""Benchmark t07_merge_im: Fig 9c — single-threaded IM vs merge ratio.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t07_merge_im.py``.
"""
from repro.bench import tables_single


def test_t07_merge_im(benchmark):
    df = benchmark.pedantic(
        lambda: tables_single.table_merge_ratio_single("im", "smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

"""Benchmark t08_merge_pim: Fig 9d — single-threaded PIM vs merge ratio.

Smoke-scale run of the table generator behind this figure panel; the
full-scale numbers recorded in EXPERIMENTS.md come from
``jobs/table_t08_merge_pim.py``.
"""
from repro.bench import tables_single


def test_t08_merge_pim(benchmark):
    df = benchmark.pedantic(
        lambda: tables_single.table_merge_ratio_single("pim", "smoke"), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(df) > 0

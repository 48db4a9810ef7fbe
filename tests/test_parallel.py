"""Correctness tests for the §4 multithreaded join: no duplicated or
missing results under real thread interleaving, ordered propagation,
edge-tuple and nonblocking-merge safety."""
import pytest

from repro.join.parallel import ParallelIBWJ
from repro.join.streams import (
    diff_for_match_rate,
    gen_stream,
    reference_pairs,
)


def _check(seq, w_r, w_s, diff, *, self_join=False, **kw):
    j = ParallelIBWJ(seq, w_r, w_s, diff, self_join=self_join, **kw)
    res = j.run()
    ref = reference_pairs(seq, w_r, w_s, diff, self_join=self_join)
    got = set(res.pairs)
    assert got == ref, (
        f"missing={list(ref - got)[:4]} extra={list(got - ref)[:4]}"
    )
    assert len(res.pairs) == len(ref), "duplicate results propagated"
    laters = [a for a, _ in res.pairs]
    assert laters == sorted(laters), "ordered propagation violated"
    return res


@pytest.mark.parametrize("n_threads", [1, 2, 4, 8])
@pytest.mark.parametrize("seed", [0, 1])
def test_two_way_parallel_matches_oracle(n_threads, seed):
    w = 128
    seq = gen_stream(2500, seed=seed)
    diff = diff_for_match_rate(2.0, w)
    _check(seq, w, w, diff, n_threads=n_threads, task_size=4, merge_ratio=0.5)


@pytest.mark.parametrize("n_threads", [1, 2, 4, 8])
def test_self_join_parallel_matches_oracle(n_threads):
    w = 128
    seq = gen_stream(2200, seed=2, self_join=True)
    diff = diff_for_match_rate(2.0, w)
    _check(
        seq, w, w, diff,
        self_join=True, n_threads=n_threads, task_size=4, merge_ratio=0.5,
    )


@pytest.mark.parametrize("task_size", [1, 2, 8, 16])
def test_task_size_sweep(task_size):
    w = 96
    seq = gen_stream(1600, seed=3)
    diff = diff_for_match_rate(2.0, w)
    _check(seq, w, w, diff, n_threads=4, task_size=task_size)


@pytest.mark.parametrize("blocking", [False, True])
@pytest.mark.parametrize("merge_ratio", [0.25, 1.0])
def test_merge_variants(blocking, merge_ratio):
    w = 128
    seq = gen_stream(3000, seed=4)
    diff = diff_for_match_rate(2.0, w)
    res = _check(
        seq, w, w, diff,
        n_threads=4, task_size=4,
        merge_ratio=merge_ratio, blocking_merge=blocking,
    )
    assert res.n_merges > 0  # the merge path was actually exercised


def test_asymmetric_windows_parallel():
    seq = gen_stream(2000, seed=5)
    diff = diff_for_match_rate(2.0, 256)
    _check(seq, 64, 256, diff, n_threads=4, task_size=4)


def test_asymmetric_rates_parallel():
    w = 96
    seq = gen_stream(1800, seed=6, rate_r=3, rate_s=1)
    diff = diff_for_match_rate(2.0, w)
    _check(seq, w, w, diff, n_threads=4, task_size=4)


def test_skewed_distribution_parallel():
    w = 128
    seq = gen_stream(1800, seed=7, dist="gaussian")
    diff = diff_for_match_rate(2.0, w)
    _check(seq, w, w, diff, n_threads=4, task_size=4)


def test_insertion_depth_variants():
    w = 256
    seq = gen_stream(2200, seed=8)
    diff = diff_for_match_rate(2.0, w)
    for d_i in (1, 3):
        _check(
            seq, w, w, diff,
            n_threads=4, task_size=4, insertion_depth=d_i, merge_ratio=0.5,
        )


def test_single_thread_equals_sequential_semantics():
    """n_threads=1 must produce the oracle set in exact arrival order."""
    w = 64
    seq = gen_stream(900, seed=9)
    diff = diff_for_match_rate(2.0, w)
    res = _check(seq, w, w, diff, n_threads=1, task_size=8)
    assert res.n_processed == 900


def test_edge_never_passes_unindexed(monkeypatch):
    """After the run, every position below each stream's edge is indexed."""
    w = 64
    seq = gen_stream(1000, seed=10)
    diff = diff_for_match_rate(2.0, w)
    j = ParallelIBWJ(seq, w, w, diff, n_threads=4, task_size=4)
    j.run()
    for side in ("R", "S"):
        st = j.state[side]
        for p in range(1, st.edge):
            assert st.indexed[p]


def test_throughput_and_counts_reported():
    w = 64
    seq = gen_stream(600, seed=11)
    diff = diff_for_match_rate(2.0, w)
    j = ParallelIBWJ(seq, w, w, diff, n_threads=2, task_size=4)
    res = j.run()
    assert res.n_processed == 600
    assert res.throughput > 0
    assert res.n_matches == len(res.pairs)

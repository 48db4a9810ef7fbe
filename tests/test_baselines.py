"""Unit tests for the baseline indexes: NLWJ window, chained index,
round-robin partitioning and the Bw-Tree-like delta index."""
import numpy as np
import pytest

from repro.baselines.bw_tree import BwTreeLike
from repro.baselines.chained_index import ChainedIndex
from repro.baselines.nlwj import NLWJWindow
from repro.baselines.round_robin import RoundRobinIndex


# ---------------------------------------------------------------- NLWJ
def test_nlwj_probe_matches_bruteforce():
    w = 128
    win = NLWJWindow(w)
    rng = np.random.default_rng(0)
    items = []
    for p in range(1, 500):
        k = int(rng.integers(0, 1000))
        win.insert(k, p)
        items.append((k, p))
        live = [e for e in items if e[1] > p - w]
        got = win.probe(100, 300, min_pos=p - w + 1)
        assert sorted(got) == sorted(
            e for e in live if 100 <= e[0] <= 300
        )


def test_nlwj_unfilled_slots_never_match():
    win = NLWJWindow(64)
    win.insert(0, 1)  # key 0 == empty-slot sentinel value
    got = win.probe(-5, 5, min_pos=-100)
    assert got == [(0, 1)]


def test_nlwj_overwrite_is_coarse_delete():
    w = 4
    win = NLWJWindow(w)
    for p in range(1, 10):
        win.insert(p * 10, p)
    assert len(win) == w
    got = win.probe(0, 1000, min_pos=9 - w + 1)
    assert sorted(p for _, p in got) == [6, 7, 8, 9]


# -------------------------------------------------------- chained index
@pytest.mark.parametrize("L", [2, 3, 5, 8])
@pytest.mark.parametrize("immutable", [False, True])
def test_chained_index_window_contents(L, immutable):
    w = 240
    idx = ChainedIndex(w, L, immutable)
    rng = np.random.default_rng(1)
    items = []
    for p in range(1, 1000):
        k = int(rng.integers(0, 5000))
        idx.insert(k, p)
        items.append((k, p))
        idx.expire(p - w + 1)
        live = [e for e in items if e[1] > p - w]
        got = idx.probe(0, 5000, min_pos=p - w + 1)
        if p % 97 == 0:
            assert sorted(got) == sorted(live)
    assert idx.n_subindexes <= L + 1


def test_chained_index_drops_whole_subindexes():
    w = 100
    idx = ChainedIndex(w, 5, False)  # capacity 25
    for p in range(1, 301):
        idx.insert(p, p)
    n_before = idx.n_subindexes
    dropped = idx.expire(300 - w + 1)
    assert dropped >= 1
    assert idx.n_subindexes == n_before - dropped


def test_chained_index_rejects_short_chain():
    with pytest.raises(ValueError):
        ChainedIndex(100, 1)


def test_chained_index_capacity_partitioning():
    idx = ChainedIndex(100, 5)
    assert idx.capacity == 25


def test_ib_chain_archives_are_immutable():
    from repro.core.immutable_btree import ImmutableBTree

    idx = ChainedIndex(100, 3, immutable_archive=True)
    for p in range(1, 120):
        idx.insert(p, p)
    assert idx.archived
    assert all(isinstance(t, ImmutableBTree) for t, _, _ in idx.archived)


# ----------------------------------------------------------- round-robin
@pytest.mark.parametrize("P", [1, 2, 4, 8])
def test_round_robin_window_contents(P):
    w = 256
    idx = RoundRobinIndex(w, P)
    rng = np.random.default_rng(2)
    ring = {}
    for p in range(1, 1200):
        k = int(rng.integers(0, 3000))
        if p > w:
            assert idx.delete(ring.pop(p - w), p - w)
        idx.insert(k, p)
        ring[p] = k
    assert len(idx) == w
    got = idx.probe(0, 3000)
    assert sorted(got) == sorted((k, p) for p, k in ring.items())


def test_round_robin_partitions_balanced():
    idx = RoundRobinIndex(1000, 4)
    for p in range(1, 1001):
        idx.insert(p, p)
    sizes = [len(t) for t in idx.locals]
    assert max(sizes) - min(sizes) <= 1


def test_round_robin_rejects_zero_partitions():
    with pytest.raises(ValueError):
        RoundRobinIndex(100, 0)


# ----------------------------------------------------------- Bw-Tree-like
def test_bw_tree_insert_search_reference():
    idx = BwTreeLike(page_capacity=32, consolidate_at=4)
    rng = np.random.default_rng(3)
    ref = []
    for p in range(1, 2001):
        k = int(rng.integers(0, 5000))
        idx.insert(k, p)
        ref.append((k, p))
    assert len(idx) == 2000
    for lo, hi in [(0, 5000), (100, 200), (4999, 5000), (-10, -1)]:
        got = sorted(idx.search_range(lo, hi))
        assert got == sorted(e for e in ref if lo <= e[0] <= hi)


def test_bw_tree_pages_split_under_load():
    idx = BwTreeLike(page_capacity=16, consolidate_at=4)
    for p in range(1, 501):
        idx.insert(p, p)
    assert idx.n_pages > 10
    assert idx.n_consolidations > 0


def test_bw_tree_delete():
    idx = BwTreeLike(page_capacity=16, consolidate_at=4)
    for p in range(1, 101):
        idx.insert(p % 10, p)
    assert idx.delete(5, 5)
    assert not idx.delete(5, 5)  # already gone
    assert not idx.delete(99, 1)  # never existed
    got = idx.search_range(5, 5)
    assert (5, 5) not in got
    assert len(idx) == 99


def test_bw_tree_windowed_churn():
    w = 150
    idx = BwTreeLike(page_capacity=32, consolidate_at=6)
    ring = {}
    rng = np.random.default_rng(4)
    for p in range(1, 700):
        k = int(rng.integers(0, 800))
        if p > w:
            assert idx.delete(ring.pop(p - w), p - w)
        idx.insert(k, p)
        ring[p] = k
    got = idx.search_range(0, 800)
    assert sorted(got) == sorted((k, p) for p, k in ring.items())


def test_bw_tree_delta_chain_visits_counted():
    idx = BwTreeLike(page_capacity=64, consolidate_at=16)
    for p in range(1, 50):
        idx.insert(p, p)
    v0 = idx.delta_visits
    idx.search_range(0, 100)
    assert idx.delta_visits > v0


def test_bw_tree_min_pos_filter():
    idx = BwTreeLike()
    for p in range(1, 50):
        idx.insert(7, p)
    got = idx.search_range(7, 7, min_pos=40)
    assert sorted(p for _, p in got) == list(range(40, 50))

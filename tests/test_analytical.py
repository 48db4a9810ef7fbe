"""Tests asserting the qualitative predictions of the paper's analytical
cost model (Equations 1-7), which motivate the design decisions."""
import pytest

from repro.model.analytical import (
    CostParams,
    cost_bj,
    cost_cj,
    cost_mj,
    cost_pj,
    cost_rrj,
    h_b,
    h_ib,
    merge_complexity,
)

P = CostParams()


def test_heights_log_in_window():
    assert h_b(1 << 20, P) > h_b(1 << 10, P)
    assert h_ib(1 << 20, P) < h_b(1 << 20, P)  # higher fan-out, shallower


def test_all_costs_grow_with_window():
    for fn in (cost_bj, lambda w, s, p: cost_cj(w, s, 4, p),
               lambda w, s, p: cost_rrj(w, s, 8, p),
               lambda w, s, p: cost_mj(w, s, 0.125, p),
               lambda w, s, p: cost_pj(w, s, 0.125, 2, p)):
        assert fn(1 << 22, 2.0, P) > fn(1 << 12, 2.0, P)


def test_costs_grow_with_match_rate():
    for fn in (cost_bj, lambda w, s, p: cost_cj(w, s, 4, p),
               lambda w, s, p: cost_pj(w, s, 0.125, 2, p)):
        assert fn(1 << 20, 1024.0, P) > fn(1 << 20, 2.0, P)


def test_chain_search_grows_with_length():
    """Eq. 3: the L-fold sub-index search dominates as L grows — the
    paper's Fig. 8b decline."""
    costs = [cost_cj(1 << 20, 2.0, L, P) for L in (2, 4, 8, 16)]
    assert costs == sorted(costs)


def test_round_robin_search_grows_with_cores():
    """Eq. 4: redundant P-way search makes total work grow with P."""
    costs = [cost_rrj(1 << 20, 2.0, Pn, P) for Pn in (1, 2, 4, 8, 16)]
    assert costs[-1] > costs[0]


def test_merge_ratio_tradeoff_is_u_shaped():
    """Eq. 5: extreme merge ratios are bad in both directions (Fig. 9c/d)."""
    w = 1 << 20
    ms = [2**-8, 2**-4, 1.0]
    costs = [cost_mj(w, 2.0, m, P) for m in ms]
    assert costs[1] < costs[0]
    assert costs[1] < costs[2]


def test_pim_insert_beats_im_for_large_ti():
    """§3.3.2: PIM sub-index ops beat IM's single T_I once |T_I| grows;
    with D_I routing overhead, PIM wins at high m."""
    w = 1 << 22
    assert cost_pj(w, 2.0, 1.0, 2, P) < cost_mj(w, 2.0, 1.0, P)


def test_pim_vs_im_crossover_in_depth():
    """Deeper D_I lowers sub-index height but adds routing cost — the
    Fig. 8c trade-off: some middle D_I is no worse than the extremes."""
    w = 1 << 20
    costs = {d: cost_pj(w, 2.0, 0.25, d, P) for d in (1, 2, 3, 4)}
    assert min(costs.values()) < costs[4] or min(costs.values()) < costs[1]


def test_two_stage_beats_bplus_at_default_params():
    """The headline claim (Fig. 10a): IM and PIM below B+-Tree cost."""
    w = 1 << 20
    assert cost_mj(w, 2.0, 0.125, P) < cost_bj(w, 2.0, P)
    assert cost_pj(w, 2.0, 0.125, 2, P) < cost_bj(w, 2.0, P)


def test_merge_complexity_linear():
    """Eq. 7: immutable-tree creation is O(l)."""
    a = merge_complexity(1 << 16, P)
    b = merge_complexity(1 << 17, P)
    assert b == pytest.approx(2 * a)


def test_invalid_params_rejected():
    with pytest.raises(ValueError):
        cost_cj(100, 2.0, 1, P)
    with pytest.raises(ValueError):
        cost_mj(100, 2.0, 0.0, P)
    with pytest.raises(ValueError):
        cost_pj(100, 2.0, 1.5, 2, P)

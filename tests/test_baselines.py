"""Tests for the EDTS baselines: Top-Down, Bottom-Up, RLTS+, Span-Search."""
import itertools

import numpy as np
import pytest

from repro.baselines.bottomup import bottomup_select, simplify_bottomup
from repro.baselines.rlts import get_rlts_policy, simplify_rlts, train_rlts
from repro.baselines.spansearch import _greedy_split, simplify_spansearch
from repro.baselines.topdown import simplify_topdown, topdown_select
from repro.core.errors import MEASURES, trajectory_error
from tests.conftest import make_traj

SIMPLIFIERS = {
    "topdown": simplify_topdown,
    "bottomup": simplify_bottomup,
}


def brute_force_best(x, y, t, budget, measure):
    """Optimal simplification by exhaustive search (tiny inputs only)."""
    n = len(x)
    best = np.inf
    interior = range(1, n - 1)
    for keep_interior in itertools.combinations(interior, budget - 2):
        keep = np.array([0, *keep_interior, n - 1])
        best = min(best, trajectory_error(x, y, t, keep, measure))
    return best


@pytest.mark.parametrize("name,fn", SIMPLIFIERS.items())
@pytest.mark.parametrize("measure", MEASURES)
class TestBudgetedSimplifiers:
    def test_budget_respected_exactly(self, name, fn, measure):
        x, y, t = make_traj(60, seed=0)
        keep = fn(x, y, t, 12, measure)
        assert len(keep) == 12

    def test_endpoints_always_kept(self, name, fn, measure):
        x, y, t = make_traj(40, seed=1)
        keep = fn(x, y, t, 6, measure)
        assert keep[0] == 0 and keep[-1] == 39

    def test_keep_sorted_unique(self, name, fn, measure):
        x, y, t = make_traj(50, seed=2)
        keep = fn(x, y, t, 10, measure)
        assert np.all(np.diff(keep) > 0)

    def test_budget_floor_two(self, name, fn, measure):
        x, y, t = make_traj(20, seed=3)
        keep = fn(x, y, t, 1, measure)
        assert len(keep) == 2

    def test_full_budget_keeps_everything(self, name, fn, measure):
        x, y, t = make_traj(15, seed=4)
        keep = fn(x, y, t, 15, measure)
        assert len(keep) == 15

    def test_monotone_more_budget_less_error(self, name, fn, measure):
        x, y, t = make_traj(80, seed=5)
        errs = [
            trajectory_error(x, y, t, fn(x, y, t, w, measure), measure)
            for w in (4, 10, 25, 60)
        ]
        # not strictly monotone per-step for heuristics, but the ends
        # must order correctly and errors must be non-explosive
        assert errs[-1] <= errs[0] + 1e-9

    def test_near_optimal_on_tiny_input(self, name, fn, measure):
        x, y, t = make_traj(9, seed=6)
        keep = fn(x, y, t, 4, measure)
        got = trajectory_error(x, y, t, keep, measure)
        best = brute_force_best(x, y, t, 4, measure)
        assert got <= best * 3 + 1e-6  # heuristics are approximations


class TestCollectiveSelect:
    @pytest.mark.parametrize("select", [topdown_select, bottomup_select])
    def test_global_budget_met(self, select):
        trajs = [make_traj(30, seed=s) for s in range(4)]
        keeps = select(trajs, 20, "sed")
        assert sum(len(k) for k in keeps) == 20

    @pytest.mark.parametrize("select", [topdown_select, bottomup_select])
    def test_endpoint_floor_when_budget_too_small(self, select):
        trajs = [make_traj(20, seed=s) for s in range(3)]
        keeps = select(trajs, 2, "sed")
        assert all(len(k) >= 2 for k in keeps)
        assert sum(len(k) for k in keeps) == 6

    @pytest.mark.parametrize("select", [topdown_select, bottomup_select])
    def test_nonuniform_allocation_possible(self, select):
        # A complex trajectory + a straight line: the straight line
        # should receive fewer points than the complex one.
        xc, yc, tc = make_traj(40, seed=7)
        xs = np.linspace(0, 100, 40)
        straight = (xs, np.zeros(40), np.arange(40.0))
        keeps = select([(xc, yc, tc), straight], 20, "ped")
        assert len(keeps[0]) > len(keeps[1])

    def test_topdown_collective_beats_or_matches_uniform(self):
        trajs = [make_traj(40, seed=s) for s in (8, 9)]
        w = 16
        coll = topdown_select(trajs, w, "sed")
        err_coll = max(
            trajectory_error(*tr, k, "sed") for tr, k in zip(trajs, coll)
        )
        uni = [simplify_topdown(*tr, w // 2, "sed") for tr in trajs]
        err_uni = max(trajectory_error(*tr, k, "sed") for tr, k in zip(trajs, uni))
        assert err_coll <= err_uni + 1e-9


class TestRLTS:
    def test_policy_trains_and_caches(self):
        p1 = get_rlts_policy("sed")
        p2 = get_rlts_policy("sed")
        assert p1 is p2

    def test_budget_respected(self):
        x, y, t = make_traj(50, seed=1)
        keep = simplify_rlts(x, y, t, 10, "sed")
        assert len(keep) == 10 and keep[0] == 0 and keep[-1] == 49

    def test_train_returns_usable_policy(self):
        pol = train_rlts("ped", episodes=3, traj_len=30, seed=0)
        x, y, t = make_traj(30, seed=2)
        keep = simplify_rlts(x, y, t, 8, "ped", policy=pol)
        assert len(keep) == 8

    def test_error_comparable_to_bottomup(self):
        x, y, t = make_traj(60, seed=3)
        e_rl = trajectory_error(x, y, t, simplify_rlts(x, y, t, 12, "sed"), "sed")
        e_bu = trajectory_error(x, y, t, simplify_bottomup(x, y, t, 12, "sed"), "sed")
        assert e_rl <= e_bu * 5 + 1e-6  # learned policy in the same league


class TestSpanSearch:
    def test_budget_respected(self):
        x, y, t = make_traj(60, seed=0)
        keep = simplify_spansearch(x, y, t, 12)
        assert len(keep) <= 12 and keep[0] == 0 and keep[-1] == 59

    def test_greedy_split_error_bounded(self):
        x, y, t = make_traj(50, seed=1)
        eps = 0.5
        keep = _greedy_split(x, y, t, eps)
        assert trajectory_error(x, y, t, keep, "dad") <= eps + 1e-9

    def test_larger_tolerance_fewer_points(self):
        x, y, t = make_traj(50, seed=2)
        loose = _greedy_split(x, y, t, 1.5)
        tight = _greedy_split(x, y, t, 0.05)
        assert len(loose) <= len(tight)

    def test_slack_budget_filled_with_topdown(self):
        # A nearly straight trajectory simplifies to few points; the
        # fill should then use the remaining budget.
        x = np.linspace(0, 100, 40) + np.random.default_rng(0).normal(0, 0.01, 40)
        y = np.zeros(40)
        t = np.arange(40.0)
        keep = simplify_spansearch(x, y, t, 10)
        assert len(keep) == 10

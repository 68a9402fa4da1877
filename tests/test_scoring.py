"""Unit tests for the EXP-3D objective over concrete selections."""
import math

import pytest

from repro.core.config import ExplainConfig, clip_p, logit
from repro.core.matches import Phi
from repro.core.scoring import (
    ComponentProblem,
    CTuple,
    Edge,
    evaluate_selection,
    selection_upper_bounds,
    selection_valid,
)

CFG = ExplainConfig()


def make(tuples, edges, phi=Phi.EQ):
    return ComponentProblem(tuples, edges, phi, CFG)


class TestConfig:
    def test_constants_ordering(self):
        # b (keep) must beat c (change) must be in the same ballpark as a.
        assert CFG.b > CFG.c
        assert CFG.b > CFG.a

    def test_unmatched_prefers_removal_at_defaults(self):
        # alpha = beta = 0.9: log(0.1) > log(0.9) + log(0.1).
        assert CFG.unmatched_is_removal(3.0)
        assert CFG.unmatched_score(3.0) == pytest.approx(CFG.a)

    def test_unmatched_zero_impact_keeps(self):
        assert not CFG.unmatched_is_removal(0.0)
        assert CFG.unmatched_score(0.0) == pytest.approx(CFG.b)

    def test_logit_clips_extremes(self):
        assert math.isfinite(logit(1.0))
        assert math.isfinite(logit(0.0))
        assert clip_p(1.0) < 1.0


class TestValidity:
    def test_eq_rejects_double_use_either_side(self):
        t = [CTuple(1, "a", 1), CTuple(1, "b", 1), CTuple(2, "x", 1)]
        p = make(t, [Edge(0, 2, 0.9), Edge(1, 2, 0.9)], Phi.EQ)
        assert selection_valid(p, [0])
        assert not selection_valid(p, [0, 1])

    def test_lt_allows_many_left_to_one_right(self):
        t = [CTuple(1, "a", 1), CTuple(1, "b", 1), CTuple(2, "x", 2)]
        p = make(t, [Edge(0, 2, 0.9), Edge(1, 2, 0.9)], Phi.LT)
        assert selection_valid(p, [0, 1])

    def test_lt_rejects_one_left_to_many_right(self):
        t = [CTuple(1, "a", 1), CTuple(2, "x", 1), CTuple(2, "y", 1)]
        p = make(t, [Edge(0, 1, 0.9), Edge(0, 2, 0.9)], Phi.LT)
        assert not selection_valid(p, [0, 1])

    def test_gt_mirrors_lt(self):
        t = [CTuple(1, "a", 1), CTuple(2, "x", 1), CTuple(2, "y", 1)]
        p = make(t, [Edge(0, 1, 0.9), Edge(0, 2, 0.9)], Phi.GT)
        assert selection_valid(p, [0, 1])

    def test_invalid_selection_raises(self):
        t = [CTuple(1, "a", 1), CTuple(1, "b", 1), CTuple(2, "x", 1)]
        p = make(t, [Edge(0, 2, 0.9), Edge(1, 2, 0.9)], Phi.EQ)
        with pytest.raises(ValueError):
            evaluate_selection(p, [0, 1])

    def test_edge_must_cross_sides(self):
        with pytest.raises(ValueError):
            make([CTuple(1, "a", 1), CTuple(1, "b", 1)], [Edge(0, 1, 0.5)])


class TestEvaluateSelection:
    def test_empty_selection_scores_unmatched(self):
        t = [CTuple(1, "a", 2.0), CTuple(2, "x", 2.0)]
        p = make(t, [Edge(0, 1, 0.8)])
        sol = evaluate_selection(p, [])
        expected = math.log(1 - 0.8) + 2 * CFG.a
        assert sol.score == pytest.approx(expected)
        assert sol.removed == [0, 1]
        assert sol.value_changes == {}

    def test_matched_equal_impacts_all_keep(self):
        t = [CTuple(1, "a", 2.0), CTuple(2, "x", 2.0)]
        p = make(t, [Edge(0, 1, 0.8)])
        sol = evaluate_selection(p, [0])
        assert sol.score == pytest.approx(math.log(0.8) + 2 * CFG.b)
        assert sol.removed == [] and sol.value_changes == {}

    def test_matched_unequal_impacts_one_value_change(self):
        t = [CTuple(1, "a", 2.0), CTuple(2, "x", 1.0)]
        p = make(t, [Edge(0, 1, 0.8)])
        sol = evaluate_selection(p, [0])
        assert sol.score == pytest.approx(math.log(0.8) + CFG.b + CFG.c)
        # Tie-break prefers the side-2 tuple, raised to balance.
        assert sol.value_changes == {1: pytest.approx(2.0)}

    def test_value_change_feasibility_picks_nonnegative(self):
        # side-2 impact smaller than the gap: lowering side-1 to -1 is
        # infeasible, so side-2 must be raised (preferred anyway).
        t = [CTuple(1, "a", 5.0), CTuple(2, "x", 1.0)]
        p = make(t, [Edge(0, 1, 0.8)])
        sol = evaluate_selection(p, [0])
        (idx, new), = sol.value_changes.items()
        assert new >= 0
        assert new == pytest.approx(5.0) and idx == 1

    def test_many_to_one_component_balances_group(self):
        # Two programs of impact 1+2 against a college of 3: all keep.
        t = [CTuple(1, "a", 1.0), CTuple(1, "b", 2.0), CTuple(2, "x", 3.0)]
        p = make(t, [Edge(0, 2, 0.9), Edge(1, 2, 0.9)], Phi.LT)
        sol = evaluate_selection(p, [0, 1])
        assert sol.value_changes == {}
        assert sol.score == pytest.approx(2 * math.log(0.9) + 3 * CFG.b)

    def test_unmatched_zero_impact_not_removed(self):
        t = [CTuple(1, "a", 0.0), CTuple(2, "x", 1.0)]
        p = make(t, [Edge(0, 1, 0.5)])
        sol = evaluate_selection(p, [])
        assert sol.removed == [1]
        assert 0 not in sol.value_changes

    def test_upper_bounds_nonnegative_and_finite(self):
        t = [CTuple(1, "a", 2.0), CTuple(2, "x", 1.0)]
        p = make(t, [Edge(0, 1, 0.99), Edge(0, 1, 0.01)])
        bounds = selection_upper_bounds(p)
        assert all(b >= 0 and math.isfinite(b) for b in bounds)
        assert bounds[0] > bounds[1]

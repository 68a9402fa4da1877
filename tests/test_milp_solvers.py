"""Solver correctness: B&B vs enumeration, Hungarian vs B&B, router."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.config import ExplainConfig
from repro.core.matches import Phi
from repro.core.scoring import ComponentProblem, CTuple, Edge, evaluate_selection
from repro.milp.bb_solver import enumerate_optimum, solve_exact
from repro.milp.matching import lap_min, solve_matching
from repro.milp.solver import solve_component, solve_problem

from tests.util import random_problem

import numpy as np


class TestBranchAndBound:
    @given(st.integers(0, 200))
    @settings(max_examples=60, deadline=None)
    def test_bb_matches_enumeration_eq(self, seed):
        p = random_problem(seed, n1=3, n2=3, edge_prob=0.6, phi=Phi.EQ)
        assert solve_exact(p).score == pytest.approx(enumerate_optimum(p).score)

    @given(st.integers(0, 200))
    @settings(max_examples=40, deadline=None)
    def test_bb_matches_enumeration_lt(self, seed):
        p = random_problem(seed, n1=4, n2=2, edge_prob=0.6, phi=Phi.LT)
        assert solve_exact(p).score == pytest.approx(enumerate_optimum(p).score)

    @given(st.integers(0, 200))
    @settings(max_examples=40, deadline=None)
    def test_bb_matches_enumeration_gt(self, seed):
        p = random_problem(seed, n1=2, n2=4, edge_prob=0.6, phi=Phi.GT)
        assert solve_exact(p).score == pytest.approx(enumerate_optimum(p).score)

    def test_bb_selects_obvious_match(self):
        t = [CTuple(1, "a", 1.0), CTuple(2, "x", 1.0)]
        p = ComponentProblem(t, [Edge(0, 1, 0.95)], Phi.EQ, ExplainConfig())
        sol = solve_exact(p)
        assert sol.selected == [0] and sol.removed == []

    def test_bb_rejects_low_probability_match(self):
        t = [CTuple(1, "a", 1.0), CTuple(2, "x", 1.0)]
        p = ComponentProblem(t, [Edge(0, 1, 0.001)], Phi.EQ, ExplainConfig())
        sol = solve_exact(p)
        assert sol.selected == [] and sol.removed == [0, 1]

    def test_bb_prefers_consistent_pairing_over_single_high_p(self):
        """The paper's A/B vs A'/B' example (Section 5.2): explain3D picks
        (A,A'),(B,B') even though (A,B') alone has higher probability."""
        t = [
            CTuple(1, "A", 1.0),
            CTuple(1, "B", 1.0),
            CTuple(2, "A'", 1.0),
            CTuple(2, "B'", 1.0),
        ]
        edges = [
            Edge(0, 2, 0.8),  # (A, A')
            Edge(1, 3, 0.8),  # (B, B')
            Edge(0, 3, 0.9),  # (A, B')
            Edge(1, 2, 0.5),  # (B, A')
        ]
        p = ComponentProblem(t, edges, Phi.EQ, ExplainConfig())
        sol = solve_exact(p)
        assert sorted(sol.selected) == [0, 1]


class TestHungarian:
    @given(st.integers(0, 300))
    @settings(max_examples=60, deadline=None)
    def test_lap_min_matches_bruteforce(self, seed):
        rng = np.random.default_rng(seed)
        n, m = int(rng.integers(1, 5)), int(rng.integers(1, 5))
        if n > m:
            n, m = m, n
        cost = rng.uniform(-5, 5, size=(n, m))
        got = lap_min(cost)
        best = None
        from itertools import permutations

        for perm in permutations(range(m), n):
            v = sum(cost[i, perm[i]] for i in range(n))
            best = v if best is None else min(best, v)
        assert sum(cost[i, got[i]] for i in range(n)) == pytest.approx(best)

    @given(st.integers(0, 300))
    @settings(max_examples=60, deadline=None)
    def test_matching_equals_bb_on_eq_problems(self, seed):
        p = random_problem(seed, n1=4, n2=4, edge_prob=0.5, phi=Phi.EQ)
        assert solve_matching(p).score == pytest.approx(solve_exact(p).score)

    def test_matching_with_parallel_edges_keeps_best(self):
        t = [CTuple(1, "a", 1.0), CTuple(2, "x", 1.0)]
        p = ComponentProblem(
            t, [Edge(0, 1, 0.6), Edge(0, 1, 0.9)], Phi.EQ, ExplainConfig()
        )
        sol = solve_matching(p)
        assert sol.selected == [1]

    def test_matching_empty_sides(self):
        p = ComponentProblem([CTuple(1, "a", 1.0)], [], Phi.EQ, ExplainConfig())
        assert solve_matching(p).removed == [0]


class TestRouter:
    def test_large_eq_component_routes_to_matching(self):
        cfg = ExplainConfig(exact_edge_limit=4)
        p = random_problem(11, n1=6, n2=6, edge_prob=0.5, phi=Phi.EQ, cfg=cfg)
        assert len(p.edges) > 4
        exact = enumerate_optimum(p)
        assert solve_component(p).score == pytest.approx(exact.score)

    @given(st.integers(0, 120))
    @settings(max_examples=30, deadline=None)
    def test_local_search_close_to_exact_on_lt(self, seed):
        cfg = ExplainConfig(exact_edge_limit=0)  # force greedy path
        p = random_problem(seed, n1=5, n2=3, edge_prob=0.5, phi=Phi.LT, cfg=cfg)
        exact = enumerate_optimum(p)
        got = solve_component(p)
        # Local search is near-exact; tolerate a small gap, never a better
        # score than the optimum.
        assert got.score <= exact.score + 1e-9
        assert got.score >= exact.score - 2.0

    def test_solve_problem_splits_components(self):
        tuples = [
            CTuple(1, "a", 1.0),
            CTuple(2, "x", 1.0),
            CTuple(1, "b", 2.0),
            CTuple(2, "y", 2.0),
        ]
        edges = [Edge(0, 1, 0.9), Edge(2, 3, 0.9)]
        sol = solve_problem(tuples, edges, Phi.EQ)
        assert sorted(sol.selected) == [0, 1]
        joint = evaluate_selection(
            ComponentProblem(tuples, edges, Phi.EQ, ExplainConfig()), [0, 1]
        )
        assert sol.score == pytest.approx(joint.score)

    def test_solve_problem_no_edges(self):
        tuples = [CTuple(1, "a", 1.0), CTuple(2, "x", 3.0)]
        sol = solve_problem(tuples, [], Phi.EQ)
        assert sol.removed == [0, 1] and sol.selected == []


class TestLocalSearchEq:
    @given(st.integers(0, 80))
    @settings(max_examples=25, deadline=None)
    def test_eq_local_search_valid_and_reasonable(self, seed):
        # Force the greedy+local-search path on one-to-one problems (the
        # oversized-component fallback) and check validity + quality.
        cfg = ExplainConfig(exact_edge_limit=0, matching_node_limit=0)
        p = random_problem(seed, n1=4, n2=4, edge_prob=0.6, phi=Phi.EQ, cfg=cfg)
        got = solve_component(p)
        exact = enumerate_optimum(p)
        from repro.core.scoring import selection_valid

        assert selection_valid(p, got.selected)
        assert got.score <= exact.score + 1e-9
        # This path only serves components where the paper's own NOOPT
        # DNFs; best-effort quality, never validity, is the contract.
        assert got.score >= exact.score - 7.0

"""The explicit Section 3.2 MILP agrees with the structural solvers.

For random small instances: the solver's Solution, mapped to a full
variable assignment, must (1) satisfy every linear constraint of the
built model and (2) produce the same objective value — i.e. the fast
solvers optimize exactly the program the paper hands to CPLEX.
"""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.matches import Phi
from repro.milp.bb_solver import solve_exact
from repro.milp.model import assignment_from_solution, build_model, check_assignment

from tests.util import random_problem


@pytest.mark.parametrize("phi", [Phi.EQ, Phi.LT, Phi.GT])
def test_model_builds_expected_variables(phi):
    p = random_problem(3, n1=2, n2=2, edge_prob=1.0, phi=phi)
    m = build_model(p)
    # x,y per tuple + z per edge; I* per tuple; P per tuple + Iz per edge.
    assert len([v for v in m.binaries if v.startswith("x")]) == 4
    assert len([v for v in m.binaries if v.startswith("z")]) == len(p.edges)
    assert len(m.integers) == 4
    assert any(con.label.startswith("eq10") for con in m.constraints)
    assert any(con.label.startswith("eq12") for con in m.constraints)


@given(st.integers(0, 400), st.sampled_from([Phi.EQ, Phi.LT, Phi.GT]))
@settings(max_examples=80, deadline=None)
def test_solution_is_feasible_and_objective_matches(seed, phi):
    p = random_problem(seed, n1=3, n2=3, edge_prob=0.5, phi=phi)
    sol = solve_exact(p)
    model = build_model(p)
    asg = assignment_from_solution(p, sol)
    feasible, obj, violations = check_assignment(model, asg)
    assert feasible, violations
    assert obj == pytest.approx(sol.score, abs=1e-6)


def test_empty_selection_assignment_feasible():
    p = random_problem(1, n1=2, n2=2, edge_prob=1.0)
    from repro.core.scoring import evaluate_selection

    sol = evaluate_selection(p, [])
    feasible, obj, violations = check_assignment(
        build_model(p), assignment_from_solution(p, sol)
    )
    assert feasible, violations
    assert obj == pytest.approx(sol.score, abs=1e-6)

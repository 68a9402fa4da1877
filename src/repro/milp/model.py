"""Explicit MILP encoding of one EXP-3D component (Section 3.2).

The paper hands this program to CPLEX; we build the same program —
binary ``x_i`` (tuple is a provenance-based explanation), binary ``y_i``
(refined impact equals the original), integer-relaxed ``I*_i`` (refined
impact), binary ``z_ij`` (match in the evidence), auxiliary continuous
``P_i`` (the linearized quadratic of Eq. 8) and ``Iz_ij`` (the linearized
``z_ij * I*_i`` of Eq. 11) — and use it in two ways:

1. as machine-checkable documentation: ``assignment_from_solution`` maps a
   solver ``Solution`` to a full variable assignment and
   ``check_assignment`` verifies every constraint and recomputes the
   objective, so tests prove the structural solvers in ``repro.milp``
   optimize exactly this program;
2. as the reference brute-force target for small instances.

One deviation worth naming: the paper's component enumeration
``S = {(eta(t_j), t_j)}`` omits kept tuples on the degree-constrained side
that end up with no selected match; Definition 3.3 makes them singleton
components whose impact must equal the empty other side (0). We add the
corresponding big-M constraint ``I*_i <= M * (x_i + sum_j z_ij)``.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

from repro.core.config import clip_p
from repro.core.matches import Phi
from repro.core.scoring import ComponentProblem, Solution

BIG_M = 1e7


@dataclass
class LinCon:
    """A linear constraint ``sum(coef * var) sense rhs`` with sense in {<=, ==}."""

    terms: dict[str, float]
    sense: str
    rhs: float
    label: str = ""


@dataclass
class MILPModel:
    """Variables, constraints and (linear) objective of one component."""

    binaries: list[str] = field(default_factory=list)
    integers: list[str] = field(default_factory=list)  # I*_i, bounded below by 0
    continuous: list[str] = field(default_factory=list)  # P_i, Iz_ij
    constraints: list[LinCon] = field(default_factory=list)
    objective: dict[str, float] = field(default_factory=dict)  # maximize
    obj_const: float = 0.0


def build_model(problem: ComponentProblem) -> MILPModel:
    """Translate a component problem into the Section 3.2 MILP."""
    cfg = problem.cfg
    m = MILPModel()
    a, b, c = cfg.a, cfg.b, cfg.c
    L = min(b, c) - abs(a) - 1.0  # lower bound for P_i (Eq. 8's L)
    U = 0.0  # log-probabilities are never positive (Eq. 8's U)

    for i, t in enumerate(problem.tuples):
        x, y, istar, p_aux = f"x{i}", f"y{i}", f"I{i}", f"P{i}"
        m.binaries += [x, y]
        m.integers.append(istar)
        m.continuous.append(p_aux)
        # Eq. (7): y_i = 1 forces I*_i = I_i (the converse is
        # objective-enforced because b > c).
        m.constraints.append(
            LinCon({istar: 1.0, y: BIG_M}, "<=", t.impact + BIG_M, f"eq7+:{i}")
        )
        m.constraints.append(
            LinCon({istar: -1.0, y: BIG_M}, "<=", -t.impact + BIG_M, f"eq7-:{i}")
        )
        # Eq. (8): P_i linearizes (1-x_i) * ((1-y_i) c + y_i b)
        # (b is the keep-impact constant, c the change-impact one):
        #   P <= U(1-x);  P >= L(1-x);
        #   P >= c + y(b-c) - U x;  P <= c + y(b-c) - L x.
        m.constraints.append(LinCon({p_aux: 1.0, x: U}, "<=", U, f"eq8a:{i}"))
        m.constraints.append(LinCon({p_aux: -1.0, x: L}, "<=", -L, f"eq8b:{i}"))
        m.constraints.append(
            LinCon({p_aux: -1.0, y: (b - c), x: -U}, "<=", -c, f"eq8c:{i}")
        )
        m.constraints.append(
            LinCon({p_aux: 1.0, y: -(b - c), x: L}, "<=", c, f"eq8d:{i}")
        )
        # Variable bound: refined impacts are non-negative.
        m.constraints.append(LinCon({istar: -1.0}, "<=", 0.0, f"ibound:{i}"))
        # log Pr(t_i) = x_i * a + P_i
        m.objective[x] = m.objective.get(x, 0.0) + a
        m.objective[p_aux] = 1.0

    left_constrained = problem.phi.left_max_degree_one
    right_constrained = problem.phi.right_max_degree_one
    incident1: dict[int, list[str]] = {}
    incident2: dict[int, list[str]] = {}
    for k, e in enumerate(problem.edges):
        z = f"z{k}"
        m.binaries.append(z)
        incident1.setdefault(e.i, []).append(z)
        incident2.setdefault(e.j, []).append(z)
        # Eq. (9): a selected match forbids removing either endpoint.
        m.constraints.append(LinCon({z: 1.0, f"x{e.i}": 1.0}, "<=", 1.0, f"eq9l:{k}"))
        m.constraints.append(LinCon({z: 1.0, f"x{e.j}": 1.0}, "<=", 1.0, f"eq9r:{k}"))
        p = clip_p(e.p)
        m.objective[z] = m.objective.get(z, 0.0) + (math.log(p) - math.log(1 - p))
        m.obj_const += math.log(1 - p)

    # Eq. (10): valid-mapping cardinality.
    if left_constrained:
        for i, zs in incident1.items():
            m.constraints.append(
                LinCon({z: 1.0 for z in zs}, "<=", 1.0, f"eq10l:{i}")
            )
    if right_constrained:
        for j, zs in incident2.items():
            m.constraints.append(
                LinCon({z: 1.0 for z in zs}, "<=", 1.0, f"eq10r:{j}")
            )

    # Eqs. (11)-(12): impact equality per component. WLOG orient so the
    # degree-<=1 side is side 1 (mirror for GT-only problems).
    mirror = right_constrained and not left_constrained
    hub_tuples = [
        (j, t) for j, t in enumerate(problem.tuples) if t.side == (2 if not mirror else 1)
    ]
    for j, tj in hub_tuples:
        adj = [
            (k, e) for k, e in enumerate(problem.edges)
            if (e.j if not mirror else e.i) == j
        ]
        terms: dict[str, float] = {}
        for k, e in adj:
            i = e.i if not mirror else e.j
            iz = f"Iz{k}"
            m.continuous.append(iz)
            # Eq. (11): Iz_k = z_k * I*_i with 0 <= I* <= BIG_M.
            m.constraints.append(LinCon({iz: 1.0, f"z{k}": -BIG_M}, "<=", 0.0, f"eq11a:{k}"))
            m.constraints.append(LinCon({iz: -1.0}, "<=", 0.0, f"eq11b:{k}"))
            m.constraints.append(
                LinCon({iz: 1.0, f"I{i}": -1.0}, "<=", 0.0, f"eq11c:{k}")
            )
            m.constraints.append(
                LinCon({iz: -1.0, f"I{i}": 1.0, f"z{k}": BIG_M}, "<=", BIG_M, f"eq11d:{k}")
            )
            terms[iz] = 1.0
        # Eq. (12): component impact equality; a removed hub keeps I*_j = 0.
        terms[f"I{j}"] = -1.0
        m.constraints.append(LinCon(dict(terms), "==", 0.0, f"eq12:{j}"))
        # A removed hub's refined impact is pinned to 0 so Eq. (12) stays
        # consistent: I*_j <= BIG_M * (1 - x_j).
        m.constraints.append(
            LinCon({f"I{j}": 1.0, f"x{j}": BIG_M}, "<=", BIG_M, f"eq12x:{j}")
        )

    # Singleton completion for the degree-constrained leaf side (see
    # module docstring): kept-but-unmatched tuples must refine to 0.
    incident_leaf = incident1 if not mirror else incident2
    for i, t in enumerate(problem.tuples):
        if t.side != (1 if not mirror else 2):
            continue
        zs = incident_leaf.get(i, [])
        terms = {f"I{i}": 1.0, f"x{i}": -BIG_M}
        for z in zs:
            terms[z] = -BIG_M
        m.constraints.append(LinCon(terms, "<=", 0.0, f"singleton:{i}"))
    return m


def assignment_from_solution(
    problem: ComponentProblem, sol: Solution
) -> dict[str, float]:
    """Map a structural ``Solution`` to a full MILP variable assignment."""
    cfg = problem.cfg
    asg: dict[str, float] = {}
    removed = set(sol.removed)
    for i, t in enumerate(problem.tuples):
        x = 1.0 if i in removed else 0.0
        istar = sol.value_changes.get(i, t.impact if not x else 0.0)
        if x:
            istar = 0.0
        y = 1.0 if (not x and abs(istar - t.impact) <= cfg.impact_tol) else 0.0
        p_aux = 0.0 if x else (cfg.b if y else cfg.c)
        asg[f"x{i}"], asg[f"y{i}"], asg[f"I{i}"], asg[f"P{i}"] = x, y, istar, p_aux
    selected = set(sol.selected)
    mirror = problem.phi == Phi.GT  # same orientation rule as build_model
    for k, e in enumerate(problem.edges):
        z = 1.0 if k in selected else 0.0
        asg[f"z{k}"] = z
        leaf = e.i if not mirror else e.j
        asg[f"Iz{k}"] = z * asg[f"I{leaf}"]
    return asg


def check_assignment(
    model: MILPModel, asg: dict[str, float], *, tol: float = 1e-4
) -> tuple[bool, float, list[str]]:
    """Verify constraints; return (feasible, objective value, violations)."""
    violations = []
    for con in model.constraints:
        lhs = sum(coef * asg.get(v, 0.0) for v, coef in con.terms.items())
        if con.sense == "<=" and lhs > con.rhs + tol:
            violations.append(f"{con.label}: {lhs:.4f} > {con.rhs:.4f}")
        elif con.sense == "==" and abs(lhs - con.rhs) > tol:
            violations.append(f"{con.label}: {lhs:.4f} != {con.rhs:.4f}")
    obj = model.obj_const + sum(
        coef * asg.get(v, 0.0) for v, coef in model.objective.items()
    )
    return (not violations, obj, violations)

"""The EXP-3D objective (Equations 1–6) over concrete edge selections.

A *component problem* is one piece of the bipartite graph
``G = (T1, T2, M_tuple)``: canonical tuples on both sides plus candidate
tuple matches. Every solver in ``repro.milp`` ultimately decides, for each
candidate match, whether it enters the evidence mapping; this module turns
such a selection into the *optimal* full solution (Delta, delta, impacts)
and its log-probability:

- A tuple incident to no selected match is its own connected component;
  impact equality forces removal (``log(1-alpha)``) or a value change to
  impact 0 (``log alpha + log(1-beta)``) — whichever scores higher.
- A connected component of selected matches with equal impact sums keeps
  all original impacts (``log alpha + log beta`` per tuple).
- A component with unequal sums changes exactly one tuple's impact (the
  cheapest completion: ``b > c`` makes a second change never optimal, and
  raising one tuple on the smaller-sum side is always feasible with a
  non-negative refined impact).

The choice of *which* tuple absorbs the value change is score-symmetric in
the MILP; we deterministically prefer a feasible side-2 tuple (the
many-to-one "aggregate" side in our datasets), then side 1, largest
impact first. Evaluation metrics score delta at component granularity, so
this tie-break never affects accuracy numbers (DESIGN.md §5).
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import Iterable, Sequence

from repro.core.config import ExplainConfig, clip_p, logit
from repro.core.matches import Phi


@dataclass(frozen=True)
class CTuple:
    """A canonical tuple: which side it lives on, its key, its impact."""

    side: int  # 1 or 2
    key: str
    impact: float


@dataclass(frozen=True)
class Edge:
    """A candidate tuple match between tuples ``i`` (side 1) and ``j`` (side 2).

    ``i``/``j`` index into ``ComponentProblem.tuples``.
    """

    i: int
    j: int
    p: float


@dataclass
class ComponentProblem:
    """One independently solvable piece of an EXP-3D instance."""

    tuples: list[CTuple]
    edges: list[Edge]
    phi: Phi = Phi.EQ
    cfg: ExplainConfig = field(default_factory=ExplainConfig)

    def __post_init__(self) -> None:
        for e in self.edges:
            if self.tuples[e.i].side != 1 or self.tuples[e.j].side != 2:
                raise ValueError("edges must run from a side-1 to a side-2 tuple")


@dataclass
class Solution:
    """Explanations + evidence for one component problem.

    selected: indices of edges in the evidence mapping ``M*_tuple``.
    removed: indices of tuples in Delta (provenance-based explanations).
    value_changes: tuple index -> refined impact (value-based explanations).
    score: log Pr(E | T1, T2, M_tuple) up to the problem-wide constant.
    """

    selected: list[int]
    removed: list[int]
    value_changes: dict[int, float]
    score: float


def selection_valid(problem: ComponentProblem, selected: Iterable[int]) -> bool:
    """Definition 3.2: cardinality of the evidence respects ``phi``."""
    deg1: dict[int, int] = {}
    deg2: dict[int, int] = {}
    for idx in selected:
        e = problem.edges[idx]
        deg1[e.i] = deg1.get(e.i, 0) + 1
        deg2[e.j] = deg2.get(e.j, 0) + 1
    if problem.phi.left_max_degree_one and any(d > 1 for d in deg1.values()):
        return False
    if problem.phi.right_max_degree_one and any(d > 1 for d in deg2.values()):
        return False
    return True


def _pick_change_tuple(
    problem: ComponentProblem, members: Sequence[int], diff: float
) -> tuple[int, float]:
    """Choose which member tuple absorbs a value change of ``diff``.

    ``diff = sum(side1 impacts) - sum(side2 impacts)``. Raising a tuple on
    the smaller side is always feasible; lowering one on the larger side
    requires its impact to cover the difference. Preference order:
    feasible side-2 tuples, then side-1, largest impact first.
    """
    candidates: list[tuple[int, int, float, float]] = []  # (pref, -impact, idx)
    for idx in members:
        t = problem.tuples[idx]
        # Refined impact if this tuple absorbs the whole imbalance:
        new = t.impact - diff if t.side == 1 else t.impact + diff
        if new < -problem.cfg.impact_tol:
            continue
        pref = 0 if t.side == 2 else 1
        candidates.append((pref, -t.impact, float(idx), new))
    if not candidates:  # raise a smaller-side tuple instead (always >= 0)
        smaller = 1 if diff < 0 else 2
        for idx in members:
            t = problem.tuples[idx]
            if t.side == smaller:
                new = t.impact + abs(diff)
                candidates.append((0, -t.impact, float(idx), new))
    pref, _, idx, new = min(candidates)
    return int(idx), new


def evaluate_selection(
    problem: ComponentProblem,
    selected: Iterable[int],
    *,
    check_valid: bool = True,
) -> Solution:
    """Score an edge selection and derive the optimal Delta/delta for it.

    ``check_valid=False`` lets baselines (THRESHOLD, RSWOOSH) evaluate
    cardinality-violating selections; components are then whatever the
    selected edges induce.
    """
    sel = sorted(set(selected))
    if check_valid and not selection_valid(problem, sel):
        raise ValueError("selection violates the valid-mapping property")
    cfg = problem.cfg
    n = len(problem.tuples)

    score = 0.0
    in_sel = set(sel)
    for idx, e in enumerate(problem.edges):
        p = clip_p(e.p)
        score += math.log(p) if idx in in_sel else math.log(1.0 - p)

    # Union-find over tuples joined by selected edges.
    parent = list(range(n))

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    matched: set[int] = set()
    for idx in sel:
        e = problem.edges[idx]
        matched.add(e.i)
        matched.add(e.j)
        ri, rj = find(e.i), find(e.j)
        if ri != rj:
            parent[ri] = rj

    removed: list[int] = []
    value_changes: dict[int, float] = {}

    comps: dict[int, list[int]] = {}
    for idx in matched:
        comps.setdefault(find(idx), []).append(idx)

    for idx, t in enumerate(problem.tuples):
        if idx in matched:
            continue
        score += cfg.unmatched_score(t.impact)
        if cfg.unmatched_is_removal(t.impact):
            removed.append(idx)
        elif abs(t.impact) > cfg.impact_tol:
            value_changes[idx] = 0.0

    for members in comps.values():
        s1 = sum(problem.tuples[i].impact for i in members if problem.tuples[i].side == 1)
        s2 = sum(problem.tuples[i].impact for i in members if problem.tuples[i].side == 2)
        diff = s1 - s2
        if abs(diff) <= cfg.impact_tol:
            score += cfg.b * len(members)
        else:
            score += cfg.b * (len(members) - 1) + cfg.c
            idx, new = _pick_change_tuple(problem, members, diff)
            value_changes[idx] = new

    return Solution(sel, sorted(removed), value_changes, score)


def selection_upper_bounds(problem: ComponentProblem) -> list[float]:
    """Admissible per-edge optimistic gains for branch-and-bound pruning.

    Including edge ``e`` can improve the objective by at most its logit
    plus the best-case tuple-disposition swing: both endpoints move from
    their unmatched score to ``b``, and the merge can repair the impact
    imbalance of at most the two components it joins (``2 (b - c)``).
    """
    cfg = problem.cfg
    bounds = []
    for e in problem.edges:
        ti, tj = problem.tuples[e.i], problem.tuples[e.j]
        swing = (
            (cfg.b - cfg.unmatched_score(ti.impact))
            + (cfg.b - cfg.unmatched_score(tj.impact))
            + 2.0 * (cfg.b - cfg.c)
        )
        bounds.append(max(0.0, logit(e.p) + swing))
    return bounds

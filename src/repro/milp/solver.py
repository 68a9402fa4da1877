"""Component-problem router: the stage-2 "MILP solver" of explain3D.

Routing (DESIGN.md §2):

- components within ``exact_edge_limit`` edges: exact branch-and-bound;
- larger ``==`` components: exact Hungarian matching (the one-to-one
  objective decomposes over pairs, so the matching optimum is the MILP
  optimum);
- larger ``<=``/``>=`` components: greedy per-constrained-tuple seeding +
  steepest local search over (assign / reassign / drop) moves. Exact on
  every instance small enough to cross-check; near-exact beyond (the
  impact-equality coupling is the only non-decomposable term).

``solve_problem`` first splits the input into maximal connected components
(free, accuracy-preserving — Section 4's opening observation) and solves
each independently; this is also the per-partition entry point used inside
``applyInPandas`` by the pipeline.
"""
from __future__ import annotations

from repro.core.matches import Phi
from repro.core.scoring import ComponentProblem, CTuple, Edge, Solution, evaluate_selection
from repro.milp.bb_solver import solve_exact
from repro.milp.components import connected_components_local
from repro.milp.matching import solve_matching


def _local_search(problem: ComponentProblem, seed_selected: list[int]) -> Solution:
    """Greedy improvement for many-to-one components.

    The degree-constrained side picks at most one incident edge; we sweep
    tuples on that side, trying every alternative (including none), and
    keep any strict improvement. Under a one-to-one match both sides are
    constrained, so moves additionally respect an occupancy map of the
    other side. Converges in a few passes because each accepted move
    strictly increases a bounded objective.
    """
    left_cap = problem.phi.left_max_degree_one
    both_capped = left_cap and problem.phi.right_max_degree_one
    by_tuple: dict[int, list[int]] = {}
    for k, e in enumerate(problem.edges):
        t = e.i if left_cap else e.j
        by_tuple.setdefault(t, []).append(k)

    current: dict[int, int | None] = {t: None for t in by_tuple}
    occupied: dict[int, int] = {}  # other-side tuple -> edge using it
    for k in seed_selected:
        e = problem.edges[k]
        other = e.j if left_cap else e.i
        if both_capped and other in occupied:
            continue
        current[e.i if left_cap else e.j] = k
        occupied[other] = k

    def score_of(sel_map: dict[int, int | None]) -> Solution:
        return evaluate_selection(
            problem, [k for k in sel_map.values() if k is not None]
        )

    def other_of(k: int) -> int:
        e = problem.edges[k]
        return e.j if left_cap else e.i

    best = score_of(current)
    for _ in range(4):  # steepest-descent passes
        improved = False
        for t, options in by_tuple.items():
            base = current[t]
            for cand in [None, *options]:
                if cand == base:
                    continue
                if (
                    both_capped
                    and cand is not None
                    and occupied.get(other_of(cand), cand) != cand
                ):
                    continue  # the other endpoint is taken by another edge
                current[t] = cand
                trial = score_of(current)
                if trial.score > best.score + 1e-12:
                    if base is not None:
                        occupied.pop(other_of(base), None)
                    if cand is not None:
                        occupied[other_of(cand)] = cand
                    best, base, improved = trial, cand, True
                else:
                    current[t] = base
        if not improved:
            break
    return best


def _greedy_seed(problem: ComponentProblem) -> list[int]:
    """Each degree-constrained tuple takes its highest-p edge if p > 0.5."""
    left_cap = problem.phi.left_max_degree_one
    best_for: dict[int, int] = {}
    for k, e in enumerate(problem.edges):
        t = e.i if left_cap else e.j
        if e.p > 0.5 and (t not in best_for or e.p > problem.edges[best_for[t]].p):
            best_for[t] = k
    return list(best_for.values())


def solve_component(problem: ComponentProblem) -> Solution:
    """Solve one connected component with the cheapest exact method."""
    if not problem.edges:
        return evaluate_selection(problem, [])
    if len(problem.edges) <= problem.cfg.exact_edge_limit:
        return solve_exact(problem)
    if (
        problem.phi == Phi.EQ
        and len(problem.tuples) <= problem.cfg.matching_node_limit
    ):
        return solve_matching(problem)
    return _local_search(problem, _greedy_seed(problem))


def solve_problem(
    tuples: list[CTuple],
    edges: list[Edge],
    phi: Phi,
    cfg=None,
) -> Solution:
    """Split into maximal connected components and solve each exactly.

    Returns one merged Solution in the index space of ``tuples``/``edges``.
    """
    from repro.core.config import DEFAULT_CONFIG

    cfg = cfg or DEFAULT_CONFIG
    comp_of = connected_components_local(len(tuples), [(e.i, e.j) for e in edges])
    by_comp_tuples: dict[int, list[int]] = {}
    for idx, c in enumerate(comp_of):
        by_comp_tuples.setdefault(c, []).append(idx)
    by_comp_edges: dict[int, list[int]] = {}
    for k, e in enumerate(edges):
        by_comp_edges.setdefault(comp_of[e.i], []).append(k)

    selected: list[int] = []
    removed: list[int] = []
    value_changes: dict[int, float] = {}
    score = 0.0
    for c, tidx in by_comp_tuples.items():
        local_of = {g: l for l, g in enumerate(tidx)}
        eidx = by_comp_edges.get(c, [])
        sub = ComponentProblem(
            tuples=[tuples[g] for g in tidx],
            edges=[
                Edge(local_of[edges[k].i], local_of[edges[k].j], edges[k].p)
                for k in eidx
            ],
            phi=phi,
            cfg=cfg,
        )
        sol = solve_component(sub)
        score += sol.score
        selected += [eidx[k] for k in sol.selected]
        removed += [tidx[l] for l in sol.removed]
        value_changes.update({tidx[l]: v for l, v in sol.value_changes.items()})
    return Solution(sorted(selected), sorted(removed), value_changes, score)

"""Exact branch-and-bound over the match variables of one component.

Given the closed-form optimal tuple dispositions for any fixed edge
selection (``repro.core.scoring.evaluate_selection``), the MILP of
Section 3.2 collapses to a 0/1 search over the ``z`` variables subject to
the valid-mapping cardinality constraints. We branch on edges in
descending optimistic-gain order and prune with the admissible per-edge
upper bounds of ``selection_upper_bounds``; tests cross-check the result
against full enumeration and against the explicit MILP model.

Intended for components up to ``ExplainConfig.exact_edge_limit`` edges —
the smart partitioner (Section 4) is what keeps real components that
small. Larger components route to the Hungarian/greedy solvers.
"""
from __future__ import annotations

from repro.core.scoring import (
    ComponentProblem,
    Solution,
    evaluate_selection,
    selection_upper_bounds,
)


def solve_exact(problem: ComponentProblem, *, node_limit: int = 2_000_000) -> Solution:
    """Exact optimum of a small component problem.

    node_limit bounds the search as a safety valve; hitting it raises so a
    caller never silently accepts a non-optimal "exact" answer.
    """
    bounds = selection_upper_bounds(problem)
    order = sorted(range(len(problem.edges)), key=lambda k: -bounds[k])
    # suffix_bound[d] = best-case gain from edges order[d:].
    suffix = [0.0] * (len(order) + 1)
    for d in range(len(order) - 1, -1, -1):
        suffix[d] = suffix[d + 1] + bounds[order[d]]

    left_cap = problem.phi.left_max_degree_one
    right_cap = problem.phi.right_max_degree_one
    deg1: dict[int, int] = {}
    deg2: dict[int, int] = {}

    best = evaluate_selection(problem, [])
    nodes = 0
    chosen: list[int] = []

    def dfs(d: int) -> None:
        nonlocal best, nodes
        nodes += 1
        if nodes > node_limit:
            raise RuntimeError(
                f"branch-and-bound node limit {node_limit} exceeded "
                f"({len(problem.edges)} edges) — route this component to a "
                "heuristic solver instead"
            )
        cur = evaluate_selection(problem, chosen)
        if cur.score > best.score:
            best = cur
        if d == len(order) or cur.score + suffix[d] <= best.score:
            return
        k = order[d]
        e = problem.edges[k]
        # Branch 1: include edge k if cardinality permits.
        if not (left_cap and deg1.get(e.i, 0) >= 1) and not (
            right_cap and deg2.get(e.j, 0) >= 1
        ):
            chosen.append(k)
            deg1[e.i] = deg1.get(e.i, 0) + 1
            deg2[e.j] = deg2.get(e.j, 0) + 1
            dfs(d + 1)
            deg1[e.i] -= 1
            deg2[e.j] -= 1
            chosen.pop()
        # Branch 2: exclude edge k.
        dfs(d + 1)

    dfs(0)
    return best


def enumerate_optimum(problem: ComponentProblem) -> Solution:
    """Reference optimum by full enumeration (tests only; <= ~16 edges)."""
    n = len(problem.edges)
    best: Solution | None = None
    from repro.core.scoring import selection_valid

    for mask in range(1 << n):
        sel = [k for k in range(n) if mask >> k & 1]
        if not selection_valid(problem, sel):
            continue
        cand = evaluate_selection(problem, sel)
        if best is None or cand.score > best.score + 1e-12:
            best = cand
    assert best is not None
    return best

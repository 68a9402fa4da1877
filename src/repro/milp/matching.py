"""Exact max-weight bipartite matching for ``==`` components.

Under an equivalence attribute match, valid mappings are one-to-one
(Definition 3.2), so connected components of the evidence are matched
pairs and singletons and the EXP-3D objective decomposes over pairs:

    w(i, j) = logit(p_ij) + pairScore(i, j) - U_i - U_j

with ``pairScore = 2b`` when the impacts agree and ``b + c`` otherwise,
and ``U_t`` the best unmatched disposition. Maximizing the summed weight
over a matching therefore *is* the MILP optimum — no approximation. We
solve it with the Jonker–Volgenant shortest-augmenting-path algorithm
(O(n^3), numpy-vectorized inner loop), with per-row dummy columns so any
tuple may stay unmatched.
"""
from __future__ import annotations

import numpy as np

from repro.core.config import logit
from repro.core.matches import Phi
from repro.core.scoring import ComponentProblem, Solution, evaluate_selection

_BIG = 1e9


def lap_min(cost: np.ndarray) -> np.ndarray:
    """Minimum-cost assignment of an ``n x m`` matrix with ``n <= m``.

    Returns ``col_of_row`` (length n). Classic shortest-augmenting-path
    (e-maxx/JV) with potentials; inner Dijkstra step vectorized.
    """
    n, m = cost.shape
    assert n <= m, "lap_min expects n <= m (pad with dummy columns)"
    u = np.zeros(n + 1)
    v = np.zeros(m + 1)
    p = np.zeros(m + 1, dtype=np.int64)  # p[j]: row (1-based) matched to col j
    way = np.zeros(m + 1, dtype=np.int64)
    for i in range(1, n + 1):
        p[0] = i
        j0 = 0
        minv = np.full(m + 1, np.inf)
        used = np.zeros(m + 1, dtype=bool)
        while True:
            used[j0] = True
            i0 = p[j0]
            cur = cost[i0 - 1, :] - u[i0] - v[1:]
            free = ~used[1:]
            better = free & (cur < minv[1:])
            minv[1:][better] = cur[better]
            way[1:][better] = j0
            cand = np.where(free, minv[1:], np.inf)
            j1 = int(np.argmin(cand)) + 1
            delta = cand[j1 - 1]
            u[p[used]] += delta
            v[np.flatnonzero(used)] -= delta
            minv[1:][free] -= delta
            j0 = j1
            if p[j0] == 0:
                break
        while j0 != 0:
            j1 = way[j0]
            p[j0] = p[j1]
            j0 = j1
    col_of_row = np.full(n, -1, dtype=np.int64)
    for j in range(1, m + 1):
        if p[j] > 0:
            col_of_row[p[j] - 1] = j - 1
    return col_of_row


def solve_matching(problem: ComponentProblem) -> Solution:
    """Exact optimum for a one-to-one (``==`` / strict) component."""
    if problem.phi != Phi.EQ:
        raise ValueError("solve_matching requires a one-to-one attribute match")
    cfg = problem.cfg
    lefts = [i for i, t in enumerate(problem.tuples) if t.side == 1]
    rights = [j for j, t in enumerate(problem.tuples) if t.side == 2]
    li = {t: k for k, t in enumerate(lefts)}
    rj = {t: k for k, t in enumerate(rights)}
    n, m = len(lefts), len(rights)
    if n == 0 or m == 0 or not problem.edges:
        return evaluate_selection(problem, [])

    # Profit matrix over real columns; dummy column r per row allows "skip".
    cost = np.full((n, m + n), _BIG)
    cost[np.arange(n), m + np.arange(n)] = 0.0
    edge_at: dict[tuple[int, int], int] = {}
    for k, e in enumerate(problem.edges):
        a, bcol = li[e.i], rj[e.j]
        ti, tj = problem.tuples[e.i], problem.tuples[e.j]
        pair = (
            2 * cfg.b
            if abs(ti.impact - tj.impact) <= cfg.impact_tol
            else cfg.b + cfg.c
        )
        w = (
            logit(e.p)
            + pair
            - cfg.unmatched_score(ti.impact)
            - cfg.unmatched_score(tj.impact)
        )
        # Keep the best parallel edge only (duplicates can't both be used).
        if -w < cost[a, bcol]:
            cost[a, bcol] = -w
            edge_at[(a, bcol)] = k
    col_of_row = lap_min(cost)
    selected = [
        edge_at[(a, int(c))]
        for a, c in enumerate(col_of_row)
        if c < m and cost[a, int(c)] < _BIG / 2 and cost[a, int(c)] < 0
    ]
    return evaluate_selection(problem, selected)

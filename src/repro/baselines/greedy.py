"""GREEDY baseline: explain3D's objective, built greedily (Section 5.1.3).

Starting from an empty evidence mapping, iterate the initial matches in
descending probability; include a match iff it keeps the mapping valid
AND improves the objective value. The objective delta of adding one match
is computed incrementally from the component structure:

    delta = logit(p) + unmatched->matched swing of new endpoints
            + imbalance-penalty change of the merged component

which is exactly the change ``evaluate_selection`` would report, so
GREEDY optimizes the true EXP-3D objective — just myopically, which is
why it gets stuck in local maxima (the paper's observation).
"""
from __future__ import annotations

import pandas as pd

from repro.baselines.common import derive_from_evidence, tuples_frame
from repro.core.config import ExplainConfig, logit
from repro.core.matches import Phi
from repro.core.pipeline import ExplainResult


def greedy_explain(
    t1_pdf: pd.DataFrame,
    t2_pdf: pd.DataFrame,
    matches_pdf: pd.DataFrame,
    phi: Phi,
    cfg: ExplainConfig | None = None,
) -> ExplainResult:
    """Probability-ordered greedy evidence construction."""
    cfg = cfg or ExplainConfig()
    tuples = tuples_frame(t1_pdf, t2_pdf)
    impact = {(int(r.side), r.key): float(r.impact) for r in tuples.itertuples()}

    parent: dict[tuple, tuple] = {}
    comp: dict[tuple, tuple[float, float]] = {}  # root -> (s1, s2) of matched

    def find(x):
        parent.setdefault(x, x)
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    def penalty(sums: tuple[float, float]) -> float:
        return 0.0 if abs(sums[0] - sums[1]) <= cfg.impact_tol else cfg.c - cfg.b

    deg: dict[tuple, int] = {}
    evidence: list[tuple[str, str]] = []
    ordered = matches_pdf.sort_values("p", ascending=False, kind="mergesort")
    for r in ordered.itertuples():
        a, b = (1, r.key1), (2, r.key2)
        if a not in impact or b not in impact:
            continue
        if phi.left_max_degree_one and deg.get(a, 0) >= 1:
            continue
        if phi.right_max_degree_one and deg.get(b, 0) >= 1:
            continue
        ra, rb = find(a), find(b)
        gain = logit(float(r.p))
        sums_a = comp.get(ra, (0.0, 0.0))
        sums_b = comp.get(rb, (0.0, 0.0)) if rb != ra else (0.0, 0.0)
        before = 0.0
        if deg.get(a, 0) == 0:
            gain += cfg.b - cfg.unmatched_score(impact[a])
            add_a = (impact[a], 0.0)
        else:
            add_a = (0.0, 0.0)
        if deg.get(b, 0) == 0:
            gain += cfg.b - cfg.unmatched_score(impact[b])
            add_b = (0.0, impact[b])
        else:
            add_b = (0.0, 0.0)
        if ra in comp:
            before += penalty(sums_a)
        if rb != ra and rb in comp:
            before += penalty(sums_b)
        merged = (
            sums_a[0] + (sums_b[0] if rb != ra else 0.0) + add_a[0] + add_b[0],
            sums_a[1] + (sums_b[1] if rb != ra else 0.0) + add_a[1] + add_b[1],
        )
        gain += penalty(merged) - before
        if gain <= 0:
            continue
        evidence.append((r.key1, r.key2))
        deg[a] = deg.get(a, 0) + 1
        deg[b] = deg.get(b, 0) + 1
        if ra != rb:
            parent[ra] = rb
        comp.pop(ra, None)
        comp[find(b)] = merged
    return derive_from_evidence(tuples, evidence)

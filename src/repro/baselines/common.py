"""Shared explanation derivation for the baseline methods (Section 5.1.3).

RSWOOSH, THRESHOLD, GREEDY and EXACTCOVER all turn an evidence mapping
into explanations the same way: tuples without a match become
provenance-based explanations, and evidence components with unequal
impact sums become value-based explanations. This helper implements that
derivation over collected canonical tuples (no validity requirements —
baseline evidence may violate cardinality, as THRESHOLD's does).
"""
from __future__ import annotations

import pandas as pd

from repro.core.pipeline import ExplainResult


def tuples_frame(t1_pdf: pd.DataFrame, t2_pdf: pd.DataFrame) -> pd.DataFrame:
    """Stack two collected canonical relations into (side, key, impact)."""
    a = t1_pdf[["key", "impact"]].copy()
    a["side"] = 1
    b = t2_pdf[["key", "impact"]].copy()
    b["side"] = 2
    return pd.concat([a, b], ignore_index=True)


def derive_from_evidence(
    tuples: pd.DataFrame, evidence: list[tuple[str, str]], *, tol: float = 1e-6
) -> ExplainResult:
    """Map an evidence mapping to (Delta, delta) explanations."""
    impact = {(int(r.side), r.key): float(r.impact) for r in tuples.itertuples()}
    parent: dict[tuple[int, str], tuple[int, str]] = {}

    def find(x):
        parent.setdefault(x, x)
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    matched: set[tuple[int, str]] = set()
    for k1, k2 in evidence:
        a, b = (1, k1), (2, k2)
        matched |= {a, b}
        ra, rb = find(a), find(b)
        if ra != rb:
            parent[ra] = rb

    delta = sorted(k for k in impact if k not in matched)
    members: dict[tuple[int, str], set] = {}
    for t in matched:
        members.setdefault(find(t), set()).add(t)
    value_changes: list[tuple[int, str, float, float]] = []
    value_components: list[frozenset] = []
    for comp in members.values():
        s1 = sum(impact.get(t, 0.0) for t in comp if t[0] == 1)
        s2 = sum(impact.get(t, 0.0) for t in comp if t[0] == 2)
        if abs(s1 - s2) > tol:
            side, key = sorted(comp)[-1]
            value_changes.append((side, key, impact.get((side, key), 0.0), s1))
            value_components.append(frozenset(comp))
    return ExplainResult(
        evidence=list(evidence),
        delta=delta,
        value_changes=value_changes,
        value_components=value_components,
        score=0.0,
    )

"""FORMALEXP baseline: single-dataset intervention explanations.

Adaptation of Roy & Suciu's formal explanation framework to the disjoint
setting, exactly as the paper evaluates it (Section 5.1.3): compare the
two query results, then ask on *each* dataset "why is this result high
(resp. low)?". Candidate explanations are conjunctive predicates
``attr = value`` over the provenance attributes; a predicate's score is
its intervention effect — the amount removing its tuples moves the
aggregate. The top-k (k = 15) predicates' tuples become provenance-based
explanations. No evidence mapping is produced (the method is
single-dataset by design), which is why its f-measure is low.
"""
from __future__ import annotations

import pandas as pd

from repro.core.canonical import canonical_key_series
from repro.core.pipeline import ExplainResult


def _top_predicates(
    prov: pd.DataFrame, attrs: list[str], k: int
) -> list[tuple[str, object]]:
    """Rank ``attr = value`` predicates by intervention effect."""
    scores: list[tuple[float, str, object]] = []
    for a in attrs:
        eff = prov.groupby(a)["impact"].sum()
        for value, s in eff.items():
            scores.append((float(abs(s)), a, value))
    scores.sort(key=lambda t: (-t[0], t[1], str(t[2])))
    return [(a, v) for _, a, v in scores[:k]]


def formalexp_explain(
    p1_pdf: pd.DataFrame,
    p2_pdf: pd.DataFrame,
    match_attrs1: list[str],
    match_attrs2: list[str],
    *,
    k: int = 15,
) -> ExplainResult:
    """Top-15 per-side intervention predicates; covered tuples -> Delta."""
    delta: set[tuple[int, str]] = set()
    for side, prov, match_attrs in (
        (1, p1_pdf, match_attrs1),
        (2, p2_pdf, match_attrs2),
    ):
        attrs = [
            c
            for c in prov.columns
            if c not in ("impact", "gid") and prov[c].dtype == object
        ] or list(match_attrs)
        keys = canonical_key_series(prov, match_attrs)
        for a, v in _top_predicates(prov, attrs, k):
            covered = keys[prov[a] == v]
            delta.update((side, key) for key in covered)
    return ExplainResult(
        evidence=[],
        delta=sorted(delta),
        value_changes=[],
        value_components=[],
        score=0.0,
    )

"""EXACTCOVER baseline: the paper's adapted Exact Cover heuristic.

Per Section 5.1.3: tuples of one provenance relation are elements, tuples
of the other are sets; an element is covered by a set iff an initial
tuple match links them. The decision problem becomes an optimization —
select sets so that the total number of covered sets and elements is
maximized while every element is covered at most once (the exactness
constraint). We solve it greedily: sets in descending coverable-element
order, selecting a set when it covers at least one still-uncovered
element and none of its coverable elements is already covered.

The evidence is the (element, set) links of selected sets; explanations
derive as for the other evidence-only baselines. Impacts and probability
refinement play no role — the reason the paper finds it performs badly
everywhere.
"""
from __future__ import annotations

import pandas as pd

from repro.baselines.common import derive_from_evidence, tuples_frame
from repro.core.pipeline import ExplainResult


def exactcover_explain(
    t1_pdf: pd.DataFrame,
    t2_pdf: pd.DataFrame,
    matches_pdf: pd.DataFrame,
) -> ExplainResult:
    """Greedy maximum exact cover of T1 elements by T2 sets."""
    elements_of: dict[str, set[str]] = {}
    for r in matches_pdf.itertuples():
        elements_of.setdefault(r.key2, set()).add(r.key1)
    order = sorted(
        elements_of.items(), key=lambda kv: (-len(kv[1]), kv[0])
    )
    covered: set[str] = set()
    evidence: list[tuple[str, str]] = []
    for set_key, elems in order:
        if not elems or (elems & covered):
            continue  # overlap would cover an element twice
        covered |= elems
        evidence.extend((e, set_key) for e in sorted(elems))
    return derive_from_evidence(tuples_frame(t1_pdf, t2_pdf), evidence)

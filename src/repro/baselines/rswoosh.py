"""RSWOOSH baseline: Swoosh-style entity resolution (Benjelloun et al.).

R-Swoosh repeatedly merges any two records that match, until a fixpoint.
With a union-style merge function, the fixpoint clusters are exactly the
connected components of the pairwise match relation at the similarity
threshold — which is how we compute them (0.75 token-Jaccard by default,
the paper's setting). Cross-side pairs inside a cluster become the
deterministic evidence (p = 1.0); explanations derive as for THRESHOLD.
"""
from __future__ import annotations

import pandas as pd

from repro.baselines.common import derive_from_evidence, tuples_frame
from repro.core.pipeline import ExplainResult


def rswoosh_explain(
    t1_pdf: pd.DataFrame,
    t2_pdf: pd.DataFrame,
    sims_pdf: pd.DataFrame,
    *,
    threshold: float = 0.75,
) -> ExplainResult:
    """Merge-closure entity resolution over the similarity pairs."""
    matching = sims_pdf[sims_pdf.sim >= threshold]
    parent: dict[tuple[int, str], tuple[int, str]] = {}

    def find(x):
        parent.setdefault(x, x)
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for r in matching.itertuples():
        a, b = find((1, r.key1)), find((2, r.key2))
        if a != b:
            parent[a] = b
    clusters: dict[tuple[int, str], tuple[list, list]] = {}
    for k in t1_pdf.key:
        clusters.setdefault(find((1, k)), ([], []))[0].append(k)
    for k in t2_pdf.key:
        clusters.setdefault(find((2, k)), ([], []))[1].append(k)
    evidence = [
        (k1, k2)
        for lefts, rights in clusters.values()
        for k1 in lefts
        for k2 in rights
    ]
    return derive_from_evidence(tuples_frame(t1_pdf, t2_pdf), evidence)

"""THRESHOLD baseline: keep every initial match with ``p >= threshold``.

The paper's simplest baseline (THRESHOLD-0.9). The resulting evidence can
violate the valid-mapping cardinality (no refinement happens); high
precision, low recall on evidence, and correspondingly inflated
provenance-based explanations.
"""
from __future__ import annotations

import pandas as pd

from repro.baselines.common import derive_from_evidence, tuples_frame
from repro.core.pipeline import ExplainResult


def threshold_explain(
    t1_pdf: pd.DataFrame,
    t2_pdf: pd.DataFrame,
    matches_pdf: pd.DataFrame,
    *,
    threshold: float = 0.9,
) -> ExplainResult:
    """Evidence = matches with ``p >= threshold``; derive explanations."""
    kept = matches_pdf[matches_pdf.p >= threshold]
    evidence = list(zip(kept.key1, kept.key2))
    return derive_from_evidence(tuples_frame(t1_pdf, t2_pdf), evidence)

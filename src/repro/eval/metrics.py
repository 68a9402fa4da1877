"""Accuracy metrics (Section 5.1.4): precision / recall / F-measure.

Explanation accuracy scores Delta by exact (side, key) identity and
value-based explanations at component granularity: a predicted value
component matches an unmatched gold value component iff their tuple sets
intersect (greedy 1-1, so neither side is double counted) — see DESIGN.md
§5 on why component granularity is the side-symmetric choice. Evidence
accuracy scores tuple-match pairs by exact identity.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.pipeline import ExplainResult
from repro.data.gold import Gold


@dataclass(frozen=True)
class PRF:
    """Precision, recall and their harmonic mean."""

    precision: float
    recall: float

    @property
    def f1(self) -> float:
        if self.precision + self.recall == 0:
            return 0.0
        return 2 * self.precision * self.recall / (self.precision + self.recall)


def _prf(tp: float, n_pred: int, n_gold: int) -> PRF:
    precision = tp / n_pred if n_pred else (1.0 if n_gold == 0 else 0.0)
    recall = tp / n_gold if n_gold else 1.0
    return PRF(precision, recall)


def explanation_prf(result: ExplainResult, gold: Gold) -> PRF:
    """Accuracy of the combined Delta + delta explanation set."""
    tp = len(set(result.delta) & gold.delta)
    unmatched = list(gold.value_components)
    for comp in result.value_components:
        for i, g in enumerate(unmatched):
            if comp & g:
                del unmatched[i]
                tp += 1
                break
    n_pred = len(result.delta) + len(result.value_components)
    n_gold = len(gold.delta) + len(gold.value_components)
    return _prf(tp, n_pred, n_gold)


def evidence_prf(result: ExplainResult, gold: Gold) -> PRF:
    """Accuracy of the refined evidence mapping."""
    pred = set(result.evidence)
    tp = len(pred & gold.pairs)
    return _prf(tp, len(pred), len(gold.pairs))

"""Stage 3: explanation summarization (Data X-Ray substitute).

The paper's stage 3 marks explanation tuples as targets and runs an
existing pattern miner (Data Auditor / Data X-Ray) over their provenance
attributes. We implement the same contract with a greedy
precision-constrained pattern cover:

- candidate patterns are single ``attr = value`` predicates over the
  provenance attributes of one side (plus conjunctive pairs when single
  attributes are not precise enough);
- a pattern is admissible when at least ``min_precision`` of the
  provenance tuples it covers are targets;
- patterns are chosen greedily by uncovered-target coverage; leftover
  targets become singleton patterns.

``|E_S|`` — the summarized explanation count of Figure 4 — is the number
of chosen patterns plus singletons plus one entry per value-based
explanation group.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd

from repro.core.canonical import canonical_key_series
from repro.core.pipeline import ExplainResult


@dataclass(frozen=True)
class Pattern:
    """A conjunctive pattern covering part of the explanations."""

    predicates: tuple[tuple[str, object], ...]  # ((attr, value), ...)
    covered: int

    def __str__(self) -> str:
        body = " AND ".join(f"{a}={v!r}" for a, v in self.predicates)
        return f"[{body}] ({self.covered} tuples)"


def summarize_side(
    prov_pdf: pd.DataFrame,
    target_keys: set[str],
    match_attrs: list[str] | tuple[str, ...],
    *,
    strict: bool = False,
    min_precision: float = 0.9,
    max_pairs: int = 200,
) -> list[Pattern]:
    """Greedy pattern cover of one side's provenance-based explanations."""
    if not len(prov_pdf) or not target_keys:
        return []
    keys = canonical_key_series(prov_pdf, match_attrs, strict=strict)
    is_target = keys.isin(target_keys).to_numpy()
    attrs = [
        c for c in prov_pdf.columns
        if c not in ("impact", "gid") and prov_pdf[c].dtype == object
    ]
    candidates: list[tuple[tuple[tuple[str, object], ...], pd.Series]] = []
    for a in attrs:
        for v in prov_pdf[a].dropna().unique():
            candidates.append((((a, v),), prov_pdf[a] == v))
    # Conjunctive pairs over the two densest attributes, capped.
    if len(attrs) >= 2:
        a1, a2 = attrs[0], attrs[1]
        combos = (
            prov_pdf[is_target].groupby([a1, a2]).size().sort_values(ascending=False)
        )
        for (v1, v2) in list(combos.index[:max_pairs]):
            candidates.append(
                (((a1, v1), (a2, v2)), (prov_pdf[a1] == v1) & (prov_pdf[a2] == v2))
            )

    admissible = []
    for preds, mask in candidates:
        m = mask.to_numpy()
        total = int(m.sum())
        hit = int((m & is_target).sum())
        if total and hit / total >= min_precision and hit >= 2:
            admissible.append((preds, m, hit))

    chosen: list[Pattern] = []
    uncovered = is_target.copy()
    while uncovered.any() and admissible:
        admissible.sort(key=lambda t: -int((t[1] & uncovered).sum()))
        preds, m, _ = admissible[0]
        gain = int((m & uncovered).sum())
        if gain < 2:
            break
        chosen.append(Pattern(preds, gain))
        uncovered &= ~m
        admissible = admissible[1:]
    # Singleton patterns for whatever remains.
    leftover_keys = set(keys[uncovered]) & target_keys
    for k in sorted(leftover_keys):
        chosen.append(Pattern((("key", k),), 1))
    return chosen


def summarize(
    result: ExplainResult,
    p1_pdf: pd.DataFrame,
    p2_pdf: pd.DataFrame,
    match_attrs1,
    match_attrs2,
    *,
    strict: bool = False,
    min_precision: float = 0.9,
) -> list[Pattern]:
    """Summarize a full explanation set; ``len(...)`` is ``|E_S|``."""
    d1 = {k for s, k in result.delta if s == 1}
    d2 = {k for s, k in result.delta if s == 2}
    patterns = summarize_side(
        p1_pdf, d1, match_attrs1, strict=strict, min_precision=min_precision
    )
    patterns += summarize_side(
        p2_pdf, d2, match_attrs2, strict=strict, min_precision=min_precision
    )
    # Value-based explanations summarize as one group when present.
    if result.value_changes:
        patterns.append(
            Pattern((("impact", "mismatch"),), len(result.value_changes))
        )
    return patterns

"""Metric tests (Section 5.1.4)."""
import pytest

from repro.core.pipeline import ExplainResult
from repro.data.gold import Gold
from repro.eval.metrics import PRF, evidence_prf, explanation_prf


def result(evidence=(), delta=(), comps=()):
    return ExplainResult(
        evidence=list(evidence),
        delta=list(delta),
        value_changes=[(s, k, 0.0, 1.0) for c in comps for (s, k) in list(c)[:1]],
        value_components=[frozenset(c) for c in comps],
        score=0.0,
    )


GOLD = Gold(
    pairs={("a", "a'"), ("b", "b'")},
    delta={(1, "x"), (2, "y")},
    value_components=[frozenset({(1, "a"), (2, "a'")})],
)


class TestPRF:
    def test_f1_harmonic_mean(self):
        assert PRF(0.5, 1.0).f1 == pytest.approx(2 / 3)

    def test_f1_zero_when_both_zero(self):
        assert PRF(0.0, 0.0).f1 == 0.0


class TestExplanationPRF:
    def test_perfect(self):
        r = result(delta=[(1, "x"), (2, "y")], comps=[{(1, "a"), (2, "a'")}])
        prf = explanation_prf(r, GOLD)
        assert prf.precision == 1.0 and prf.recall == 1.0

    def test_partial_recall(self):
        r = result(delta=[(1, "x")])
        prf = explanation_prf(r, GOLD)
        assert prf.precision == 1.0
        assert prf.recall == pytest.approx(1 / 3)

    def test_value_component_overlap_matching(self):
        # Predicted component overlaps the gold one -> counted correct.
        r = result(comps=[{(1, "a"), (2, "zzz")}])
        prf = explanation_prf(r, GOLD)
        assert prf.precision == 1.0

    def test_value_components_not_double_counted(self):
        r = result(comps=[{(1, "a")}, {(2, "a'")}])
        prf = explanation_prf(r, GOLD)
        # Two predictions, one gold component: only one can match.
        assert prf.precision == pytest.approx(0.5)

    def test_empty_prediction_zero_precision_convention(self):
        prf = explanation_prf(result(), GOLD)
        assert prf.recall == 0.0
        assert prf.precision == 0.0  # gold nonempty, nothing predicted

    def test_empty_gold_empty_prediction_perfect(self):
        empty = Gold(set(), set(), [])
        prf = explanation_prf(result(), empty)
        assert prf.precision == 1.0 and prf.recall == 1.0


class TestEvidencePRF:
    def test_exact_pair_identity(self):
        r = result(evidence=[("a", "a'"), ("a", "b'")])
        prf = evidence_prf(r, GOLD)
        assert prf.precision == pytest.approx(0.5)
        assert prf.recall == pytest.approx(0.5)

    def test_no_evidence_method(self):
        prf = evidence_prf(result(), GOLD)
        assert prf.recall == 0.0

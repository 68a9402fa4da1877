"""Baseline method tests (Section 5.1.3)."""
import pandas as pd
import pytest

from repro.baselines.common import derive_from_evidence, tuples_frame
from repro.baselines.exactcover import exactcover_explain
from repro.baselines.formalexp import formalexp_explain
from repro.baselines.greedy import greedy_explain
from repro.baselines.rswoosh import rswoosh_explain
from repro.baselines.threshold import threshold_explain
from repro.core.matches import Phi


def canon(keys, impacts):
    return pd.DataFrame({"key": keys, "impact": impacts})


T1 = canon(["a", "b", "c"], [1.0, 2.0, 1.0])
T2 = canon(["a'", "b'", "d'"], [1.0, 1.0, 3.0])


def matches(rows):
    return pd.DataFrame(rows, columns=["key1", "key2", "p"])


class TestDeriveFromEvidence:
    def test_unmatched_tuples_become_delta(self):
        r = derive_from_evidence(tuples_frame(T1, T2), [("a", "a'")])
        assert (1, "b") in r.delta and (2, "d'") in r.delta
        assert (1, "a") not in r.delta

    def test_unequal_component_becomes_value_explanation(self):
        r = derive_from_evidence(tuples_frame(T1, T2), [("b", "b'")])
        assert len(r.value_components) == 1
        assert frozenset({(1, "b"), (2, "b'")}) in r.value_components

    def test_equal_component_no_value_explanation(self):
        r = derive_from_evidence(tuples_frame(T1, T2), [("a", "a'")])
        assert r.value_components == []


class TestThreshold:
    def test_keeps_only_high_probability(self):
        m = matches([("a", "a'", 0.95), ("b", "b'", 0.5)])
        r = threshold_explain(T1, T2, m, threshold=0.9)
        assert r.evidence == [("a", "a'")]

    def test_cardinality_violations_allowed(self):
        m = matches([("a", "a'", 0.95), ("a", "b'", 0.95)])
        r = threshold_explain(T1, T2, m)
        assert len(r.evidence) == 2  # no refinement: both kept


class TestGreedy:
    def test_selects_high_probability_valid_matches(self):
        m = matches([("a", "a'", 0.9), ("b", "b'", 0.8)])
        r = greedy_explain(T1, T2, m, Phi.EQ)
        assert set(r.evidence) == {("a", "a'"), ("b", "b'")}

    def test_respects_cardinality(self):
        m = matches([("a", "a'", 0.9), ("a", "b'", 0.85)])
        r = greedy_explain(T1, T2, m, Phi.EQ)
        assert r.evidence == [("a", "a'")]

    def test_local_maximum_failure_mode(self):
        """The A/B example: greedy takes (a,b') first and blocks the
        consistent pairing explain3D finds (Section 5.2's discussion)."""
        t1 = canon(["A", "B"], [1.0, 1.0])
        t2 = canon(["A'", "B'"], [1.0, 1.0])
        m = matches(
            [("A", "B'", 0.9), ("A", "A'", 0.8), ("B", "B'", 0.8), ("B", "A'", 0.5)]
        )
        r = greedy_explain(t1, t2, m, Phi.EQ)
        assert ("A", "B'") in r.evidence
        assert ("A", "A'") not in r.evidence

    def test_rejects_negative_gain_matches(self):
        m = matches([("a", "a'", 0.01)])
        r = greedy_explain(T1, T2, m, Phi.EQ)
        assert r.evidence == []


class TestRSwoosh:
    def test_merge_closure_produces_cluster_pairs(self):
        sims = pd.DataFrame(
            [("a", "a'", 0.8), ("b", "b'", 0.9)], columns=["key1", "key2", "sim"]
        )
        r = rswoosh_explain(T1, T2, sims)
        assert set(r.evidence) == {("a", "a'"), ("b", "b'")}

    def test_below_threshold_ignored(self):
        sims = pd.DataFrame([("a", "a'", 0.5)], columns=["key1", "key2", "sim"])
        r = rswoosh_explain(T1, T2, sims)
        assert r.evidence == []

    def test_transitive_merge(self):
        # a ~ a' and b ~ a' transitively cluster {a, b, a'}: both cross
        # pairs emitted (deterministic matches, p=1 semantics).
        sims = pd.DataFrame(
            [("a", "a'", 0.8), ("b", "a'", 0.8)], columns=["key1", "key2", "sim"]
        )
        r = rswoosh_explain(T1, T2, sims)
        assert set(r.evidence) == {("a", "a'"), ("b", "a'")}


class TestExactCover:
    def test_prefers_larger_sets_and_exactness(self):
        m = matches(
            [("a", "d'", 0.5), ("b", "d'", 0.5), ("a", "a'", 0.9), ("c", "b'", 0.5)]
        )
        r = exactcover_explain(T1, T2, m)
        # d' covers {a, b} (2 elements), chosen first; a' then overlaps on
        # a and is skipped; b' covers c.
        assert ("a", "d'") in r.evidence and ("b", "d'") in r.evidence
        assert ("a", "a'") not in r.evidence
        assert ("c", "b'") in r.evidence

    def test_empty_matches(self):
        r = exactcover_explain(T1, T2, matches([]))
        assert r.evidence == []
        assert len(r.delta) == 6


class TestFormalExp:
    def test_no_evidence_and_topk_delta(self):
        p1 = pd.DataFrame(
            {"major": ["x", "y"], "degree": ["BS", "BS"], "impact": [1.0, 1.0]}
        )
        p2 = pd.DataFrame({"program": ["x", "z"], "impact": [1.0, 3.0]})
        r = formalexp_explain(p1, p2, ["major"], ["program"])
        assert r.evidence == []
        assert len(r.delta) > 0

    def test_topk_limits_predicates(self):
        p1 = pd.DataFrame(
            {"major": [f"m{i}" for i in range(40)], "impact": [1.0] * 40}
        )
        p2 = pd.DataFrame({"program": ["p"], "impact": [1.0]})
        r = formalexp_explain(p1, p2, ["major"], ["program"], k=15)
        assert len([d for d in r.delta if d[0] == 1]) == 15

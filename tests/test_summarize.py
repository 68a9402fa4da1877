"""Stage-3 summarization tests (Data X-Ray substitute)."""
import pandas as pd

from repro.core.pipeline import ExplainResult
from repro.core.summarize import Pattern, summarize, summarize_side


def _prov(majors, degrees):
    return pd.DataFrame(
        {"major": majors, "degree": degrees, "impact": [1.0] * len(majors)}
    )


class TestSummarizeSide:
    def test_dominant_pattern_found(self):
        majors = [f"m{i}" for i in range(20)]
        degrees = ["Associate"] * 10 + ["B.S."] * 10
        prov = _prov(majors, degrees)
        targets = set(majors[:10])  # exactly the Associate rows
        pats = summarize_side(prov, targets, ["major"])
        assert len(pats) == 1
        assert pats[0].predicates == (("degree", "Associate"),)
        assert pats[0].covered == 10

    def test_low_precision_pattern_rejected(self):
        majors = [f"m{i}" for i in range(10)]
        degrees = ["B.S."] * 10  # pattern covers everything -> precision 0.3
        prov = _prov(majors, degrees)
        targets = set(majors[:3])
        pats = summarize_side(prov, targets, ["major"])
        # Falls back to singletons (each major value is its own pattern or key).
        covered = sum(p.covered for p in pats)
        assert covered == 3

    def test_leftover_targets_become_singletons(self):
        majors = [f"m{i}" for i in range(8)]
        degrees = ["Associate"] * 4 + ["B.A."] * 4
        prov = _prov(majors, degrees)
        targets = set(majors[:4]) | {majors[5]}  # 4 covered by pattern + 1 odd
        pats = summarize_side(prov, targets, ["major"])
        assert any(p.covered == 4 for p in pats)
        assert sum(1 for p in pats if p.covered == 1) >= 1

    def test_empty_targets(self):
        assert summarize_side(_prov(["a"], ["B.S."]), set(), ["major"]) == []

    def test_summary_is_smaller_than_explanations(self):
        n = 40
        majors = [f"m{i}" for i in range(n)]
        degrees = ["Associate"] * 30 + ["B.S."] * 10
        prov = _prov(majors, degrees)
        targets = set(majors[:30])
        pats = summarize_side(prov, targets, ["major"])
        assert len(pats) < len(targets)


class TestSummarizeFull:
    def test_value_changes_grouped(self):
        result = ExplainResult(
            evidence=[],
            delta=[],
            value_changes=[(1, "k1", 2.0, 1.0), (2, "k2", 1.0, 2.0)],
            value_components=[],
            score=0.0,
        )
        pats = summarize(result, _prov(["a"], ["B.S."]), _prov(["b"], ["B.A."]),
                         ["major"], ["major"])
        assert len(pats) == 1
        assert pats[0].covered == 2

    def test_pattern_str_roundtrip(self):
        p = Pattern((("degree", "Associate"),), 5)
        assert "degree" in str(p) and "5" in str(p)

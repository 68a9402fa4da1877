"""End-to-end evaluation harness tests: the paper's headline claims.

These assert the *shape* of Figures 6 and 7 at test scale: explain3D
beats every baseline on explanation F-measure, THRESHOLD/RSWOOSH trade
recall for precision on evidence, FORMALEXP produces no evidence, and
smart partitioning does not change accuracy materially.
"""
import pytest

from repro.core.config import ExplainConfig
from repro.data.academic import academic_pair
from repro.data.synthetic import synthetic_pair
from repro.eval.harness import build_case, run_method, run_methods

CFG = ExplainConfig()


@pytest.fixture(scope="module")
def academic_run(spark):
    case = academic_pair(spark, "umass")
    return build_case(spark, case, label_fraction=1.0)


@pytest.fixture(scope="module")
def synthetic_run(spark):
    case = synthetic_pair(spark, n=150, d=0.2, v=500, seed=4)
    return build_case(spark, case, label_fraction=1.0)


@pytest.fixture(scope="module")
def academic_rows(spark, academic_run):
    return {r.method: r for r in run_methods(spark, academic_run)}


class TestAcademicShape:
    def test_explain3d_beats_all_baselines_on_explanations(self, academic_rows):
        ours = academic_rows["EXPLAIN3D"].expl.f1
        for m, row in academic_rows.items():
            if m.startswith("EXPLAIN3D"):
                continue
            if m == "GREEDY":
                # GREEDY optimizes the same objective and can tie when the
                # initial mapping has no ambiguous pairings (its structural
                # failure mode is pinned in test_baselines).
                assert ours >= row.expl.f1, (m, ours, row.expl.f1)
            else:
                assert ours > row.expl.f1, (m, ours, row.expl.f1)

    def test_explain3d_beats_baselines_on_evidence(self, academic_rows):
        ours = academic_rows["EXPLAIN3D"].evid.f1
        for m in ("THRESHOLD-0.9", "RSWOOSH", "GREEDY", "EXACTCOVER"):
            assert ours >= academic_rows[m].evid.f1, m

    def test_explain3d_accuracy_is_high(self, academic_rows):
        assert academic_rows["EXPLAIN3D"].expl.f1 > 0.75
        assert academic_rows["EXPLAIN3D"].evid.f1 > 0.8

    def test_threshold_high_precision_low_recall_evidence(self, academic_rows):
        row = academic_rows["THRESHOLD-0.9"]
        assert row.evid.precision > 0.9
        assert row.evid.recall < academic_rows["EXPLAIN3D"].evid.recall

    def test_formalexp_produces_no_evidence(self, academic_rows):
        assert academic_rows["FORMALEXP-TOP15"].n_evidence == 0
        assert academic_rows["FORMALEXP-TOP15"].expl.f1 < 0.5

    def test_exactcover_performs_badly(self, academic_rows):
        assert academic_rows["EXACTCOVER"].expl.f1 < academic_rows["GREEDY"].expl.f1

    def test_batching_preserves_accuracy(self, academic_rows):
        ours = academic_rows["EXPLAIN3D"].expl.f1
        batched = academic_rows["EXPLAIN3D-BATCH100"].expl.f1
        assert abs(ours - batched) < 0.05

    def test_stats_table_shape(self, academic_run):
        s = academic_run.sizes
        assert s["P1"] == 113 and s["T1"] == 95
        assert s["T2"] == 81 and s["M*_gold"] == 71
        assert s["M"] > s["M*_gold"]  # initial mapping is a crude superset


class TestSyntheticShape:
    def test_near_perfect_accuracy(self, spark, synthetic_run):
        res, _ = run_method(spark, "EXPLAIN3D", synthetic_run)
        from repro.eval.metrics import evidence_prf, explanation_prf

        expl = explanation_prf(res, synthetic_run.gold)
        evid = evidence_prf(res, synthetic_run.gold)
        assert expl.f1 > 0.9
        assert evid.f1 > 0.9

    def test_batch_modes_match_noopt(self, spark, synthetic_run):
        from repro.eval.metrics import explanation_prf

        base, _ = run_method(spark, "EXPLAIN3D", synthetic_run)
        b100, _ = run_method(spark, "EXPLAIN3D-BATCH100", synthetic_run)
        f0 = explanation_prf(base, synthetic_run.gold).f1
        f1 = explanation_prf(b100, synthetic_run.gold).f1
        assert abs(f0 - f1) < 0.05

    def test_timing_fields_populated(self, spark, synthetic_run):
        rows = run_methods(spark, synthetic_run, methods=("EXPLAIN3D", "GREEDY"))
        for r in rows:
            assert r.solve_seconds > 0
            assert r.total_seconds > r.solve_seconds

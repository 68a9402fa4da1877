"""Completeness (Definition 3.4) of explain3D's output, end to end.

The defining property of a complete explanation set: applying every
refinement it prescribes — remove Delta tuples, apply delta impact
changes — makes the two queries return the same result. These tests check
that on real generator output, for both additive aggregates and the
many-to-one academic case, with and without smart partitioning.
"""
import pytest

from repro.data.academic import academic_pair
from repro.data.synthetic import synthetic_pair
from repro.eval.harness import build_case, run_method


def refined_totals(run, result):
    """Side totals after applying the prescribed refinements."""
    removed = set(result.delta)
    changes = {(s, k): new for s, k, _, new in result.value_changes}
    totals = {1: 0.0, 2: 0.0}
    for side, pdf in ((1, run.t1_pdf), (2, run.t2_pdf)):
        for r in pdf.itertuples():
            key = (side, r.key)
            if key in removed:
                continue
            totals[side] += changes.get(key, float(r.impact))
    return totals


@pytest.fixture(scope="module")
def synth_run(spark):
    return build_case(
        spark, synthetic_pair(spark, n=120, d=0.25, v=400, seed=9),
        label_fraction=1.0,
    )


@pytest.fixture(scope="module")
def acad_run(spark):
    return build_case(spark, academic_pair(spark, "umass"), label_fraction=1.0)


class TestCompleteness:
    def test_synthetic_refined_results_agree(self, spark, synth_run):
        result, _ = run_method(spark, "EXPLAIN3D", synth_run)
        t = refined_totals(synth_run, result)
        assert t[1] == pytest.approx(t[2])

    def test_synthetic_batched_refined_results_agree(self, spark, synth_run):
        result, _ = run_method(spark, "EXPLAIN3D-BATCH100", synth_run)
        t = refined_totals(synth_run, result)
        assert t[1] == pytest.approx(t[2])

    def test_academic_refined_results_agree(self, spark, acad_run):
        result, _ = run_method(spark, "EXPLAIN3D", acad_run)
        t = refined_totals(acad_run, result)
        assert t[1] == pytest.approx(t[2])

    def test_original_results_disagree(self, synth_run):
        # Sanity: without refinements the totals differ (d > 0).
        t1 = synth_run.t1_pdf.impact.sum()
        t2 = synth_run.t2_pdf.impact.sum()
        assert t1 != pytest.approx(t2)

    def test_greedy_is_also_complete(self, spark, synth_run):
        # GREEDY derives explanations from its evidence the same way, so
        # its refinements must also reconcile the results.
        result, _ = run_method(spark, "GREEDY", synth_run)
        t = refined_totals(synth_run, result)
        assert t[1] == pytest.approx(t[2])

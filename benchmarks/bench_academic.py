"""Benchmark: Figure 6 (academic pairs) — stage-1 mapping + per-method solve."""
import pytest

from repro.data.academic import academic_pair
from repro.eval.harness import build_case, run_method


@pytest.fixture(scope="module")
def umass_run(spark):
    return build_case(spark, academic_pair(spark, "umass"), label_fraction=0.5)


@pytest.fixture(scope="module")
def osu_run(spark):
    return build_case(spark, academic_pair(spark, "osu"), label_fraction=0.5)


def bench_stage1(benchmark, spark, preset):
    case = academic_pair(spark, preset)
    benchmark.pedantic(
        lambda: build_case(spark, case, label_fraction=0.5), rounds=1, iterations=1
    )


def test_stage1_mapping_umass(benchmark, spark):
    bench_stage1(benchmark, spark, "umass")


def test_stage1_mapping_osu(benchmark, spark):
    bench_stage1(benchmark, spark, "osu")


@pytest.mark.parametrize(
    "method",
    ["EXPLAIN3D", "EXPLAIN3D-BATCH100", "GREEDY", "THRESHOLD-0.9", "RSWOOSH",
     "EXACTCOVER", "FORMALEXP-TOP15"],
)
def test_solve_umass(benchmark, spark, umass_run, method):
    benchmark.pedantic(
        lambda: run_method(spark, method, umass_run), rounds=1, iterations=1
    )


@pytest.mark.parametrize("method", ["EXPLAIN3D", "GREEDY"])
def test_solve_osu(benchmark, spark, osu_run, method):
    benchmark.pedantic(
        lambda: run_method(spark, method, osu_run), rounds=1, iterations=1
    )

"""Benchmark: Figure 8 (synthetic sweeps) — NOOPT vs BATCH solve times."""
import pytest

from repro.core.pipeline import explain3d
from repro.data.synthetic import synthetic_pair
from repro.eval.harness import build_case

MODES = {"NOOPT": None, "BATCH-100": 100, "BATCH-1000": 1000}


@pytest.fixture(scope="module")
def run_n1k(spark):
    return build_case(
        spark, synthetic_pair(spark, n=1000, d=0.2, v=1000), label_fraction=0.5
    )


@pytest.fixture(scope="module")
def run_v100(spark):
    # Small vocabulary: dense spurious-match graph, the hard case of
    # Figure 8c where partitioning matters most.
    return build_case(
        spark, synthetic_pair(spark, n=1000, d=0.2, v=100), label_fraction=0.5
    )


@pytest.mark.parametrize("mode", MODES)
def test_solve_n1000_v1000(benchmark, spark, run_n1k, mode):
    benchmark.pedantic(
        lambda: explain3d(spark, run_n1k.problem, batch=MODES[mode]),
        rounds=1,
        iterations=1,
    )


@pytest.mark.parametrize("mode", MODES)
def test_solve_n1000_v100(benchmark, spark, run_v100, mode):
    benchmark.pedantic(
        lambda: explain3d(spark, run_v100.problem, batch=MODES[mode]),
        rounds=1,
        iterations=1,
    )

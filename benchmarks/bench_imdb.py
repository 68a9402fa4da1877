"""Benchmark: Figure 7 (IMDb templates) — partitioned vs unpartitioned solve."""
import pytest

from repro.data.imdb import imdb_case, imdb_views
from repro.eval.harness import build_case, run_method

N_MOVIES = 2000


@pytest.fixture(scope="module")
def views(spark):
    return imdb_views(spark, n_movies=N_MOVIES, seed=0)


@pytest.fixture(scope="module")
def q5_run(spark, views):
    return build_case(spark, imdb_case(spark, views, 5, 1990), label_fraction=0.5)


@pytest.fixture(scope="module")
def q10_run(spark, views):
    return build_case(
        spark, imdb_case(spark, views, 10, "Comedy"), label_fraction=0.5
    )


@pytest.mark.parametrize("method", ["EXPLAIN3D", "EXPLAIN3D-BATCH1000", "GREEDY"])
def test_solve_q5_sum_gross(benchmark, spark, q5_run, method):
    benchmark.pedantic(
        lambda: run_method(spark, method, q5_run), rounds=1, iterations=1
    )


@pytest.mark.parametrize("method", ["EXPLAIN3D", "EXPLAIN3D-BATCH1000", "RSWOOSH"])
def test_solve_q10_antijoin(benchmark, spark, q10_run, method):
    benchmark.pedantic(
        lambda: run_method(spark, method, q10_run), rounds=1, iterations=1
    )


def test_stage1_mapping_q10(benchmark, spark, views):
    case = imdb_case(spark, views, 10, "Comedy")
    benchmark.pedantic(
        lambda: build_case(spark, case, label_fraction=0.5), rounds=1, iterations=1
    )

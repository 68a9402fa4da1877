"""Edge-case coverage across the stack: empty inputs, GT problems,
extreme priors, decode helpers, and the strict-query harness path."""
import math

import pandas as pd
import pytest

from repro.core.canonical import canonical_key_series, canonicalize
from repro.core.config import ExplainConfig, clip_p
from repro.core.matches import Phi, attr_match
from repro.core.pipeline import (
    ExplainProblem,
    explain3d,
    value_components_of,
)
from repro.core.queries import IMPACT_COL, QuerySpec
from repro.core.scoring import ComponentProblem, CTuple, Edge, evaluate_selection


class TestConfigExtremes:
    def test_alpha_one_is_finite(self):
        cfg = ExplainConfig(alpha=1.0, beta=1.0)
        assert math.isfinite(cfg.a) and math.isfinite(cfg.c)

    def test_clip_p_bounds(self):
        assert 0 < clip_p(-1.0) < clip_p(2.0) < 1

    def test_low_beta_prefers_value_changes_over_removal(self):
        # beta close to 0.5: value changes are cheap, removal relatively
        # expensive -> unmatched tuples keep with impact 0.
        cfg = ExplainConfig(alpha=0.9, beta=0.55)
        assert not cfg.unmatched_is_removal(2.0)
        t = [CTuple(1, "a", 2.0), CTuple(2, "x", 1.0)]
        p = ComponentProblem(t, [Edge(0, 1, 0.5)], Phi.EQ, cfg)
        sol = evaluate_selection(p, [])
        assert sol.removed == []
        assert sol.value_changes == {0: 0.0, 1: 0.0}


class TestKeySeries:
    def test_matches_spark_key(self, spark):
        pdf = pd.DataFrame({"a": ["x y", None], "b": [1, 2], "impact": [1.0, 1.0]})
        t = canonicalize(spark.createDataFrame(pdf), ["a", "b"])
        spark_keys = {r["key"] for r in t.collect()}
        pandas_keys = set(canonical_key_series(pdf, ["a", "b"]))
        assert pandas_keys == spark_keys

    def test_strict_suffix(self):
        pdf = pd.DataFrame({"a": ["x"]})
        (k,) = canonical_key_series(pdf, ["a"], strict=True)
        assert k.endswith("#1")


class TestValueComponents:
    def test_change_inside_component(self):
        comps = value_components_of(
            [("k1", "k2"), ("k3", "k2")], [(2, "k2", 1.0, 3.0)]
        )
        assert comps == [frozenset({(1, "k1"), (1, "k3"), (2, "k2")})]

    def test_isolated_change_is_singleton(self):
        comps = value_components_of([], [(1, "kx", 2.0, 0.0)])
        assert comps == [frozenset({(1, "kx")})]


class TestPipelineCorners:
    def _problem(self, spark, phi=Phi.GT):
        t1 = spark.createDataFrame(
            pd.DataFrame({"key": ["college"], "impact": [3.0], "name": ["college"]})
        )
        t2 = spark.createDataFrame(
            pd.DataFrame(
                {"key": ["p1", "p2"], "impact": [1.0, 2.0], "name": ["p1", "p2"]}
            )
        )
        matches = spark.createDataFrame(
            pd.DataFrame(
                {"key1": ["college", "college"], "key2": ["p1", "p2"],
                 "p": [0.9, 0.9]}
            )
        )
        return ExplainProblem(t1, t2, matches, phi)

    def test_gt_one_to_many_mapping(self, spark):
        # One side-1 tuple legitimately maps to two side-2 tuples.
        res = explain3d(spark, self._problem(spark, Phi.GT))
        assert len(res.evidence) == 2
        assert res.delta == [] and res.value_changes == []

    def test_eq_forbids_one_to_many(self, spark):
        res = explain3d(spark, self._problem(spark, Phi.EQ))
        assert len(res.evidence) <= 1

    def test_no_matches_all_delta(self, spark):
        t1 = spark.createDataFrame(
            pd.DataFrame({"key": ["a"], "impact": [1.0]})
        )
        t2 = spark.createDataFrame(
            pd.DataFrame({"key": ["b"], "impact": [2.0]})
        )
        empty = spark.createDataFrame([], "key1 string, key2 string, p double")
        res = explain3d(spark, ExplainProblem(t1, t2, empty, Phi.EQ))
        assert set(res.delta) == {(1, "a"), (2, "b")}
        assert res.evidence == []

    def test_batching_with_no_matches(self, spark):
        t1 = spark.createDataFrame(
            pd.DataFrame({"key": [f"a{i}" for i in range(30)], "impact": [1.0] * 30})
        )
        t2 = spark.createDataFrame(
            pd.DataFrame({"key": ["b"], "impact": [1.0]})
        )
        empty = spark.createDataFrame([], "key1 string, key2 string, p double")
        res = explain3d(spark, ExplainProblem(t1, t2, empty, Phi.EQ), batch=10)
        assert len(res.delta) == 31
        assert res.n_partitions == 4  # ceil(31/10)

    def test_matches_referencing_unknown_keys_ignored(self, spark):
        t1 = spark.createDataFrame(pd.DataFrame({"key": ["a"], "impact": [1.0]}))
        t2 = spark.createDataFrame(pd.DataFrame({"key": ["b"], "impact": [1.0]}))
        matches = spark.createDataFrame(
            pd.DataFrame({"key1": ["ghost"], "key2": ["b"], "p": [0.9]})
        )
        res = explain3d(spark, ExplainProblem(t1, t2, matches, Phi.EQ))
        assert res.evidence == []


class TestQuerySpecExtra:
    def test_non_aggregate_result_returns_distinct_rows(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"x": ["a", "a", "b"]}))
        q = QuerySpec(("x",), agg=None)
        rows = q.result(q.provenance(df))
        assert sorted(rows) == [("a",), ("b",)]

    def test_min_aggregate_impact(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"x": ["a", "b"], "v": [5.0, 3.0]}))
        q = QuerySpec(("x",), agg="min", agg_attr="v")
        assert q.result(q.provenance(df)) == 3.0
        assert not q.additive

    def test_condition_column_object(self, spark):
        import pyspark.sql.functions as F

        df = spark.createDataFrame(pd.DataFrame({"x": ["a", "b"]}))
        q = QuerySpec(("x",), agg="count")
        assert q.provenance(df, F.col("x") == "a").count() == 1

    def test_impact_column_name_stable(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"x": ["a"]}))
        q = QuerySpec(("x",), agg="count")
        assert IMPACT_COL in q.provenance(df).columns


class TestAttrMatchValidation:
    def test_mismatched_arity_rejected(self):
        with pytest.raises(ValueError):
            attr_match(("a", "b"), Phi.EQ, ("c",))

    def test_phi_degree_semantics(self):
        assert Phi.LT.left_max_degree_one and not Phi.LT.right_max_degree_one
        assert Phi.GT.right_max_degree_one and not Phi.GT.left_max_degree_one
        assert Phi.EQ.left_max_degree_one and Phi.EQ.right_max_degree_one

"""End-to-end pipeline tests on the paper's running example (Figs. 1 & 3).

Q1 counts degree programs in D1; Q2 counts majors at university A in D2;
Q3 sums bachelor counts per college in D3. The expected explanations come
straight from Example 2 of the paper.
"""
import pandas as pd
import pytest

from repro.core.canonical import KEY_COL, canonicalize
from repro.core.config import ExplainConfig
from repro.core.matches import Phi, attr_match
from repro.core.pipeline import ExplainProblem, explain3d, prepare_problem
from repro.core.queries import IMPACT_COL, QuerySpec
from repro.oracle import assert_equivalent

CFG = ExplainConfig()


@pytest.fixture(scope="module")
def d1(spark):
    return spark.createDataFrame(
        pd.DataFrame(
            {
                "program": ["Accounting", "CS", "CS", "ECE", "EE", "Management", "Design"],
                "degree": ["B.S.", "B.A.", "B.S.", "B.S.", "B.S.", "B.A.", "B.A."],
            }
        )
    )


@pytest.fixture(scope="module")
def d2(spark):
    return spark.createDataFrame(
        pd.DataFrame(
            {
                "univ": ["A"] * 6 + ["B"],
                "major": ["Accounting", "CSE", "ECE", "EE", "Management", "Design", "Art"],
            }
        )
    )


@pytest.fixture(scope="module")
def d3(spark):
    return spark.createDataFrame(
        pd.DataFrame(
            {
                "college": ["Business", "Engineering", "Computer Science"],
                "num_bach": [2, 2, 1],
            }
        )
    )


class TestProvenance:
    def test_count_query_impacts_are_one(self, d1):
        q = QuerySpec(("program",), agg="count")
        p = q.provenance(d1)
        assert p.count() == 7
        assert p.agg({"impact": "sum"}).collect()[0][0] == 7.0

    def test_selection_filters_provenance(self, d2):
        q = QuerySpec(("major",), agg="count")
        p = q.provenance(d2, "univ = 'A'")
        assert p.count() == 6

    def test_sum_query_impact_is_attribute(self, d3):
        q = QuerySpec(("college",), agg="sum", agg_attr="num_bach")
        p = q.provenance(d3)
        assert q.result(p) == 5.0

    def test_results_disagree_as_in_figure_1(self, d1, d2, d3):
        q1 = QuerySpec(("program",), agg="count")
        q2 = QuerySpec(("major",), agg="count")
        q3 = QuerySpec(("college",), agg="sum", agg_attr="num_bach")
        assert q1.result(q1.provenance(d1)) == 7.0
        assert q2.result(q2.provenance(d2, "univ = 'A'")) == 6.0
        assert q3.result(q3.provenance(d3)) == 5.0

    def test_invalid_agg_rejected(self):
        with pytest.raises(ValueError):
            QuerySpec(("x",), agg="median")
        with pytest.raises(ValueError):
            QuerySpec(("x",), agg="sum")  # missing agg_attr


class TestCanonicalization:
    def test_figure_3_canonical_relation(self, d1):
        q1 = QuerySpec(("program",), agg="count")
        t1 = canonicalize(q1.provenance(d1), ["program"])
        rows = {r["program"]: r[IMPACT_COL] for r in t1.collect()}
        assert rows == {
            "Accounting": 1.0, "CS": 2.0, "ECE": 1.0, "EE": 1.0,
            "Management": 1.0, "Design": 1.0,
        }

    def test_canonicalization_matches_duckdb(self, spark, d1):
        q1 = QuerySpec(("program",), agg="count")
        p1 = q1.provenance(d1)
        t1 = canonicalize(p1, ["program"]).select("program", IMPACT_COL)
        assert_equivalent(
            t1,
            "SELECT program, SUM(impact) AS impact FROM p1 GROUP BY program",
            p1=p1,
        )

    def test_strict_canonicalization_keeps_all_tuples(self, d1):
        q = QuerySpec(("program",), agg="max", agg_attr="program")
        # MAX over a string attr is artificial; only tuple counts matter here.
        p = QuerySpec(("program",), agg="count").provenance(d1)
        t = canonicalize(p, ["program"], additive=False)
        assert t.count() == 7
        assert t.select(KEY_COL).distinct().count() == 7

    def test_gold_column_carried(self, spark):
        p = spark.createDataFrame(
            pd.DataFrame({"a": ["x", "x", "y"], "impact": [1.0, 1.0, 1.0],
                          "gid": ["g1", "g1", "g2"]})
        )
        t = canonicalize(p, ["a"], gold_col="gid")
        rows = {r["a"]: r["gold_key"] for r in t.collect()}
        assert rows == {"x": "g1", "y": "g2"}


def _problem_q1_q2(spark, d1, d2):
    q1 = QuerySpec(("program",), agg="count")
    q2 = QuerySpec(("major",), agg="count")
    t1 = canonicalize(q1.provenance(d1), ["program"])
    t2 = canonicalize(q2.provenance(d2, "univ = 'A'"), ["major"])
    # Initial mapping as in Section 2.1's example: CS->CSE comes from the
    # record-linkage black box with p=0.9, identical names with p=1.0.
    matches = spark.createDataFrame(
        pd.DataFrame(
            {
                "key1": ["Accounting", "CS", "ECE", "EE", "Management", "Design"],
                "key2": ["Accounting", "CSE", "ECE", "EE", "Management", "Design"],
                "p": [1.0, 0.9, 1.0, 1.0, 1.0, 1.0],
            }
        )
    )
    return ExplainProblem(t1, t2, matches, Phi.EQ)


class TestExplain3DRunningExample:
    def test_q1_vs_q2_value_explanation_on_cs(self, spark, d1, d2):
        res = explain3d(spark, _problem_q1_q2(spark, d1, d2))
        assert len(res.evidence) == 6
        assert res.delta == []
        # CS counted twice in Q1 but CSE once in Q2: one value change.
        assert len(res.value_changes) == 1
        side, key, old, new = res.value_changes[0]
        assert {old, new} == {1.0, 2.0}
        assert key in ("CS", "CSE")

    def test_q1_vs_q3_provenance_and_value_explanations(self, spark, d1, d3):
        q1 = QuerySpec(("program",), agg="count")
        q3 = QuerySpec(("college",), agg="sum", agg_attr="num_bach")
        t1 = canonicalize(q1.provenance(d1), ["program"])
        t3 = canonicalize(q3.provenance(d3), ["college"])
        matches = spark.createDataFrame(
            pd.DataFrame(
                {
                    "key1": ["Accounting", "Management", "ECE", "EE", "CS"],
                    "key2": ["Business", "Business", "Engineering", "Engineering",
                             "Computer Science"],
                    "p": [0.9, 0.9, 0.9, 0.9, 0.9],
                }
            )
        )
        res = explain3d(
            spark, ExplainProblem(t1, t3, matches, Phi.LT)
        )
        # Design has no match in D3: provenance-based explanation.
        assert (1, "Design") in res.delta
        # CS college lists 1 bachelor degree but CS has 2: value change.
        changed = {(s, k) for s, k, _, _ in res.value_changes}
        assert changed & {(1, "CS"), (2, "Computer Science")}
        assert len(res.evidence) == 5

    def test_smart_partitioning_preserves_result(self, spark, d1, d2):
        prob = _problem_q1_q2(spark, d1, d2)
        basic = explain3d(spark, prob)
        batched = explain3d(spark, prob, batch=4)
        assert sorted(batched.evidence) == sorted(basic.evidence)
        assert batched.score == pytest.approx(basic.score, abs=1e-6)
        assert batched.n_partitions >= 2

    def test_score_is_finite_and_negative(self, spark, d1, d2):
        res = explain3d(spark, _problem_q1_q2(spark, d1, d2))
        assert res.score < 0

    def test_value_components_group_pairs(self, spark, d1, d2):
        res = explain3d(spark, _problem_q1_q2(spark, d1, d2))
        (comp,) = res.value_components
        assert (1, "CS") in comp and (2, "CSE") in comp


class TestPrepareProblem:
    def test_stage1_end_to_end(self, spark, d1, d2):
        q1 = QuerySpec(("program",), agg="count")
        q2 = QuerySpec(("major",), agg="count")
        p1 = q1.provenance(d1)
        p2 = q2.provenance(d2, "univ = 'A'")
        gold = spark.createDataFrame(
            pd.DataFrame(
                {
                    "key1": ["Accounting", "ECE", "EE", "Management", "Design"],
                    "key2": ["Accounting", "ECE", "EE", "Management", "Design"],
                }
            )
        )
        prob = prepare_problem(
            p1, p2, q1, q2, attr_match("program", Phi.EQ, "major"), gold,
            label_fraction=1.0,
        )
        m = {(r.key1, r.key2): r.p for r in prob.matches.collect()}
        # Identical names share their token: p -> 1.0 bucket.
        assert m[("Accounting", "Accounting")] == pytest.approx(1.0)
        # CS vs CSE share no token: the pair is absent from the mapping.
        assert ("CS", "CSE") not in m
        res = explain3d(spark, prob)
        # Without the CS-CSE link both CS and CSE become explanations.
        assert (1, "CS") in res.delta and (2, "CSE") in res.delta

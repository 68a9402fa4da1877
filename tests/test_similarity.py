"""Similarity join + probability calibration tests (Section 5.1.2)."""
import pandas as pd
import pytest

from repro.core.canonical import canonicalize
from repro.core.matches import Phi, attr_match
from repro.core.prob_map import calibrate
from repro.core.similarity import pairwise_similarity


def _canon(spark, names, impacts, col="name"):
    pdf = pd.DataFrame({col: names, "impact": impacts})
    return canonicalize(spark.createDataFrame(pdf), [col])


class TestJaccard:
    def test_identical_strings_score_one(self, spark):
        t1 = _canon(spark, ["data systems"], [1.0])
        t2 = _canon(spark, ["data systems"], [1.0])
        sims = pairwise_similarity(t1, t2, attr_match("name", Phi.EQ, "name"))
        assert sims.collect()[0]["sim"] == pytest.approx(1.0)

    def test_partial_token_overlap(self, spark):
        # {data, systems} vs {data, mining}: 1 shared of 3 union.
        t1 = _canon(spark, ["data systems"], [1.0])
        t2 = _canon(spark, ["data mining"], [1.0])
        sims = pairwise_similarity(t1, t2, attr_match("name", Phi.EQ, "name"))
        assert sims.collect()[0]["sim"] == pytest.approx(1 / 3)

    def test_no_shared_token_pair_absent(self, spark):
        t1 = _canon(spark, ["alpha"], [1.0])
        t2 = _canon(spark, ["beta"], [1.0])
        sims = pairwise_similarity(t1, t2, attr_match("name", Phi.EQ, "name"))
        assert sims.count() == 0

    def test_tokenization_case_and_punctuation(self, spark):
        t1 = _canon(spark, ["Computer-Science (B.S.)"], [1.0])
        t2 = _canon(spark, ["computer science b s"], [1.0])
        sims = pairwise_similarity(t1, t2, attr_match("name", Phi.EQ, "name"))
        assert sims.collect()[0]["sim"] == pytest.approx(1.0)

    def test_duplicate_tokens_counted_once(self, spark):
        t1 = _canon(spark, ["a a b"], [1.0])
        t2 = _canon(spark, ["a b b"], [1.0])
        sims = pairwise_similarity(t1, t2, attr_match("name", Phi.EQ, "name"))
        assert sims.collect()[0]["sim"] == pytest.approx(1.0)

    def test_blocking_produces_cross_pairs(self, spark):
        t1 = _canon(spark, ["x common", "y common"], [1.0, 1.0])
        t2 = _canon(spark, ["z common"], [1.0])
        sims = pairwise_similarity(t1, t2, attr_match("name", Phi.EQ, "name"))
        assert sims.count() == 2


class TestNumericSimilarity:
    def test_mixed_string_numeric_mean(self, spark):
        pdf1 = pd.DataFrame({"title": ["movie one"], "year": [2000], "impact": [1.0]})
        pdf2 = pd.DataFrame({"title": ["movie one"], "year": [2001], "impact": [1.0]})
        t1 = canonicalize(spark.createDataFrame(pdf1), ["title", "year"])
        t2 = canonicalize(spark.createDataFrame(pdf2), ["title", "year"])
        m = attr_match(("title", "year"), Phi.EQ, ("title", "year"), numeric=("year",))
        sims = pairwise_similarity(t1, t2, m)
        # title jaccard 1.0, year sim 1/(1+1) = 0.5; mean = 0.75.
        assert sims.collect()[0]["sim"] == pytest.approx(0.75)

    def test_equal_numbers_score_one(self, spark):
        pdf = pd.DataFrame({"title": ["a b"], "year": [1999], "impact": [1.0]})
        t1 = canonicalize(spark.createDataFrame(pdf), ["title", "year"])
        t2 = canonicalize(spark.createDataFrame(pdf.copy()), ["title", "year"])
        m = attr_match(("title", "year"), Phi.EQ, ("title", "year"), numeric=("year",))
        assert pairwise_similarity(t1, t2, m).collect()[0]["sim"] == pytest.approx(1.0)


class TestCalibration:
    def test_bucket_probability_from_labels(self, spark):
        sims = spark.createDataFrame(
            pd.DataFrame(
                {
                    "key1": ["a", "b", "c", "d"],
                    "key2": ["a'", "b'", "c'", "d'"],
                    "sim": [0.95, 0.95, 0.95, 0.95],
                }
            )
        )
        gold = spark.createDataFrame(
            pd.DataFrame({"key1": ["a", "b", "c"], "key2": ["a'", "b'", "c'"]})
        )
        out = calibrate(sims, gold, buckets=10, label_fraction=1.0)
        ps = {r.key1: r.p for r in out.collect()}
        # All four land in the same bucket: p = 3/4 everywhere.
        assert all(p == pytest.approx(0.75) for p in ps.values())

    def test_unlabeled_bucket_falls_back_to_midpoint(self, spark):
        sims = spark.createDataFrame(
            pd.DataFrame({"key1": ["a"], "key2": ["x"], "sim": [0.55]})
        )
        gold = spark.createDataFrame(pd.DataFrame({"key1": ["zz"], "key2": ["zz"]}))
        out = calibrate(sims, gold, buckets=10, label_fraction=0.0)
        # bucket 5 of 10 -> midpoint 0.55.
        assert out.collect()[0]["p"] == pytest.approx(0.55)

    def test_no_true_match_bucket_gets_floor_probability(self, spark):
        sims = spark.createDataFrame(
            pd.DataFrame(
                {"key1": ["a", "b"], "key2": ["x", "y"], "sim": [0.4, 0.4]}
            )
        )
        gold = spark.createDataFrame(pd.DataFrame({"key1": ["zz"], "key2": ["zz"]}))
        out = calibrate(sims, gold, buckets=10, label_fraction=1.0)
        # Labeled bucket with zero true matches: floored at 1/(n+2), kept
        # as low-probability initial matches (Definition 2.4's p > 0).
        ps = [r.p for r in out.collect()]
        assert ps == [pytest.approx(0.25)] * 2

    def test_top_bucket_clamped(self, spark):
        sims = spark.createDataFrame(
            pd.DataFrame({"key1": ["a"], "key2": ["a'"], "sim": [1.0]})
        )
        gold = spark.createDataFrame(pd.DataFrame({"key1": ["a"], "key2": ["a'"]}))
        out = calibrate(sims, gold, buckets=50, label_fraction=1.0)
        assert out.collect()[0]["p"] == pytest.approx(1.0)

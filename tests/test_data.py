"""Dataset generator tests: structure, sizes, and gold consistency."""
import numpy as np
import pandas as pd
import pytest

from repro.core.canonical import canonicalize
from repro.core.config import ExplainConfig
from repro.data.academic import PRESETS, academic_pair
from repro.data.base import GID_COL
from repro.data.errors import corrupt_numeric, corrupt_strings, make_vocab
from repro.data.gold import gold_standard
from repro.data.imdb import QUERY_TEMPLATES, imdb_case, imdb_views
from repro.data.synthetic import synthetic_pair

CFG = ExplainConfig()


def _gold_of(case):
    strict = not (case.q1.additive and case.q2.additive)
    t1 = canonicalize(case.p1, case.match.attrs1, additive=not strict, gold_col=GID_COL)
    t2 = canonicalize(case.p2, case.match.attrs2, additive=not strict, gold_col=GID_COL)
    return t1, t2, gold_standard(t1, t2, CFG)


class TestErrors:
    def test_make_vocab_distinct(self):
        v = make_vocab(50, np.random.default_rng(0))
        assert len(v) == len(set(v)) == 50

    def test_corrupt_strings_rate_and_log(self):
        rng = np.random.default_rng(0)
        pdf = pd.DataFrame({"s": [f"alpha beta {i}" for i in range(100)]})
        log = corrupt_strings(pdf, "s", 0.1, rng, ["zzz"])
        assert len(log) == 10
        for c in log:
            assert pdf.iloc[c.row]["s"] == c.new != c.old

    def test_corrupt_numeric_changes_values(self):
        rng = np.random.default_rng(0)
        pdf = pd.DataFrame({"x": np.arange(1.0, 101.0)})
        log = corrupt_numeric(pdf, "x", 0.05, rng)
        assert len(log) == 5
        assert all(c.new != c.old for c in log)

    def test_corrupt_empty_frame_noop(self):
        rng = np.random.default_rng(0)
        assert corrupt_strings(pd.DataFrame({"s": []}), "s", 0.1, rng, ["a"]) == []


class TestSynthetic:
    def test_sizes_and_schema(self, spark):
        case = synthetic_pair(spark, n=100, d=0.2, v=200, seed=1)
        assert case.n1 == 100 and case.n2 == 80
        assert case.p1.count() == 100
        assert set(case.p1.columns) == {"match_attr", GID_COL, "impact"}

    def test_gold_structure(self, spark):
        case = synthetic_pair(spark, n=100, d=0.2, v=500, seed=2)
        t1, t2, gold = _gold_of(case)
        # d*n = 20 dropped phrases -> side-1 deltas; d*n = 20 corrupted
        # survivors -> value components (phrase collisions may shift by 1).
        d1 = {k for s, k in gold.delta if s == 1}
        assert 18 <= len(d1) <= 21
        assert 18 <= len(gold.value_components) <= 21
        assert len(gold.pairs) >= 75

    def test_zero_difference_ratio_identical(self, spark):
        case = synthetic_pair(spark, n=60, d=0.0, v=300, seed=3)
        _, _, gold = _gold_of(case)
        assert gold.delta == set()
        assert gold.value_components == []
        assert len(gold.pairs) == 60

    def test_determinism(self, spark):
        a = synthetic_pair(spark, n=50, d=0.3, v=100, seed=7)
        b = synthetic_pair(spark, n=50, d=0.3, v=100, seed=7)
        assert sorted(map(tuple, a.p1.collect())) == sorted(map(tuple, b.p1.collect()))


class TestAcademic:
    @pytest.mark.parametrize("preset", ["umass", "osu"])
    def test_figure4_shape(self, spark, preset):
        cfgp = PRESETS[preset]
        case = academic_pair(spark, preset)
        t1, t2, gold = _gold_of(case)
        # |P|, |T| per Figure 4.
        n_prog = cfgp["shared"] + cfgp["only1"]
        assert case.p1.count() == n_prog + cfgp["multi"]
        assert t1.count() == n_prog
        assert t2.count() == cfgp["shared"] + cfgp["only2"]
        # Gold evidence = shared programs = the paper's |M*_tuple|.
        assert len(gold.pairs) == cfgp["shared"]
        assert len(gold.value_components) == cfgp["mismatch"]
        assert len(gold.delta) == cfgp["only1"] + cfgp["only2"]

    def test_query_results_disagree(self, spark):
        case = academic_pair(spark, "umass")
        r1 = case.q1.result(case.p1)
        r2 = case.q2.result(case.p2)
        assert r1 != r2

    def test_provenance_excludes_other_universities(self, spark):
        case = academic_pair(spark, "umass")
        assert case.p2.count() == 81
        assert case.n2 > 3000  # Stats holds thousands of other-univ rows

    def test_associate_pattern_present(self, spark):
        # The side-1-only programs should be dominated by Associate rows,
        # giving stage 3 its summarization pattern.
        case = academic_pair(spark, "umass")
        pdf = case.p1.toPandas()
        t1, t2, gold = _gold_of(case)
        d1_keys = {k for s, k in gold.delta if s == 1}
        only1 = pdf[pdf.major.isin({k for k in d1_keys})]
        frac = (only1.degree == "Associate").mean()
        assert frac > 0.5


@pytest.fixture(scope="module")
def views(spark):
    return imdb_views(spark, n_movies=400, seed=0)


class TestImdb:
    def test_view_sizes(self, views):
        assert views.movie1.count() == 400
        assert views.movie2.count() == 400
        assert views.n1 > 400 and views.n2 > views.movie2.count()

    def test_view1_loses_secondary_genres(self, views):
        genres1 = views.movie1.select("mid").distinct().count()
        genre_rows2 = views.movieinfo.where("info_type = 'genre'").count()
        assert genre_rows2 > genres1  # view 2 keeps multi-genre rows

    @pytest.mark.parametrize("template", sorted(QUERY_TEMPLATES))
    def test_all_templates_build_and_have_gold(self, spark, views, template):
        # Highly selective templates (comedy-in-year at 400 movies) can be
        # empty for a given year; scan a few instantiations like the
        # paper's 10-per-template sampling does.
        params = ["Comedy"] if template == 10 else [1990, 1995, 1985, 2000]
        for param in params:
            case = imdb_case(spark, views, template, param)
            if case.p1.count() > 0 and case.p2.count() > 0:
                break
        else:
            pytest.fail(f"no non-empty instantiation for template {template}")
        t1, t2, gold = _gold_of(case)
        assert len(gold.pairs) > 0, case.name

    def test_count_template_has_loss_deltas(self, spark, views):
        # Q3 counts comedies: view 1 lost secondary genres, so some
        # comedies exist only on side 2.
        deltas = set()
        for year in (1985, 1990, 1995, 2000):
            case = imdb_case(spark, views, 3, year)
            _, _, gold = _gold_of(case)
            deltas |= {s for s, _ in gold.delta}
        assert 2 in deltas

    def test_gross_template_has_value_mismatches(self, spark, views):
        comps = 0
        for year in (1985, 1990, 1995):
            case = imdb_case(spark, views, 5, year)
            _, _, gold = _gold_of(case)
            comps += len(gold.value_components)
        assert comps > 0  # injected gross errors surface as value golds

    def test_strict_template_uses_strict_canonicalization(self, spark, views):
        case = imdb_case(spark, views, 8, 1990)  # AVG: strict
        assert not (case.q1.additive and case.q2.additive)
        t1, t2, gold = _gold_of(case)
        assert t1.count() == case.p1.count()

    def test_unknown_template_rejected(self, spark, views):
        with pytest.raises(ValueError):
            imdb_case(spark, views, 11, 1990)

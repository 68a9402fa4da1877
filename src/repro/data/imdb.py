"""IMDb-like dataset pair: two views with loss + injected errors (Sec. 5.1.1).

Base data (movies, persons, cast/directs links) is generated once, then
projected into the paper's two view schemas:

View 1 — ``Movie(movie_id, title, release_year, genre, country, runtimes,
gross, budget)``, ``Actor``/``Director`` (split persons), ``MovieActor``,
``MovieDirector``. A movie keeps only its *first* genre and country, so a
portion of data is lost in migration — the paper's deliberate design.

View 2 — ``Movie(m_id, title, release_year)``, ``MovieInfo(m_id,
info_type, info)`` (keeps *all* genres/countries), ``Person``,
``MoviePerson`` (actor/director roles merged — view 2's own loss).

~5% random cell errors are injected into both views with the BART
substitute (``repro.data.errors``). Gold standards derive from the base
ids threaded through as ``gid``.

``imdb_case(template, param)`` materializes the paper's 10 query
templates (joins, subqueries/anti-joins, non-aggregates and all five
aggregate functions) as provenance relations over the two views.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession

from repro.core.matches import Phi, attr_match
from repro.core.queries import QuerySpec
from repro.data.base import GID_COL, ProblemCase
from repro.data.errors import corrupt_numeric, corrupt_strings, make_vocab

GENRES = [
    "Comedy", "Drama", "Action", "Thriller", "Romance", "Horror",
    "Documentary", "Animation", "Crime", "Sci-Fi", "Western", "Musical",
]
COUNTRIES = ["USA", "UK", "France", "Germany", "Italy", "Japan", "Canada", "Spain"]

QUERY_TEMPLATES = {
    1: "actors cast in short movies released in <year>",
    2: "movies directed by someone born in <year>",
    3: "number of comedy movies released in <year>",
    4: "number of movies released in the US in <year>",
    5: "total gross value for movies released in <year>",
    6: "maximum gross value for movies released in <year>",
    7: "longest movie released in <year>",
    8: "average gross value for movies released in <year>",
    9: "average runtime for movies released in <year>",
    10: "actresses who have not starred in any <genre> movies",
}


@dataclass
class ImdbViews:
    """Spark DataFrames of both views plus base sizes for the stats table."""

    movie1: DataFrame
    actor: DataFrame
    director: DataFrame
    movieactor: DataFrame
    moviedirector: DataFrame
    movie2: DataFrame
    movieinfo: DataFrame
    person: DataFrame
    movieperson: DataFrame
    n1: int  # total tuples in view 1
    n2: int  # total tuples in view 2


def imdb_views(
    spark: SparkSession,
    *,
    n_movies: int = 2000,
    seed: int = 0,
    err_frac: float = 0.05,
) -> ImdbViews:
    """Generate base data and derive both (corrupted) views."""
    rng = np.random.default_rng(seed)
    title_pool = make_vocab(400, rng, word_len=5)
    first_pool = make_vocab(150, rng, word_len=6)
    last_pool = make_vocab(250, rng, word_len=7)

    n_persons = max(4, int(0.8 * n_movies))
    years = rng.integers(1970, 2004, n_movies)
    titles = [
        " ".join(rng.choice(title_pool, size=int(rng.integers(2, 5)), replace=False))
        for _ in range(n_movies)
    ]
    n_genres = rng.integers(1, 4, n_movies)
    genre_lists = [
        list(rng.choice(GENRES, size=g, replace=False)) for g in n_genres
    ]
    country_lists = [
        (["USA"] if rng.random() < 0.4 else []) + list(
            rng.choice(COUNTRIES[1:], size=int(rng.integers(0, 2)), replace=False)
        ) or [str(rng.choice(COUNTRIES))]
        for _ in range(n_movies)
    ]
    movies = pd.DataFrame(
        {
            "mid": np.arange(n_movies),
            "title": titles,
            "release_year": years,
            "runtimes": rng.integers(45, 190, n_movies),
            "gross": (rng.random(n_movies) * 9.9e7 + 1e6).round(0),
            "budget": (rng.random(n_movies) * 4.9e7 + 1e6).round(0),
        }
    )
    firstnames = rng.choice(first_pool, n_persons)
    lastnames = rng.choice(last_pool, n_persons)
    persons = pd.DataFrame(
        {
            "pid": np.arange(n_persons),
            "firstname": firstnames,
            "lastname": lastnames,
            "gender": rng.choice(["f", "m"], n_persons),
            "dob": [
                f"{y}-{m:02d}-{d:02d}"
                for y, m, d in zip(
                    rng.integers(1930, 1991, n_persons),
                    rng.integers(1, 13, n_persons),
                    rng.integers(1, 29, n_persons),
                )
            ],
        }
    )
    cast = pd.DataFrame(
        {
            "mid": np.repeat(np.arange(n_movies), 3),
            "pid": rng.integers(0, n_persons, 3 * n_movies),
        }
    ).drop_duplicates()
    directs = pd.DataFrame(
        {"mid": np.arange(n_movies), "pid": rng.integers(0, n_persons, n_movies)}
    )

    # ---- view 1: flat movie with FIRST genre/country only (data loss) --
    v1_movie = movies.copy()
    v1_movie["genre"] = [g[0] for g in genre_lists]
    v1_movie["country"] = [c[0] for c in country_lists]
    actor_ids = sorted(set(cast.pid))
    director_ids = sorted(set(directs.pid))
    v1_actor = persons[persons.pid.isin(actor_ids)].copy()
    v1_director = persons[persons.pid.isin(director_ids)].copy()

    # ---- view 2: narrow movie + key-value info, merged person roles ----
    v2_movie = movies[["mid", "title", "release_year"]].copy()
    info_rows = []
    for r in movies.itertuples():
        for g in genre_lists[r.mid]:
            info_rows.append((r.mid, "genre", g))
        for ctry in country_lists[r.mid]:
            info_rows.append((r.mid, "country", ctry))
        info_rows.append((r.mid, "runtimes", str(r.runtimes)))
        info_rows.append((r.mid, "gross", str(r.gross)))
        info_rows.append((r.mid, "budget", str(r.budget)))
    v2_info = pd.DataFrame(info_rows, columns=["mid", "info_type", "info"])
    v2_person = persons.copy()
    v2_person["name"] = v2_person.firstname + " " + v2_person.lastname
    v2_person = v2_person[["pid", "name", "gender", "dob"]]
    v2_movieperson = pd.concat([cast, directs]).drop_duplicates()

    # ---- ~5% random errors in both views (BART substitute) -------------
    rng_err = np.random.default_rng(seed + 1)
    corrupt_strings(v1_movie, "title", err_frac, rng_err, title_pool)
    corrupt_numeric(v1_movie, "gross", err_frac, rng_err)
    corrupt_numeric(v1_movie, "runtimes", err_frac / 2, rng_err, lo=0.5, hi=2.0)
    corrupt_strings(v1_actor, "lastname", err_frac, rng_err, last_pool)
    corrupt_strings(v2_movie, "title", err_frac, rng_err, title_pool)
    corrupt_strings(v2_person, "name", err_frac, rng_err, last_pool)
    gross_rows = v2_info.info_type == "gross"
    sub = v2_info[gross_rows].copy()
    sub["info_f"] = sub["info"].astype(float)
    corrupt_numeric(sub, "info_f", err_frac, rng_err)
    v2_info.loc[gross_rows, "info"] = sub["info_f"].astype(str).to_numpy()

    n1 = len(v1_movie) + len(v1_actor) + len(v1_director) + len(cast) + len(directs)
    n2 = len(v2_movie) + len(v2_info) + len(v2_person) + len(v2_movieperson)
    sdf = spark.createDataFrame
    return ImdbViews(
        movie1=sdf(v1_movie),
        actor=sdf(v1_actor),
        director=sdf(v1_director),
        movieactor=sdf(cast),
        moviedirector=sdf(directs),
        movie2=sdf(v2_movie),
        movieinfo=sdf(v2_info),
        person=sdf(v2_person),
        movieperson=sdf(v2_movieperson),
        n1=n1,
        n2=n2,
    )


def _movie_sides(views: ImdbViews):
    """Movie-level provenance bases with gid and matching attrs."""
    m1 = views.movie1.withColumn(GID_COL, F.col("mid").cast("string"))
    m2 = views.movie2.withColumn(GID_COL, F.col("mid").cast("string"))
    return m1, m2


def _person_name_df(views: ImdbViews, table: DataFrame) -> DataFrame:
    """View-1 person table with a combined ``name`` column + gid."""
    return table.withColumn(
        "name", F.concat_ws(" ", "firstname", "lastname")
    ).withColumn(GID_COL, F.col("pid").cast("string"))


_MOVIE_MATCH = attr_match(
    ("title", "release_year"), Phi.EQ, ("title", "release_year"),
    numeric=("release_year",),
)
_PERSON_MATCH = attr_match(("name", "dob"), Phi.EQ, ("name", "dob"))


def _info_value(views: ImdbViews, info_type: str, cast_to: str | None = None):
    """MovieInfo rows of one type as (mid, value)."""
    df = views.movieinfo.where(F.col("info_type") == info_type).select(
        "mid", F.col("info").alias(info_type)
    )
    if cast_to:
        df = df.withColumn(info_type, F.col(info_type).cast(cast_to))
    return df


def imdb_case(
    spark: SparkSession,
    views: ImdbViews,
    template: int,
    param: int | str,
) -> ProblemCase:
    """Materialize query template ``template`` with parameter ``param``."""
    m1, m2 = _movie_sides(views)
    name = f"imdb-Q{template}({param})"

    if template == 1:  # actors in short movies of <year>: non-aggregate
        q = QuerySpec(("name", "dob", GID_COL), agg=None)
        a1 = _person_name_df(views, views.actor)
        p1 = q.provenance(
            views.movieactor.join(
                m1.where(
                    (F.col("release_year") == param) & (F.col("runtimes") < 75)
                ).select("mid"),
                "mid",
            ).join(a1, "pid")
        )
        short2 = _info_value(views, "runtimes", "double").where(
            F.col("runtimes") < 75
        )
        p2_src = (
            views.movieperson.join(
                m2.where(F.col("release_year") == param).select("mid"), "mid"
            )
            .join(short2.select("mid"), "mid")
            .join(
                views.person.withColumn(GID_COL, F.col("pid").cast("string")), "pid"
            )
        )
        p2 = q.provenance(p2_src)
        return ProblemCase(name, p1, p2, q, q, _PERSON_MATCH, views.n1, views.n2)

    if template == 2:  # movies directed by someone born in <year>
        q = QuerySpec(("title", "release_year", GID_COL), agg=None)
        d1 = views.director.where(F.year(F.to_date("dob")) == param)
        mids1 = views.moviedirector.join(d1.select("pid"), "pid").select("mid").distinct()
        p1 = q.provenance(mids1.join(m1, "mid"))
        d2 = views.person.where(F.year(F.to_date("dob")) == param)
        mids2 = views.movieperson.join(d2.select("pid"), "pid").select("mid").distinct()
        p2 = q.provenance(mids2.join(m2, "mid"))
        return ProblemCase(name, p1, p2, q, q, _MOVIE_MATCH, views.n1, views.n2)

    if template in (3, 4):  # COUNT comedy / US movies in <year>
        q = QuerySpec(("title", "release_year", GID_COL), agg="count")
        if template == 3:
            cond1 = F.col("genre") == "Comedy"
            info2 = views.movieinfo.where(
                (F.col("info_type") == "genre") & (F.col("info") == "Comedy")
            )
        else:
            cond1 = F.col("country") == "USA"
            info2 = views.movieinfo.where(
                (F.col("info_type") == "country") & (F.col("info") == "USA")
            )
        p1 = q.provenance(m1.where(F.col("release_year") == param).where(cond1))
        p2 = q.provenance(
            m2.where(F.col("release_year") == param).join(
                info2.select("mid").distinct(), "mid"
            )
        )
        return ProblemCase(name, p1, p2, q, q, _MOVIE_MATCH, views.n1, views.n2)

    if template in (5, 6, 8):  # SUM / MAX / AVG gross in <year>
        agg = {5: "sum", 6: "max", 8: "avg"}[template]
        q = QuerySpec(("title", "release_year", GID_COL), agg=agg, agg_attr="gross")
        p1 = q.provenance(m1.where(F.col("release_year") == param))
        p2 = q.provenance(
            m2.where(F.col("release_year") == param).join(
                _info_value(views, "gross", "double"), "mid"
            )
        )
        return ProblemCase(name, p1, p2, q, q, _MOVIE_MATCH, views.n1, views.n2)

    if template in (7, 9):  # MAX / AVG runtime in <year>
        agg = {7: "max", 9: "avg"}[template]
        q = QuerySpec(("title", "release_year", GID_COL), agg=agg, agg_attr="runtimes")
        p1 = q.provenance(m1.where(F.col("release_year") == param))
        p2 = q.provenance(
            m2.where(F.col("release_year") == param).join(
                _info_value(views, "runtimes", "double"), "mid"
            )
        )
        return ProblemCase(name, p1, p2, q, q, _MOVIE_MATCH, views.n1, views.n2)

    if template == 10:  # actresses never in a <genre> movie: anti-join
        q = QuerySpec(("name", "dob", GID_COL), agg=None)
        genre_mids1 = views.movie1.where(F.col("genre") == param).select("mid")
        in_genre1 = views.movieactor.join(genre_mids1, "mid").select("pid").distinct()
        a1 = _person_name_df(views, views.actor).where(F.col("gender") == "f")
        p1 = q.provenance(a1.join(in_genre1, "pid", "left_anti"))
        genre_mids2 = views.movieinfo.where(
            (F.col("info_type") == "genre") & (F.col("info") == param)
        ).select("mid")
        in_genre2 = views.movieperson.join(genre_mids2, "mid").select("pid").distinct()
        appearing = views.movieperson.select("pid").distinct()
        a2 = (
            views.person.withColumn(GID_COL, F.col("pid").cast("string"))
            .where(F.col("gender") == "f")
            .join(appearing, "pid")
        )
        p2 = q.provenance(a2.join(in_genre2, "pid", "left_anti"))
        return ProblemCase(name, p1, p2, q, q, _PERSON_MATCH, views.n1, views.n2)

    raise ValueError(f"unknown template {template}")

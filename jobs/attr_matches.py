"""Figure 5 reproduction: the attribute matches used by every case.

These are inputs (the paper also treats them as given, derived offline by
schema-matching tools), so the "experiment" is printing the configured
matches of each dataset module. Usage: ``spark-submit jobs/attr_matches.py``.
"""
from __future__ import annotations

from repro.data.academic import academic_pair
from repro.data.imdb import imdb_case, imdb_views
from repro.eval.session import make_session

_PHI = {"lt": "⊑", "gt": "⊒", "eq": "≡"}


def describe(case) -> str:
    m = case.match
    return (
        f"{case.name}: ({', '.join(m.attrs1)}) {_PHI[m.phi.value]} "
        f"({', '.join(m.attrs2)})"
        + (f"  [numeric: {', '.join(m.numeric)}]" if m.numeric else "")
    )


def main() -> None:
    spark = make_session("attr-matches")
    print(describe(academic_pair(spark, "umass")))
    print(describe(academic_pair(spark, "osu")))
    views = imdb_views(spark, n_movies=50, seed=0)
    seen = set()
    for t in (1, 2):  # person-match and movie-match templates
        c = imdb_case(spark, views, t, 1990)
        d = describe(c)
        if d not in seen:
            seen.add(d)
            print(d)
    spark.stop()


if __name__ == "__main__":
    main()

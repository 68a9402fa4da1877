"""Figure 4 reproduction: dataset statistics table.

Prints, per evaluation case, N / |P| / |T|, |M_tuple|, |M*_tuple| (both
gold and the one explain3D derives), and |E| -> |E_S| after stage-3
summarization. Usage:

    spark-submit jobs/stats_table.py [n_movies]
"""
from __future__ import annotations

import sys

from repro.core.summarize import summarize
from repro.data.academic import academic_pair
from repro.data.imdb import imdb_case, imdb_views
from repro.eval.harness import build_case, run_method
from repro.eval.session import make_session


def stats_rows(spark, cases, label_fraction: float = 0.5):
    """One Figure-4 row per case."""
    rows = []
    for case in cases:
        run = build_case(spark, case, label_fraction=label_fraction)
        result, _ = run_method(spark, "EXPLAIN3D", run)
        patterns = summarize(
            result,
            run.p1_pdf,
            run.p2_pdf,
            run.case.match.attrs1,
            run.case.match.attrs2,
            strict=run.strict,
        )
        s = run.sizes
        rows.append(
            {
                "case": case.name,
                "N": f"{s['N1']}/{s['N2']}",
                "|P|": f"{s['P1']}/{s['P2']}",
                "|T|": f"{s['T1']}/{s['T2']}",
                "|M|": s["M"],
                "|M*| (gold)": s["M*_gold"],
                "|M*| (ours)": len(result.evidence),
                "|E| (gold)": s["E_gold"],
                "|E| (ours)": result.n_explanations,
                "|E_S|": len(patterns),
            }
        )
    return rows


def print_table(rows) -> None:
    cols = list(rows[0].keys())
    print("| " + " | ".join(cols) + " |")
    print("|" + "---|" * len(cols))
    for r in rows:
        print("| " + " | ".join(str(r[c]) for c in cols) + " |")


def main(n_movies: int = 2000) -> None:
    spark = make_session("stats-table")
    cases = [academic_pair(spark, "umass"), academic_pair(spark, "osu")]
    views = imdb_views(spark, n_movies=n_movies, seed=0)
    for t in range(1, 11):
        param = "Comedy" if t == 10 else 1990
        cases.append(imdb_case(spark, views, t, param))
    print_table(stats_rows(spark, cases))
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 2000)

"""Figure 7 reproduction: accuracy + runtime on the IMDb templates.

Runs every method over the 10 query templates (a few instantiations each,
averaged — the paper uses 10 instantiations per template) and prints
per-template and overall rows. Usage:

    spark-submit jobs/imdb_table.py [n_movies] [n_instantiations]
"""
from __future__ import annotations

import sys
from collections import defaultdict

import numpy as np

from repro.data.imdb import GENRES, imdb_case, imdb_views
from repro.eval.harness import build_case, run_methods
from repro.eval.session import make_session

METHODS = (
    "EXPLAIN3D",
    "EXPLAIN3D-BATCH1000",
    "GREEDY",
    "THRESHOLD-0.9",
    "RSWOOSH",
    "EXACTCOVER",
    "FORMALEXP-TOP15",
)


def imdb_rows(spark, views, n_inst: int, templates=range(1, 11)):
    """All method rows over sampled template instantiations."""
    rng = np.random.default_rng(42)
    rows = []
    for t in templates:
        made = 0
        tried = 0
        while made < n_inst and tried < 4 * n_inst + 8:
            tried += 1
            param = (
                str(rng.choice(GENRES))
                if t == 10
                else int(rng.integers(1970, 2004))
            )
            case = imdb_case(spark, views, t, param)
            if case.p1.count() == 0 or case.p2.count() == 0:
                continue  # empty instantiation (sparse year), resample
            made += 1
            run = build_case(spark, case, label_fraction=0.5)
            rows += run_methods(spark, run, methods=METHODS)
            if t == 10:
                break  # genre space is small; one instantiation suffices
    return rows


def print_avg(rows) -> None:
    by_m = defaultdict(list)
    for r in rows:
        by_m[r.method].append(r)
    print("| method | expl P | expl R | expl F | evid P | evid R | evid F | solve s | total s |")
    print("|" + "---|" * 9)
    for m, rs in by_m.items():
        def avg(f):
            return sum(f(r) for r in rs) / len(rs)

        print(
            f"| {m} | {avg(lambda r: r.expl.precision):.3f} | "
            f"{avg(lambda r: r.expl.recall):.3f} | {avg(lambda r: r.expl.f1):.3f} | "
            f"{avg(lambda r: r.evid.precision):.3f} | {avg(lambda r: r.evid.recall):.3f} | "
            f"{avg(lambda r: r.evid.f1):.3f} | {avg(lambda r: r.solve_seconds):.3f} | "
            f"{avg(lambda r: r.total_seconds):.2f} |"
        )


def print_per_template(rows) -> None:
    by_tm = defaultdict(list)
    for r in rows:
        template = r.case.split("(")[0]
        by_tm[(template, r.method)].append(r)
    print("| template | method | expl F | evid F | solve s |")
    print("|" + "---|" * 5)
    for (t, m), rs in sorted(by_tm.items()):
        f = sum(r.expl.f1 for r in rs) / len(rs)
        e = sum(r.evid.f1 for r in rs) / len(rs)
        s = sum(r.solve_seconds for r in rs) / len(rs)
        print(f"| {t} | {m} | {f:.3f} | {e:.3f} | {s:.3f} |")


def main(n_movies: int = 2000, n_inst: int = 3) -> None:
    spark = make_session("imdb-table")
    views = imdb_views(spark, n_movies=n_movies, seed=0)
    rows = imdb_rows(spark, views, n_inst)
    print_per_template(rows)
    print()
    print_avg(rows)
    spark.stop()


if __name__ == "__main__":
    main(
        int(sys.argv[1]) if len(sys.argv) > 1 else 2000,
        int(sys.argv[2]) if len(sys.argv) > 2 else 3,
    )

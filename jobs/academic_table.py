"""Figure 6 reproduction: accuracy + runtime on the academic pairs.

Prints explanation P/R/F, evidence P/R/F, and times for all Section 5.1.3
methods on the UMass-like and OSU-like pairs. Usage:

    spark-submit jobs/academic_table.py
"""
from __future__ import annotations

from repro.data.academic import academic_pair
from repro.eval.harness import ALL_METHODS, build_case, run_methods
from repro.eval.session import make_session


def print_rows(rows) -> None:
    hdr = (
        "| case | method | expl P | expl R | expl F | evid P | evid R | "
        "evid F | solve s | total s |"
    )
    print(hdr)
    print("|" + "---|" * 10)
    for r in rows:
        print(
            f"| {r.case} | {r.method} | {r.expl.precision:.3f} | "
            f"{r.expl.recall:.3f} | {r.expl.f1:.3f} | {r.evid.precision:.3f} | "
            f"{r.evid.recall:.3f} | {r.evid.f1:.3f} | {r.solve_seconds:.3f} | "
            f"{r.total_seconds:.2f} |"
        )


def main() -> None:
    spark = make_session("academic-table")
    rows = []
    for preset in ("umass", "osu"):
        run = build_case(spark, academic_pair(spark, preset), label_fraction=0.5)
        rows += run_methods(spark, run, methods=ALL_METHODS)
    print_rows(rows)
    spark.stop()


if __name__ == "__main__":
    main()

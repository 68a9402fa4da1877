"""Evaluation harness: run all Section 5.1.3 methods on a problem case.

``build_case`` executes stage 1 once (canonicalization, similarity join,
calibration — the shared >98%-of-runtime step of the paper's timing
analysis) and derives the gold standard from the generator's clean ids.
``run_methods`` then executes each requested method on the prepared
inputs and scores it, producing one row per method — the contents of the
paper's Figures 6 and 7.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession

from repro.baselines.exactcover import exactcover_explain
from repro.baselines.formalexp import formalexp_explain
from repro.baselines.greedy import greedy_explain
from repro.baselines.rswoosh import rswoosh_explain
from repro.baselines.threshold import threshold_explain
from repro.core.canonical import canonicalize
from repro.core.config import DEFAULT_CONFIG, ExplainConfig
from repro.core.matches import Phi
from repro.core.pipeline import ExplainProblem, ExplainResult, explain3d
from repro.core.prob_map import calibrate
from repro.core.similarity import pairwise_similarity
from repro.data.base import GID_COL, ProblemCase
from repro.data.gold import Gold, gold_standard
from repro.eval.metrics import PRF, evidence_prf, explanation_prf

ALL_METHODS = (
    "EXPLAIN3D",
    "EXPLAIN3D-BATCH100",
    "GREEDY",
    "THRESHOLD-0.9",
    "RSWOOSH",
    "EXACTCOVER",
    "FORMALEXP-TOP15",
)


@dataclass
class CaseRun:
    """Stage-1 outputs shared by every method on one case."""

    case: ProblemCase
    problem: ExplainProblem
    gold: Gold
    sims_pdf: object  # pandas: key1, key2, sim
    matches_pdf: object  # pandas: key1, key2, p
    t1_pdf: object  # pandas canonical side 1 (key, impact, ...)
    t2_pdf: object
    p1_pdf: object  # pandas provenance side 1
    p2_pdf: object
    strict: bool
    mapping_seconds: float  # stage-1 wall time (shared across methods)

    @property
    def sizes(self) -> dict:
        """The Figure 4 statistics for this case."""
        return {
            "N1": self.case.n1,
            "N2": self.case.n2,
            "P1": len(self.p1_pdf),
            "P2": len(self.p2_pdf),
            "T1": len(self.t1_pdf),
            "T2": len(self.t2_pdf),
            "M": len(self.matches_pdf),
            "M*_gold": len(self.gold.pairs),
            "E_gold": self.gold.n_explanations,
        }


def build_case(
    spark: SparkSession,
    case: ProblemCase,
    *,
    cfg: ExplainConfig = DEFAULT_CONFIG,
    label_fraction: float = 0.5,
) -> CaseRun:
    """Run stage 1 and assemble everything the methods consume."""
    t0 = time.perf_counter()
    strict = not (case.q1.additive and case.q2.additive)
    t1 = canonicalize(
        case.p1, case.match.attrs1, additive=not strict, gold_col=GID_COL
    ).cache()
    t2 = canonicalize(
        case.p2, case.match.attrs2, additive=not strict, gold_col=GID_COL
    ).cache()
    gold = gold_standard(t1, t2, cfg)
    sims = pairwise_similarity(t1, t2, case.match).cache()
    matches = calibrate(
        sims, gold.pairs_df(spark), buckets=cfg.buckets, label_fraction=label_fraction
    )
    sims_pdf = sims.toPandas()
    matches_pdf = matches.toPandas()
    t1_pdf = t1.toPandas()
    t2_pdf = t2.toPandas()
    p1_pdf = case.p1.toPandas()
    p2_pdf = case.p2.toPandas()
    phi = Phi.EQ if strict else case.match.phi
    problem = ExplainProblem(t1, t2, matches, phi)
    return CaseRun(
        case=case,
        problem=problem,
        gold=gold,
        sims_pdf=sims_pdf,
        matches_pdf=matches_pdf,
        t1_pdf=t1_pdf,
        t2_pdf=t2_pdf,
        p1_pdf=p1_pdf,
        p2_pdf=p2_pdf,
        strict=strict,
        mapping_seconds=time.perf_counter() - t0,
    )


def run_method(
    spark: SparkSession,
    method: str,
    run: CaseRun,
    *,
    cfg: ExplainConfig = DEFAULT_CONFIG,
) -> tuple[ExplainResult, float]:
    """Execute one method; returns (result, solve seconds)."""
    t0 = time.perf_counter()
    if method == "EXPLAIN3D":
        result = explain3d(spark, run.problem, cfg=cfg)
    elif method.startswith("EXPLAIN3D-BATCH"):
        batch = int(method.removeprefix("EXPLAIN3D-BATCH"))
        result = explain3d(spark, run.problem, cfg=cfg, batch=batch)
    elif method == "GREEDY":
        result = greedy_explain(
            run.t1_pdf, run.t2_pdf, run.matches_pdf, run.problem.phi, cfg
        )
    elif method.startswith("THRESHOLD"):
        thr = float(method.split("-")[1]) if "-" in method else 0.9
        result = threshold_explain(
            run.t1_pdf, run.t2_pdf, run.matches_pdf, threshold=thr
        )
    elif method == "RSWOOSH":
        result = rswoosh_explain(run.t1_pdf, run.t2_pdf, run.sims_pdf)
    elif method == "EXACTCOVER":
        result = exactcover_explain(run.t1_pdf, run.t2_pdf, run.matches_pdf)
    elif method.startswith("FORMALEXP"):
        result = formalexp_explain(
            run.p1_pdf,
            run.p2_pdf,
            list(run.case.match.attrs1),
            list(run.case.match.attrs2),
        )
        if run.strict:
            # Strict canonical keys carry a per-group row suffix;
            # FORMALEXP derived plain keys, so re-suffix (singleton groups).
            result.delta = sorted((s, k + "␟#1") for s, k in result.delta)
    else:
        raise ValueError(f"unknown method {method}")
    return result, time.perf_counter() - t0


@dataclass
class MethodRow:
    """One table row: method accuracy + runtime on a case."""

    case: str
    method: str
    expl: PRF
    evid: PRF
    solve_seconds: float
    total_seconds: float
    n_explanations: int
    n_evidence: int


def run_methods(
    spark: SparkSession,
    run: CaseRun,
    methods=ALL_METHODS,
    *,
    cfg: ExplainConfig = DEFAULT_CONFIG,
) -> list[MethodRow]:
    """Score every method on one prepared case."""
    rows = []
    for m in methods:
        result, secs = run_method(spark, m, run, cfg=cfg)
        rows.append(
            MethodRow(
                case=run.case.name,
                method=m,
                expl=explanation_prf(result, run.gold),
                evid=evidence_prf(result, run.gold),
                solve_seconds=secs,
                total_seconds=secs + run.mapping_seconds,
                n_explanations=result.n_explanations,
                n_evidence=len(result.evidence),
            )
        )
    return rows

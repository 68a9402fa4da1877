"""The 3-stage explain3D driver (Sections 3–4) on Spark.

Stage 1 (``prepare_problem``) builds canonical relations with Catalyst
plans and derives the initial probabilistic tuple mapping with the
token-blocking similarity join + bucket calibration.

Stage 2 (``explain3d``) partitions the bipartite match graph — maximal
connected components for the basic algorithm (``batch=None``, the paper's
NOOPT), or the smart partitioner (``batch=100/1000``) — and solves every
sub-MILP *in parallel on executors*: tuples and matches are cogrouped by
partition id and each group runs the exact component solver inside
``applyInPandas``. Matches cut by the partitioner are excluded from the
evidence and contribute their ``log(1-p)`` on the driver.

Stage 3 lives in ``repro.core.summarize``.

Partitioning metadata (keys, impacts, match probabilities — not the raw
datasets) is collected to the driver to run the graph algorithms; the raw
provenance never leaves Spark. This mirrors the paper's setting, where
stage 2 runs on a single CPLEX host while the mapping generation is the
data-heavy phase.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.canonical import KEY_COL, canonicalize
from repro.core.config import DEFAULT_CONFIG, ExplainConfig, clip_p
from repro.core.matches import AttributeMatch, Phi
from repro.core.prob_map import calibrate
from repro.core.queries import IMPACT_COL, QuerySpec
from repro.core.scoring import ComponentProblem, CTuple, Edge
from repro.core.similarity import pairwise_similarity
from repro.milp.components import connected_components_local
from repro.milp.solver import solve_problem
from repro.partition.smart import smart_partition

_RESULT_SCHEMA = (
    "kind string, side int, key string, key2 string, p double, old double, new double"
)


@dataclass
class ExplainProblem:
    """A prepared EXP-3D instance: canonical relations + initial mapping."""

    t1: DataFrame
    t2: DataFrame
    matches: DataFrame  # key1, key2, p
    phi: Phi


@dataclass
class ExplainResult:
    """Explanations ``E = (Delta, delta | M*_tuple)`` plus bookkeeping."""

    evidence: list[tuple[str, str]]
    delta: list[tuple[int, str]]  # (side, key): provenance-based explanations
    value_changes: list[tuple[int, str, float, float]]  # side, key, old, new
    value_components: list[frozenset[tuple[int, str]]]
    score: float
    n_partitions: int = 1

    @property
    def n_explanations(self) -> int:
        """|E| = |Delta| + |delta|."""
        return len(self.delta) + len(self.value_changes)


def prepare_problem(
    p1: DataFrame,
    p2: DataFrame,
    q1: QuerySpec,
    q2: QuerySpec,
    match: AttributeMatch,
    gold_pairs: DataFrame,
    *,
    cfg: ExplainConfig = DEFAULT_CONFIG,
    gold_col: str | None = None,
    label_fraction: float = 0.5,
) -> ExplainProblem:
    """Stage 1: canonicalize both provenances and calibrate the mapping.

    ``gold_pairs`` — true canonical-key matches used only to label the
    similarity buckets (Section 5.1.2's labeled sample).
    """
    strict = not (q1.additive and q2.additive)
    t1 = canonicalize(p1, match.attrs1, additive=not strict, gold_col=gold_col)
    t2 = canonicalize(p2, match.attrs2, additive=not strict, gold_col=gold_col)
    sims = pairwise_similarity(t1, t2, match)
    matches = calibrate(
        sims, gold_pairs, buckets=cfg.buckets, label_fraction=label_fraction
    )
    phi = Phi.EQ if strict else match.phi
    return ExplainProblem(t1, t2, matches, phi)


def _solve_group_fn(phi: Phi, cfg: ExplainConfig):
    """Build the cogrouped applyInPandas solver for one problem."""

    def solve(tuples_pdf: pd.DataFrame, edges_pdf: pd.DataFrame) -> pd.DataFrame:
        # Canonical ordering: cogroup delivery order is
        # nondeterministic, and equal-probability matches (a calibration
        # artifact — bucketing quantizes p) make the optimum tie-break on
        # input order. Sort so reruns give identical explanations.
        tuples_pdf = tuples_pdf.sort_values(["side", "key"])
        edges_pdf = edges_pdf.sort_values(["key1", "key2", "p"])
        tuples = [
            CTuple(int(r.side), r.key, float(r.impact))
            for r in tuples_pdf.itertuples()
        ]
        idx = {(t.side, t.key): i for i, t in enumerate(tuples)}
        edges = [
            Edge(idx[(1, r.key1)], idx[(2, r.key2)], float(r.p))
            for r in edges_pdf.itertuples()
            if (1, r.key1) in idx and (2, r.key2) in idx
        ]
        sol = solve_problem(tuples, edges, phi, cfg)
        rows: list[tuple] = []
        for k in sol.selected:
            e = edges[k]
            rows.append(
                ("evidence", 0, tuples[e.i].key, tuples[e.j].key, e.p, None, None)
            )
        for i in sol.removed:
            t = tuples[i]
            rows.append(("delta", t.side, t.key, None, None, t.impact, None))
        for i, new in sol.value_changes.items():
            t = tuples[i]
            rows.append(("value", t.side, t.key, None, None, t.impact, new))
        rows.append(("score", 0, None, None, None, None, sol.score))
        return pd.DataFrame(
            rows, columns=["kind", "side", "key", "key2", "p", "old", "new"]
        )

    return solve


def explain3d(
    spark: SparkSession,
    problem: ExplainProblem,
    *,
    cfg: ExplainConfig = DEFAULT_CONFIG,
    batch: int | None = None,
) -> ExplainResult:
    """Stage 2: partition the match graph and solve sub-MILPs in parallel.

    batch=None — the basic algorithm (maximal connected components);
    batch=B — smart partitioning with ``L_max = B``, ``k = ceil(n/B)``.
    """
    # Sorted collection keeps partition assignment and tie-breaking
    # deterministic across runs (Spark collect order is not).
    tp1 = problem.t1.select(KEY_COL, IMPACT_COL).toPandas().sort_values(KEY_COL)
    tp2 = problem.t2.select(KEY_COL, IMPACT_COL).toPandas().sort_values(KEY_COL)
    mp = (
        problem.matches.select("key1", "key2", "p")
        .toPandas()
        .sort_values(["key1", "key2"])
        .reset_index(drop=True)
    )

    keys = [(1, k) for k in tp1[KEY_COL]] + [(2, k) for k in tp2[KEY_COL]]
    impacts = np.concatenate(
        [tp1[IMPACT_COL].to_numpy(float), tp2[IMPACT_COL].to_numpy(float)]
    )
    index = {sk: i for i, sk in enumerate(keys)}
    known = mp.apply(
        lambda r: (1, r.key1) in index and (2, r.key2) in index, axis=1
    ) if len(mp) else pd.Series(dtype=bool)
    mp = mp[known] if len(mp) else mp
    edge_idx = (
        np.array(
            [[index[(1, a)], index[(2, b)]] for a, b in zip(mp.key1, mp.key2)],
            dtype=np.int64,
        )
        if len(mp)
        else np.zeros((0, 2), dtype=np.int64)
    )
    edge_p = mp.p.to_numpy(float) if len(mp) else np.zeros(0)

    if batch is None:
        comp = connected_components_local(
            len(keys), [(int(a), int(b)) for a, b in edge_idx]
        )
        pid_of_tuple = np.asarray(comp, dtype=np.int64)
        cut_edges = np.zeros(0, dtype=np.int64)
        n_partitions = len(set(comp))
    else:
        part = smart_partition(len(keys), edge_idx, edge_p, cfg, batch)
        pid_of_tuple, cut_edges, n_partitions = (
            part.pid_of_tuple,
            part.cut_edges,
            part.n_partitions,
        )

    tuples_pdf = pd.DataFrame(
        {
            "pid": pid_of_tuple,
            "side": [s for s, _ in keys],
            "key": [k for _, k in keys],
            "impact": impacts,
        }
    )
    keep = np.ones(len(mp), dtype=bool)
    keep[cut_edges] = False
    edges_pdf = pd.DataFrame(
        {
            "pid": pid_of_tuple[edge_idx[keep, 0]] if len(mp) else [],
            "key1": mp.key1.to_numpy()[keep] if len(mp) else [],
            "key2": mp.key2.to_numpy()[keep] if len(mp) else [],
            "p": edge_p[keep] if len(mp) else [],
        }
    )
    cut_score = float(sum(math.log(1.0 - clip_p(p)) for p in edge_p[~keep]))

    t_df = spark.createDataFrame(tuples_pdf)
    e_df = (
        spark.createDataFrame(edges_pdf)
        if len(edges_pdf)
        else spark.createDataFrame([], "pid long, key1 string, key2 string, p double")
    )
    out = (
        t_df.groupBy("pid")
        .cogroup(e_df.groupBy("pid"))
        .applyInPandas(_solve_group_fn(problem.phi, cfg), schema=_RESULT_SCHEMA)
        .toPandas()
    )
    return _decode(out, cut_score, n_partitions)


def _decode(out: pd.DataFrame, cut_score: float, n_partitions: int) -> ExplainResult:
    evidence = [
        (r.key, r.key2) for r in out[out.kind == "evidence"].itertuples()
    ]
    delta = [(int(r.side), r.key) for r in out[out.kind == "delta"].itertuples()]
    value_changes = [
        (int(r.side), r.key, float(r.old), float(r.new))
        for r in out[out.kind == "value"].itertuples()
    ]
    score = cut_score + float(out[out.kind == "score"].new.sum())
    return ExplainResult(
        evidence,
        sorted(delta),
        value_changes,
        value_components_of(evidence, value_changes),
        score,
        n_partitions,
    )


def value_components_of(
    evidence: list[tuple[str, str]],
    value_changes: list[tuple[int, str, float, float]],
) -> list[frozenset[tuple[int, str]]]:
    """Group each value change with its evidence-connected component.

    Used by the metrics: a predicted value-based explanation is scored at
    the granularity of the component containing the changed tuple.
    """
    parent: dict[tuple[int, str], tuple[int, str]] = {}

    def find(x):
        parent.setdefault(x, x)
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for k1, k2 in evidence:
        a, b = find((1, k1)), find((2, k2))
        if a != b:
            parent[a] = b
    members: dict[tuple[int, str], set] = {}
    for k1, k2 in evidence:
        members.setdefault(find((1, k1)), set()).update({(1, k1), (2, k2)})
    comps = []
    for side, key, _, _ in value_changes:
        root = find((side, key))
        comps.append(frozenset(members.get(root, set()) | {(side, key)}))
    return comps

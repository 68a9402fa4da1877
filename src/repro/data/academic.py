"""Academic dataset pairs replicating Section 5.1.1's structure.

Two presets mirror the paper's pairs (sizes from Figure 4):

- ``umass``: Major(major, degree, school) with 113 rows over 95 programs
  vs. an NCES-like School/Stats pair whose target university has 81
  program rows; 71 programs are shared (the paper's ``|M*_tuple|`` = 71).
- ``osu``: 282 rows over 206 programs vs. 153 NCES rows, 140 shared.

Discrepancy mechanisms, as documented in the paper's analysis:

- side-1-only programs, mostly with degree "Associate" (the pattern the
  summarizer should find);
- multi-degree majors counted twice by Q1 while NCES lists
  ``bach_degr = 1`` (gold value-based explanations);
- word-level renames in NCES program names, including a few full renames
  that no similarity join can recover (the paper's "Foodservice Systems
  Administration" vs "Food Business Management" failure mode);
- thousands of other-university rows in Stats that the query filters out
  (they inflate N but not the provenance).

Q1 = COUNT(major) over Major; Q2 = SUM(bach_degr) over School join Stats
filtered to the target university. Attribute match per Figure 5:
``(major) <= (program)``.
"""
from __future__ import annotations

import zlib

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import SparkSession

from repro.core.matches import Phi, attr_match
from repro.core.queries import QuerySpec
from repro.data.base import GID_COL, ProblemCase
from repro.data.errors import make_vocab

PRESETS = {
    # shared, only1, only2, multi-degree rows, value mismatches, other univs
    "umass": dict(shared=71, only1=24, only2=10, multi=18, mismatch=10),
    "osu": dict(shared=140, only1=66, only2=13, multi=76, mismatch=20),
}

_DEGREES = ["B.S.", "B.A."]
_SCHOOLS = [
    "engineering", "business", "natural sciences", "humanities",
    "social sciences", "education", "nursing", "public health",
]


def academic_pair(
    spark: SparkSession,
    preset: str = "umass",
    *,
    seed: int = 0,
    rename_frac: float = 0.2,
    full_rename_frac: float = 0.06,
    n_other_univs: int = 49,
    programs_per_other: int = 80,
    pool_size: int = 60,
) -> ProblemCase:
    """Generate one academic dataset pair with a known gold structure."""
    cfgp = PRESETS[preset]
    # zlib.crc32, not hash(): str hashing is salted per process and would
    # make the "same" dataset differ between runs.
    rng = np.random.default_rng(seed + zlib.crc32(preset.encode()) % 1000)
    pool = make_vocab(pool_size, rng, word_len=6)

    def name(k: int) -> str:
        words = rng.choice(pool, size=2 + k % 2, replace=False)
        return " ".join(words)

    n_prog1 = cfgp["shared"] + cfgp["only1"]
    prog_names = []
    seen: set[str] = set()
    i = 0
    while len(prog_names) < n_prog1 + cfgp["only2"]:
        nm = name(i)
        i += 1
        if nm not in seen:
            seen.add(nm)
            prog_names.append(nm)
    side1_names = prog_names[:n_prog1]  # shared first, then only1
    only2_names = prog_names[n_prog1:]

    # ---- side 1: the Major table --------------------------------------
    rows1 = []
    degree_counts = np.ones(n_prog1, dtype=int)
    multi_idx = rng.choice(cfgp["shared"], size=cfgp["multi"], replace=False)
    degree_counts[multi_idx] += 1
    for p in range(n_prog1):
        is_only1 = p >= cfgp["shared"]
        for d in range(degree_counts[p]):
            # 3 of 4 side-1-only programs are Associate-degree ones — the
            # dominant pattern stage 3 should summarize (deterministic so
            # the fraction is stable at every preset size).
            if is_only1 and p % 4 != 0:
                degree = "Associate"
            else:
                degree = _DEGREES[d % 2]
            rows1.append(
                {
                    "major": side1_names[p],
                    "degree": degree,
                    "school": _SCHOOLS[p % len(_SCHOOLS)],
                    GID_COL: f"prog{p}",
                }
            )
    major_pdf = pd.DataFrame(rows1)

    # ---- side 2: School + Stats ---------------------------------------
    target_univ = "State University"
    schools = [{"id": 0, "univ_name": target_univ, "city": "Amherst"}]
    stats = []
    mismatch_set = set(
        rng.choice(multi_idx, size=min(cfgp["mismatch"], len(multi_idx)), replace=False)
    )
    used2: set[str] = set(side1_names) | set(only2_names)
    for p in range(cfgp["shared"]):
        nm = side1_names[p]
        r = rng.random()
        if r < full_rename_frac:
            while True:  # unrecoverable rename; avoid canonical collisions
                words = rng.choice(pool, size=len(nm.split()), replace=False)
                cand = " ".join(words)
                if cand not in used2:
                    nm = cand
                    break
        elif r < full_rename_frac + rename_frac:
            while True:
                toks = nm.split()
                toks[int(rng.integers(len(toks)))] = pool[int(rng.integers(len(pool)))]
                cand = " ".join(toks)
                if cand not in used2:
                    nm = cand
                    break
        used2.add(nm)
        bach = 1 if p in mismatch_set else int(degree_counts[p])
        stats.append({"id": 0, "program": nm, "bach_degr": bach, GID_COL: f"prog{p}"})
    for j, nm in enumerate(only2_names):
        stats.append(
            {"id": 0, "program": nm, "bach_degr": int(rng.integers(1, 3)),
             GID_COL: f"only2_{j}"}
        )
    for u in range(1, n_other_univs + 1):
        schools.append({"id": u, "univ_name": f"univ {u}", "city": f"city {u}"})
        for _ in range(programs_per_other):
            stats.append(
                {
                    "id": u,
                    "program": " ".join(rng.choice(pool, size=2, replace=False)),
                    "bach_degr": int(rng.integers(1, 4)),
                    GID_COL: "other",
                }
            )
    school_df = spark.createDataFrame(pd.DataFrame(schools))
    stats_df = spark.createDataFrame(pd.DataFrame(stats))

    q1 = QuerySpec(("major", "degree", "school", GID_COL), agg="count")
    q2 = QuerySpec(("program", GID_COL), agg="sum", agg_attr="bach_degr")
    p1 = q1.provenance(spark.createDataFrame(major_pdf))
    joined = stats_df.join(school_df, "id").where(
        F.col("univ_name") == target_univ
    )
    p2 = q2.provenance(joined)
    return ProblemCase(
        name=f"academic-{preset}",
        p1=p1,
        p2=p2,
        q1=q1,
        q2=q2,
        match=attr_match("major", Phi.LT, "program"),
        n1=len(major_pdf),
        n2=len(stats),
    )

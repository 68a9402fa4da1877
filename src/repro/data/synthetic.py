"""Section 5.3's synthetic data generator.

Schema on both sides: ``Table(id, match_attr, val)`` with
``(match_attr) == (match_attr)`` and ``SUM(val)`` queries. Generation:

1. create ``n`` tuples with ``match_attr`` a phrase of 5 random words from
   a vocabulary of ``v`` words and ``val`` uniform in [1, 10]; copy to
   both datasets;
2. randomly drop ``d * n`` tuples (uniformly) from dataset 2 — these
   become gold provenance-based explanations;
3. randomly corrupt ``val`` on ``d * n`` of the surviving dataset-2
   tuples — gold value-based explanations.

The vocabulary size controls the number of spurious candidate matches:
small ``v`` makes unrelated phrases share words, which is exactly the
knob Figure 8c turns.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.matches import Phi, attr_match
from repro.core.queries import QuerySpec
from repro.data.base import GID_COL, ProblemCase
from repro.data.errors import make_vocab


def synthetic_pair(
    spark: SparkSession,
    *,
    n: int = 1000,
    d: float = 0.2,
    v: int = 1000,
    seed: int = 0,
    words_per_phrase: int = 5,
) -> ProblemCase:
    """Build one synthetic dataset pair with difference ratio ``d``."""
    rng = np.random.default_rng(seed)
    vocab = np.array(make_vocab(v, rng))
    phrases = np.array(
        [" ".join(row) for row in vocab[rng.integers(0, v, (n, words_per_phrase))]]
    )
    vals = rng.integers(1, 11, n).astype(float)
    base = pd.DataFrame({"id": np.arange(n), "match_attr": phrases, "val": vals})
    # The clean identity is the phrase itself: canonicalization groups by
    # match_attr, so colliding phrases legitimately merge on both sides.
    base[GID_COL] = base["match_attr"]

    d1 = base.copy()
    d2 = base.copy()
    n_diff = int(round(d * n))
    dropped = rng.choice(n, size=min(n_diff, n), replace=False)
    d2 = d2.drop(index=dropped).reset_index(drop=True)
    if len(d2):
        corrupt = rng.choice(
            len(d2), size=min(n_diff, len(d2)), replace=False
        )
        bump = rng.integers(1, 6, len(corrupt)).astype(float)
        d2.loc[corrupt, "val"] = d2.loc[corrupt, "val"] + bump

    q = QuerySpec(("match_attr", GID_COL), agg="sum", agg_attr="val")
    p1 = q.provenance(spark.createDataFrame(d1[["match_attr", "val", GID_COL]]))
    p2 = q.provenance(spark.createDataFrame(d2[["match_attr", "val", GID_COL]]))
    return ProblemCase(
        name=f"synthetic(n={n},d={d},v={v})",
        p1=p1,
        p2=p2,
        q1=q,
        q2=q,
        match=attr_match("match_attr", Phi.EQ, "match_attr"),
        n1=n,
        n2=len(d2),
    )

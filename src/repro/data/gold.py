"""Gold standards derived from clean identities (Section 5.1.1).

Generators thread a clean identity (``gid``) through every provenance
tuple; canonicalization carries it as ``gold_key``. The gold standard then
falls out of a join:

- gold evidence = canonical tuples on both sides sharing a ``gold_key``;
- gold provenance-based explanations (Delta) = canonical tuples whose
  ``gold_key`` appears on one side only;
- gold value-based explanations = connected components of the gold
  evidence whose impact sums disagree (component granularity — see
  DESIGN.md §5 on the side-symmetry of value changes).

This is exactly Definition 3.4 instantiated with the generator's ground
truth, mirroring how the paper records view-generation losses and BART
errors as its optimal explanations.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.canonical import GOLD_COL, KEY_COL
from repro.core.config import ExplainConfig
from repro.core.queries import IMPACT_COL


@dataclass
class Gold:
    """Ground-truth evidence and explanations for one problem case."""

    pairs: set[tuple[str, str]]
    delta: set[tuple[int, str]]
    value_components: list[frozenset[tuple[int, str]]]

    @property
    def n_explanations(self) -> int:
        return len(self.delta) + len(self.value_components)

    def pairs_df(self, spark: SparkSession) -> DataFrame:
        """Gold evidence as a DataFrame for similarity-bucket labeling."""
        if not self.pairs:
            return spark.createDataFrame([], "key1 string, key2 string")
        pdf = pd.DataFrame(sorted(self.pairs), columns=["key1", "key2"])
        return spark.createDataFrame(pdf)


def gold_standard(
    t1: DataFrame, t2: DataFrame, cfg: ExplainConfig | None = None
) -> Gold:
    """Derive the gold standard from two canonical relations with gold keys."""
    cfg = cfg or ExplainConfig()
    g1 = t1.select(KEY_COL, IMPACT_COL, GOLD_COL).toPandas()
    g2 = t2.select(KEY_COL, IMPACT_COL, GOLD_COL).toPandas()
    # Pair tuples sharing a gold key; if canonicalization ever leaves
    # several tuples with the same gold key on a side (strict queries over
    # noisy duplicates), pair them off in deterministic key order.
    g1 = g1.sort_values(KEY_COL).reset_index(drop=True)
    g2 = g2.sort_values(KEY_COL).reset_index(drop=True)
    g1["rank"] = g1.groupby(GOLD_COL).cumcount()
    g2["rank"] = g2.groupby(GOLD_COL).cumcount()
    merged = g1.merge(
        g2, on=[GOLD_COL, "rank"], how="outer", suffixes=("_1", "_2"), indicator=True
    ).rename(columns={"_merge": "origin"})  # itertuples mangles _-prefixed names

    pairs: set[tuple[str, str]] = set()
    delta: set[tuple[int, str]] = set()
    comp_sums: dict[str, tuple[float, float, set]] = {}
    for r in merged.itertuples():
        if r.origin == "left_only":
            delta.add((1, r.key_1))
        elif r.origin == "right_only":
            delta.add((2, r.key_2))
        else:
            pairs.add((r.key_1, r.key_2))
            s1, s2, members = comp_sums.get(r.gold_key, (0.0, 0.0, set()))
            comp_sums[r.gold_key] = (
                s1 + float(r.impact_1),
                s2 + float(r.impact_2),
                members | {(1, r.key_1), (2, r.key_2)},
            )
    value_components = [
        frozenset(members)
        for s1, s2, members in comp_sums.values()
        if abs(s1 - s2) > cfg.impact_tol
    ]
    return Gold(pairs, delta, value_components)

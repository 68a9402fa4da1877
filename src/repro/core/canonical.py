"""Canonicalization (Definition 3.1) as a Catalyst plan.

``T = pi_{A,I}( G_{A, SUM(I)} (P) )`` — group the provenance relation by
the matching attributes and sum impacts. Queries that require a strict
one-to-one mapping (AVG/MAX/MIN) keep their provenance unchanged; we only
attach the canonical key (disambiguated with a deterministic suffix when
two provenance tuples share matching-attribute values).

Every canonical relation carries:

- ``key``: string identity of the tuple — the matching-attribute values
  joined with an unprintable separator (plus ``#n`` suffix for strict
  queries). This key is what evidence mappings and explanations refer to.
- ``impact``: the (consolidated) impact ``I``.
- the matching-attribute columns themselves (similarity runs on them).
- optionally ``gold_key``: generator-provided clean identity used to build
  gold standards (MIN over the group; never read by the solvers).
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, Window

from repro.core.queries import IMPACT_COL

KEY_COL = "key"
GOLD_COL = "gold_key"
KEY_SEP = "␟"  # symbol-for-unit-separator: never occurs in data


def canonical_key_series(
    pdf, attrs: list[str] | tuple[str, ...], *, strict: bool = False
):
    """Pandas mirror of the canonical ``key`` column.

    Baselines that work on collected provenance (FORMALEXP) need to refer
    to explanations by the same keys the Spark canonicalization produces;
    this replicates ``_key_expr`` for a pandas frame. Only sound for
    attribute types whose Spark string cast matches Python ``str`` (
    strings and integers — all matching attributes in this repo).
    """
    out = None
    for a in list(attrs):
        col = pdf[a].map(lambda v: "␀" if v is None else str(v))
        out = col if out is None else out + KEY_SEP + col
    if strict:
        # Strict canonicalization suffixes a per-group row number; for
        # baseline key reconstruction, assume singleton groups (#1).
        out = out + KEY_SEP + "#1"
    return out


def _key_expr(attrs: list[str]):
    parts = []
    for a in attrs:
        parts.append(F.coalesce(F.col(a).cast("string"), F.lit("␀")))
    return F.concat_ws(KEY_SEP, *parts)


def canonicalize(
    provenance: DataFrame,
    attrs: list[str] | tuple[str, ...],
    *,
    additive: bool = True,
    gold_col: str | None = None,
) -> DataFrame:
    """Build the canonical relation ``T`` of a provenance relation ``P``.

    attrs: the matching attributes of this side (from ``M_attr``).
    additive: False for AVG/MAX/MIN queries (no consolidation).
    gold_col: name of a clean-identity column to carry through as
        ``gold_key`` (for synthetic gold standards), or None.
    """
    attrs = list(attrs)
    if additive:
        aggs = [F.sum(IMPACT_COL).alias(IMPACT_COL)]
        if gold_col:
            aggs.append(F.min(gold_col).alias(GOLD_COL))
        out = (
            provenance.groupBy(*attrs)
            .agg(*aggs)
            .withColumn(KEY_COL, _key_expr(attrs))
        )
    else:
        # Strict 1-1 queries: identity, with a deterministic disambiguator
        # so tuples sharing matching-attribute values get distinct keys.
        w = Window.partitionBy(*attrs).orderBy(F.col(IMPACT_COL).asc_nulls_last())
        cols = attrs + [IMPACT_COL] + ([gold_col] if gold_col else [])
        out = (
            provenance.select(*cols)
            .withColumn("_rn", F.row_number().over(w))
            .withColumn(
                KEY_COL,
                F.concat(_key_expr(attrs), F.lit(KEY_SEP + "#"), F.col("_rn")),
            )
            .drop("_rn")
        )
        if gold_col:
            out = out.withColumnRenamed(gold_col, GOLD_COL)
    ordered = [KEY_COL, IMPACT_COL, *attrs] + ([GOLD_COL] if gold_col else [])
    return out.select(*ordered)

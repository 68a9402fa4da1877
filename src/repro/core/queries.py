"""Queries ``Q = pi_o sigma_c(X)`` and provenance relations (Def. 2.3).

``X`` may be an arbitrary DataFrame expression (joins, unions, subqueries
are allowed — the caller composes them with the DataFrame API before
handing the result in). The projection ``o`` is either a set of attributes
(non-aggregate query) or one of SUM/COUNT/AVG/MAX/MIN over one attribute.

The provenance relation ``P(A1, ..., I)`` keeps every tuple of
``sigma_c(X)`` and adds the *impact* column ``I``:

- non-aggregate or COUNT: ``I = 1`` for every tuple;
- SUM/AVG/MAX/MIN over attribute ``A``: ``I = t.A``.

AVG/MAX/MIN additionally require a strict one-to-one tuple mapping
downstream (canonicalization must not consolidate tuples — Section 3.1).
"""
from __future__ import annotations

from dataclasses import dataclass

import pyspark.sql.functions as F
from pyspark.sql import Column, DataFrame

IMPACT_COL = "impact"

_AGGS = {"count", "sum", "avg", "max", "min", None}
# Aggregates whose provenance may be consolidated by summing impacts.
ADDITIVE_AGGS = {"count", "sum", None}


@dataclass(frozen=True)
class QuerySpec:
    """One side of an EXP-3D problem: a selection + projection over a source.

    source_cols: columns to keep in the provenance relation (superset of
        the matching attributes; extra columns feed stage-3 summarization).
    agg: one of 'count'/'sum'/'avg'/'max'/'min' or None (non-aggregate).
    agg_attr: attribute the aggregate applies to (ignored for COUNT/None).
    """

    source_cols: tuple[str, ...]
    agg: str | None = "count"
    agg_attr: str | None = None

    def __post_init__(self) -> None:
        if self.agg not in _AGGS:
            raise ValueError(f"unsupported aggregate {self.agg!r}")
        if self.agg in {"sum", "avg", "max", "min"} and not self.agg_attr:
            raise ValueError(f"aggregate {self.agg!r} needs agg_attr")

    @property
    def additive(self) -> bool:
        """Whether canonicalization may consolidate tuples (Section 3.1)."""
        return self.agg in ADDITIVE_AGGS

    def provenance(self, selected: DataFrame, condition: Column | str | None = None) -> DataFrame:
        """Build the provenance relation ``P`` from ``sigma_c(X)``.

        ``selected`` is the (already joined/composed) source ``X``;
        ``condition`` is the selection ``c`` (None keeps all tuples).
        """
        df = selected
        if condition is not None:
            df = df.filter(condition)
        if self.agg in {"sum", "avg", "max", "min"}:
            impact = F.col(self.agg_attr).cast("double")
        else:  # COUNT or non-aggregate: each tuple contributes 1
            impact = F.lit(1.0)
        return df.select(*self.source_cols, impact.alias(IMPACT_COL))

    def result(self, provenance: DataFrame) -> float | int | list:
        """Evaluate the query from its provenance relation (for reporting)."""
        if self.agg is None:
            return [tuple(r) for r in provenance.drop(IMPACT_COL).distinct().collect()]
        fn = {"count": F.sum, "sum": F.sum, "avg": F.avg, "max": F.max, "min": F.min}[
            self.agg
        ]
        row = provenance.agg(fn(IMPACT_COL).alias("r")).collect()[0]
        return row["r"]

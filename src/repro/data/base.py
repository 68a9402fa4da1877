"""Shared shapes for evaluation datasets.

Every generator produces a ``ProblemCase``: the two provenance relations
(already selected/joined per the case's queries, each carrying a hidden
clean-identity column ``gid``), the query specs, and the attribute match.
Gold standards are *derived* from the ``gid`` columns at canonical level
(``repro.data.gold``) — exactly how the paper builds its IMDb gold: track
what the view generation lost and what the error injector corrupted.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame

from repro.core.matches import AttributeMatch
from repro.core.queries import QuerySpec

GID_COL = "gid"


@dataclass
class ProblemCase:
    """One dataset-pair + query-pair evaluation case."""

    name: str
    p1: DataFrame  # provenance relation of Q1 (impact + attrs + gid)
    p2: DataFrame
    q1: QuerySpec
    q2: QuerySpec
    match: AttributeMatch
    n1: int  # original dataset size N (for the Fig. 4 stats table)
    n2: int

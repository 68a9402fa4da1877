"""Attribute matches (Definition 2.1) and their cardinality rules.

An attribute match ``(A_i phi A_j)`` relates a set of categorical
attributes of query 1's relation to a set of attributes of query 2's
relation, with ``phi`` one of:

- ``EQ`` (``A_i == A_j``): one-to-one tuple mapping — both sides of the
  canonical bipartite graph have maximum degree 1 in a valid mapping.
- ``LT`` (``A_i <= A_j``, "less general"): many-to-one — every T1 tuple
  has degree at most 1.
- ``GT`` (``A_i >= A_j``, "more general"): one-to-many — every T2 tuple
  has degree at most 1.

Many-to-many mappings are never valid (Definition 3.2).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from enum import Enum
from typing import Sequence


class Phi(str, Enum):
    """Semantic relation between two matched attribute sets."""

    EQ = "eq"  # A_i == A_j  (one-to-one)
    LT = "lt"  # A_i <= A_j  (many T1 tuples -> one T2 tuple)
    GT = "gt"  # A_i >= A_j  (one T1 tuple -> many T2 tuples)

    @property
    def left_max_degree_one(self) -> bool:
        """Whether valid mappings bound every T1 tuple's degree by 1."""
        return self in (Phi.EQ, Phi.LT)

    @property
    def right_max_degree_one(self) -> bool:
        """Whether valid mappings bound every T2 tuple's degree by 1."""
        return self in (Phi.EQ, Phi.GT)


@dataclass(frozen=True)
class AttributeMatch:
    """One attribute match ``(attrs1 phi attrs2)`` between two queries.

    ``attrs1``/``attrs2`` are the column names in the canonical relations
    of query 1 / query 2 that carry the matched semantics. ``numeric``
    lists which of them should be compared with the normalized-Euclidean
    similarity rather than token Jaccard (Section 5.1.2).
    """

    attrs1: tuple[str, ...]
    attrs2: tuple[str, ...]
    phi: Phi = Phi.EQ
    numeric: tuple[str, ...] = field(default=())

    def __post_init__(self) -> None:
        if len(self.attrs1) != len(self.attrs2):
            raise ValueError(
                "attribute matches must pair attrs positionally; got "
                f"{self.attrs1} vs {self.attrs2}"
            )

    @property
    def pairs(self) -> Sequence[tuple[str, str]]:
        """Positionally paired (attr1, attr2) column names."""
        return tuple(zip(self.attrs1, self.attrs2))


def attr_match(
    attrs1: Sequence[str] | str,
    phi: Phi | str,
    attrs2: Sequence[str] | str,
    numeric: Sequence[str] = (),
) -> AttributeMatch:
    """Convenience constructor: ``attr_match("program", Phi.LT, "college")``."""
    if isinstance(attrs1, str):
        attrs1 = (attrs1,)
    if isinstance(attrs2, str):
        attrs2 = (attrs2,)
    return AttributeMatch(tuple(attrs1), tuple(attrs2), Phi(phi), tuple(numeric))

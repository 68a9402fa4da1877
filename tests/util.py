"""Shared helpers for tests: small random EXP-3D component instances."""
from __future__ import annotations

import random

from repro.core.config import ExplainConfig
from repro.core.matches import Phi
from repro.core.scoring import ComponentProblem, CTuple, Edge


def random_problem(
    seed: int,
    *,
    n1: int = 4,
    n2: int = 4,
    edge_prob: float = 0.5,
    phi: Phi = Phi.EQ,
    cfg: ExplainConfig | None = None,
) -> ComponentProblem:
    """A reproducible random component problem with integer impacts."""
    rng = random.Random(seed)
    tuples = [CTuple(1, f"a{i}", float(rng.randint(1, 5))) for i in range(n1)]
    tuples += [CTuple(2, f"b{j}", float(rng.randint(1, 5))) for j in range(n2)]
    edges = []
    for i in range(n1):
        for j in range(n2):
            if rng.random() < edge_prob:
                edges.append(Edge(i, n1 + j, round(rng.uniform(0.05, 0.99), 3)))
    return ComponentProblem(tuples, edges, phi, cfg or ExplainConfig())

"""Global knobs for the Explain3D reproduction.

Values mirror Section 4 / 5.1 of the paper where stated (theta_l=0.1,
theta_h=0.9, R=100, 50 similarity buckets). The priors alpha/beta are only
constrained to (0.5, 1] in the paper; we fix 0.9/0.9 and document this in
DESIGN.md.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

# Probabilities are clipped into [P_EPS, 1 - P_EPS] before entering the
# log-space objective so that p=1.0 matches (allowed by Def. 2.4) do not
# produce -inf via log(1-p).
P_EPS = 1e-6


@dataclass(frozen=True)
class ExplainConfig:
    """Parameters of the EXP-3D objective and the smart partitioner.

    alpha: a-priori probability that a tuple is covered by both queries.
    beta: a-priori probability that a tuple's impact is correct.
    theta_l / theta_h / reward: smart-partitioning edge-weight knobs
        (Section 4): ``w = p*R`` if ``p >= theta_h``, ``p/R`` if
        ``p <= theta_l``, else ``p``.
    buckets: number of similarity buckets for similarity-to-probability
        calibration (Section 5.1.2).
    exact_edge_limit: components with at most this many edges are solved
        by exact branch-and-bound; larger ones route to the Hungarian
        (phi = '==', still exact) or greedy+local-search solvers.
    matching_node_limit: Hungarian cutoff — one-to-one components with
        more tuples than this fall back to greedy+local search (the cost
        matrix would be GB-scale; the paper's unpartitioned NOOPT likewise
        DNFs on such components). Smart partitioning keeps real
        components far below this.
    impact_tol: numeric tolerance when comparing (sums of) impacts.
    """

    alpha: float = 0.9
    beta: float = 0.9
    theta_l: float = 0.1
    theta_h: float = 0.9
    reward: float = 100.0
    buckets: int = 50
    exact_edge_limit: int = 16
    matching_node_limit: int = 4000
    impact_tol: float = 1e-6

    # -- derived log-space constants of Equation (8) --------------------
    @property
    def a(self) -> float:
        """log Pr(t | t in Delta): the tuple is a provenance explanation."""
        return math.log(1.0 - self.alpha + P_EPS)

    @property
    def b(self) -> float:
        """log Pr(t | t kept, impact correct) = log(alpha) + log(beta)."""
        return math.log(self.alpha) + math.log(self.beta)

    @property
    def c(self) -> float:
        """log Pr(t | t kept, impact changed) = log(alpha) + log(1-beta)."""
        return math.log(self.alpha) + math.log(1.0 - self.beta + P_EPS)

    def unmatched_score(self, impact: float) -> float:
        """Best log-probability for a tuple with no selected match.

        Such a tuple is its own connected component, so impact equality
        forces either removal (``a``) or a value change to impact 0
        (``c``; free, ``b``, if the impact already is 0).
        """
        if abs(impact) <= self.impact_tol:
            return max(self.a, self.b)
        return max(self.a, self.c)

    def unmatched_is_removal(self, impact: float) -> bool:
        """Whether the optimal disposition of an unmatched tuple is Delta."""
        if abs(impact) <= self.impact_tol:
            return self.a > self.b
        return self.a >= self.c


DEFAULT_CONFIG = ExplainConfig()


def clip_p(p: float) -> float:
    """Clip a match probability into the open interval used in log space."""
    return min(max(p, P_EPS), 1.0 - P_EPS)


def logit(p: float) -> float:
    """log p - log(1-p) for a clipped probability: the score swing of
    including a tuple match in the evidence versus leaving it out."""
    p = clip_p(p)
    return math.log(p) - math.log(1.0 - p)

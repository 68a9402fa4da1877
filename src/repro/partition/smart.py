"""The smart-partitioning driver (Algorithm 3).

``smart_partition`` composes Algorithm 2 (pre-partitioning) with the
balanced partitioner and uncontracts the result back to tuples. The
number of partitions follows Section 5.3's batching rule:
``k = ceil((|T1| + |T2|) / batch)`` with ``L_max = batch``.

Matches whose endpoints land in different partitions are *cut*: they
cannot enter any sub-problem's evidence, and the pipeline accounts their
``log(1-p)`` term on the driver. This is the only accuracy-loss mechanism
of smart partitioning — the edge-weight rescaling plus contraction exists
precisely to make cut edges low-probability ones.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np

from repro.core.config import ExplainConfig
from repro.partition.partitioner import partition_supergraph
from repro.partition.prepartition import prepartition


@dataclass
class PartitionResult:
    """Tuple-level partition assignment plus the set of cut matches."""

    pid_of_tuple: np.ndarray  # partition id per tuple index
    cut_edges: np.ndarray  # indices of matches crossing partitions
    n_partitions: int


def smart_partition(
    n_tuples: int,
    edge_idx: np.ndarray,
    edge_p: np.ndarray,
    cfg: ExplainConfig,
    batch: int,
) -> PartitionResult:
    """Algorithm 3: pre-partition, partition, uncontract."""
    if n_tuples == 0:
        return PartitionResult(np.zeros(0, dtype=np.int64), np.zeros(0, dtype=np.int64), 1)
    k = max(1, math.ceil(n_tuples / batch))
    sg = prepartition(n_tuples, edge_idx, edge_p, cfg)
    pid_super = partition_supergraph(sg.sizes, sg.edges, k, batch)
    pid_of_tuple = pid_super[sg.super_of]
    if len(edge_idx):
        cut = pid_of_tuple[edge_idx[:, 0]] != pid_of_tuple[edge_idx[:, 1]]
        cut_edges = np.flatnonzero(cut)
    else:
        cut_edges = np.zeros(0, dtype=np.int64)
    return PartitionResult(pid_of_tuple, cut_edges, k)

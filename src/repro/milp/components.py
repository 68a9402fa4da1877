"""Connected components — driver union-find and Spark hash-min variants.

The driver version backs the per-partition solver; the Spark version
(iterative hash-min label propagation over an edge DataFrame) assigns
component ids at dataflow scale for the NOOPT pipeline and the
pre-partitioning step of the smart optimizer (Algorithm 2).
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame


def connected_components_local(
    n: int, edges: list[tuple[int, int]]
) -> list[int]:
    """Union-find over ``n`` nodes; returns a component id per node."""
    parent = list(range(n))

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for a, b in edges:
        ra, rb = find(a), find(b)
        if ra != rb:
            parent[ra] = rb
    return [find(i) for i in range(n)]


def connected_components_spark(
    nodes: DataFrame, edges: DataFrame, *, max_iter: int = 50
) -> DataFrame:
    """Hash-min label propagation: ``(node) -> (node, component)``.

    nodes: one string column ``node``; edges: columns ``src``, ``dst``.
    Each iteration every node adopts the minimum label in its closed
    neighborhood; converges in O(diameter) rounds. Labels are the
    lexicographic minimum node id of the component.
    """
    labels = nodes.select("node", F.col("node").alias("comp"))
    sym = edges.select("src", "dst").union(
        edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    ).distinct()
    for _ in range(max_iter):
        neigh = (
            sym.join(labels.withColumnRenamed("node", "dst"), "dst")
            .groupBy("src")
            .agg(F.min("comp").alias("neigh_comp"))
            .withColumnRenamed("src", "node")
        )
        updated = (
            labels.join(neigh, "node", "left")
            .select(
                "node",
                F.least(
                    F.col("comp"), F.coalesce("neigh_comp", F.col("comp"))
                ).alias("comp"),
                (F.coalesce("neigh_comp", F.col("comp")) < F.col("comp")).alias(
                    "changed"
                ),
            )
        )
        updated = updated.localCheckpoint(eager=True)
        n_changed = updated.where("changed").count()
        labels = updated.drop("changed")
        if n_changed == 0:
            break
    return labels

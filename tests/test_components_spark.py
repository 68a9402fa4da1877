"""Spark hash-min connected components vs. the driver union-find."""
import pandas as pd
import pytest

from repro.milp.components import (
    connected_components_local,
    connected_components_spark,
)


def _run(spark, nodes, edges):
    ndf = spark.createDataFrame(pd.DataFrame({"node": nodes}))
    if edges:
        edf = spark.createDataFrame(pd.DataFrame(edges, columns=["src", "dst"]))
    else:
        edf = spark.createDataFrame([], "src string, dst string")
    out = connected_components_spark(ndf, edf)
    return {r.node: r.comp for r in out.collect()}


class TestSparkCC:
    def test_chain_and_island(self, spark):
        comp = _run(spark, ["a", "b", "c", "d"], [("a", "b"), ("b", "c")])
        assert comp["a"] == comp["b"] == comp["c"] == "a"
        assert comp["d"] == "d"

    def test_no_edges(self, spark):
        comp = _run(spark, ["x", "y"], [])
        assert comp == {"x": "x", "y": "y"}

    def test_agrees_with_union_find(self, spark):
        import random

        rng = random.Random(3)
        n = 40
        nodes = [f"n{i:02d}" for i in range(n)]
        edges = [
            (nodes[rng.randrange(n)], nodes[rng.randrange(n)]) for _ in range(30)
        ]
        comp_spark = _run(spark, nodes, edges)
        idx = {k: i for i, k in enumerate(nodes)}
        local = connected_components_local(
            n, [(idx[a], idx[b]) for a, b in edges]
        )
        # Same partition structure (labels may differ).
        groups_spark = {}
        for k, c in comp_spark.items():
            groups_spark.setdefault(c, set()).add(k)
        groups_local = {}
        for k, c in zip(nodes, local):
            groups_local.setdefault(c, set()).add(k)
        assert sorted(map(sorted, groups_spark.values())) == sorted(
            map(sorted, groups_local.values())
        )

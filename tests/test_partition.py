"""Smart-partitioning unit tests (Section 4, Algorithms 2-3)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.config import ExplainConfig
from repro.milp.components import connected_components_local
from repro.partition.partitioner import edge_cut_weight, partition_supergraph
from repro.partition.prepartition import prepartition
from repro.partition.smart import smart_partition
from repro.partition.weights import adjust_weights

CFG = ExplainConfig()


class TestWeights:
    def test_high_probability_rewarded(self):
        w = adjust_weights(np.array([0.95]), CFG)
        assert w[0] == pytest.approx(95.0)

    def test_low_probability_penalized(self):
        w = adjust_weights(np.array([0.05]), CFG)
        assert w[0] == pytest.approx(0.0005)

    def test_mid_probability_unchanged(self):
        w = adjust_weights(np.array([0.5]), CFG)
        assert w[0] == pytest.approx(0.5)

    def test_thresholds_inclusive(self):
        w = adjust_weights(np.array([CFG.theta_h, CFG.theta_l]), CFG)
        assert w[0] == pytest.approx(CFG.theta_h * CFG.reward)
        assert w[1] == pytest.approx(CFG.theta_l / CFG.reward)


class TestUnionFind:
    def test_components_basic(self):
        comp = connected_components_local(5, [(0, 1), (1, 2), (3, 4)])
        assert comp[0] == comp[1] == comp[2]
        assert comp[3] == comp[4]
        assert comp[0] != comp[3]

    def test_isolated_nodes_distinct(self):
        comp = connected_components_local(3, [])
        assert len(set(comp)) == 3


class TestPrepartition:
    def test_high_p_edges_contracted(self):
        # 0-1 high, 1-2 low: supernode {0,1} and {2}.
        edges = np.array([[0, 1], [1, 2]])
        p = np.array([0.95, 0.3])
        sg = prepartition(3, edges, p, CFG)
        assert sg.super_of[0] == sg.super_of[1] != sg.super_of[2]
        assert sorted(sg.sizes.tolist()) == [1, 2]
        # Only the low edge survives as a superedge, with unadjusted w=0.3.
        assert len(sg.edges) == 1
        assert sg.edges[0][2] == pytest.approx(0.3)

    def test_internal_edges_disappear(self):
        edges = np.array([[0, 1], [0, 1]])
        p = np.array([0.95, 0.2])  # second edge becomes internal
        sg = prepartition(2, edges, p, CFG)
        assert sg.edges == []

    def test_parallel_superedges_sum_weights(self):
        edges = np.array([[0, 1], [0, 1]])
        p = np.array([0.3, 0.4])
        sg = prepartition(2, edges, p, CFG)
        assert len(sg.edges) == 1
        assert sg.edges[0][2] == pytest.approx(0.7)


class TestPartitioner:
    def test_respects_capacity(self):
        sizes = np.array([3, 3, 3, 3])
        pid = partition_supergraph(sizes, [], k=2, l_max=6)
        loads = np.bincount(pid, weights=sizes, minlength=2)
        assert (loads <= 6).all()

    def test_attraction_groups_heavy_neighbors(self):
        sizes = np.array([1, 1, 1, 1])
        edges = [(0, 1, 10.0), (2, 3, 10.0), (1, 2, 0.1)]
        pid = partition_supergraph(sizes, edges, k=2, l_max=2)
        assert pid[0] == pid[1]
        assert pid[2] == pid[3]
        assert edge_cut_weight(edges, pid) == pytest.approx(0.1)

    def test_oversized_supernode_gets_own_bin(self):
        sizes = np.array([5, 1])
        pid = partition_supergraph(sizes, [], k=2, l_max=3)
        assert pid[0] != pid[1]

    @given(st.integers(0, 100))
    @settings(max_examples=25, deadline=None)
    def test_all_nodes_assigned(self, seed):
        rng = np.random.default_rng(seed)
        n = int(rng.integers(1, 20))
        sizes = rng.integers(1, 4, n)
        edges = [
            (int(a), int(b), float(rng.random()))
            for a, b in rng.integers(0, n, (n, 2))
            if a != b
        ]
        pid = partition_supergraph(sizes, edges, k=4, l_max=8)
        assert (pid >= 0).all() and (pid < 4).all()


class TestSmartPartition:
    def test_never_cuts_high_probability_edges(self):
        rng = np.random.default_rng(0)
        n = 60
        edge_idx = rng.integers(0, n, (120, 2))
        edge_idx = edge_idx[edge_idx[:, 0] != edge_idx[:, 1]]
        edge_p = rng.random(len(edge_idx))
        part = smart_partition(n, edge_idx, edge_p, CFG, batch=10)
        assert (edge_p[part.cut_edges] < CFG.theta_h).all()

    def test_partition_count_follows_batch_rule(self):
        part = smart_partition(95, np.zeros((0, 2), dtype=int), np.zeros(0), CFG, batch=10)
        assert part.n_partitions == 10

    def test_empty_graph(self):
        part = smart_partition(0, np.zeros((0, 2), dtype=int), np.zeros(0), CFG, batch=10)
        assert part.n_partitions == 1
        assert len(part.pid_of_tuple) == 0

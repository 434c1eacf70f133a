"""Dinic max-flow + the time-expanded reduction (Section 4.2.1)."""
import math

import pytest

from repro.core.graph import TemporalGraph
from repro.core.greedy import greedy_flow
from repro.core.randgen import random_temporal_dag
from repro.maxflow_static.dinic import Dinic
from repro.maxflow_static.time_expanded import (
    build_time_expanded,
    max_flow_time_expanded,
)


class TestDinic:
    def test_single_edge(self):
        d = Dinic(2)
        d.add_edge(0, 1, 7.0)
        assert d.max_flow(0, 1) == pytest.approx(7.0)

    def test_series_bottleneck(self):
        d = Dinic(3)
        d.add_edge(0, 1, 10.0)
        d.add_edge(1, 2, 3.0)
        assert d.max_flow(0, 2) == pytest.approx(3.0)

    def test_parallel_edges_add(self):
        d = Dinic(2)
        d.add_edge(0, 1, 2.0)
        d.add_edge(0, 1, 5.0)
        assert d.max_flow(0, 1) == pytest.approx(7.0)

    def test_classic_clrs_network(self):
        # CLRS Figure 26.1: max flow 23.
        d = Dinic(6)
        s, v1, v2, v3, v4, t = range(6)
        d.add_edge(s, v1, 16)
        d.add_edge(s, v2, 13)
        d.add_edge(v1, v3, 12)
        d.add_edge(v2, v1, 4)
        d.add_edge(v2, v4, 14)
        d.add_edge(v3, v2, 9)
        d.add_edge(v3, t, 20)
        d.add_edge(v4, v3, 7)
        d.add_edge(v4, t, 4)
        assert d.max_flow(s, t) == pytest.approx(23.0)

    def test_needs_augmenting_through_back_edge(self):
        # The classic diamond where a naive greedy path assignment must
        # be undone via the residual edge.
        d = Dinic(4)
        d.add_edge(0, 1, 1)
        d.add_edge(0, 2, 1)
        d.add_edge(1, 2, 1)
        d.add_edge(1, 3, 1)
        d.add_edge(2, 3, 1)
        assert d.max_flow(0, 3) == pytest.approx(2.0)

    def test_disconnected_is_zero(self):
        d = Dinic(4)
        d.add_edge(0, 1, 5)
        d.add_edge(2, 3, 5)
        assert d.max_flow(0, 3) == pytest.approx(0.0)

    def test_source_equals_sink(self):
        d = Dinic(2)
        d.add_edge(0, 1, 5)
        assert d.max_flow(0, 0) == pytest.approx(0.0)

    def test_infinite_capacity_passthrough(self):
        d = Dinic(3)
        d.add_edge(0, 1, 4.0)
        d.add_edge(1, 2, math.inf)
        assert d.max_flow(0, 2) == pytest.approx(4.0)

    def test_negative_capacity_rejected(self):
        d = Dinic(2)
        with pytest.raises(ValueError):
            d.add_edge(0, 1, -1.0)

    def test_long_chain_no_recursion_limit(self):
        n = 5000
        d = Dinic(n)
        for i in range(n - 1):
            d.add_edge(i, i + 1, 2.0)
        assert d.max_flow(0, n - 1) == pytest.approx(2.0)


class TestTimeExpanded:
    def test_figure3(self):
        g = TemporalGraph.from_interactions(
            [(0, 1, 1, 5.0), (0, 2, 2, 3.0), (1, 2, 3, 5.0), (1, 3, 4, 4.0), (2, 3, 5, 1.0)],
            source=0,
            sink=3,
        )
        assert max_flow_time_expanded(g) == pytest.approx(5.0)

    def test_chain_equals_greedy(self):
        g = TemporalGraph.from_interactions(
            [(0, 1, 1, 5.0), (1, 2, 2, 3.0), (1, 2, 9, 4.0), (2, 3, 10, 7.0)],
            source=0,
            sink=3,
        )
        assert max_flow_time_expanded(g) == pytest.approx(greedy_flow(g))

    def test_strict_semantics_same_timestamp(self):
        g = TemporalGraph.from_interactions(
            [(0, 1, 5, 4.0), (1, 2, 5, 4.0)], source=0, sink=2
        )
        assert max_flow_time_expanded(g) == pytest.approx(0.0)

    def test_unspendable_arrival_dropped(self):
        # Vertex 1's only outgoing interaction is before the inflow, so
        # the inflow edge has no head node and contributes nothing.
        g = TemporalGraph.from_interactions(
            [(1, 2, 1, 5.0), (0, 1, 3, 5.0)], source=0, sink=2
        )
        assert max_flow_time_expanded(g) == pytest.approx(0.0)

    def test_node_count_linear_in_interactions(self):
        g = TemporalGraph.from_interactions(
            [(0, 1, t, 1.0) for t in range(10)] + [(1, 2, t + 1, 1.0) for t in range(10)],
            source=0,
            sink=2,
        )
        d, s, t = build_time_expanded(g)
        assert d.n <= 2 + 20 + 20  # S, T, <= one node per interaction + slack

    @pytest.mark.parametrize("seed", range(15))
    def test_at_least_greedy_on_random_dags(self, seed):
        g = random_temporal_dag(n_vertices=8, edge_prob=0.4, seed=seed)
        assert max_flow_time_expanded(g) >= greedy_flow(g) - 1e-9

"""Algorithm 1 (Section 4.2.3) — deletion traces from Figure 6 + properties.

The Figure 6 inputs are reconstructed so the prose's deletion sequence
holds verbatim (the figure itself is not part of the text): for G1,
vertex x's min incoming timestamp is 5, killing (2,7) on (x,y) and
(1,2) on (x,z); y's becomes 9 killing (3,3); z's becomes 10 killing
(4,2). For G2, (3,4) on (x,y) dies because 3 < min{5,8}, cascading the
deletion of x and of y.
"""
import pytest

from repro.core.graph import TemporalGraph
from repro.core.preprocess import preprocess
from repro.core.randgen import random_temporal_dag
from repro.core.solubility import soluble_by_greedy
from repro.maxflow_static.time_expanded import max_flow_time_expanded

S, X, Y, Z, T = 0, 1, 2, 3, 4


def g1():
    return TemporalGraph.from_interactions(
        [
            (S, X, 5, 4.0),
            (X, Y, 2, 7.0),
            (X, Y, 9, 3.0),
            (X, Z, 1, 2.0),
            (X, Z, 10, 5.0),
            (Y, T, 3, 3.0),
            (Y, T, 12, 2.0),
            (Z, T, 4, 2.0),
            (Z, T, 11, 1.0),
        ],
        source=S,
        sink=T,
    )


def g2():
    return TemporalGraph.from_interactions(
        [
            (S, X, 5, 3.0),
            (S, X, 8, 2.0),
            (X, Y, 3, 4.0),
            (Y, T, 6, 1.0),
            (S, Z, 5, 2.0),
            (Z, T, 4, 2.0),
            (Z, T, 9, 3.0),
        ],
        source=S,
        sink=T,
    )


class TestG1Trace:
    def test_interaction_deletions_follow_prose(self):
        res = preprocess(g1())
        h = res.graph
        assert h.edges[(X, Y)] == [(9, 3.0)]
        assert h.edges[(X, Z)] == [(10, 5.0)]
        assert h.edges[(Y, T)] == [(12, 2.0)]
        assert h.edges[(Z, T)] == [(11, 1.0)]

    def test_counts(self):
        res = preprocess(g1())
        assert res.interactions_removed == 4
        assert res.edges_removed == 0
        assert res.vertices_removed == 0
        assert not res.zero_flow


class TestG2Trace:
    def test_cascade_deletes_x_and_y(self):
        res = preprocess(g2())
        h = res.graph
        # x loses its only outgoing edge -> x deleted (with (s,x));
        # y then has no incoming -> deleted (with (y,t)).
        assert set(h.edges) == {(S, Z), (Z, T)}
        assert h.edges[(Z, T)] == [(9, 3.0)]

    def test_result_soluble_by_greedy(self):
        res = preprocess(g2())
        assert soluble_by_greedy(res.graph)

    def test_counts(self):
        res = preprocess(g2())
        assert res.vertices_removed == 2
        assert res.edges_removed == 3
        assert not res.zero_flow


class TestFigure1a:
    def graph(self):
        return TemporalGraph.from_interactions(
            [
                (0, 1, 1, 3.0),
                (1, 3, 5, 5.0),
                (0, 2, 2, 6.0),
                (2, 3, 8, 5.0),
                (2, 4, 9, 4.0),
                (3, 4, 2, 3.0),
            ],
            source=0,
            sink=4,
        )

    def test_z_branch_collapses(self):
        # (2,$3) on (z,t) is the intro's example of a removable
        # interaction; its removal cascades away x and z entirely.
        res = preprocess(self.graph())
        assert set(res.graph.edges) == {(0, 2), (2, 4)}

    def test_becomes_soluble_class_b(self):
        res = preprocess(self.graph())
        assert soluble_by_greedy(res.graph)


class TestZeroFlow:
    def test_sink_unreachable_in_time(self):
        # All sink-incoming interactions precede any possible inflow.
        g = TemporalGraph.from_interactions(
            [(0, 1, 5, 2.0), (1, 2, 1, 2.0)], source=0, sink=2
        )
        res = preprocess(g)
        assert res.zero_flow

    def test_source_loses_all_outgoing(self):
        # 1 is a dead end; deleting it removes the source's only edge.
        g = TemporalGraph.from_interactions(
            [(0, 1, 1, 2.0), (2, 3, 2, 2.0), (0, 2, 5, 1.0), (2, 3, 9, 1.0)],
            source=0,
            sink=3,
        )
        # Vertex 1 has no outgoing edge at all -> upward cascade; but the
        # source still has (0,2), so flow is not zero here.
        res = preprocess(g)
        assert not res.zero_flow
        assert set(res.graph.edges) == {(0, 2), (2, 3)}

    def test_fully_dead_graph(self):
        g = TemporalGraph.from_interactions(
            [(0, 1, 5, 2.0), (1, 2, 3, 9.0)], source=0, sink=2
        )
        res = preprocess(g)
        assert res.zero_flow
        assert max_flow_time_expanded(g) == pytest.approx(0.0)


class TestNonDag:
    def test_cycle_raises(self):
        g = TemporalGraph.from_interactions(
            [(0, 1, 1, 1.0), (1, 2, 2, 1.0), (2, 1, 3, 1.0), (2, 3, 4, 1.0)],
            source=0,
            sink=3,
        )
        with pytest.raises(ValueError):
            preprocess(g)


@pytest.mark.parametrize("seed", range(40))
def test_preprocessing_preserves_max_flow(seed):
    g = random_temporal_dag(n_vertices=7, edge_prob=0.45, seed=seed)
    before = max_flow_time_expanded(g)
    res = preprocess(g)
    after = 0.0 if res.zero_flow else max_flow_time_expanded(res.graph)
    assert after == pytest.approx(before, abs=1e-9)


@pytest.mark.parametrize("seed", range(20))
def test_preprocessing_never_grows_the_problem(seed):
    g = random_temporal_dag(n_vertices=8, edge_prob=0.4, seed=200 + seed)
    res = preprocess(g)
    assert res.graph.n_interactions <= g.n_interactions
    assert len(res.graph.edges) <= len(g.edges)

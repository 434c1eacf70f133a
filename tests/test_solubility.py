"""Greedy-solubility test (Lemmas 1-2, Section 4.2.2)."""
import pytest

from repro.core.graph import TemporalGraph
from repro.core.greedy import greedy_flow
from repro.core.solubility import soluble_by_greedy
from repro.maxflow_static.time_expanded import max_flow_time_expanded


def g(rows, source=0, sink=None):
    sink = max(max(r[0], r[1]) for r in rows) if sink is None else sink
    return TemporalGraph.from_interactions(rows, source=source, sink=sink)


class TestCondition:
    def test_chain_is_soluble(self):
        assert soluble_by_greedy(g([(0, 1, 1, 1.0), (1, 2, 2, 1.0), (2, 3, 3, 1.0)]))

    def test_branching_intermediate_not_soluble(self):
        # Vertex 1 has two outgoing edges (the Figure 3 situation).
        assert not soluble_by_greedy(
            g([(0, 1, 1, 1.0), (1, 2, 2, 1.0), (1, 3, 3, 1.0), (2, 3, 4, 1.0)])
        )

    def test_source_may_branch(self):
        # Lemma 2: only the source is allowed multiple outgoing edges.
        assert soluble_by_greedy(
            g([(0, 1, 1, 1.0), (0, 2, 2, 1.0), (1, 3, 3, 1.0), (2, 3, 4, 1.0)])
        )

    def test_dead_end_vertex_not_soluble(self):
        # Vertex 2 has zero outgoing edges — "exactly one" fails.
        assert not soluble_by_greedy(
            g([(0, 1, 1, 1.0), (0, 2, 2, 1.0), (1, 3, 3, 1.0)], sink=3)
        )

    def test_sink_needs_no_outgoing(self):
        assert soluble_by_greedy(g([(0, 1, 1, 1.0), (1, 2, 2, 1.0)]))

    def test_multi_in_single_out_is_fine(self):
        # Converging edges are allowed; only out-degree matters.
        assert soluble_by_greedy(
            g([(0, 1, 1, 1.0), (0, 2, 1, 1.0), (1, 3, 2, 1.0), (2, 3, 2, 1.0), (3, 4, 5, 9.0)])
        )


class TestLemmaHolds:
    @pytest.mark.parametrize(
        "rows",
        [
            # chain (Lemma 1)
            [(0, 1, 1, 5.0), (1, 2, 3, 4.0), (1, 2, 6, 2.0), (2, 3, 7, 9.0)],
            # source-branching DAG (Lemma 2, like Figure 5(b))
            [
                (0, 1, 1, 8.0),
                (0, 2, 2, 6.0),
                (1, 3, 3, 7.0),
                (2, 3, 4, 9.0),
                (3, 4, 5, 20.0),
            ],
            # converging chains
            [(0, 1, 1, 3.0), (0, 2, 2, 4.0), (1, 4, 5, 3.0), (2, 4, 6, 4.0)],
        ],
    )
    def test_greedy_equals_max_when_soluble(self, rows):
        graph = g(rows)
        assert soluble_by_greedy(graph)
        assert greedy_flow(graph) == pytest.approx(max_flow_time_expanded(graph))

    def test_counterexample_when_not_soluble(self):
        # Figure 3: greedy 1 < max 5, and the test correctly says "no".
        graph = g(
            [(0, 1, 1, 5.0), (0, 2, 2, 3.0), (1, 2, 3, 5.0), (1, 3, 4, 4.0), (2, 3, 5, 1.0)]
        )
        assert not soluble_by_greedy(graph)
        assert greedy_flow(graph) < max_flow_time_expanded(graph)

"""Pre / PreSim pipelines and the class A/B/C taxonomy (Section 6.2)."""
import math

import pytest

from repro.core.graph import TemporalGraph
from repro.core.pipeline import run_all_methods, run_greedy, run_lp, run_pre, run_presim
from repro.core.randgen import random_temporal_dag
from repro.maxflow_static.time_expanded import max_flow_time_expanded


def figure3():
    return TemporalGraph.from_interactions(
        [(0, 1, 1, 5.0), (0, 2, 2, 3.0), (1, 2, 3, 5.0), (1, 3, 4, 4.0), (2, 3, 5, 1.0)],
        source=0,
        sink=3,
    )


def figure1a():
    return TemporalGraph.from_interactions(
        [(0, 1, 1, 3.0), (1, 3, 5, 5.0), (0, 2, 2, 6.0), (2, 3, 8, 5.0), (2, 4, 9, 4.0), (3, 4, 2, 3.0)],
        source=0,
        sink=4,
    )


def chain():
    return TemporalGraph.from_interactions(
        [(0, 1, 1, 5.0), (1, 2, 2, 3.0), (2, 3, 4, 9.0)], source=0, sink=3
    )


class TestClasses:
    def test_chain_is_class_a(self):
        assert run_pre(chain()).cls == "A"
        assert run_presim(chain()).cls == "A"

    def test_figure1a_is_class_b(self):
        # Preprocessing collapses the z branch; the rest is a chain.
        assert run_pre(figure1a()).cls == "B"

    def test_figure3_is_class_c(self):
        # Nothing is removable and y branches: LP is required.
        assert run_pre(figure3()).cls == "C"

    def test_zero_flow_counts_as_class_b(self):
        g = TemporalGraph.from_interactions(
            [(0, 1, 5, 2.0), (1, 2, 1, 2.0), (1, 3, 2, 1.0), (1, 2, 0, 1.0)],
            source=0,
            sink=2,
        )
        res = run_pre(g)
        assert res.cls == "B"
        assert res.flow == pytest.approx(0.0)


class TestFlowsAgree:
    @pytest.mark.parametrize("make", [figure3, figure1a, chain])
    def test_pre_presim_lp_agree(self, make):
        g = make()
        expect = max_flow_time_expanded(g)
        assert run_lp(g).flow == pytest.approx(expect)
        assert run_pre(g).flow == pytest.approx(expect)
        assert run_presim(g).flow == pytest.approx(expect)

    @pytest.mark.parametrize("make", [figure3, figure1a, chain])
    def test_greedy_lower_bound(self, make):
        g = make()
        assert run_greedy(g).flow <= max_flow_time_expanded(g) + 1e-9


class TestRunAllMethods:
    def test_row_shape(self):
        row = run_all_methods(figure3())
        assert set(row) == {
            "cls",
            "flow_greedy", "flow_lp", "flow_pre", "flow_presim",
            "ms_greedy", "ms_lp", "ms_pre", "ms_presim",
        }
        assert row["cls"] == "C"

    def test_lp_cap_skips_direct_lp_only(self):
        row = run_all_methods(figure3(), lp_cap=3)
        assert math.isnan(row["flow_lp"])
        assert row["flow_pre"] == pytest.approx(5.0)
        assert row["flow_presim"] == pytest.approx(5.0)

    def test_timings_positive(self):
        row = run_all_methods(figure3())
        for k in ("ms_greedy", "ms_lp", "ms_pre", "ms_presim"):
            assert row[k] >= 0.0


@pytest.mark.parametrize("seed", range(50))
def test_all_methods_consistent_on_random_dags(seed):
    g = random_temporal_dag(n_vertices=7, edge_prob=0.45, seed=seed)
    row = run_all_methods(g)
    exact = max_flow_time_expanded(g)
    assert row["flow_lp"] == pytest.approx(exact, abs=1e-6)
    assert row["flow_pre"] == pytest.approx(exact, abs=1e-6)
    assert row["flow_presim"] == pytest.approx(exact, abs=1e-6)
    assert row["flow_greedy"] <= exact + 1e-6
    if row["cls"] in ("A", "B"):
        assert row["flow_greedy"] == pytest.approx(exact, abs=1e-6) or row["cls"] == "B"

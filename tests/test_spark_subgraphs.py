"""Section 6.2 subgraph extraction, oracle-checked (Table 5 machinery)."""
import duckdb
import pandas as pd
import pytest

from repro.core.graph import SINK, SOURCE, TemporalGraph
from repro.oracle import assert_equivalent
from repro.spark.subgraphs import (
    cycle_paths,
    extract_seed_subgraphs,
    seed_edge_sets,
    subgraph_stats,
)

EDGES_SQL = "(select distinct src as u, dst as v from i)"


class TestCyclePaths:
    def test_2hop_matches_oracle(self, interactions, interactions_pdf):
        assert_equivalent(
            cycle_paths(interactions, 2),
            f"""
            select e1.u as a, e1.v as b
            from {EDGES_SQL} e1 join {EDGES_SQL} e2
              on e1.v = e2.u and e2.v = e1.u
            """,
            i=interactions_pdf,
        )

    def test_3hop_matches_oracle(self, interactions, interactions_pdf):
        assert_equivalent(
            cycle_paths(interactions, 3),
            f"""
            select e1.u as a, e1.v as b, e2.v as c
            from {EDGES_SQL} e1
            join {EDGES_SQL} e2 on e1.v = e2.u
            join {EDGES_SQL} e3 on e2.v = e3.u and e3.v = e1.u
            where e2.v != e1.u and e1.v != e2.v
            """,
            i=interactions_pdf,
        )

    def test_bad_hops_raises(self, interactions):
        with pytest.raises(ValueError):
            cycle_paths(interactions, 4)

    def test_no_self_cycles(self, interactions):
        pdf = cycle_paths(interactions, 3).toPandas()
        assert (pdf["a"] != pdf["b"]).all()
        assert (pdf["b"] != pdf["c"]).all()
        assert (pdf["a"] != pdf["c"]).all()


class TestSeedEdgeSets:
    def test_every_seed_subgraph_is_a_dag(self, interactions):
        pdf = seed_edge_sets(interactions).toPandas()
        for seed, grp in pdf.groupby("seed"):
            rows = [
                (SOURCE if u == seed else u, SINK if v == seed else v, 0, 1.0)
                for u, v in zip(grp["u"], grp["v"])
            ]
            g = TemporalGraph.from_interactions(rows, source=SOURCE, sink=SINK)
            assert g.is_dag(), f"seed {seed} produced a cyclic subgraph"

    def test_seed_has_out_and_in_edges(self, interactions):
        pdf = seed_edge_sets(interactions).toPandas()
        for seed, grp in pdf.groupby("seed"):
            assert (grp["u"] == seed).any()
            assert (grp["v"] == seed).any()

    def test_seeds_are_cycle_origins(self, interactions, interactions_pdf):
        seeds = set(seed_edge_sets(interactions).toPandas()["seed"])
        con = duckdb.connect()
        con.register("i", interactions_pdf)
        expected = con.execute(
            f"""
            select distinct a from (
              select e1.u a from {EDGES_SQL} e1 join {EDGES_SQL} e2
                on e1.v=e2.u and e2.v=e1.u
              union
              select e1.u a from {EDGES_SQL} e1
                join {EDGES_SQL} e2 on e1.v=e2.u
                join {EDGES_SQL} e3 on e2.v=e3.u and e3.v=e1.u
                where e2.v != e1.u and e1.v != e2.v
            )
            """
        ).fetchdf()
        con.close()
        assert seeds == set(expected["a"])


class TestExtraction:
    def test_seed_relabelled_to_source_sink(self, subgraphs):
        pdf = subgraphs.toPandas()
        for seed, grp in pdf.groupby("seed"):
            assert seed not in set(grp["src"]) | set(grp["dst"])
            assert (grp["src"] == SOURCE).any()
            assert (grp["dst"] == SINK).any()

    def test_interaction_cap_enforced(self, interactions):
        capped = extract_seed_subgraphs(interactions, max_interactions=50)
        counts = capped.groupBy("seed").count().toPandas()
        assert (counts["count"] <= 50).all()

    def test_max_seeds_cap(self, interactions):
        few = extract_seed_subgraphs(interactions, max_interactions=400, max_seeds=5)
        assert few.select("seed").distinct().count() <= 5

    def test_interactions_come_from_network(self, subgraphs, interactions_pdf):
        pdf = subgraphs.toPandas()
        net = {
            (r.src, r.dst, r.ts): r.qty for r in interactions_pdf.itertuples()
        }
        for seed, grp in pdf.groupby("seed"):
            for src, dst, ts, qty in zip(grp["src"], grp["dst"], grp["ts"], grp["qty"]):
                u = seed if src == SOURCE else src
                v = seed if dst == SINK else dst
                assert net[(u, v, ts)] == pytest.approx(qty)


class TestSubgraphStats:
    def test_matches_oracle_on_collected_results(self, subgraphs):
        pdf = subgraphs.toPandas()
        per_seed = (
            pdf.assign(edge=list(zip(pdf["src"], pdf["dst"])))
            .groupby("seed")
            .agg(
                n_vertices=("src", lambda s: 0),  # placeholder, fixed below
                n_edges=("edge", "nunique"),
                n_interactions=("edge", "size"),
            )
        )
        per_seed["n_vertices"] = [
            len(set(grp["src"]) | set(grp["dst"]))
            for _, grp in pdf.groupby("seed")
        ]
        expect = pd.DataFrame(
            [
                {
                    "n_subgraphs": len(per_seed),
                    "avg_vertices": per_seed["n_vertices"].mean(),
                    "avg_edges": per_seed["n_edges"].mean(),
                    "avg_interactions": float(per_seed["n_interactions"].mean()),
                }
            ]
        )
        got = subgraph_stats(subgraphs).toPandas()
        pd.testing.assert_frame_equal(
            got.astype(float), expect.astype(float), check_exact=False, rtol=1e-9
        )

    def test_stats_row_sane(self, subgraphs):
        row = subgraph_stats(subgraphs).collect()[0]
        assert row["n_subgraphs"] > 0
        assert row["avg_vertices"] >= 3.0
        assert row["avg_edges"] >= 2.0
        assert row["avg_interactions"] >= row["avg_edges"]

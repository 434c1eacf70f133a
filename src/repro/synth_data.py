"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ---------------------------------------------------------------------------
# Temporal interaction networks (Kosyfaki et al., ICDE 2021 reproduction).
#
# The paper evaluates on three real networks (Bitcoin transactions, CTU-13
# botnet traffic, Prosper Loans) that are not available offline; these
# profile-matched synthetic generators are the documented substitutes
# (DESIGN.md §1). Each profile fixes, at SF=1.0, a laptop-scale stand-in for
# the real network and scales node/interaction counts linearly in ``sf``:
#
# * zipfian out-/in-degree skew (``alpha``) — hubs, as in transaction graphs;
# * ``reciprocity`` — fraction of edges that get a reverse edge, which is
#   what creates the 2-hop cycles the paper's subgraphs/patterns are built
#   from;
# * ``closure`` — fraction of 2-paths closed into triangles (3-hop cycles);
# * heavy-tailed interactions-per-edge (zipf over edges), matching the
#   paper's observation that extracted subgraphs carry many interactions;
# * lognormal quantities with mean matched to the paper's "avg. flow"
#   column (34.4 BTC / 19.2 KB / $76).
# ---------------------------------------------------------------------------

_NETWORK_PROFILES = {
    # name: (n_nodes, n_edges, n_interactions at SF=1.0,
    #        zipf alpha, reciprocity, closure, qty_mean, ts_range)
    "bitcoin": (60_000, 140_000, 230_000, 1.25, 0.25, 0.15, 34.4, 1_000_000),
    "ctu13": (30_000, 35_000, 140_000, 1.15, 0.08, 0.03, 19.2, 1_000_000),
    "prosper": (4_500, 150_000, 152_000, 1.05, 0.10, 0.10, 76.0, 1_000_000),
}


def interaction_network(
    spark: SparkSession, *, profile: str = "bitcoin", sf: float = 0.1, seed: int = 7
) -> DataFrame:
    """A temporal interaction network ``(src, dst, ts, qty)`` (Definition 1).

    Deterministic in ``(profile, sf, seed)``. ``ts`` is an integer
    timestamp, ``qty`` a positive float quantity. Self-loops are removed;
    parallel interactions on an edge are the norm (edges are interaction
    *sequences*).
    """
    pdf = interaction_network_pdf(profile=profile, sf=sf, seed=seed)
    return spark.createDataFrame(pdf)


def interaction_network_pdf(
    *, profile: str = "bitcoin", sf: float = 0.1, seed: int = 7
) -> pd.DataFrame:
    """pandas twin of :func:`interaction_network` (also feeds the oracle)."""
    if profile not in _NETWORK_PROFILES:
        raise ValueError(f"unknown profile {profile!r}; choose from {sorted(_NETWORK_PROFILES)}")
    n_nodes, n_edges, n_inter, alpha, recip, closure, qty_mean, ts_range = _NETWORK_PROFILES[profile]
    n_nodes = max(10, int(n_nodes * sf))
    n_edges = max(20, int(n_edges * sf))
    n_inter = max(30, int(n_inter * sf))
    g = _rng(seed)

    # Zipf-skewed endpoint sampling -> hubs and (after closure) cycles.
    ranks = np.arange(1, n_nodes + 1)
    w = 1.0 / ranks**alpha
    w /= w.sum()
    src = g.choice(ranks, size=int(n_edges * 1.3), p=w)
    dst = g.choice(ranks, size=int(n_edges * 1.3), p=w)
    keep = src != dst
    edges = np.unique(np.stack([src[keep], dst[keep]], axis=1), axis=0)

    # Reciprocity: reverse a deterministic subset of edges (2-hop cycles).
    n_rec = int(len(edges) * recip)
    rec = edges[g.choice(len(edges), size=n_rec, replace=False)][:, ::-1]
    # Triangle closure: for 2-paths (a->b, b->c) close c->a (3-hop cycles).
    eb = pd.DataFrame(edges, columns=["u", "v"])
    two_paths = eb.merge(eb, left_on="v", right_on="u", suffixes=("_1", "_2"))
    two_paths = two_paths[two_paths["u_1"] != two_paths["v_2"]]
    n_close = min(int(len(edges) * closure), len(two_paths))
    if n_close > 0:
        sel = two_paths.iloc[
            g.choice(len(two_paths), size=n_close, replace=False)
        ]
        closing = np.stack([sel["v_2"].to_numpy(), sel["u_1"].to_numpy()], axis=1)
    else:
        closing = np.empty((0, 2), dtype=edges.dtype)
    all_edges = np.unique(np.vstack([edges, rec, closing]), axis=0)

    # Heavy-tailed interaction counts per edge: zipf over a shuffled edge
    # order so hub edges are not automatically the busiest.
    order = g.permutation(len(all_edges))
    ew = 1.0 / np.arange(1, len(all_edges) + 1) ** 1.1
    ew /= ew.sum()
    eid = g.choice(order, size=n_inter, p=ew)
    qty = np.round(g.lognormal(mean=0.0, sigma=1.2, size=n_inter), 4)
    qty *= qty_mean / max(qty.mean(), 1e-9)  # match the paper's avg flow
    pdf = pd.DataFrame(
        {
            "src": all_edges[eid, 0].astype("int64"),
            "dst": all_edges[eid, 1].astype("int64"),
            "ts": g.integers(0, ts_range, size=n_inter).astype("int64"),
            "qty": np.round(qty, 4),
        }
    )
    # One interaction per (edge, ts): duplicate (src,dst,ts) rows would be
    # indistinguishable; keep the first deterministically.
    pdf = (
        pdf.drop_duplicates(subset=["src", "dst", "ts"])
        .sort_values(["src", "dst", "ts"])
        .reset_index(drop=True)
    )
    return pdf

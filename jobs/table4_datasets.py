"""Table 4 — dataset characteristics of the three synthetic networks.

Usage: ``spark-submit jobs/table4_datasets.py [sf]`` (default SF=0.1).
Prints one row per profile: #nodes, #edges, #interactions, avg flow,
next to the paper's numbers for the real datasets.
"""
import sys

from pyspark.sql import SparkSession

from repro.spark.network import dataset_stats
from repro.synth_data import interaction_network

PAPER_TABLE4 = {
    "bitcoin": ("12M", "27.7M", "45.5M", 34.4),
    "ctu13": ("607K", "697K", "2.8M", 19.2),
    "prosper": ("88K", "3M", "3.04M", 76.0),
}


def run(spark: SparkSession, sf: float = 0.1) -> list[dict]:
    """Compute the Table-4 rows; returns one dict per profile."""
    rows = []
    for profile in ("bitcoin", "ctu13", "prosper"):
        stats = dataset_stats(
            interaction_network(spark, profile=profile, sf=sf)
        ).collect()[0]
        rows.append(
            {
                "dataset": profile,
                "n_nodes": stats["n_nodes"],
                "n_edges": stats["n_edges"],
                "n_interactions": stats["n_interactions"],
                "avg_flow": stats["avg_flow"],
                "paper": PAPER_TABLE4[profile],
            }
        )
    return rows


def main() -> None:
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.1
    spark = SparkSession.builder.appName("table4").getOrCreate()
    print(f"Table 4 (synthetic stand-ins at SF={sf}; paper numbers in parens)")
    print(f"{'dataset':10s} {'#nodes':>9s} {'#edges':>9s} {'#inter':>9s} {'avg flow':>10s}")
    for r in run(spark, sf):
        pn, pe, pi, pf = r["paper"]
        print(
            f"{r['dataset']:10s} {r['n_nodes']:>9d} {r['n_edges']:>9d} "
            f"{r['n_interactions']:>9d} {r['avg_flow']:>10.2f}   "
            f"(paper: {pn}, {pe}, {pi}, {pf})"
        )
    spark.stop()


if __name__ == "__main__":
    main()

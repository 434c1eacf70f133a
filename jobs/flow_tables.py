"""Tables 6-8 — flow-computation runtimes per method and class.

Usage: ``spark-submit jobs/flow_tables.py <bitcoin|ctu13|prosper> [sf]``.
Prints the paper's table shape: All / Class A / B / C rows with average
per-subgraph milliseconds for Greedy, LP, Pre, PreSim.
"""
import sys

from pyspark.sql import SparkSession

from repro.spark.flow_jobs import compute_flows, runtime_table
from repro.spark.subgraphs import extract_seed_subgraphs
from repro.synth_data import interaction_network

# (table, rows) from the paper: cls -> (n, greedy, lp, pre, presim) in msec.
PAPER_TABLES = {
    "bitcoin": {
        "All": (48_700, 0.0491, 5775, 838.8, 524.5),
        "A": (35_400, 0.0074, 2667.18, 0.0078, 0.0078),
        "B": (7_891, 0.295, 7179.39, 0.575, 0.575),
        "C": (5_366, 0.353, 24_248, 7_615.8, 4_762.43),
    },
    "ctu13": {
        "All": (9_235, 0.0035, 10.313, 6.314, 0.7902),
        "A": (9_199, 0.0032, 3.835, 0.0033, 0.0033),
        "B": (3, 0.0037, 71.07, 0.0074, 0.0074),
        "C": (33, 0.0757, 1_810.38, 1_767.5, 220.2),
    },
    "prosper": {
        "All": (137, 0.0027, 0.5105, 0.0352, 0.0157),
        "A": (94, 0.0015, 0.5072, 0.0016, 0.0016),
        "B": (25, 0.004, 0.5646, 0.008, 0.008),
        "C": (18, 0.0067, 0.4527, 0.2373, 0.0889),
    },
}
PAPER_TABLE_NO = {"bitcoin": 6, "ctu13": 7, "prosper": 8}


def run(
    spark: SparkSession,
    profile: str,
    sf: float = 0.1,
    *,
    max_interactions: int = 800,
    lp_cap: int | None = None,
):
    """Extract subgraphs, run all methods, return (results, table) DFs."""
    interactions = interaction_network(spark, profile=profile, sf=sf)
    sub = extract_seed_subgraphs(interactions, max_interactions=max_interactions)
    results = compute_flows(sub, lp_cap=lp_cap).cache()
    return results, runtime_table(results)


def print_table(profile: str, table_pdf) -> None:
    no = PAPER_TABLE_NO[profile]
    print(f"\nTable {no} — runtime (msec) for {profile} subgraphs "
          "(ours | paper in parens)")
    print(f"{'':8s} {'n':>6s} {'Greedy':>10s} {'LP':>12s} {'Pre':>12s} {'PreSim':>12s}")
    for _, row in table_pdf.iterrows():
        cls = row["cls"]
        paper = PAPER_TABLES[profile].get(cls if cls != "All" else "All")
        label = "All" if cls == "All" else f"Class {cls}"
        line = (
            f"{label:8s} {int(row['n_subgraphs']):>6d} "
            f"{row['greedy_ms']:>10.4f} {row['lp_ms']:>12.3f} "
            f"{row['pre_ms']:>12.4f} {row['presim_ms']:>12.4f}"
        )
        if paper:
            line += f"   (paper n={paper[0]}: {paper[1]}, {paper[2]}, {paper[3]}, {paper[4]})"
        print(line)


def main() -> None:
    profile = sys.argv[1] if len(sys.argv) > 1 else "ctu13"
    sf = float(sys.argv[2]) if len(sys.argv) > 2 else 0.1
    spark = SparkSession.builder.appName(f"flow-tables-{profile}").getOrCreate()
    _, table = run(spark, profile, sf)
    print_table(profile, table.toPandas())
    spark.stop()


if __name__ == "__main__":
    main()

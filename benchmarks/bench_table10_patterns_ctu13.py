"""Table 10 — pattern search (GB vs PB) on the ctu13-profile network."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from _pattern_bench import run_pattern_table  # noqa: E402


def test_table10_patterns_ctu13(spark, benchmark):
    run_pattern_table(spark, benchmark, "ctu13")

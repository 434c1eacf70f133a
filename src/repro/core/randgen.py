"""Seeded random temporal DAGs for property/metamorphic tests.

Vertices ``0 .. n-1`` are in topological order by id; vertex 0 is the
source and ``n-1`` the sink, so every generated graph is a DAG by
construction. Edges, interaction counts, timestamps, and quantities are
drawn from a ``numpy`` generator, so a graph is fully determined by its
parameters + seed (hypothesis feeds us seeds).
"""
from __future__ import annotations

import numpy as np

from .graph import TemporalGraph


def random_temporal_dag(
    *,
    n_vertices: int = 6,
    edge_prob: float = 0.4,
    max_interactions_per_edge: int = 3,
    t_range: int = 50,
    max_qty: int = 10,
    integer_qty: bool = True,
    seed: int = 0,
) -> TemporalGraph:
    """A random DAG with source 0 and sink ``n_vertices - 1``.

    Ensures at least one edge out of the source and one into the sink
    so the instance is never degenerate (flow may still be 0).
    """
    rng = np.random.default_rng(seed)
    n = max(2, n_vertices)
    rows = []

    def add_edge(v: int, u: int) -> None:
        k = int(rng.integers(1, max_interactions_per_edge + 1))
        ts = rng.integers(0, t_range, size=k)
        qs = (
            rng.integers(1, max_qty + 1, size=k).astype(float)
            if integer_qty
            else np.round(rng.random(k) * max_qty + 0.01, 3)
        )
        for t, q in zip(ts, qs):
            rows.append((v, u, float(t), float(q)))

    edges = set()
    for v in range(n - 1):
        for u in range(v + 1, n):
            if rng.random() < edge_prob:
                edges.add((v, u))
    if not any(e[0] == 0 for e in edges):
        edges.add((0, int(rng.integers(1, n))))
    if not any(e[1] == n - 1 for e in edges):
        edges.add((int(rng.integers(0, n - 1)), n - 1))
    for v, u in sorted(edges):
        add_edge(v, u)
    return TemporalGraph.from_interactions(rows, source=0, sink=n - 1)

"""Maximum-flow LP formulation (Section 4.2.1, equations (1)-(3)).

One variable per interaction that does *not* originate from the source;
source-origin interactions are fixed at their full quantity (the paper's
observation that reserving at the infinite-buffer source never helps)
and folded into the constraint right-hand sides as constants.

For variable interaction ``i`` on edge ``(v, u)``:

* ``0 <= x_i <= q_i``                                  (eq. 1)
* ``x_i + sum_{out j of v, t_j < t_i} x_j
        - sum_{in  j of v, t_j < t_i} x_j  <=  F_v(t_i)``  (eq. 2)

where ``F_v(t_i)`` is the fixed inflow to ``v`` from source-origin
interactions strictly before ``t_i``. The objective (eq. 3) maximizes
the total quantity arriving at the sink (plus the constant contribution
of any direct source→sink interactions).
"""
from __future__ import annotations

from typing import Dict, List, Tuple

import numpy as np

from ..core.graph import TemporalGraph
from .simplex import LPResult, solve_lp_maximize


def build_lp(g: TemporalGraph) -> Tuple[np.ndarray, np.ndarray, np.ndarray, float, List[Tuple[float, int, int, float]]]:
    """Build ``(c, A, b, constant, variables)`` for the max-flow LP.

    ``variables[k]`` is the interaction ``(t, src, dst, q)`` that
    variable ``k`` controls; ``constant`` is the fixed flow delivered
    straight from the source into the sink.
    """
    rows = g.interactions_in_time_order()
    var_rows = [r for r in rows if r[1] != g.source]
    n = len(var_rows)
    idx_of: Dict[int, List[int]] = {}

    # Per-vertex chronological event lists, to build eq. (2) rows.
    # out_vars[v]: indices of variable interactions leaving v
    # in_vars[v]:  indices of variable interactions entering v
    # fixed_in[v]: (t, q) of source-origin interactions entering v
    out_vars: Dict[int, List[int]] = {}
    in_vars: Dict[int, List[int]] = {}
    fixed_in: Dict[int, List[Tuple[float, float]]] = {}
    for k, (t, v, u, q) in enumerate(var_rows):
        out_vars.setdefault(v, []).append(k)
        in_vars.setdefault(u, []).append(k)
    constant = 0.0
    for t, v, u, q in rows:
        if v == g.source:
            if u == g.sink:
                constant += q
            else:
                fixed_in.setdefault(u, []).append((t, q))

    c = np.zeros(n)
    for k, (t, v, u, q) in enumerate(var_rows):
        if u == g.sink:
            c[k] = 1.0

    # Eq. (1) upper bounds as rows, then one eq. (2) row per variable.
    A = np.zeros((2 * n, n))
    b = np.zeros(2 * n)
    for k, (t, v, u, q) in enumerate(var_rows):
        A[k, k] = 1.0
        b[k] = q
    for k, (t, v, u, q) in enumerate(var_rows):
        r = n + k
        A[r, k] = 1.0
        # Outgoing siblings at the *same* timestamp are included (<=):
        # the paper's strict "<" would let simultaneous interactions each
        # spend the full buffer independently. With "<=", every member of
        # a same-timestamp group carries the joint constraint
        #   sum(group) + earlier-out - earlier-in <= fixed-in,
        # matching the time-expanded reduction and the greedy scan.
        for j in out_vars.get(v, []):
            if j != k and var_rows[j][0] <= t:
                A[r, j] += 1.0
        for j in in_vars.get(v, []):
            if var_rows[j][0] < t:
                A[r, j] -= 1.0
        b[r] = sum(q2 for t2, q2 in fixed_in.get(v, []) if t2 < t)
    return c, A, b, constant, var_rows


def max_flow_lp(g: TemporalGraph) -> float:
    """Solve the max-flow LP for ``g`` and return the optimal flow."""
    c, A, b, constant, var_rows = build_lp(g)
    if len(var_rows) == 0:
        return constant
    res: LPResult = solve_lp_maximize(c, A, b)
    return res.value + constant

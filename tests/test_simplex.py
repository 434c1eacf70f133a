"""Unit tests for the from-scratch simplex solver (repro.lp.simplex)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.lp.simplex import LPResult, SimplexError, solve_lp_maximize


class TestKnownLPs:
    def test_single_variable_bound(self):
        res = solve_lp_maximize([1.0], [[1.0]], [5.0])
        assert res.value == pytest.approx(5.0)
        assert res.x[0] == pytest.approx(5.0)

    def test_two_variables_shared_resource(self):
        # max x + y s.t. x <= 3, y <= 4, x + y <= 5  -> 5
        res = solve_lp_maximize(
            [1.0, 1.0], [[1, 0], [0, 1], [1, 1]], [3.0, 4.0, 5.0]
        )
        assert res.value == pytest.approx(5.0)

    def test_weighted_objective_prefers_heavier_variable(self):
        # max 3x + y s.t. x + y <= 4, x <= 2 -> x=2, y=2 -> 8
        res = solve_lp_maximize([3.0, 1.0], [[1, 1], [1, 0]], [4.0, 2.0])
        assert res.value == pytest.approx(8.0)
        assert res.x == pytest.approx([2.0, 2.0])

    def test_zero_objective(self):
        res = solve_lp_maximize([0.0], [[1.0]], [5.0])
        assert res.value == pytest.approx(0.0)

    def test_negative_objective_keeps_x_zero(self):
        res = solve_lp_maximize([-2.0], [[1.0]], [5.0])
        assert res.value == pytest.approx(0.0)
        assert res.x[0] == pytest.approx(0.0)

    def test_degenerate_constraints(self):
        # Redundant + degenerate rows (b=0) must not cycle.
        res = solve_lp_maximize(
            [1.0, 1.0],
            [[1, 0], [1, 0], [0, 1], [1, 1], [1, -1]],
            [2.0, 2.0, 2.0, 3.0, 0.0],
        )
        assert res.value == pytest.approx(3.0)

    def test_classic_lp(self):
        # max 3x + 5y s.t. x <= 4, 2y <= 12, 3x + 2y <= 18 -> 36
        res = solve_lp_maximize(
            [3.0, 5.0], [[1, 0], [0, 2], [3, 2]], [4.0, 12.0, 18.0]
        )
        assert res.value == pytest.approx(36.0)
        assert res.x == pytest.approx([2.0, 6.0])


class TestErrors:
    def test_negative_b_raises(self):
        with pytest.raises(SimplexError):
            solve_lp_maximize([1.0], [[1.0]], [-1.0])

    def test_unbounded_raises(self):
        with pytest.raises(SimplexError):
            solve_lp_maximize([1.0, 1.0], [[1.0, -1.0]], [1.0])

    def test_shape_mismatch_raises(self):
        with pytest.raises(SimplexError):
            solve_lp_maximize([1.0, 2.0], [[1.0]], [1.0])

    def test_one_dim_A_raises(self):
        with pytest.raises(SimplexError):
            solve_lp_maximize([1.0], np.ones(3), [1.0])

    def test_no_constraints_positive_c_unbounded(self):
        with pytest.raises(SimplexError):
            solve_lp_maximize([1.0], np.zeros((0, 1)), np.zeros(0))

    def test_no_variables_returns_zero(self):
        res = solve_lp_maximize(np.zeros(0), np.zeros((2, 0)), [1.0, 2.0])
        assert res.value == pytest.approx(0.0)


@settings(max_examples=60, deadline=None)
@given(st.integers(min_value=0, max_value=10_000))
def test_random_lps_feasible_and_dominant(seed):
    """The returned optimum is feasible and >= many random feasible points."""
    rng = np.random.default_rng(seed)
    m, n = int(rng.integers(1, 8)), int(rng.integers(1, 6))
    A = rng.uniform(0.1, 2.0, size=(m, n))  # positive coeffs -> bounded
    b = rng.uniform(0.5, 5.0, size=m)
    c = rng.uniform(-1.0, 2.0, size=n)
    res: LPResult = solve_lp_maximize(c, A, b)
    assert np.all(A @ res.x <= b + 1e-6)
    assert np.all(res.x >= -1e-9)
    assert res.value == pytest.approx(float(c @ res.x), abs=1e-6)
    for _ in range(25):
        x = rng.uniform(0, 1, size=n)
        # Scale into the feasible region.
        denom = np.max(A @ x / b)
        x = x / max(denom, 1e-9) * rng.uniform(0, 1)
        if np.all(A @ x <= b + 1e-9):
            assert c @ x <= res.value + 1e-6

"""Unit tests for the two-phase simplex LP substrate."""
import numpy as np
import pytest

from repro.ilp.simplex import INFEASIBLE, OPTIMAL, UNBOUNDED, solve_lp


def _check(A, b, c, expected_obj, tol=1e-6):
    res = solve_lp(np.array(A, float), np.array(b, float), np.array(c, float))
    assert res.status == OPTIMAL
    assert res.objective == pytest.approx(expected_obj, abs=tol)
    assert np.allclose(np.array(A, float) @ res.x, b, atol=1e-6)
    assert (res.x >= -1e-9).all()
    return res


def test_trivial_single_equation():
    _check([[1.0]], [5.0], [1.0], 5.0)


def test_two_vars_pick_cheaper():
    # x1 + x2 = 10, min 2x1 + x2 → all on x2
    res = _check([[1, 1]], [10], [2, 1], 10.0)
    assert res.x[1] == pytest.approx(10)


def test_negative_rhs_rows_flipped():
    # -x1 = -4 → x1 = 4
    _check([[-1.0]], [-4.0], [1.0], 4.0)


def test_standard_lp_with_slack_columns():
    # max 3x+2y st x+y<=4, x+3y<=6  (as equalities with slacks)
    A = [[1, 1, 1, 0], [1, 3, 0, 1]]
    b = [4, 6]
    c = [-3, -2, 0, 0]
    res = _check(A, b, c, -12.0)
    assert res.x[0] == pytest.approx(4)


def test_degenerate_lp_terminates():
    A = [[1, 1, 1, 0], [1, 1, 0, 1]]  # redundant-ish rows
    b = [2, 2]
    c = [-1, -1, 0, 0]
    res = solve_lp(np.array(A, float), np.array(b, float), np.array(c, float))
    assert res.status == OPTIMAL
    assert res.objective == pytest.approx(-2.0)


def test_infeasible_detected():
    # x1 = 1 and x1 = 2
    res = solve_lp(np.array([[1.0], [1.0]]), np.array([1.0, 2.0]), np.array([0.0]))
    assert res.status == INFEASIBLE


def test_infeasible_negative_requirement():
    # x1 + x2 = -1 with x >= 0
    res = solve_lp(np.array([[1.0, 1.0]]), np.array([-1.0]), np.array([1.0, 1.0]))
    assert res.status == INFEASIBLE


def test_unbounded_detected():
    # x1 - x2 = 0, min -x1
    res = solve_lp(np.array([[1.0, -1.0]]), np.array([0.0]), np.array([-1.0, 0.0]))
    assert res.status == UNBOUNDED


def test_redundant_row_handled():
    A = [[1, 1], [2, 2]]
    b = [3, 6]
    res = solve_lp(np.array(A, float), np.array(b, float), np.array([1.0, 2.0]))
    assert res.status == OPTIMAL
    assert res.objective == pytest.approx(3.0)


def test_zero_rows():
    res = solve_lp(np.zeros((0, 3)), np.zeros(0), np.array([1.0, 1.0, 1.0]))
    assert res.status == OPTIMAL
    assert res.objective == 0.0


@pytest.mark.parametrize("seed", range(8))
def test_random_feasible_systems_reach_zero_slack(seed):
    """Random consistent 0/1 systems: min-slack LP must reach slack 0."""
    g = np.random.default_rng(seed)
    m, n = 6, 12
    A0 = (g.random((m, n)) < 0.4).astype(float)
    x_true = g.integers(0, 5, n).astype(float)
    b = A0 @ x_true
    # slack columns s+ / s-
    A = np.hstack([A0, np.eye(m), -np.eye(m)])
    c = np.concatenate([np.zeros(n), np.ones(2 * m)])
    res = solve_lp(A, b, c)
    assert res.status == OPTIMAL
    assert res.objective == pytest.approx(0.0, abs=1e-7)


@pytest.mark.parametrize("seed", range(5))
def test_random_lp_matches_bruteforce_vertex_enum(seed):
    """Cross-check small LPs against brute-force basic-solution enumeration."""
    from itertools import combinations

    g = np.random.default_rng(100 + seed)
    m, n = 3, 6
    A = g.integers(0, 3, (m, n)).astype(float)
    x_true = g.integers(0, 4, n).astype(float)
    b = A @ x_true
    c = g.integers(1, 5, n).astype(float)
    res = solve_lp(A, b, c)
    assert res.status == OPTIMAL
    best = np.inf
    for cols in combinations(range(n), m):
        B = A[:, cols]
        if abs(np.linalg.det(B)) < 1e-9:
            continue
        xb = np.linalg.solve(B, b)
        if (xb < -1e-9).any():
            continue
        x = np.zeros(n)
        x[list(cols)] = xb
        best = min(best, c @ x)
    assert res.objective == pytest.approx(best, abs=1e-6)

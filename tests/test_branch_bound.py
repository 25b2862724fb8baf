"""Unit tests for the branch-and-bound ILP substrate."""
import numpy as np
import pytest

from repro.ilp import solve_ilp
from repro.ilp.simplex import INFEASIBLE


def test_integral_lp_returns_immediately():
    A = np.array([[1.0, 1.0]])
    b = np.array([4.0])
    c = np.array([1.0, 2.0])
    res = solve_ilp(A, b, c)
    assert res.integral and res.nodes == 1
    assert res.objective == pytest.approx(4.0)


def test_branching_needed_fractional_root():
    # x1/2 + x2 = 1.5 ... build a system whose LP optimum is fractional:
    # min x1 s.t. 2 x1 - x2 = 1  → LP picks x1=0.5, x2=0; ILP needs x1>=1
    A = np.array([[2.0, -1.0]])
    b = np.array([1.0])
    c = np.array([1.0, 0.0])
    res = solve_ilp(A, b, c)
    assert res.integral
    x = res.x
    assert np.allclose(A @ x, b)
    assert float(x[0]).is_integer() and float(x[1]).is_integer()
    assert res.objective == pytest.approx(1.0)  # x1=1, x2=1


def test_infeasible_integer_system():
    # 2x = 3 has no nonnegative integer solution; LP is feasible (x=1.5)
    A = np.array([[2.0]])
    b = np.array([3.0])
    c = np.array([0.0])
    res = solve_ilp(A, b, c, node_limit=50)
    assert not res.integral  # must not claim an integral solution exists


def test_lp_infeasible_propagates():
    A = np.array([[1.0], [1.0]])
    b = np.array([1.0, 2.0])
    res = solve_ilp(A, b, np.array([0.0]))
    assert res.status == INFEASIBLE


@pytest.mark.parametrize("seed", range(10))
def test_random_consistent_01_systems_solved_exactly(seed):
    """Alg-1-shaped systems (0/1 matrix, consistent integer rhs) with slack
    columns must reach zero slack with an integral solution."""
    g = np.random.default_rng(seed)
    m, n = 5, 10
    A0 = (g.random((m, n)) < 0.45).astype(float)
    x_true = g.integers(0, 6, n).astype(float)
    b = A0 @ x_true
    A = np.hstack([A0, np.eye(m), -np.eye(m)])
    c = np.concatenate([np.zeros(n), np.ones(2 * m)])
    res = solve_ilp(A, b, c, node_limit=100)
    assert res.integral
    assert res.objective == pytest.approx(0.0, abs=1e-6)
    x = res.x[:n]
    assert np.allclose(np.round(x), x)
    assert np.allclose(A0 @ x, b)


def test_node_limit_returns_best_effort():
    g = np.random.default_rng(3)
    m, n = 4, 8
    A0 = (g.random((m, n)) < 0.5).astype(float)
    b = A0 @ g.integers(0, 4, n)
    A = np.hstack([A0, np.eye(m), -np.eye(m)])
    c = np.concatenate([np.zeros(n), np.ones(2 * m)])
    res = solve_ilp(A, b.astype(float), c, node_limit=1)
    assert res.x is not None  # still returns the relaxation


def test_best_first_finds_optimum_not_just_any_integral():
    # min x1 + 10 x2 s.t. x1 + x2 = 3 → x1=3, x2=0 (both integral corners)
    A = np.array([[1.0, 1.0]])
    b = np.array([3.0])
    c = np.array([1.0, 10.0])
    res = solve_ilp(A, b, c)
    assert res.integral
    assert res.objective == pytest.approx(3.0)

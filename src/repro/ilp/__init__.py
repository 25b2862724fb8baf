"""Integer Linear Programming substrate.

The paper solves Algorithm 1's system ``Ax = b`` with PuLP + CBC; neither is
available offline, so this package provides the replacement: a dense
two-phase primal simplex (``simplex``) and a node-limited branch-and-bound
integer solver with a structured rounding fallback (``branch_bound``).
"""
from .simplex import LPResult, solve_lp
from .branch_bound import ILPResult, solve_ilp

__all__ = ["LPResult", "solve_lp", "ILPResult", "solve_ilp"]

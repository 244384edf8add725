"""Tiny dense linear-programming substrate.

The GHD search needs the fractional edge cover number ρ* of each bag
(paper §III-A, fhw minimization). The container ships no LP solver
(no scipy), so this subpackage implements a small two-phase simplex
adequate for the ≤ 10-variable covers that arise from Q1–Q6.
"""
from repro.lp.simplex import LPResult, solve_lp  # noqa: F401

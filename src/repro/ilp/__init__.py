"""Exact 0/1 integer linear programming substrate.

The paper solves its multi-query optimization ILP with Gurobi; this
container has no solver, so `repro.ilp` implements one from scratch:
a branch-and-bound search with unit propagation over binary variables,
SOS1-style branching on one-of constraint groups, and a pluggable
domain lower bound. Exact (proves optimality) with an optional time
limit returning the best incumbent.
"""
from .model import Constraint, IlpModel
from .solver import Solution, solve

__all__ = ["Constraint", "IlpModel", "Solution", "solve"]

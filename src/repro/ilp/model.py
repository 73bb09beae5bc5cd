"""0/1 ILP model container.

Minimize ``c·x`` subject to linear constraints ``a·x ≥ b`` or
``a·x = b`` with every variable binary. Variables are referenced by
string name; the model assigns dense indices for the solver.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Mapping


@dataclass(frozen=True)
class Constraint:
    """``Σ coeffs[v]·v  (≥ | =)  rhs`` over binary variables."""

    coeffs: tuple[tuple[str, float], ...]
    sense: str  # ">=" or "=="
    rhs: float

    def __post_init__(self) -> None:
        if self.sense not in (">=", "=="):
            raise ValueError(f"unsupported sense {self.sense!r}")

    @staticmethod
    def of(coeffs: Mapping[str, float], sense: str, rhs: float) -> "Constraint":
        return Constraint(tuple(sorted(coeffs.items())), sense, rhs)

    def __str__(self) -> str:  # pragma: no cover - debugging sugar
        terms = " + ".join(f"{c:+g}·{v}" for v, c in self.coeffs)
        return f"{terms} {self.sense} {self.rhs:g}"


@dataclass
class IlpModel:
    """A 0/1 ILP: named binary variables, objective and constraints."""

    objective: dict[str, float] = field(default_factory=dict)
    constraints: list[Constraint] = field(default_factory=list)
    _vars: dict[str, int] = field(default_factory=dict)

    def add_var(self, name: str, obj: float = 0.0) -> str:
        """Register a binary variable (idempotent; objective coefficients
        of repeated registrations must agree)."""
        if name in self._vars:
            prev = self.objective.get(name, 0.0)
            if abs(prev - obj) > 1e-9 * max(1.0, abs(prev)):
                raise ValueError(
                    f"variable {name} re-added with different objective "
                    f"({prev} vs {obj})"
                )
            return name
        self._vars[name] = len(self._vars)
        if obj:
            self.objective[name] = obj
        return name

    def add_constraint(
        self, coeffs: Mapping[str, float], sense: str, rhs: float
    ) -> Constraint:
        for v in coeffs:
            if v not in self._vars:
                raise KeyError(f"unknown variable {v}")
        c = Constraint.of(coeffs, sense, rhs)
        self.constraints.append(c)
        return c

    @property
    def variables(self) -> tuple[str, ...]:
        return tuple(self._vars)

    @property
    def num_variables(self) -> int:
        return len(self._vars)

    @property
    def num_constraints(self) -> int:
        return len(self.constraints)

    def objective_value(self, assignment: Mapping[str, int]) -> float:
        return sum(c for v, c in self.objective.items() if assignment.get(v))

    def is_feasible(self, assignment: Mapping[str, int]) -> bool:
        """Check a *complete* assignment against every constraint."""
        for con in self.constraints:
            lhs = sum(c * assignment.get(v, 0) for v, c in con.coeffs)
            if con.sense == ">=" and lhs < con.rhs - 1e-9:
                return False
            if con.sense == "==" and abs(lhs - con.rhs) > 1e-9:
                return False
        return True

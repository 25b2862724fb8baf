"""NAE-3SAT → C-Extension reduction (Proposition 2.8).

Builds the gadget instance exactly as in the proof: relation
``R1(Var, Alpha, Cls, Chosen?)`` with one tuple per literal-occurrence that
can satisfy its clause, ``R2(Chosen, E)`` with keys {0, 1}, and two DCs:

1. arity 2 — same Var, different Alpha, same Chosen (consistency);
2. arity 3 — same Cls, same Chosen for all three (not-all-equal).

Used by tests both to validate the k-ary conflict machinery and to check
that solutions of the pipeline decode into valid NAE assignments.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd

from .constraints import Comp, Cond, DC

#: A clause is a tuple of signed literals, e.g. (1, -2, 3) = x1 ∨ ¬x2 ∨ x3.
Clause = tuple[int, ...]


@dataclass
class ReductionInstance:
    r1: pd.DataFrame  # p_id, Var, Alpha, Cls  (Chosen missing)
    r2: pd.DataFrame  # Chosen (key), E
    dcs: list[DC]
    clauses: list[Clause]


def build_instance(clauses: list[Clause]) -> ReductionInstance:
    rows = []
    for j, clause in enumerate(clauses):
        for lit in clause:
            var = f"x{abs(lit)}"
            alpha = 1 if lit > 0 else 0  # making Var=alpha makes the clause true
            rows.append((var, alpha, f"C{j}"))
    r1 = pd.DataFrame(rows, columns=["Var", "Alpha", "Cls"])
    r1.insert(0, "p_id", range(1, len(r1) + 1))
    r2 = pd.DataFrame({"Chosen": [0, 1], "E": ["a", "b"]})
    dcs = [
        DC(
            name="dc_consistency",
            preds=(Cond.of(), Cond.of()),
            comps=(
                Comp(0, "Var", "=", 1, "Var"),
                Comp(0, "Alpha", "!=", 1, "Alpha"),
            ),
        ),
        DC(
            name="dc_nae",
            preds=(Cond.of(), Cond.of(), Cond.of()),
            comps=(
                Comp(0, "Cls", "=", 1, "Cls"),
                Comp(1, "Cls", "=", 2, "Cls"),
            ),
        ),
    ]
    return ReductionInstance(r1=r1, r2=r2, dcs=dcs, clauses=clauses)


def decode_assignment(r1_hat: pd.DataFrame) -> dict[str, bool] | None:
    """Extract the assignment α: t.Chosen = 1 iff α(Var) = Alpha.

    Returns None if the completion is inconsistent (some variable would be
    assigned both truth values) — cannot happen when DC 1 holds.
    """
    alpha: dict[str, bool] = {}
    for _, t in r1_hat.iterrows():
        val = bool(t["Alpha"]) if t["Chosen"] == 1 else not bool(t["Alpha"])
        if t["Var"] in alpha and alpha[t["Var"]] != val:
            return None
        alpha[t["Var"]] = val
    return alpha


def is_nae_satisfying(clauses: list[Clause], alpha: dict[str, bool]) -> bool:
    """Every clause has at least one true and at least one false literal."""
    for clause in clauses:
        vals = [alpha[f"x{abs(l)}"] == (l > 0) for l in clause]
        if all(vals) or not any(vals):
            return False
    return True


def nae_satisfiable(clauses: list[Clause]) -> bool:
    """Brute-force NAE satisfiability (test oracle; instances are small)."""
    vs = sorted({abs(l) for c in clauses for l in c})
    for m in range(2 ** len(vs)):
        alpha = {f"x{v}": bool((m >> i) & 1) for i, v in enumerate(vs)}
        if is_nae_satisfying(clauses, alpha):
            return True
    return False

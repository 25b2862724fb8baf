"""Constraint workloads: the 12 DCs of Table 4 and the good/bad CC sets.

``S_DC_all`` / ``S_DC_good`` follow Table 4 verbatim (good = first 8, the
age-window rules that create no cliques in conflict graphs; 9–12 add the
clique-forming count rules).

``S_CC_good`` / ``S_CC_bad`` follow Table 5's structure. The paper's good set
contains zero intersecting pairs under the strict Def 4.2 classifier; that
forces a specific combinatorial shape which we construct programmatically:

* *singleton* R1 predicates (one per role × Multi_ling slice, pairwise
  disjoint) may be crossed with **every** Tenure-Area combo and Area-only
  value — identical R1 parts with disjoint R2 parts are disjoint CCs;
* *laminar trees* of nested age predicates are bound to a **single**
  Tenure-Area combo each (nested R1 parts with different R2 parts would be
  intersecting under Def 4.2), with the root additionally emitted Area-only
  (full containment).

The bad set appends genuinely overlapping age intervals (Table 5, right
column) which intersect the good predicates and push whole diagrams to the
ILP. All targets are true counts of the ground-truth join, so the input
constraint system is always consistent (as with the paper's Census-derived
counts).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from . import census as cz
from .core.constraints import CC, Cond, DC, OutsideComp, pairwise_dc

# ---------------------------------------------------------------------------
# Denial constraints (Table 4)
# ---------------------------------------------------------------------------

_CHILD3 = {cz.BIO_CHILD, cz.ADOPTED_CHILD, cz.STEP_CHILD}


def _age_window_dc(name: str, p_owner: Cond, p_member: Cond, lo: int, hi: int) -> DC:
    """"No <member> can have age outside [A+lo, A+hi]" with A = owner age."""
    return DC(
        name=name,
        preds=(p_owner, p_member),
        comps=(OutsideComp(i=1, col_i="Age", j=0, col_j="Age", lo=lo, hi=hi),),
    )


def make_dcs() -> list[DC]:
    """The 12 DCs of Table 4, in order."""
    owner = Cond.of(Rel=cz.OWNER)
    owner_ml0 = Cond.of(Rel=cz.OWNER, Multi_ling=0)
    owner_ml1 = Cond.of(Rel=cz.OWNER, Multi_ling=1)
    spouses = Cond.of(Rel={cz.SPOUSE, cz.PARTNER})
    parents = Cond.of(Rel={cz.PARENT, cz.PARENT_IN_LAW})
    return [
        _age_window_dc("dc1_child_ml0", owner_ml0, Cond.of(Rel=_CHILD3), -69, -12),
        _age_window_dc("dc2_child_ml1", owner_ml1, Cond.of(Rel=_CHILD3), -50, -12),
        _age_window_dc("dc3_spouse", owner, spouses, -50, 50),
        _age_window_dc("dc4_sibling", owner, Cond.of(Rel=cz.SIBLING), -35, 35),
        _age_window_dc("dc5_parent", owner, parents, 12, 115),
        _age_window_dc("dc6_grandchild", owner, Cond.of(Rel=cz.GRANDCHILD), -115, -30),
        _age_window_dc("dc7_child_in_law", owner, Cond.of(Rel=cz.CHILD_IN_LAW), -69, -1),
        _age_window_dc("dc8_foster", owner, Cond.of(Rel=cz.FOSTER_CHILD), -69, -12),
        pairwise_dc("dc9_two_owners", owner, owner),
        pairwise_dc(
            "dc10_young_owner",
            Cond.of(Rel=cz.OWNER, Age=(0, 29)),
            Cond.of(Rel={cz.GRANDCHILD, cz.CHILD_IN_LAW}),
        ),
        pairwise_dc(
            "dc11_old_owner",
            Cond.of(Rel=cz.OWNER, Age=(95, 114)),
            parents,
        ),
        pairwise_dc("dc12_two_spouses", spouses, spouses),
    ]


def dcs_all() -> list[DC]:
    return make_dcs()


def dcs_good() -> list[DC]:
    """First 8 DCs — no cliques in conflict graphs (§6.1)."""
    return make_dcs()[:8]


# ---------------------------------------------------------------------------
# Cardinality constraints (Table 5 structure)
# ---------------------------------------------------------------------------

# A predicate is (role, age_interval, multi_ling | None).
_Pred = tuple[str, tuple[int, int], int | None]

#: Singleton predicates: pairwise-disjoint R1 parts within each role, safe to
#: cross with every R2 combo (identical R1 ⇒ disjoint when R2 parts differ).
_GOOD_SINGLES: list[_Pred] = [
    (cz.OWNER, (18, 114), 0),
    (cz.OWNER, (18, 114), 1),
    (cz.SPOUSE, (18, 114), 1),
    (cz.SPOUSE, (18, 114), 0),
    (cz.PARENT, (18, 39), None),
    (cz.PARENT, (40, 85), 0),
    (cz.PARENT, (40, 85), 1),
    (cz.HOUSEMATE, (15, 85), 0),
    (cz.HOUSEMATE, (15, 85), 1),
    (cz.GRANDCHILD, (18, 30), 0),
    (cz.GRANDCHILD, (18, 30), 1),
    (cz.PARTNER, (18, 114), 1),
]

#: Laminar trees (root, [children...]) of nested/disjoint age predicates —
#: each tree is bound to one Tenure-Area combo (+ root Area-only).
_TreeNode = tuple[_Pred, list]
_GOOD_TREES: list[_TreeNode] = [
    (
        (cz.BIO_CHILD, (0, 10), None),
        [
            ((cz.BIO_CHILD, (6, 10), None), []),
            (
                (cz.BIO_CHILD, (2, 5), None),
                [((cz.BIO_CHILD, (3, 5), None), [((cz.BIO_CHILD, (3, 5), 0), [])])],
            ),
        ],
    ),
    (
        (cz.BIO_CHILD, (11, 18), None),
        [((cz.BIO_CHILD, (11, 13), None), []), ((cz.BIO_CHILD, (14, 18), None), [])],
    ),
    (
        (cz.BIO_CHILD, (19, 30), None),
        [((cz.BIO_CHILD, (22, 30), None), [((cz.BIO_CHILD, (25, 30), 1), [])])],
    ),
    (
        (cz.STEP_CHILD, (0, 30), None),
        [((cz.STEP_CHILD, (0, 20), None), []), ((cz.STEP_CHILD, (21, 30), 1), [])],
    ),
    (
        (cz.ADOPTED_CHILD, (19, 40), None),
        [((cz.ADOPTED_CHILD, (25, 40), 1), [((cz.ADOPTED_CHILD, (31, 40), 1), [])])],
    ),
]

#: Overlapping (neither nested nor disjoint) predicates per Table 5 (right).
_BAD_PREDS: list[_Pred] = [
    (cz.SPOUSE, (21, 114), 1),
    (cz.SPOUSE, (21, 64), 1),
    (cz.SPOUSE, (18, 39), 1),
    (cz.SPOUSE, (18, 85), 1),
    (cz.SPOUSE, (40, 85), 1),
    (cz.GRANDCHILD, (0, 39), 1),
    (cz.GRANDCHILD, (22, 39), 1),
    (cz.BIO_CHILD, (0, 8), None),
    (cz.BIO_CHILD, (4, 12), None),
    (cz.STEP_CHILD, (0, 21), None),
    (cz.ADOPTED_CHILD, (19, 39), None),
]


def _pred_cond(p: _Pred) -> Cond:
    role, (lo, hi), ml = p
    kw: dict = {"Rel": role, "Age": (lo, hi)}
    if ml is not None:
        kw["Multi_ling"] = ml
    return Cond.of(**kw)


def _flatten_tree(node: _TreeNode) -> list[_Pred]:
    pred, children = node
    out = [pred]
    for c in children:
        out.extend(_flatten_tree(c))
    return out


def _combos(housing: pd.DataFrame) -> list[tuple[str, str]]:
    """Active (Tenure, Area) combos, most common first (stable target counts)."""
    vc = housing.groupby(["Tenure", "Area"]).size().sort_values(ascending=False)
    return [(t, a) for (t, a) in vc.index]


def _count(truth: pd.DataFrame, cond: Cond) -> int:
    return int(cond.mask(truth).sum())


def _emit(ccs: list[CC], truth: pd.DataFrame, r1: Cond, r2: Cond) -> None:
    full = r1.merge(r2)
    ccs.append(CC(cc_id=len(ccs), r1=r1, r2=r2, target=_count(truth, full)))


def make_cc_good(db: cz.CensusDB, n_cc: int = 120, seed: int = 0) -> list[CC]:
    """Non-intersecting CC set (paper's S_CC^good), true-count targets."""
    g = np.random.default_rng(seed)
    truth = db.truth_vjoin
    combos = _combos(db.housing)
    areas = sorted(db.housing["Area"].unique())

    units: list[list[tuple[Cond, Cond]]] = []
    # one unit per laminar tree: whole tree on one combo + root Area-only
    for k, tree in enumerate(_GOOD_TREES):
        t, a = combos[k % len(combos)]
        unit = [(_pred_cond(tree[0]), Cond.of(Area=a))]
        unit += [(_pred_cond(p), Cond.of(Tenure=t, Area=a)) for p in _flatten_tree(tree)]
        units.append(unit)
    # singleton predicates × every combo (each pairing its own unit)
    for p in _GOOD_SINGLES:
        for t, a in combos:
            units.append([(_pred_cond(p), Cond.of(Tenure=t, Area=a))])
        for a in areas:
            units.append([(_pred_cond(p), Cond.of(Area=a))])

    order = np.arange(len(units))
    g.shuffle(order[len(_GOOD_TREES):])  # keep trees first so they survive
    ccs: list[CC] = []
    for i in order:
        for r1, r2 in units[i]:
            if len(ccs) >= n_cc:
                return ccs
            _emit(ccs, truth, r1, r2)
    return ccs


def make_cc_bad(db: cz.CensusDB, n_cc: int = 120, seed: int = 0) -> list[CC]:
    """CC set with intersecting pairs (paper's S_CC^bad)."""
    g = np.random.default_rng(seed)
    truth = db.truth_vjoin
    combos = _combos(db.housing)
    n_bad = max(4, n_cc // 4)
    ccs = make_cc_good(db, n_cc=n_cc - n_bad, seed=seed)
    for k, p in enumerate(_BAD_PREDS * ((n_bad // len(_BAD_PREDS)) + 1)):
        if len(ccs) >= n_cc:
            break
        t, a = combos[int(g.integers(0, len(combos)))]
        _emit(ccs, truth, _pred_cond(p), Cond.of(Tenure=t, Area=a))
    return ccs

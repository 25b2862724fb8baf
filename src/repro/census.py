"""Census-like Persons/Housing generator (substrate for the paper's data).

The paper evaluates on a dataset derived from the 2010 U.S. Decennial Census
[44]: ``Persons(p_id, Age, Rel, Multi_ling, h_id)`` with the FK ``h_id``
missing, and ``Housing(h_id, Tenure, Area, ...)`` with up to 10 non-key
columns. That dataset is unavailable offline, so this module generates a
synthetic equivalent with:

* the paper's Persons:Housing ratio (25,099 : 9,820 ≈ 2.556 at scale 1×),
* household structures whose ground-truth ``h_id`` assignment satisfies all
  12 DCs of Table 4 (verified by tests), so that true-count CC targets are
  always consistent,
* the same R2 column ladder as §6.1: (Tenure, Area) → +(County, St) →
  +(Div, Reg) → +(Water, Bath) → +(Fridge, Stove).

Scales follow Table 1 via ``scale`` (the paper's 1×..160×) shrunk by a global
``shrink`` factor so the reproduction runs at laptop scale.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

PERSONS_PER_SCALE = 25_099
HOUSING_PER_SCALE = 9_820

OWNER = "Owner"
SPOUSE = "Spouse"
PARTNER = "Unmarried partner"
BIO_CHILD = "Biological child"
ADOPTED_CHILD = "Adopted child"
STEP_CHILD = "Step child"
FOSTER_CHILD = "Foster child"
SIBLING = "Sibling"
PARENT = "Parent"
PARENT_IN_LAW = "Parent-in-law"
CHILD_IN_LAW = "Child-in-law"
GRANDCHILD = "Grandchild"
HOUSEMATE = "Housemate"

ROLES = [
    OWNER, SPOUSE, PARTNER, BIO_CHILD, ADOPTED_CHILD, STEP_CHILD,
    FOSTER_CHILD, SIBLING, PARENT, PARENT_IN_LAW, CHILD_IN_LAW, GRANDCHILD,
    HOUSEMATE,
]

TENURES = ["Owned", "Mortgaged", "Rented", "NoPay"]
N_AREAS = 12
AREAS = [f"A{i:02d}" for i in range(1, N_AREAS + 1)]

#: R2 column ladder per §6.1 (2, 4, 6, 8, 10 non-key columns).
R2_COLUMN_LADDER = {
    2: ["Tenure", "Area"],
    4: ["Tenure", "County", "Area", "St"],
    6: ["Tenure", "County", "Area", "St", "Div", "Reg"],
    8: ["Tenure", "County", "Area", "St", "Div", "Reg", "Water", "Bath"],
    10: [
        "Tenure", "County", "Area", "St", "Div", "Reg", "Water", "Bath",
        "Fridge", "Stove",
    ],
}

AGE_MAX = 114


@dataclass
class CensusDB:
    """A generated database: persons (with ground-truth h_id) + housing."""

    persons: pd.DataFrame   # p_id, Age, Rel, Multi_ling, h_id (ground truth)
    housing: pd.DataFrame   # h_id + non-key columns
    scale: float
    shrink: float

    @property
    def truth_vjoin(self) -> pd.DataFrame:
        """Ground-truth join view (used only to derive CC targets)."""
        return self.persons.merge(self.housing, on="h_id", how="left")

    def persons_missing_fk(self) -> pd.DataFrame:
        """R1 as the algorithms see it — FK column dropped."""
        return self.persons.drop(columns=["h_id"])

    def spark_r1(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.persons_missing_fk())

    def spark_r2(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.housing)


def _clamp(lo: int, hi: int) -> tuple[int, int]:
    return max(0, lo), min(AGE_MAX, hi)


def _household_members(g: np.random.Generator, owner_age: int) -> list[tuple[str, int]]:
    """Sample household members so every Table-4 DC holds with this owner.

    Age windows mirror Table 4 exactly (children use the *narrower*
    multi-lingual window [A-50, A-12] so DCs 1 and 2 both hold regardless of
    the owner's Multi_ling value).
    """
    o = owner_age
    members: list[tuple[str, int]] = [(OWNER, o)]

    def draw(lo: int, hi: int) -> int | None:
        lo, hi = _clamp(lo, hi)
        if lo > hi:
            return None
        return int(g.integers(lo, hi + 1))

    r = g.random()
    if r < 0.45:  # spouse — DC3, DC12 (at most one spouse/partner)
        a = draw(max(18, o - 50), o + 50)
        if a is not None:
            members.append((SPOUSE, a))
    elif r < 0.55:
        a = draw(max(18, o - 50), o + 50)
        if a is not None:
            members.append((PARTNER, a))

    n_children = min(int(g.poisson(0.9)), 4)
    for _ in range(n_children):  # DCs 1, 2, 8
        a = draw(o - 50, o - 12)
        if a is None:
            continue
        role = g.choice(
            [BIO_CHILD, STEP_CHILD, ADOPTED_CHILD, FOSTER_CHILD],
            p=[0.70, 0.12, 0.10, 0.08],
        )
        members.append((str(role), a))

    if o >= 30:  # DC10 gates grandchildren and children-in-law
        if g.random() < 0.10:
            for _ in range(int(g.integers(1, 3))):
                a = draw(o - 115, o - 30)  # DC6
                if a is not None:
                    members.append((GRANDCHILD, a))
        if g.random() < 0.05:
            a = draw(max(16, o - 69), o - 1)  # DC7
            if a is not None:
                members.append((CHILD_IN_LAW, a))
    if o <= 94:  # DC11 gates parents (owners are capped at 94 anyway)
        if g.random() < 0.06:
            a = draw(o + 12, o + 115)  # DC5
            if a is not None:
                members.append((PARENT, a))
        if g.random() < 0.03:
            a = draw(o + 12, o + 115)
            if a is not None:
                members.append((PARENT_IN_LAW, a))
    if g.random() < 0.06:
        a = draw(o - 35, o + 35)  # DC4
        if a is not None:
            members.append((SIBLING, a))
    if g.random() < 0.08:
        for _ in range(int(g.integers(1, 3))):
            a = draw(15, 85)
            if a is not None:
                members.append((HOUSEMATE, a))
    return members


def _area_table(g: np.random.Generator, n: int) -> pd.DataFrame:
    """Housing rows with the full 10-column ladder + geography hierarchy."""
    ranks = np.arange(1, N_AREAS + 1)
    w = 1.0 / ranks**0.8
    w /= w.sum()
    area_idx = g.choice(np.arange(N_AREAS), size=n, p=w)
    pdf = pd.DataFrame(
        {
            "h_id": np.arange(1, n + 1, dtype=np.int64),
            "Tenure": g.choice(TENURES, size=n, p=[0.30, 0.30, 0.32, 0.08]),
            "Area": [AREAS[i] for i in area_idx],
            "County": [f"C{i // 2:02d}" for i in area_idx],
            "St": [f"S{i // 4}" for i in area_idx],
            "Div": [f"D{i // 8}" for i in area_idx],
            "Reg": [f"R{i // 12}" for i in area_idx],
            "Water": g.integers(0, 2, n),
            "Bath": g.integers(0, 2, n),
            "Fridge": g.integers(0, 2, n),
            "Stove": g.integers(0, 2, n),
        }
    )
    return pdf


def generate(
    *,
    scale: float = 1.0,
    shrink: float = 0.01,
    n_r2_cols: int = 2,
    seed: int = 0,
) -> CensusDB:
    """Generate a CensusDB at paper ``scale`` shrunk by ``shrink``."""
    if n_r2_cols not in R2_COLUMN_LADDER:
        raise ValueError(f"n_r2_cols must be one of {sorted(R2_COLUMN_LADDER)}")
    g = np.random.default_rng(seed)
    n_housing = max(4, round(HOUSING_PER_SCALE * scale * shrink))
    housing = _area_table(g, n_housing)

    rows: list[tuple[int, str, int]] = []  # (h_id, Rel, Age)
    for h_id in range(1, n_housing + 1):
        if g.random() < 0.10:
            continue  # empty household: slack for phase-II coloring
        owner_age = int(g.integers(19, 95))
        for role, age in _household_members(g, owner_age):
            rows.append((h_id, role, age))
    persons = pd.DataFrame(rows, columns=["h_id", "Rel", "Age"])
    persons.insert(0, "p_id", np.arange(1, len(persons) + 1, dtype=np.int64))
    persons["Multi_ling"] = g.integers(0, 5, len(persons)) == 0
    persons["Multi_ling"] = persons["Multi_ling"].astype(np.int64)
    persons["Age"] = persons["Age"].astype(np.int64)
    persons["h_id"] = persons["h_id"].astype(np.int64)
    persons = persons[["p_id", "Age", "Rel", "Multi_ling", "h_id"]]

    keep = ["h_id"] + R2_COLUMN_LADDER[n_r2_cols]
    return CensusDB(
        persons=persons, housing=housing[keep].copy(), scale=scale, shrink=shrink
    )

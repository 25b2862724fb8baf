"""Unit tests for the constraint language (Defs 2.2, 2.4, 4.2–4.4)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.constraints import (
    CC,
    CONTAINED,
    CONTAINS,
    DISJOINT,
    EQUAL,
    INTERSECTING,
    Comp,
    Cond,
    DC,
    OutsideComp,
    cc_relationship,
    pairwise_dc,
)


# ---------------------------------------------------------------------- Cond
def test_cond_of_scalar_is_categorical():
    c = Cond.of(Rel="Owner")
    assert c.spec("Rel") == ("in", frozenset(["Owner"]))


def test_cond_of_tuple_is_range():
    c = Cond.of(Age=(0, 24))
    assert c.spec("Age") == ("range", 0, 24)


def test_cond_of_set_is_membership():
    c = Cond.of(Rel={"Owner", "Spouse"})
    assert c.spec("Rel") == ("in", frozenset(["Owner", "Spouse"]))


def test_cond_empty_interval_rejected():
    with pytest.raises(ValueError):
        Cond.of(Age=(10, 5))


def test_cond_columns_sorted_and_stable():
    c = Cond.of(Rel="Owner", Age=(0, 10))
    assert c.columns == ("Age", "Rel")


def test_cond_restrict_projects():
    c = Cond.of(Rel="Owner", Age=(0, 10))
    assert c.restrict(["Rel"]).columns == ("Rel",)


def test_cond_merge_disjoint_columns():
    m = Cond.of(Rel="Owner").merge(Cond.of(Area="Chicago"))
    assert m.columns == ("Area", "Rel")


def test_cond_merge_overlap_raises():
    with pytest.raises(ValueError):
        Cond.of(Rel="Owner").merge(Cond.of(Rel="Spouse"))


@pytest.mark.parametrize(
    "a,b,expected",
    [
        (dict(Age=(0, 10)), dict(Age=(11, 20)), True),
        (dict(Age=(0, 10)), dict(Age=(10, 20)), False),
        (dict(Rel="Owner"), dict(Rel="Spouse"), True),
        (dict(Rel="Owner"), dict(Rel={"Owner", "Spouse"}), False),
        (dict(Rel="Owner"), dict(Age=(0, 10)), False),  # different columns
        (dict(Age=(0, 10), Rel="Owner"), dict(Age=(5, 6), Rel="Spouse"), True),
        (dict(), dict(Age=(0, 1)), False),  # empty cond = full domain
    ],
)
def test_cond_disjoint(a, b, expected):
    ca, cb = Cond.of(**a), Cond.of(**b)
    assert ca.disjoint_with(cb) is expected
    assert cb.disjoint_with(ca) is expected


@pytest.mark.parametrize(
    "outer,inner,expected",
    [
        (dict(Age=(0, 20)), dict(Age=(5, 10)), True),
        (dict(Age=(0, 20)), dict(Age=(5, 25)), False),
        (dict(Age=(0, 20)), dict(Age=(5, 10), Rel="Owner"), True),  # more attrs
        (dict(Age=(0, 20), Rel="Owner"), dict(Age=(5, 10)), False),  # fewer attrs
        (dict(Rel={"Owner", "Spouse"}), dict(Rel="Owner"), True),
        (dict(), dict(Rel="Owner"), True),  # empty cond contains everything
        (dict(Age=(0, 20)), dict(Age=(0, 20)), True),  # reflexive
    ],
)
def test_cond_contains(outer, inner, expected):
    assert Cond.of(**outer).contains(Cond.of(**inner)) is expected


def test_cond_mask_range_and_cat():
    pdf = pd.DataFrame({"Age": [5, 15, 25], "Rel": ["Owner", "Owner", "Spouse"]})
    m = Cond.of(Age=(0, 20), Rel="Owner").mask(pdf)
    assert m.tolist() == [True, True, False]


def test_cond_matches_row():
    c = Cond.of(Age=(0, 20), Rel="Owner")
    assert c.matches_row({"Age": 5, "Rel": "Owner"})
    assert not c.matches_row({"Age": 25, "Rel": "Owner"})


def test_cond_to_sql_roundtrip_duckdb():
    import duckdb

    pdf = pd.DataFrame({"Age": [5, 15, 25], "Rel": ["Owner", "Owner", "Spouse"]})
    sql = Cond.of(Age=(0, 20), Rel="Owner").to_sql()
    n = duckdb.sql(f"SELECT count(*) FROM pdf WHERE {sql}").fetchone()[0]
    assert n == 2


def test_cond_str_readable():
    assert "Age∈[0,24]" in str(Cond.of(Age=(0, 24)))
    assert str(Cond.of()) == "TRUE"


# ------------------------------------------------------------ relationships
def _cc(i, r1, r2, k=0):
    return CC(i, Cond.of(**r1), Cond.of(**r2), k)


@pytest.mark.parametrize(
    "r1a,r2a,r1b,r2b,expected",
    [
        # disjoint via R1
        (dict(Rel="Owner"), dict(Area="C"), dict(Rel="Spouse"), dict(Area="C"), DISJOINT),
        (dict(Age=(0, 9)), dict(Area="C"), dict(Age=(10, 20)), dict(Area="N"), DISJOINT),
        # disjoint via identical R1 + disjoint R2 (paper's special case)
        (dict(Rel="Owner"), dict(Area="C"), dict(Rel="Owner"), dict(Area="N"), DISJOINT),
        (
            dict(Rel="Owner"),
            dict(Area="C", Tenure="O"),
            dict(Rel="Owner"),
            dict(Area="C", Tenure="R"),
            DISJOINT,
        ),
        # containment (full condition)
        (dict(Age=(0, 20)), dict(Area="C"), dict(Age=(5, 10)), dict(Area="C"), CONTAINS),
        (dict(Age=(5, 10)), dict(Area="C"), dict(Age=(0, 20)), dict(Area="C"), CONTAINED),
        (
            dict(Age=(0, 20)),
            dict(Area="C"),
            dict(Age=(5, 10)),
            dict(Area="C", Tenure="O"),
            CONTAINS,
        ),
        # equality
        (dict(Rel="Owner"), dict(Area="C"), dict(Rel="Owner"), dict(Area="C"), EQUAL),
        # intersecting: overlapping intervals (Example 4.5)
        (
            dict(Age=(10, 49)),
            dict(Area="C"),
            dict(Age=(30, 70)),
            dict(Area="N"),
            INTERSECTING,
        ),
        # intersecting: nested R1 but different R2 (strict Def 4.2!)
        (
            dict(Age=(5, 10)),
            dict(Area="C"),
            dict(Age=(0, 20)),
            dict(Area="N"),
            INTERSECTING,
        ),
        # intersecting: different attribute sets on R1
        (dict(Rel="Owner"), dict(Area="C"), dict(Age=(0, 24)), dict(Area="C"), INTERSECTING),
        # nested R1, nested R2 (Tenure-Area inside Area-only) → containment
        (
            dict(Age=(5, 10)),
            dict(Area="C", Tenure="O"),
            dict(Age=(0, 20)),
            dict(Area="C"),
            CONTAINED,
        ),
    ],
)
def test_cc_relationship(r1a, r2a, r1b, r2b, expected):
    a, b = _cc(0, r1a, r2a), _cc(1, r1b, r2b)
    assert cc_relationship(a, b) == expected


def test_cc_relationship_symmetry():
    a = _cc(0, dict(Age=(0, 20)), dict(Area="C"))
    b = _cc(1, dict(Age=(5, 10)), dict(Area="C"))
    assert cc_relationship(a, b) == CONTAINS
    assert cc_relationship(b, a) == CONTAINED


# ----------------------------------------------------------------------- DC
def test_dc_requires_arity_two():
    with pytest.raises(ValueError):
        DC("bad", (Cond.of(),))


def test_dc_comp_index_validated():
    with pytest.raises(ValueError):
        DC("bad", (Cond.of(), Cond.of()), (Comp(0, "Age", "<", 5, "Age"),))


@pytest.mark.parametrize(
    "op,expected",
    [("<", [True, False, False]), (">", [False, False, True]),
     ("<=", [True, True, False]), (">=", [False, True, True]),
     ("=", [False, True, False]), ("!=", [True, False, True])],
)
def test_comp_apply_ops(op, expected):
    c = Comp(0, "a", op, 1, "b")
    vi = np.array([1, 2, 3])
    vj = np.array([2, 2, 2])
    assert c.apply(vi, vj).tolist() == expected


def test_comp_apply_offset():
    c = Comp(0, "a", ">", 1, "b", offset=10)
    assert c.apply(np.array([13]), np.array([2])).tolist() == [True]
    assert c.apply(np.array([12]), np.array([2])).tolist() == [False]


def test_outside_comp():
    c = OutsideComp(1, "Age", 0, "Age", lo=-50, hi=50)
    owner = np.array([60, 60, 60])
    member = np.array([9, 60, 111])
    assert c.apply(member, owner).tolist() == [True, False, True]


def test_pairwise_dc_builder():
    dc = pairwise_dc(
        "d", Cond.of(Rel="Owner"), Cond.of(Rel="Spouse"), [("Age", "<", "Age", -50)]
    )
    assert dc.arity == 2
    assert dc.comps[0].i == 0 and dc.comps[0].j == 1


def test_dc_violation_sql_counts_with_duckdb():
    import duckdb

    t = pd.DataFrame(
        {
            "p_id": [1, 2, 3],
            "Rel": ["Owner", "Owner", "Spouse"],
            "Age": [50, 50, 20],
            "h_id": [1, 1, 2],
        }
    )
    dc = pairwise_dc("dc_oo", Cond.of(Rel="Owner"), Cond.of(Rel="Owner"))
    sql = dc.to_sql_violation("t", key="p_id", fk="h_id")
    n = duckdb.sql(sql).fetchone()[0]
    assert n == 2  # both owners of household 1 violate

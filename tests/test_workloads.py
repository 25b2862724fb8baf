"""Tests for the Table-4 DCs and Table-5-style CC workloads."""
import itertools

import pytest

from repro import census, workloads
from repro.core.constraints import INTERSECTING, cc_relationship


def test_twelve_dcs_in_order():
    dcs = workloads.dcs_all()
    assert len(dcs) == 12
    assert dcs[0].name == "dc1_child_ml0"
    assert dcs[8].name == "dc9_two_owners"


def test_good_dcs_are_first_eight():
    good = workloads.dcs_good()
    assert [d.name for d in good] == [d.name for d in workloads.dcs_all()[:8]]


def test_good_dcs_create_no_cliques():
    """DCs 1–8 never connect two tuples matching the same pred (owner side
    is always Rel=Owner, member side never is) — the paper's 'no cliques'."""
    for dc in workloads.dcs_good():
        p_owner, p_member = dc.preds
        assert p_owner.disjoint_with(p_member)


@pytest.mark.parametrize("n_cc", [20, 60, 120])
def test_good_set_has_zero_intersecting_pairs(db, n_cc):
    ccs = workloads.make_cc_good(db, n_cc=n_cc, seed=0)
    assert len(ccs) == n_cc
    for a, b in itertools.combinations(ccs, 2):
        assert cc_relationship(a, b) != INTERSECTING, f"{a} vs {b}"


def test_bad_set_has_intersecting_pairs(db):
    ccs = workloads.make_cc_bad(db, n_cc=60, seed=0)
    inter = [
        1
        for a, b in itertools.combinations(ccs, 2)
        if cc_relationship(a, b) == INTERSECTING
    ]
    assert len(inter) > 0


def test_targets_are_true_counts(db):
    ccs = workloads.make_cc_good(db, n_cc=40, seed=0)
    truth = db.truth_vjoin
    for cc in ccs:
        assert cc.target == int(cc.full.mask(truth).sum())


def test_cc_ids_unique_and_sequential(db):
    ccs = workloads.make_cc_bad(db, n_cc=50, seed=1)
    assert [c.cc_id for c in ccs] == list(range(50))


def test_every_cc_references_r1_and_r2(db):
    for cc in workloads.make_cc_good(db, n_cc=40, seed=0):
        assert cc.r1.columns and cc.r2.columns


def test_deterministic_in_seed(db):
    a = workloads.make_cc_good(db, n_cc=30, seed=4)
    b = workloads.make_cc_good(db, n_cc=30, seed=4)
    assert [(str(x.full), x.target) for x in a] == [(str(x.full), x.target) for x in b]


def test_bad_set_contains_overlapping_age_intervals(db):
    """At least one pair overlaps without nesting (Table 5 right column)."""
    ccs = workloads.make_cc_bad(db, n_cc=60, seed=0)
    found = False
    for a, b in itertools.combinations(ccs, 2):
        sa, sb = a.r1.spec("Age"), b.r1.spec("Age")
        if not sa or not sb or sa[0] != "range" or sb[0] != "range":
            continue
        lo = max(sa[1], sb[1])
        hi = min(sa[2], sb[2])
        nested = (sa[1] >= sb[1] and sa[2] <= sb[2]) or (
            sb[1] >= sa[1] and sb[2] <= sa[2]
        )
        if lo <= hi and not nested:
            found = True
            break
    assert found

"""The hybrid phase-I strategy (§4.3).

1. Label all CC pairs (Def 4.2–4.4) and build the Hasse structure.
2. Diagrams touched by an intersecting pair are discarded to S2; the rest
   (S1) are solved exactly by Algorithm 2.
3. S2 is solved by Algorithm 1 with the *modified marginals* (rows only for
   bins relevant to S2, with availability net of the S1 draws) and the
   restricted variable space.
4. Partial B-assignments (CCs that constrain only some active columns) are
   completed with combos that add no spurious CC contributions; leftover
   tuples get ``combo_unused`` values; bins with no harmless combo produce
   *invalid* tuples (combo_id = -1), resolved in phase II.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from .binning import Binning, Combos
from .constraints import CC
from .hasse import (
    Alloc,
    HasseStructure,
    alg2_allocate,
    build_structure,
    split_s1_s2,
)
from .ilp_phase import alg1_allocate

INVALID_COMBO = -1


@dataclass
class Phase1Result:
    """Allocation table + diagnostics for one phase-I run."""

    alloc: pd.DataFrame  # bin_id, combo_id (INVALID_COMBO = invalid), count
    timings: dict = field(default_factory=dict)
    s1_ids: list[int] = field(default_factory=list)
    s2_ids: list[int] = field(default_factory=list)
    shortfall: dict[int, int] = field(default_factory=dict)
    n_invalid: int = 0
    ilp_info: dict = field(default_factory=dict)
    structure: HasseStructure | None = None


class _Scorer:
    """Counts spurious CC contributions of a (bin, combo) assignment."""

    def __init__(self, ccs: list[CC], binning: Binning, combos: Combos):
        self.cc_ids = [c.cc_id for c in ccs]
        self.bin_sets = {c.cc_id: set(binning.cond_bin_ids(c.r1).tolist()) for c in ccs}
        self.combo_sets = {
            c.cc_id: set(combos.cond_combo_ids(c.r2).tolist()) for c in ccs
        }

    def score(self, bin_id: int, combo_id: int, allowed: set[int]) -> int:
        return sum(
            1
            for i in self.cc_ids
            if i not in allowed
            and bin_id in self.bin_sets[i]
            and combo_id in self.combo_sets[i]
        )


def resolve_partials(
    allocations: list[Alloc],
    scorer: _Scorer,
    combos: Combos,
    structure: HasseStructure | None,
) -> list[tuple[int, int, int]]:
    """Complete each allocation's partial B-values to a concrete combo.

    Returns (bin_id, combo_id, count) rows. A draw made for CC ``c`` may
    freely contribute to ``c`` and its ancestors (that is the point of the
    Hasse recursion); any other contribution is spurious and minimised.
    """
    nh = dict(
        zip(combos.table["combo_id"].tolist(), combos.table["n_households"].tolist())
    )
    out: list[tuple[int, int, int]] = []
    for a in allocations:
        elig = combos.matching_partial(a.partial)
        if len(elig) == 0:
            out.append((a.bin_id, INVALID_COMBO, a.count))
            continue
        allowed: set[int] = set()
        if a.cc_id is not None:
            allowed = {a.cc_id}
            if structure is not None:
                allowed |= structure.ancestors(a.cc_id)
        scores = {int(c): scorer.score(a.bin_id, int(c), allowed) for c in elig}
        best_score = min(scores.values())
        # split the draw across *all* minimum-score combos proportionally to
        # their household counts: every min-score combo contributes equally
        # to the allocation's own CC and its ancestors (their conditions are
        # implied by the partial), so the split preserves exactness while
        # keeping phase-II partitions balanced (fewer fresh households, no
        # giant owner cliques)
        chosen = sorted(c for c, s in scores.items() if s == best_score)
        w = np.array([max(nh[c], 1) for c in chosen], dtype=float)
        w /= w.sum()
        counts = np.floor(w * a.count).astype(int)
        rem = a.count - counts.sum()
        order = np.argsort(-(w * a.count - counts))
        counts[order[:rem]] += 1
        for c, cnt in zip(chosen, counts.tolist()):
            if cnt > 0:
                out.append((a.bin_id, c, cnt))
    return out


def fill_leftovers(
    avail: dict[int, int],
    scorer: _Scorer,
    combos: Combos,
    rng: np.random.Generator,
) -> tuple[list[tuple[int, int, int]], int]:
    """Assign combo_unused values to unallocated tuples (Algorithm 2 lines
    14–17). Returns allocation rows + the number of invalid tuples."""
    rows: list[tuple[int, int, int]] = []
    n_invalid = 0
    combo_ids = combos.table["combo_id"].tolist()
    nh_all = dict(
        zip(combos.table["combo_id"].tolist(), combos.table["n_households"].tolist())
    )
    for b, n in sorted(avail.items()):
        if n <= 0:
            continue
        unused = [c for c in combo_ids if scorer.score(b, c, set()) == 0]
        if not unused:
            rows.append((b, INVALID_COMBO, n))
            n_invalid += n
            continue
        # spread across the harmless combos proportionally to their household
        # counts: keeps phase-II partitions balanced and minimises the fresh
        # households the coloring has to mint for over-full partitions
        unused = list(rng.permutation(unused))
        w = np.array([nh_all[c] for c in unused], dtype=float)
        w /= w.sum()
        counts = np.floor(w * n).astype(int)
        rem = n - counts.sum()
        order = np.argsort(-(w * n - counts))
        counts[order[:rem]] += 1
        for c, cnt in zip(unused, counts.tolist()):
            if cnt > 0:
                rows.append((b, int(c), cnt))
        avail[b] = 0
    return rows, n_invalid


def _to_frame(rows: list[tuple[int, int, int]]) -> pd.DataFrame:
    pdf = pd.DataFrame(rows, columns=["bin_id", "combo_id", "count"])
    if len(pdf):
        pdf = (
            pdf.groupby(["bin_id", "combo_id"], as_index=False)["count"]
            .sum()
            .sort_values(["bin_id", "combo_id"])
            .reset_index(drop=True)
        )
    return pdf


def hybrid_phase1(
    ccs: list[CC],
    binning: Binning,
    combos: Combos,
    *,
    seed: int = 0,
    node_limit: int = 50,
) -> Phase1Result:
    """Run the full hybrid phase I; see module docstring."""
    rng = np.random.default_rng(seed)
    avail = binning.avail

    t0 = time.perf_counter()
    structure = build_structure(ccs)
    s1_ids, s2_ids = split_s1_s2(structure)
    t_pairwise = time.perf_counter() - t0

    t0 = time.perf_counter()
    alg2 = alg2_allocate(structure, s1_ids, binning, avail, combos)
    t_recursion = time.perf_counter() - t0

    by_id = {c.cc_id: c for c in ccs}
    s2_ccs = [by_id[i] for i in s2_ids]
    alg1 = alg1_allocate(
        s2_ccs,
        binning,
        combos,
        avail,
        marginals="restricted",
        restrict_vars=True,
        node_limit=node_limit,
    )

    scorer = _Scorer(ccs, binning, combos)
    rows = resolve_partials(alg2.allocations, scorer, combos, structure)
    rows += resolve_partials(alg1.allocations, scorer, combos, None)
    left, _ = fill_leftovers(avail, scorer, combos, rng)
    rows += left
    n_invalid = sum(c for _, cid, c in rows if cid == INVALID_COMBO)

    return Phase1Result(
        alloc=_to_frame(rows),
        timings={
            "pairwise": t_pairwise,
            "recursion": t_recursion,
            "ilp": alg1.ilp_time,
        },
        s1_ids=s1_ids,
        s2_ids=s2_ids,
        shortfall=alg2.shortfall,
        n_invalid=n_invalid,
        ilp_info={
            "n_vars": alg1.n_vars,
            "n_rows": alg1.n_rows,
            "integral": alg1.integral,
            "nodes": alg1.nodes,
            "slack": alg1.slack,
        },
        structure=structure,
    )

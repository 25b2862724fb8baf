"""Algorithm 1 (§4.1): model CCs as an integer program over (bin, combo)
variables and derive a V_Join allocation from its solution.

Variable ``x[(bin, combo)]`` counts tuples of R1-bin ``bin`` assigned the
B-values of ``combo``. Rows are (optionally) the all-way marginals — one per
bin, pinning the bin's total — plus one row per CC. The paper solves a pure
feasibility system with CBC; our substrate minimises the L1 slack of the CC
rows (zero slack ⇔ the paper's feasible solution) with branch-and-bound and
falls back to per-bin largest-remainder rounding when the node limit is hit.

``marginals``:
  * ``'none'``        — the plain baseline (Algorithm 1 without line 8);
  * ``'all'``         — every bin (baseline-with-marginals, hybrid default);
  * ``'restricted'``  — only bins relevant to the given CCs (the hybrid's
    "modified marginals" of §4.3).

``restrict_vars``: with marginals, limit variables to (bin, combo) pairs that
can contribute to some CC plus a ⊥ (unassigned) variable per bin — the
hybrid's smaller ILP. Without it the full bins × combos cross product is
used, which reproduces the baselines' large-ILP behaviour.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from ..ilp import solve_ilp
from .binning import Binning, Combos
from .constraints import CC
from .hasse import Alloc


@dataclass
class Alg1Result:
    allocations: list[Alloc]
    ilp_time: float = 0.0
    integral: bool = True
    nodes: int = 0
    n_vars: int = 0
    n_rows: int = 0
    slack: float = 0.0


def _round_per_bin(
    x: np.ndarray, var_bins: np.ndarray, bin_totals: dict[int, int]
) -> np.ndarray:
    """Largest-remainder rounding keeping each bin's total ≤ its target.

    Applied only when branch-and-bound returns a fractional solution; bins
    without a pinned total are rounded to nearest.
    """
    out = np.floor(x + 1e-9).astype(np.int64)
    rem = x - out
    for b in np.unique(var_bins):
        idx = np.where(var_bins == b)[0]
        tgt = bin_totals.get(int(b))
        if tgt is None:
            out[idx] += (rem[idx] > 0.5).astype(np.int64)
            continue
        deficit = int(round(tgt - out[idx].sum()))
        if deficit > 0:
            order = idx[np.argsort(-rem[idx])]
            out[order[:deficit]] += 1
        elif deficit < 0:
            order = idx[np.argsort(rem[idx])]
            for i in order:
                if deficit == 0:
                    break
                if out[i] > 0:
                    out[i] -= 1
                    deficit += 1
    return np.maximum(out, 0)


def alg1_allocate(
    ccs: list[CC],
    binning: Binning,
    combos: Combos,
    avail: dict[int, int],
    *,
    marginals: str = "all",
    restrict_vars: bool = False,
    node_limit: int = 50,
) -> Alg1Result:
    """Build and solve the Algorithm-1 ILP; return the allocation.

    ``avail`` gives each bin's remaining tuple budget (already net of any
    Algorithm-2 draws in the hybrid). Mutated in place for assigned counts.
    """
    import time

    if marginals not in ("none", "all", "restricted"):
        raise ValueError(marginals)
    if not ccs:
        return Alg1Result(allocations=[])

    cc_bins = {cc.cc_id: set(binning.cond_bin_ids(cc.r1).tolist()) for cc in ccs}
    cc_combos = {cc.cc_id: set(combos.cond_combo_ids(cc.r2).tolist()) for cc in ccs}

    all_bins = [b for b, n in sorted(avail.items()) if n > 0]
    all_combos = combos.table["combo_id"].tolist()

    if marginals == "all":
        marg_bins = list(all_bins)
    elif marginals == "restricted":
        rel = set().union(*cc_bins.values()) if cc_bins else set()
        marg_bins = [b for b in all_bins if b in rel]
    else:
        marg_bins = []

    # --- variables -------------------------------------------------------
    pairs: list[tuple[int, int]] = []  # (bin, combo); combo == -1 is ⊥
    if restrict_vars:
        seen = set()
        for cc in ccs:
            for b in cc_bins[cc.cc_id]:
                if avail.get(b, 0) <= 0:
                    continue
                for c in cc_combos[cc.cc_id]:
                    if (b, c) not in seen:
                        seen.add((b, c))
                        pairs.append((b, c))
        for b in marg_bins:  # ⊥ slot so marginal rows can leave tuples over
            pairs.append((b, -1))
    else:
        for b in all_bins:
            for c in all_combos:
                pairs.append((b, c))
    pairs.sort()
    n = len(pairs)
    var_bins = np.array([b for b, _ in pairs], dtype=np.int64)
    var_combos = np.array([c for _, c in pairs], dtype=np.int64)

    n_slack = 2 * len(ccs)
    rows = len(marg_bins) + len(ccs)
    A = np.zeros((rows, n + n_slack))
    b_vec = np.zeros(rows)
    c_vec = np.zeros(n + n_slack)
    c_vec[n:] = 1.0                      # CC slack cost
    c_vec[:n][var_combos == -1] = 1e-3   # mild pressure to assign tuples

    r = 0
    bin_totals: dict[int, int] = {}
    for bbin in marg_bins:
        A[r, :n][var_bins == bbin] = 1.0
        b_vec[r] = avail[bbin]
        bin_totals[bbin] = avail[bbin]
        r += 1
    for k, cc in enumerate(ccs):
        in_cc = np.isin(var_bins, list(cc_bins[cc.cc_id])) & np.isin(
            var_combos, list(cc_combos[cc.cc_id])
        )
        A[r, :n][in_cc] = 1.0
        A[r, n + 2 * k] = 1.0       # s+
        A[r, n + 2 * k + 1] = -1.0  # s-
        b_vec[r] = cc.target
        r += 1

    t0 = time.perf_counter()
    res = solve_ilp(A, b_vec, c_vec, node_limit=node_limit)
    ilp_time = time.perf_counter() - t0
    if res.x is None:
        x = np.zeros(n, dtype=np.int64)
        integral, nodes = False, res.nodes
    else:
        xf = res.x[:n]
        if res.integral:
            x = np.round(xf).astype(np.int64)
        else:
            x = _round_per_bin(xf, var_bins, bin_totals)
        integral, nodes = res.integral, res.nodes

    allocations: list[Alloc] = []
    for (bbin, cb), cnt in zip(pairs, x.tolist()):
        if cnt <= 0 or cb == -1:
            continue
        allocations.append(
            Alloc(bin_id=bbin, partial=combos.values_of(cb), count=int(cnt), cc_id=None)
        )
    # net the draws out of avail (greedy "at most c_i": cap at availability)
    per_bin: dict[int, int] = {}
    capped: list[Alloc] = []
    for a in allocations:
        used = per_bin.get(a.bin_id, 0)
        room = max(0, avail.get(a.bin_id, 0) - used)
        take = min(a.count, room)
        if take > 0:
            per_bin[a.bin_id] = used + take
            capped.append(Alloc(a.bin_id, a.partial, take, a.cc_id))
    for bbin, used in per_bin.items():
        avail[bbin] -= used

    slack = float(np.abs(res.x[n:]).sum()) if res.x is not None else float("nan")
    return Alg1Result(
        allocations=capped,
        ilp_time=ilp_time,
        integral=integral,
        nodes=nodes,
        n_vars=n,
        n_rows=rows,
        slack=slack,
    )

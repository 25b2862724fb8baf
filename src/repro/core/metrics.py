"""Error measures of §6.1, computed with Spark DataFrame queries.

* relative CC error: ``|ĉ − c| / max(10, c)`` per CC, over the *final*
  database ``R̂1 ⋈ R̂2`` (so phase-II effects are included);
* DC error: fraction of R̂1 tuples participating in at least one violated
  DC instance — detected with self-joins on the FK column (cross-checked
  against a DuckDB SQL oracle in tests).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .constraints import CC, DC, Comp, OutsideComp

_OPS = {
    "<": lambda a, b: a < b,
    ">": lambda a, b: a > b,
    "<=": lambda a, b: a <= b,
    ">=": lambda a, b: a >= b,
    "=": lambda a, b: a == b,
    "!=": lambda a, b: a != b,
}


def cc_report(r1_hat: DataFrame, r2_hat: DataFrame, ccs: list[CC], *, fk: str = "h_id") -> pd.DataFrame:
    """Per-CC achieved counts and relative errors on the final database.

    One Spark join + one groupBy over the columns any CC references; the
    resulting (small) histogram is evaluated per CC in pandas.
    """
    used: list[str] = []
    for cc in ccs:
        for col in cc.full.columns:
            if col not in used:
                used.append(col)
    joined = r1_hat.join(r2_hat, on=fk, how="inner")
    hist = joined.groupBy(*used).agg(F.count("*").alias("__n")).toPandas()
    rows = []
    for cc in ccs:
        achieved = int(hist.loc[cc.full.mask(hist), "__n"].sum()) if len(hist) else 0
        err = abs(achieved - cc.target) / max(10, cc.target)
        rows.append((cc.cc_id, cc.target, achieved, err))
    return pd.DataFrame(rows, columns=["cc_id", "target", "achieved", "rel_err"])


def cc_error_summary(report: pd.DataFrame) -> dict:
    return {
        "median": float(report["rel_err"].median()),
        "mean": float(report["rel_err"].mean()),
        "max": float(report["rel_err"].max()),
        "n_nonzero": int((report["rel_err"] > 0).sum()),
    }


def _comp_col(comp) -> F.Column:
    left = F.col(f"t{comp.i}.{comp.col_i}")
    right = F.col(f"t{comp.j}.{comp.col_j}")
    if isinstance(comp, OutsideComp):
        return (left < right + F.lit(comp.lo)) | (left > right + F.lit(comp.hi))
    rhs = right + F.lit(comp.offset) if comp.offset else right
    return _OPS[comp.op](left, rhs)


def dc_violators(r1_hat: DataFrame, dc: DC, *, key: str = "p_id", fk: str = "h_id") -> DataFrame:
    """Distinct keys of tuples violating ``dc`` (Spark self-join)."""
    k = dc.arity
    aliased = [r1_hat.alias(f"t{i}") for i in range(k)]
    joined = aliased[0]
    for i in range(1, k):
        joined = joined.join(
            aliased[i], on=F.col(f"t0.{fk}") == F.col(f"t{i}.{fk}"), how="inner"
        )
    cond = F.lit(True)
    for i in range(k):
        for j in range(i + 1, k):
            cond = cond & (F.col(f"t{i}.{key}") != F.col(f"t{j}.{key}"))
    for i, p in enumerate(dc.preds):
        if not p.is_empty():
            expr = F.lit(True)
            for col, spec in p.specs:
                ref = F.col(f"t{i}.{col}")
                if spec[0] == "range":
                    expr = expr & (ref >= spec[1]) & (ref <= spec[2])
                else:
                    expr = expr & ref.isin(list(spec[1]))
            cond = cond & expr
    for comp in dc.comps:
        cond = cond & _comp_col(comp)
    matched = joined.filter(cond)
    out = matched.select(F.col(f"t0.{key}").alias("vid"))
    for i in range(1, k):
        out = out.unionByName(matched.select(F.col(f"t{i}.{key}").alias("vid")))
    return out.distinct()


def dc_error(r1_hat: DataFrame, dcs: list[DC], *, key: str = "p_id", fk: str = "h_id") -> float:
    """Fraction of R̂1 tuples violating at least one DC (§6.1)."""
    n = r1_hat.count()
    if n == 0 or not dcs:
        return 0.0
    viol = None
    for dc in dcs:
        v = dc_violators(r1_hat, dc, key=key, fk=fk)
        viol = v if viol is None else viol.unionByName(v)
    return viol.distinct().count() / n

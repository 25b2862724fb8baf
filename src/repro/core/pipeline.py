"""End-to-end C-Extension solver (Figure 4): phase I + phase II.

``c_extension`` wires the pieces: Spark computes the bin histogram and the
active-combo table, a driver-side phase-I strategy (hybrid or a baseline)
produces the (bin, combo, count) allocation, Spark materialises V_Join and
runs the per-partition phase II, and the result is the completed ``R̂1``
plus the (possibly augmented) ``R̂2``.

Per-stage wall times are recorded for the Figure-11/13 runtime tables.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .allocation import (
    fill_null_combos_random,
    mark_null_combos_invalid,
    materialize_vjoin,
)
from .baseline import baseline_phase1
from .binning import Binning, Combos, active_r2_columns
from .constraints import CC, DC
from .hybrid import Phase1Result, hybrid_phase1
from .phase2 import complete_fk

METHODS = ("hybrid", "baseline", "baseline_marginals")


@dataclass
class CExtensionResult:
    r1_hat: DataFrame
    r2_hat: DataFrame
    vjoin: DataFrame
    phase1: Phase1Result
    binning: Binning
    combos: Combos
    timings: dict = field(default_factory=dict)
    method: str = "hybrid"


def c_extension(
    spark: SparkSession,
    r1_df: DataFrame,
    r2_df: DataFrame,
    ccs: list[CC],
    dcs: list[DC],
    *,
    method: str = "hybrid",
    seed: int = 0,
    node_limit: int = 50,
    r1_key: str = "p_id",
    r2_key: str = "h_id",
    fk: str = "h_id",
    attr_cols: list[str] | None = None,
) -> CExtensionResult:
    """Solve C-Extension for ``r1_df`` (missing FK) and ``r2_df``.

    ``attr_cols`` restricts binning to a subset of R1 columns (used by the
    snowflake driver, where the accumulated view carries already-imputed FK
    columns that must not become bin keys). CC R1-conditions may only
    reference these columns.
    """
    if method not in METHODS:
        raise ValueError(f"method must be one of {METHODS}")
    t_total = time.perf_counter()

    attrs = attr_cols or [c for c in r1_df.columns if c != r1_key]
    if r1_key != "p_id":
        r1_df = r1_df.withColumnRenamed(r1_key, "p_id")

    distinct_counts = r1_df.groupBy(*attrs).count().toPandas()
    binning = Binning.build(distinct_counts, ccs, attrs)

    active = active_r2_columns(ccs)
    if active:
        active_counts = r2_df.groupBy(*active).count().toPandas()
    else:
        import pandas as pd

        active_counts = pd.DataFrame({"count": [r2_df.count()]})
    combos = Combos.build(active_counts, active)

    t0 = time.perf_counter()
    if method == "hybrid":
        p1 = hybrid_phase1(ccs, binning, combos, seed=seed, node_limit=node_limit)
    else:
        p1 = baseline_phase1(
            ccs,
            binning,
            combos,
            with_marginals=(method == "baseline_marginals"),
            seed=seed,
            node_limit=min(node_limit, 4),
        )
    t_phase1 = time.perf_counter() - t0

    t0 = time.perf_counter()
    vjoin = materialize_vjoin(spark, r1_df, binning, p1.alloc, key="p_id")
    if method == "hybrid":
        vjoin = mark_null_combos_invalid(vjoin)
    else:
        vjoin = fill_null_combos_random(vjoin, combos, seed=seed)
    vjoin = vjoin.persist()
    vjoin.count()
    t_fill = time.perf_counter() - t0

    if active:
        combo_map = spark.createDataFrame(combos.table[[*active, "combo_id"]])
        r2_with_combo = r2_df.join(combo_map, on=active, how="inner")
    else:
        r2_with_combo = r2_df.withColumn("combo_id", F.lit(0).cast("long"))

    t0 = time.perf_counter()
    assign, r2_hat = complete_fk(
        spark,
        vjoin,
        r2_with_combo,
        r2_df,
        combos,
        binning,
        dcs,
        ccs,
        strategy="coloring" if method == "hybrid" else "random",
        r2_key=r2_key,
        seed=seed,
    )
    r1_hat = r1_df.join(assign.withColumnRenamed("h_id", fk), on="p_id", how="left")
    if r1_key != "p_id":
        r1_hat = r1_hat.withColumnRenamed("p_id", r1_key)
    r1_hat = r1_hat.persist()
    r1_hat.count()
    t_coloring = time.perf_counter() - t0

    timings = dict(p1.timings)
    timings.update(
        {
            "phase1_total": t_phase1,
            "fill": t_fill,
            "coloring": t_coloring,
            "total": time.perf_counter() - t_total,
        }
    )
    return CExtensionResult(
        r1_hat=r1_hat,
        r2_hat=r2_hat,
        vjoin=vjoin,
        phase1=p1,
        binning=binning,
        combos=combos,
        timings=timings,
        method=method,
    )

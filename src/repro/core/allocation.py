"""Materialise a phase-I allocation into the completed V_Join (Spark).

The driver-side phase-I algorithms produce ``(bin_id, combo_id, count)``
rows. Because tuples within a bin are interchangeable for every CC, the
assignment to concrete tuples is a single distributed pass:

1. tag every R1 tuple with its ``bin_id`` (join with the binning mapping);
2. number tuples within each bin (window ``row_number`` ordered by key —
   deterministic);
3. turn the allocation rows into per-bin ``[start, end)`` index ranges and
   range-join them, yielding each tuple's ``combo_id``.

Tuples beyond the allocated ranges (possible for the marginal-free baseline,
whose ILP may over-allocate a bin — "find *at most* c_i tuples") fall out
with a null combo; the caller decides the leftover strategy.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from .binning import Binning, Combos
from .hybrid import INVALID_COMBO


def alloc_ranges(alloc: pd.DataFrame) -> pd.DataFrame:
    """Per-bin cumulative [start, end) ranges, deterministic order."""
    pdf = alloc.sort_values(["bin_id", "combo_id"]).reset_index(drop=True).copy()
    pdf["end"] = pdf.groupby("bin_id")["count"].cumsum()
    pdf["start"] = pdf["end"] - pdf["count"]
    return pdf[["bin_id", "combo_id", "start", "end"]]


def materialize_vjoin(
    spark: SparkSession,
    r1_df: DataFrame,
    binning: Binning,
    alloc: pd.DataFrame,
    *,
    key: str = "p_id",
) -> DataFrame:
    """R1 ⟶ V_Join skeleton: every tuple tagged with bin_id and combo_id.

    ``combo_id`` is null for tuples with no allocation and INVALID_COMBO for
    tuples phase I explicitly marked invalid.
    """
    if binning.attrs:
        map_df = spark.createDataFrame(binning.mapping)
        tagged = r1_df.join(map_df, on=binning.attrs, how="left")
    else:  # no binnable attributes: a single bin holds everything
        tagged = r1_df.withColumn("bin_id", F.lit(0).cast("long"))
    w = Window.partitionBy("bin_id").orderBy(key)
    tagged = tagged.withColumn("__idx", F.row_number().over(w) - F.lit(1))
    ranges = alloc_ranges(alloc)
    if len(ranges) == 0:
        return tagged.withColumn("combo_id", F.lit(None).cast("long")).drop("__idx")
    ranges_df = spark.createDataFrame(ranges)
    joined = tagged.join(
        ranges_df,
        on=(
            (tagged["bin_id"] == ranges_df["bin_id"])
            & (tagged["__idx"] >= ranges_df["start"])
            & (tagged["__idx"] < ranges_df["end"])
        ),
        how="left",
    ).drop(ranges_df["bin_id"])
    return joined.drop("start", "end", "__idx")


def fill_null_combos_random(
    vjoin: DataFrame, combos: Combos, *, seed: int = 0
) -> DataFrame:
    """Baseline leftover handling at the tuple level: uniform random combo."""
    n = len(combos)
    return vjoin.withColumn(
        "combo_id",
        F.when(
            F.col("combo_id").isNull(),
            F.floor(F.rand(seed) * F.lit(n)).cast("long"),
        ).otherwise(F.col("combo_id")),
    )


def mark_null_combos_invalid(vjoin: DataFrame) -> DataFrame:
    return vjoin.withColumn(
        "combo_id",
        F.coalesce(F.col("combo_id"), F.lit(INVALID_COMBO).cast("long")),
    )

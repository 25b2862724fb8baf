"""Tests for the experiment harness (table runners)."""
import pandas as pd
import pytest

from repro import experiments


def test_table1_counts_and_paper_columns():
    df = experiments.run_table1(scales=(1, 2), shrink=0.01)
    assert list(df["scale"]) == [1, 2]
    assert (df["vjoin"] == df["persons"]).all()
    assert df["paper_persons"].iloc[0] == 25_099


def test_paper_constants_shapes():
    assert len(experiments.PAPER_FIG8A) == 5
    assert len(experiments.PAPER_FIG8B) == 5
    assert list(experiments.PAPER_FIG10["dataset"]) == [11, 12, 4, 9]
    assert len(experiments.PAPER_TABLE1) == 8


def test_fig10_dataset_grid_matches_table2():
    assert experiments.FIG10_DATASETS == [
        (11, "good", "good"),
        (12, "good", "bad"),
        (4, "all", "good"),
        (9, "all", "bad"),
    ]


def test_format_table_contains_values():
    out = experiments.format_table(pd.DataFrame({"a": [1.23456]}), "T")
    assert "== T ==" in out and "1.2346" in out


def test_run_fig8_smoke(spark):
    df = experiments.run_fig8(
        spark, "good", scales=(1,), methods=("hybrid",), n_cc=30, shrink=0.01
    )
    assert len(df) == 1
    assert df["dc_error"].iloc[0] == 0.0
    assert df["cc_median"].iloc[0] == 0.0


def test_run_fig13_smoke(spark):
    df = experiments.run_fig13(spark, n_ccs=(20,), scale=1, shrink=0.01)
    assert len(df) == 2
    good = df[df.ccs == "good"].iloc[0]
    assert good["ilp_s"] == 0.0

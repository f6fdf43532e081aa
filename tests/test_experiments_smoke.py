"""Experiment harnesses: descriptor tables + a micro Table-III/VI/VII/VIII pass."""
import numpy as np
import pytest

from repro.core.config import TINY
from repro.experiments import (
    run_table3,
    run_table6,
    run_table7,
    run_table8,
    table1_rows,
    table2_rows,
)
from repro.experiments.table4_5 import table4_rows, table5_rows

SCALE = 0.1


class TestDescriptorTables:
    def test_table1(self, spark):
        df = table1_rows(spark, scale=SCALE)
        assert list(df["dataset"]) == ["Tmall", "Instacart", "Student", "Merchant"]
        assert (df["rows_in_R"] > 100).all()

    def test_table2(self, spark):
        df = table2_rows(spark, scale=SCALE)
        assert (df["n_T"] == 2 ** df["n_attr"]).all()
        assert df.loc[df.dataset == "Tmall", "K"].iloc[0] == "user_id, merchant_id"

    def test_table4_and_5(self, spark):
        t4, t5 = table4_rows(spark, scale=SCALE), table5_rows(spark, scale=SCALE)
        assert list(t4["dataset"]) == ["Covtype", "Household"]
        assert (t5["n_T"] == 2 ** t5["n_attr"]).all()


class TestMicroGrids:
    """One dataset × one model micro-runs of each table harness."""

    def test_table3_subset(self, spark, tmp_path, monkeypatch):
        monkeypatch.setenv("REPRO_RESULTS", str(tmp_path))
        df = run_table3(spark, scale=SCALE, budget=TINY, seed=0,
                        datasets=("Instacart",), models=("LR",),
                        methods=("FT", "FT+MI", "Random", "FeatAug"))
        assert len(df) == 4
        assert df["value"].notna().all()
        assert (tmp_path / "table3.csv").exists()

    def test_table3_regression_dashes(self, spark, tmp_path, monkeypatch):
        monkeypatch.setenv("REPRO_RESULTS", str(tmp_path))
        df = run_table3(spark, scale=SCALE, budget=TINY, seed=0,
                        datasets=("Merchant",), models=("LR",),
                        methods=("FT", "FT+Chi2", "FT+Gini"))
        assert df.loc[df.method == "FT", "value"].notna().all()
        assert df.loc[df.method.isin(["FT+Chi2", "FT+Gini"]), "value"].isna().all()
        assert (df["metric"] == "RMSE").all()

    def test_table6_subset(self, spark, tmp_path, monkeypatch):
        monkeypatch.setenv("REPRO_RESULTS", str(tmp_path))
        df = run_table6(spark, scale=SCALE, budget=TINY, seed=0,
                        datasets=("Household",), models=("LR",),
                        methods=("FT", "ARDA", "AutoFeat-MAB", "FeatAug"))
        assert len(df) == 4 and df["value"].notna().all()
        assert (df["metric"] == "F1").all()

    def test_table7_subset(self, spark, tmp_path, monkeypatch):
        monkeypatch.setenv("REPRO_RESULTS", str(tmp_path))
        df = run_table7(spark, scale=SCALE, budget=TINY, seed=0,
                        datasets=("Instacart",), models=("LR",))
        assert set(df["method"]) == {"FeatAug(NoQTI)", "FeatAug(NoWU)", "FeatAug(Full)"}

    def test_table8_subset(self, spark, tmp_path, monkeypatch):
        monkeypatch.setenv("REPRO_RESULTS", str(tmp_path))
        df = run_table8(spark, scale=SCALE, budget=TINY, seed=0,
                        datasets=("Instacart",), models=("LR",))
        assert set(df["method"]) == {"FeatAug(SC)", "FeatAug(MI)", "FeatAug(LR)"}
        assert df["value"].notna().all()

"""Smoke/integration tests for the per-table experiment harnesses.

Each harness runs at a small scale on a subset of datasets so the suite
stays fast; the full-scale runs live in ``jobs/`` and ``benchmarks/``.
"""
import numpy as np
import pandas as pd
import pytest

from repro.experiments import (
    common,
    table1,
    table2,
    table3,
    table8,
    table9,
    table12,
    table13,
)


@pytest.fixture(scope="module")
def fz_prep(spark):
    return common.prepare(spark, "FZ", scale=0.5, with_features=True)


class TestCommon:
    def test_prepare_artifacts_aligned(self, fz_prep):
        assert len(fz_prep.keys) == len(fz_prep.X) == len(fz_prep.y)
        assert fz_prep.F.shape[0] == len(fz_prep.X)

    def test_labels_match_truth(self, fz_prep):
        assert (fz_prep.y == 1).sum() <= fz_prep.ds.n_matches
        assert set(np.unique(fz_prep.y)) <= {0, 1}

    def test_prf_np(self):
        y = np.array([1, 1, 0, 0, -1])
        pred = np.array([1, 0, 1, 0, 1])
        p, r, f1 = common.prf_np(pred, y)
        assert p == 0.5 and r == 0.5 and f1 == 0.5

    @pytest.mark.parametrize("method", ["MV", "D&S", "EBCC", "FS", "SN"])
    def test_run_labeling_method(self, fz_prep, method):
        gamma, secs = common.run_labeling_method(fz_prep, method)
        assert gamma.shape == (len(fz_prep.X),)
        assert secs >= 0

    def test_ze_requires_features(self, spark):
        prep = common.prepare(spark, "FZ", scale=0.4, with_features=False)
        with pytest.raises(ValueError):
            common.run_labeling_method(prep, "ZE")

    def test_unknown_method_raises(self, fz_prep):
        with pytest.raises(ValueError):
            common.run_labeling_method(fz_prep, "nope")


class TestTable1:
    def test_columns_and_rows(self, spark):
        df = table1.run(spark, scale=0.4, datasets=["FZ"])
        assert list(df.dataset) == ["FZ"]
        assert {"candset_size", "blocking_recall", "paper_candset"} <= set(df.columns)
        assert df.blocking_recall.iloc[0] > 0.8


class TestTable2:
    def test_structure(self):
        df = table2.run()
        assert len(df) == 11
        assert (df.n_new_lfs <= df.n_lfs).all()
        assert (df.paper_n_lfs > 0).all()


class TestTable3:
    def test_small_run(self, spark):
        f1_df, t_df = table3.run(
            spark, scale=0.4, datasets=["FZ"], methods=["MV", "SIMPLE-EM"]
        )
        assert "Avg." in set(f1_df.dataset)
        row = f1_df[f1_df.dataset == "FZ"].iloc[0]
        assert 0 <= row["MV"] <= 1
        assert row["SIMPLE-EM"] >= row["MV"] - 0.05
        assert t_df["SIMPLE-EM"].iloc[0] > 0


class TestTable8:
    def test_ablation_rows(self, spark):
        df = table8.run(spark, scale=0.4, datasets=["FZ"])
        for c in table8.ROWS:
            assert c in df.columns
        fz = df[df.dataset == "FZ"].iloc[0]
        # on clean FZ, exact transitivity must not hurt
        assert fz["SIMPLE-EM"] >= fz["No trans"] - 0.05


class TestTable9:
    def test_monotone_degradation(self, spark):
        df = table9.run(spark, scale=0.3, datasets=["M"])
        assert list(df.x) == table9.XS
        # evaluated F1 must (weakly) decrease as the GT is corrupted more
        assert df["MV"].iloc[0] >= df["MV"].iloc[-1]


class TestTable12:
    def test_subset_run(self):
        df = table12.run(datasets=["basketball", "youtube"], methods=["MV", "SIMPLE"])
        assert "Avg." in set(df.dataset)
        yt = df[df.dataset == "youtube"].iloc[0]
        assert yt["SIMPLE"] > yt["MV"]  # the headroom dataset

    def test_paper_columns_present(self):
        df = table12.run(datasets=["basketball"], methods=["MV"])
        assert "paper_MV" in df.columns


class TestTable13:
    def test_detection_frame(self, spark):
        df = table13.run(spark, scale=0.5, datasets=["FZ"])
        row = df.iloc[0]
        assert row["detected_dupfree_LR"] == (True, True)
        assert row["dupfree_solution_helpful"] in ("Yes", "No")

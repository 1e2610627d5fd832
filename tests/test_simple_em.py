"""Tests for SIMPLE-EM orchestration (mode selection, detection, Spark API)."""
import numpy as np
import pandas as pd
import pytest

from repro import em_data
from repro.blocking import overlap_block
from repro.core.labeling_matrix import apply_lfs, collect_matrix, pair_table
from repro.core.simple import run_simple, simple_gamma
from repro.core.simple_em import (
    detect_dupfree,
    make_transitivity_step,
    run_simple_em,
    simple_em_gamma,
)
from repro.labeling.functions import lf_suite
from repro.metrics import dataset_f1


@pytest.fixture(scope="module")
def fz_votes(spark):
    ds = em_data.load(spark, "FZ", scale=0.6)
    cfg = ds.config
    cand = overlap_block(
        ds.left, ds.right, attr=cfg.blocking_attr,
        overlap_size=cfg.blocking_overlap,
    )
    votes = apply_lfs(pair_table(ds, cand), lf_suite("FZ")).cache()
    votes.count()
    return ds, votes


class TestModeSelection:
    def test_known_dupfree_both(self, fz_votes):
        ds, votes = fz_votes
        keys, X = collect_matrix(votes)
        out = simple_em_gamma(
            keys, X, single_table=False,
            n_left=ds.left.count(), n_right=ds.right.count(),
            dupfree=(True, True), max_iter=3,
        )
        assert out.mode == "two_table_both"

    def test_known_left_only(self, fz_votes):
        ds, votes = fz_votes
        keys, X = collect_matrix(votes)
        out = simple_em_gamma(
            keys, X, single_table=False, n_left=10, n_right=10,
            dupfree=(True, False), max_iter=2,
        )
        assert out.mode == "two_table_left"

    def test_known_none(self, fz_votes):
        ds, votes = fz_votes
        keys, X = collect_matrix(votes)
        out = simple_em_gamma(
            keys, X, single_table=False, n_left=10, n_right=10,
            dupfree=(False, False), max_iter=2,
        )
        assert out.mode == "no_trans"

    def test_missing_sizes_raises(self, fz_votes):
        _, votes = fz_votes
        keys, X = collect_matrix(votes)
        with pytest.raises(ValueError):
            simple_em_gamma(keys, X, single_table=False)


class TestMakeStep:
    def test_no_trans_returns_none(self):
        assert make_transitivity_step("no_trans") is None

    def test_exact_steps_callable(self):
        for mode in ("two_table_both", "two_table_left", "two_table_right"):
            step = make_transitivity_step(mode)
            keys = pd.DataFrame({"lid": [0, 1], "rid": [5, 5]})
            gamma = np.array([0.9, 0.7])
            out = step(keys, gamma)
            assert out.shape == gamma.shape


class TestDetection:
    def test_detects_dupfree_on_clean_dataset(self, fz_votes):
        ds, votes = fz_votes
        keys, X = collect_matrix(votes)
        gamma, _, _, _ = simple_gamma(X, keys=keys, seed=0)
        left_df, right_df = detect_dupfree(
            keys, gamma, n_left=ds.left.count(), n_right=ds.right.count()
        )
        # FZ is generated duplicate-free on both sides
        assert left_df and right_df

    def test_detects_duplicates_when_injected(self):
        # fabricate predictions where each right tuple matches 3 lids
        g = np.random.default_rng(0)
        lids = np.arange(300)
        rids = np.repeat(np.arange(100), 3)
        keys = pd.DataFrame({"lid": lids, "rid": rids})
        gamma = np.ones(300)
        left_df, _ = detect_dupfree(keys, gamma, n_left=5000, n_right=5000)
        assert left_df is False


class TestTransitivityImprovesCleanData:
    def test_simple_em_beats_plain_simple_on_fz(self, fz_votes):
        ds, votes = fz_votes
        keys, X = collect_matrix(votes)
        plain, _, _, _ = simple_gamma(X, keys=keys, seed=0)
        out = simple_em_gamma(
            keys, X, single_table=False,
            n_left=ds.left.count(), n_right=ds.right.count(),
            dupfree=(True, True), seed=0,
        )
        def f1(gamma):
            pred = pd.DataFrame(
                {"lid": keys.lid, "rid": keys.rid,
                 "pred": (gamma >= 0.5).astype(int)}
            )
            spark = votes.sparkSession
            return dataset_f1(spark.createDataFrame(pred), ds).f1
        assert f1(out.gamma) >= f1(plain)


class TestSparkApi:
    def test_run_simple_em_returns_dataframe(self, fz_votes):
        ds, votes = fz_votes
        res = run_simple_em(
            votes, single_table=False,
            n_left=ds.left.count(), n_right=ds.right.count(),
            dupfree=(True, True), max_iter=3,
        )
        pdf = res.result.preds.toPandas()
        assert {"lid", "rid", "prob", "pred"} <= set(pdf.columns)
        assert len(pdf) == votes.count()

    def test_run_simple_distributed_scoring_consistent(self, fz_votes):
        """The mapInPandas scorer must agree with driver-side γ labels."""
        _, votes = fz_votes
        res = run_simple(votes, seed=0, max_iter=4)
        pdf = res.preds.orderBy("lid", "rid").toPandas()
        driver_pred = (res.gamma >= 0.5).astype(int)
        np.testing.assert_array_equal(pdf["pred"].to_numpy(), driver_pred)

"""Tests for pairwise metrics — confusion counts oracle-checked in DuckDB."""
import pandas as pd
import pytest

from repro.metrics import PRF, accuracy, pair_f1
from repro.oracle import assert_equivalent

PRED = pd.DataFrame(
    {"lid": [0, 1, 2, 3], "rid": [10, 11, 12, 13], "pred": [1, 1, 0, 1]}
)
TRUTH = pd.DataFrame(
    {"lid": [0, 1, 2, 4], "rid": [10, 11, 12, 14], "label": [1, 0, 1, 1]}
)


class TestPRF:
    def test_perfect(self):
        assert PRF(tp=5, fp=0, fn=0).f1 == 1.0

    def test_zero_division_safe(self):
        p = PRF(tp=0, fp=0, fn=0)
        assert p.precision == 0.0 and p.recall == 0.0 and p.f1 == 0.0

    def test_values(self):
        p = PRF(tp=2, fp=1, fn=1)
        assert p.precision == pytest.approx(2 / 3)
        assert p.recall == pytest.approx(2 / 3)
        assert p.f1 == pytest.approx(2 / 3)


class TestPairF1Complete:
    def test_counts(self, spark):
        pred = spark.createDataFrame(PRED)
        truth = spark.createDataFrame(TRUTH)
        prf = pair_f1(pred, truth, complete=True)
        # tp: (0,10); fp: (1,11) and (3,13)[absent from truth → nonmatch];
        # fn: (2,12) and (4,14)[absent from pred → predicted 0]
        assert (prf.tp, prf.fp, prf.fn) == (1, 2, 2)

    def test_confusion_matches_duckdb(self, spark):
        pred = spark.createDataFrame(PRED)
        truth = spark.createDataFrame(TRUTH)
        prf = pair_f1(pred, truth, complete=True)
        got = spark.createDataFrame(
            pd.DataFrame({"tp": [prf.tp], "fp": [prf.fp], "fn": [prf.fn]})
        )
        sql = """
        WITH j AS (
            SELECT coalesce(p.pred, 0) AS pred, coalesce(t.label, 0) AS label
            FROM pred_tab p FULL OUTER JOIN truth_tab t
            ON p.lid = t.lid AND p.rid = t.rid
        )
        SELECT
            sum(CASE WHEN pred = 1 AND label = 1 THEN 1 ELSE 0 END)::BIGINT AS tp,
            sum(CASE WHEN pred = 1 AND label = 0 THEN 1 ELSE 0 END)::BIGINT AS fp,
            sum(CASE WHEN pred = 0 AND label = 1 THEN 1 ELSE 0 END)::BIGINT AS fn
        FROM j
        """
        assert_equivalent(got, sql, pred_tab=PRED, truth_tab=TRUTH)


class TestPairF1Partial:
    def test_unlabeled_pairs_excluded(self, spark):
        pred = spark.createDataFrame(PRED)
        truth = spark.createDataFrame(TRUTH)
        prf = pair_f1(pred, truth, complete=False)
        # (3,13) has no GT label → excluded; fp only (1,11)
        assert (prf.tp, prf.fp, prf.fn) == (1, 1, 2)


class TestAccuracy:
    def test_inner_join_semantics(self, spark):
        pred = spark.createDataFrame(PRED)
        truth = spark.createDataFrame(TRUTH)
        # overlap pairs: (0,10) correct, (1,11) wrong, (2,12) wrong → 1/3
        assert accuracy(pred, truth) == pytest.approx(1 / 3)

    def test_accuracy_matches_duckdb(self, spark):
        pred = spark.createDataFrame(PRED)
        truth = spark.createDataFrame(TRUTH)
        acc = accuracy(pred, truth)
        got = spark.createDataFrame(pd.DataFrame({"acc": [acc]}))
        sql = """
        SELECT avg(CASE WHEN p.pred = t.label THEN 1.0 ELSE 0.0 END) AS acc
        FROM pred_tab p JOIN truth_tab t ON p.lid = t.lid AND p.rid = t.rid
        """
        assert_equivalent(got, sql, pred_tab=PRED, truth_tab=TRUTH)

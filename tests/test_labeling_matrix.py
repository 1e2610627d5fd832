"""Tests for pair-table construction + LF application (labeling matrix)."""
import numpy as np
import pandas as pd
import pytest

from repro import em_data
from repro.core.labeling_matrix import (
    apply_lfs,
    collect_matrix,
    pair_table,
    vote_columns,
)
from repro.core.majority_vote import majority_vote
from repro.labeling.functions import LF, lf_suite
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def prepared(spark):
    ds = em_data.load(spark, "FZ", scale=0.4)
    cand = spark.createDataFrame(
        ds.truth_pdf[["lid", "rid"]].head(20)
    )
    pairs = pair_table(ds, cand).cache()
    return ds, cand, pairs


class TestPairTable:
    def test_prefixed_columns(self, prepared):
        _, _, pairs = prepared
        cols = set(pairs.columns)
        assert "l_name" in cols and "r_name" in cols
        assert "lid" in cols and "rid" in cols

    def test_join_against_duckdb(self, prepared, spark):
        ds, cand, pairs = prepared
        got = pairs.select("lid", "rid", "l_name", "r_name")
        sql = """
        SELECT c.lid AS lid, c.rid AS rid,
               l.name AS l_name, r.name AS r_name
        FROM cand c
        JOIN left_tab l ON c.lid = l.rid_
        JOIN right_tab r ON c.rid = r.rid_
        """
        assert_equivalent(
            got, sql,
            cand=cand, left_tab=ds.left.select("rid_", "name"),
            right_tab=ds.right.select("rid_", "name"),
        )

    def test_row_count_preserved(self, prepared):
        _, cand, pairs = prepared
        assert pairs.count() == cand.count()


class TestApplyLfs:
    def test_vote_columns_ordered(self, prepared):
        _, _, pairs = prepared
        votes = apply_lfs(pairs, lf_suite("FZ"))
        cols = vote_columns(votes)
        assert cols == [f"lf_{j}" for j in range(len(lf_suite("FZ")))]

    def test_votes_in_range(self, prepared):
        _, _, pairs = prepared
        votes = apply_lfs(pairs, lf_suite("FZ")).toPandas()
        for c in votes.columns:
            if c.startswith("lf_"):
                assert set(votes[c].unique()) <= {-1, 0, 1}

    def test_spark_matches_driver_votes(self, prepared):
        """Distributed mapInPandas application must equal the LF run
        driver-side on the same pair frame."""
        _, _, pairs = prepared
        suite = lf_suite("FZ")
        votes = apply_lfs(pairs, suite)
        keys, X = collect_matrix(votes)
        pdf = pairs.toPandas().sort_values(["lid", "rid"]).reset_index(drop=True)
        for j, lf in enumerate(suite):
            np.testing.assert_array_equal(X[:, j], lf.vote(pdf))

    def test_equal_pos_lf_semantics(self, spark):
        pdf = pd.DataFrame(
            {
                "lid": [0, 1], "rid": [10, 11],
                "l_name": ["foo bar", "abc"], "r_name": ["Foo-Bar", "xyz"],
            }
        )
        lf = LF(name="eq", kind="equal_pos", attr="name")
        np.testing.assert_array_equal(lf.vote(pdf), [1, 0])


class TestMajorityVoteOracle:
    def test_matches_duckdb_sum_rule(self, prepared, spark):
        _, _, pairs = prepared
        suite = lf_suite("FZ")
        votes = apply_lfs(pairs, suite).cache()
        mv = majority_vote(votes).select("lid", "rid", "pred")
        vote_pdf = votes.toPandas()
        total = " + ".join(f"lf_{j}" for j in range(len(suite)))
        sql = f"""
        SELECT lid, rid,
               CASE WHEN ({total}) > 0 THEN 1 ELSE 0 END AS pred
        FROM votes_tab
        """
        assert_equivalent(mv, sql, votes_tab=vote_pdf)

    def test_tie_goes_negative(self, spark):
        pdf = pd.DataFrame(
            {"lid": [0], "rid": [1], "lf_0": [1], "lf_1": [-1], "lf_2": [0]}
        )
        mv = majority_vote(spark.createDataFrame(pdf)).first()
        assert mv["pred"] == 0


class TestCollectMatrix:
    def test_order_deterministic(self, prepared):
        _, _, pairs = prepared
        votes = apply_lfs(pairs, lf_suite("FZ"))
        k1, X1 = collect_matrix(votes)
        k2, X2 = collect_matrix(votes)
        pd.testing.assert_frame_equal(k1, k2)
        np.testing.assert_array_equal(X1, X2)

    def test_dtype_int8(self, prepared):
        _, _, pairs = prepared
        votes = apply_lfs(pairs, lf_suite("FZ"))
        _, X = collect_matrix(votes)
        assert X.dtype == np.int8

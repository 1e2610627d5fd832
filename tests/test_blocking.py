"""Tests for the Spark overlap blocker — oracle-checked against DuckDB."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.blocking import blocking_recall, overlap_block
from repro.oracle import assert_equivalent

LEFT = pd.DataFrame(
    {
        "rid_": [0, 1, 2],
        "name": ["samsung lcd monitor", "sony camera pro", "dell laptop"],
    }
)
RIGHT = pd.DataFrame(
    {
        "rid_": [10, 11, 12],
        "name": ["samsung monitor 40", "sony pro camera kit", "apple phone"],
    }
)

# DuckDB formulation of the same overlap computation (tokenize → unnest →
# join → count), used as the ground-truth oracle.
_ORACLE_SQL = """
WITH lt AS (
    SELECT rid_ AS lid, unnest(string_split(lower(name), ' ')) AS token
    FROM left_tab
), rt AS (
    SELECT rid_ AS rid, unnest(string_split(lower(name), ' ')) AS token
    FROM right_tab
)
SELECT lt.lid AS lid, rt.rid AS rid, count(*) AS overlap
FROM (SELECT DISTINCT * FROM lt) lt JOIN (SELECT DISTINCT * FROM rt) rt USING (token)
GROUP BY lt.lid, rt.rid
HAVING count(*) >= {k}
"""


class TestOverlapBlockOracle:
    @pytest.mark.parametrize("k", [1, 2, 3])
    def test_matches_duckdb(self, spark, k):
        left = spark.createDataFrame(LEFT)
        right = spark.createDataFrame(RIGHT)
        got = overlap_block(
            left, right, attr="name", overlap_size=k, max_token_df=None
        ).select("lid", "rid", "overlap")
        assert_equivalent(
            got, _ORACLE_SQL.format(k=k), left_tab=LEFT, right_tab=RIGHT
        )


class TestOverlapBlockBehavior:
    def test_single_table_orders_pairs(self, spark):
        tab = spark.createDataFrame(LEFT)
        out = overlap_block(
            tab, tab, attr="name", overlap_size=1, single_table=True,
            max_token_df=None,
        ).toPandas()
        assert (out.lid < out.rid).all()

    def test_stop_tokens_filtered(self, spark):
        # a token present in every record is dropped by max_token_df
        pdf = pd.DataFrame(
            {"rid_": range(10), "name": [f"common word{i}" for i in range(10)]}
        )
        tab = spark.createDataFrame(pdf)
        out = overlap_block(
            tab, tab, attr="name", overlap_size=1, single_table=True,
            max_token_df=0.2,
        )
        assert out.count() == 0  # only 'common' was shared, and it is a stop token

    def test_null_attribute_rows_ignored(self, spark):
        pdf = LEFT.copy()
        pdf.loc[0, "name"] = None
        tab = spark.createDataFrame(pdf)
        out = overlap_block(
            tab, spark.createDataFrame(RIGHT), attr="name", overlap_size=1,
            max_token_df=None,
        ).toPandas()
        assert 0 not in set(out.lid)

    def test_recall_complete(self, spark):
        left = spark.createDataFrame(LEFT)
        right = spark.createDataFrame(RIGHT)
        cand = overlap_block(left, right, attr="name", overlap_size=1,
                             max_token_df=None)
        truth = spark.createDataFrame(
            pd.DataFrame({"lid": [0], "rid": [10], "label": [1]})
        )
        assert blocking_recall(cand, truth) == 1.0

    def test_recall_zero_when_blocked_out(self, spark):
        left = spark.createDataFrame(LEFT)
        right = spark.createDataFrame(RIGHT)
        cand = overlap_block(left, right, attr="name", overlap_size=3,
                             max_token_df=None)
        truth = spark.createDataFrame(
            pd.DataFrame({"lid": [2], "rid": [12], "label": [1]})
        )
        assert blocking_recall(cand, truth) == 0.0

    def test_recall_empty_truth_is_one(self, spark):
        left = spark.createDataFrame(LEFT)
        right = spark.createDataFrame(RIGHT)
        cand = overlap_block(left, right, attr="name", overlap_size=1,
                             max_token_df=None)
        truth = spark.createDataFrame(
            pd.DataFrame({"lid": [0], "rid": [10], "label": [1]})
        ).where(F.lit(False))
        assert blocking_recall(cand, truth) == 1.0

"""Tests for Magellan-lite feature engineering."""
import numpy as np
import pandas as pd
import pytest

from repro import em_data
from repro.core.labeling_matrix import pair_table
from repro.features import (
    FEATURE_NAMES,
    collect_features,
    featurize,
    featurize_pdf,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def pairs(spark):
    ds = em_data.load(spark, "FZ", scale=0.4)
    cand = spark.createDataFrame(ds.truth_pdf[["lid", "rid"]].head(15))
    return pair_table(ds, cand).cache()


class TestFeaturizePdf:
    def _pdf(self):
        return pd.DataFrame(
            {
                "lid": [0, 1], "rid": [10, 11],
                "l_name": ["alpha beta", "x"], "r_name": ["alpha beta", "y"],
                "l_brand": ["sony", None], "r_brand": ["sony", "dell"],
                "l_city": ["boston", "boston"], "r_city": ["boston", "austin"],
                "l_phone": ["1-2", "3-4"], "r_phone": ["1-2", "9-9"],
                "l_descr": ["a b", "c"], "r_descr": ["a b", "d"],
                "l_price": [10.0, 20.0], "r_price": [10.0, 40.0],
                "l_size": [5.0, 5.0], "r_size": [5.0, 10.0],
                "l_year": [2000, 2000], "r_year": [2000, 2010],
            }
        )

    def test_identical_pair_scores_high(self):
        out = featurize_pdf(self._pdf())
        row = out.iloc[0]
        assert row["name_jac"] == 1.0
        assert row["brand_eq"] == 1.0
        assert row["price_rd"] == 1.0

    def test_different_pair_scores_low(self):
        out = featurize_pdf(self._pdf())
        row = out.iloc[1]
        assert row["name_jac"] == 0.0
        assert row["price_rd"] == pytest.approx(0.5)  # |20-40|/40

    def test_missing_value_neutral(self):
        out = featurize_pdf(self._pdf())
        assert out.iloc[1]["brand_eq"] == 0.5

    def test_all_features_present(self):
        out = featurize_pdf(self._pdf())
        assert list(out.columns) == ["lid", "rid"] + FEATURE_NAMES

    def test_values_bounded(self):
        out = featurize_pdf(self._pdf())
        vals = out[FEATURE_NAMES].to_numpy()
        assert (vals >= 0).all() and (vals <= 1).all()


class TestFeaturizeSpark:
    def test_distributed_equals_driver(self, pairs):
        feats = featurize(pairs)
        keys, F = collect_features(feats)
        pdf = pairs.toPandas().sort_values(["lid", "rid"]).reset_index(drop=True)
        expected = featurize_pdf(pdf)[FEATURE_NAMES].to_numpy()
        np.testing.assert_allclose(F, expected, atol=1e-12)

    def test_exact_feature_against_duckdb(self, pairs, spark):
        """brand_eq on non-null pairs is SQL-expressible — oracle check."""
        feats = featurize(pairs)
        pdf = pairs.select("lid", "rid", "l_brand", "r_brand").toPandas()
        nonnull = pdf.dropna()
        got = (
            feats.select("lid", "rid", "brand_eq")
            .join(
                spark.createDataFrame(nonnull[["lid", "rid"]]), ["lid", "rid"]
            )
        )
        sql = """
        SELECT lid, rid,
               CASE WHEN lower(l_brand) = lower(r_brand)
                    THEN 1.0 ELSE 0.0 END AS brand_eq
        FROM pairs_tab
        """
        assert_equivalent(got, sql, pairs_tab=nonnull)

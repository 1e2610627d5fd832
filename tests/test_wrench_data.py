"""Unit tests for the synthetic WRENCH-style dataset generator."""
import numpy as np
import pytest

from repro import wrench_data


class TestRegistry:
    def test_ten_datasets(self):
        assert len(wrench_data.ALL_DATASETS) == 10

    @pytest.mark.parametrize("name", wrench_data.ALL_DATASETS)
    def test_lf_counts_match_paper(self, name):
        # Table 12 fixes the #LFs per dataset; our profiles must match.
        paper_counts = {
            "basketball": 4, "commercial": 4, "tennis": 6, "yelp": 8,
            "imdb": 8, "spouse": 9, "youtube": 10, "cdr": 33, "sms": 73,
            "census": 83,
        }
        assert wrench_data.REGISTRY[name].n_lfs == paper_counts[name]


@pytest.mark.parametrize("name", wrench_data.ALL_DATASETS)
class TestGeneration:
    def test_shapes_and_values(self, name):
        ds = wrench_data.load(name)
        cfg = wrench_data.REGISTRY[name]
        assert ds.votes.shape == (cfg.n, cfg.n_lfs)
        assert set(np.unique(ds.votes)) <= {-1, 0, 1}
        assert set(np.unique(ds.y)) <= {-1, 1}

    def test_class_balance_near_config(self, name):
        ds = wrench_data.load(name)
        cfg = wrench_data.REGISTRY[name]
        assert abs((ds.y > 0).mean() - cfg.pos_rate) < 0.05

    def test_deterministic(self, name):
        a = wrench_data.load(name)
        b = wrench_data.load(name)
        np.testing.assert_array_equal(a.votes, b.votes)
        np.testing.assert_array_equal(a.y, b.y)

    def test_lfs_better_than_random(self, name):
        """Fired votes should agree with the truth more often than not —
        the weak-supervision premise (each LF beats random guessing)."""
        ds = wrench_data.load(name)
        fired = ds.votes != 0
        agree = (ds.votes == ds.y[:, None]) & fired
        assert agree.sum() / max(fired.sum(), 1) > 0.5


class TestSparkConversion:
    def test_to_spark_roundtrip(self, spark):
        ds = wrench_data.load("basketball")
        df = ds.to_spark(spark)
        assert df.count() == len(ds.y)
        cols = df.columns
        assert "lid" in cols and "label" in cols
        assert sum(c.startswith("lf_") for c in cols) == ds.votes.shape[1]

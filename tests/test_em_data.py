"""Unit tests for the synthetic EM benchmark generator."""
import numpy as np
import pandas as pd
import pytest

from repro import em_data


@pytest.fixture(scope="module")
def fz(spark):
    return em_data.load(spark, "FZ", scale=0.5)


@pytest.fixture(scope="module")
def monitor(spark):
    return em_data.load(spark, "M", scale=0.3)


class TestRegistry:
    def test_all_paper_datasets_present(self):
        assert set(em_data.ALL_DATASETS) == {
            "FZ", "DA", "DS", "AB", "AG", "WA", "IR", "YY", "ABN", "M", "C"
        }

    def test_single_vs_two_table_partition(self):
        assert set(em_data.SINGLE_TABLE) == {"M", "C"}
        assert len(em_data.TWO_TABLE) == 9

    @pytest.mark.parametrize("name", em_data.ALL_DATASETS)
    def test_configs_selfconsistent(self, name):
        cfg = em_data.REGISTRY[name]
        assert cfg.name == name
        assert 0 <= cfg.dirt <= 1
        if cfg.partial_gt:
            assert cfg.n_gt_matches > 0 and cfg.n_gt_nonmatches > 0


class TestTwoTableGeneration:
    def test_schema(self, fz):
        assert set(fz.left.columns) == set(em_data.RECORD_COLUMNS)
        assert set(fz.right.columns) == set(em_data.RECORD_COLUMNS)

    def test_ids_unique(self, fz):
        assert fz.left_pdf.rid_.is_unique
        assert fz.right_pdf.rid_.is_unique

    def test_truth_refers_to_existing_records(self, fz):
        t = fz.truth_pdf
        assert set(t.lid) <= set(fz.left_pdf.rid_)
        assert set(t.rid) <= set(fz.right_pdf.rid_)

    def test_matches_positive_labels(self, fz):
        assert (fz.truth_pdf.label == 1).all()
        assert fz.n_matches == len(fz.truth_pdf)

    def test_deterministic(self, spark):
        a = em_data.load(spark, "FZ", scale=0.5)
        b = em_data.load(spark, "FZ", scale=0.5)
        pd.testing.assert_frame_equal(a.left_pdf, b.left_pdf)
        pd.testing.assert_frame_equal(a.truth_pdf, b.truth_pdf)

    def test_dupfree_tables_have_one_record_per_entity(self, fz):
        # FZ is configured duplicate-free: no right tuple matches two lids
        t = fz.truth_pdf
        assert t.groupby("rid").size().max() == 1
        assert t.groupby("lid").size().max() == 1

    def test_dups_config_produces_dups(self, spark):
        ds = em_data.load(spark, "DS", scale=0.5)
        t = ds.truth_pdf
        # right table has duplicates → some lid matches several rids
        assert t.groupby("lid").size().max() > 1


class TestSingleTableGeneration:
    def test_left_is_right(self, monitor):
        assert monitor.left is monitor.right

    def test_truth_is_upper_triangle(self, monitor):
        t = monitor.truth_pdf
        assert (t.lid < t.rid).all()

    def test_cluster_transitivity_consistent(self, monitor):
        """Ground truth from entity clusters must satisfy transitivity."""
        t = monitor.truth_pdf
        m = {(a, b) for a, b in zip(t.lid, t.rid)}
        nodes = sorted({x for p in m for x in p})
        import itertools

        for a, b in itertools.islice(m, 300):
            for c in nodes[:50]:
                if c in (a, b):
                    continue
                ac = (min(a, c), max(a, c))
                bc = (min(b, c), max(b, c))
                if ac in m:
                    assert bc in m, f"violation {a},{b},{c}"


class TestPartialGT:
    def test_partial_contains_nonmatches(self, spark):
        ds = em_data.load(spark, "IR", scale=0.5)
        t = ds.truth_pdf
        assert (t.label == 0).any() and (t.label == 1).any()

    def test_partial_smaller_than_full(self, spark):
        ds = em_data.load(spark, "IR", scale=0.5)
        assert (ds.truth_pdf.label == 1).sum() <= ds.n_matches


class TestCorruptGroundTruth:
    def _truth(self):
        return pd.DataFrame(
            {"lid": [0, 0, 2], "rid": [1, 2, 3], "label": [1, 1, 1]}
        )

    def test_x_zero_is_identity(self):
        t = self._truth()
        out = em_data.corrupt_ground_truth(t, np.arange(10), 0.0, seed=0)
        assert set(zip(out.lid, out.rid)) == set(zip(t.lid, t.rid))

    def test_corruption_changes_matches(self):
        t = self._truth()
        out = em_data.corrupt_ground_truth(t, np.arange(10), 1.0, seed=0)
        assert set(zip(out.lid, out.rid)) != set(zip(t.lid, t.rid))

    def test_output_sorted_pairs(self):
        t = self._truth()
        out = em_data.corrupt_ground_truth(t, np.arange(10), 0.5, seed=1)
        assert (out.lid < out.rid).all()

    def test_deterministic(self):
        t = self._truth()
        o1 = em_data.corrupt_ground_truth(t, np.arange(10), 0.4, seed=5)
        o2 = em_data.corrupt_ground_truth(t, np.arange(10), 0.4, seed=5)
        pd.testing.assert_frame_equal(o1, o2)


class TestScaling:
    def test_scale_shrinks_tables(self, spark):
        big = em_data.load(spark, "AB", scale=0.6)
        small = em_data.load(spark, "AB", scale=0.3)
        assert len(small.left_pdf) < len(big.left_pdf)
        assert small.n_matches < big.n_matches

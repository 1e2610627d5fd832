"""Tests for LF suites, reuse accounting, and threshold randomization."""
import numpy as np
import pandas as pd
import pytest

from repro import em_data
from repro.labeling.functions import (
    LF,
    lf_suite,
    new_lf_count,
    randomize,
    suite_stats,
)


class TestSuites:
    @pytest.mark.parametrize("name", em_data.ALL_DATASETS)
    def test_suite_sizes_in_paper_range(self, name):
        assert 8 <= len(lf_suite(name)) <= 16

    @pytest.mark.parametrize("name", em_data.ALL_DATASETS)
    def test_attrs_exist_in_schema(self, name):
        for lf in lf_suite(name):
            assert lf.attr in em_data.RECORD_COLUMNS

    @pytest.mark.parametrize("name", em_data.ALL_DATASETS)
    def test_unique_names(self, name):
        names = [lf.name for lf in lf_suite(name)]
        assert len(names) == len(set(names))

    def test_fz_introduces_families(self):
        # FZ is first in development order — all its families are new.
        assert new_lf_count("FZ") > 0
        for lf in lf_suite("FZ"):
            assert lf.origin == "FZ"

    def test_later_datasets_reuse(self):
        # every later dataset reuses at least one earlier family
        for name in ["DA", "DS", "AB", "AG", "WA", "IR", "YY", "ABN", "M", "C"]:
            assert new_lf_count(name) < len(lf_suite(name))

    def test_suite_stats_frame(self):
        df = suite_stats()
        assert len(df) == 11
        assert (df.n_new_lfs <= df.n_lfs).all()


class TestVoting:
    def _pairs(self):
        return pd.DataFrame(
            {
                "l_name": ["alpha beta gamma", "alpha beta gamma", "x y z"],
                "r_name": ["alpha beta gamma", "alpha beta delta", "p q r"],
                "l_size": [40.0, 40.0, 40.0],
                "r_size": [40.0, 46.0, 40.0],
                "l_descr": ["40 inch tv", "40 inch tv", "40 inch tv"],
                "r_descr": ["40 inch tv", "46 inch tv", "40 inch tv"],
            }
        )

    def test_overlap_lf(self):
        lf = LF("o", "overlap", "name", {"hi": 0.8, "lo": 0.2})
        np.testing.assert_array_equal(lf.vote(self._pairs()), [1, 0, -1])

    def test_size_unmatch_lf(self):
        lf = LF("s", "equal_neg", "size")
        np.testing.assert_array_equal(lf.vote(self._pairs()), [0, -1, 0])

    def test_regex_num_unmatch(self):
        lf = LF("r", "regex_num_unmatch", "descr", {"tol": 0.5})
        np.testing.assert_array_equal(lf.vote(self._pairs()), [0, -1, 0])

    def test_null_inputs_abstain(self):
        pairs = pd.DataFrame({"l_name": [None], "r_name": ["abc"]})
        for kind, params in [
            ("equal_pos", {}), ("equal_neg", {}),
            ("num_reldiff", {"pos_tol": 0.1, "neg_tol": 0.5}),
        ]:
            lf = LF("n", kind, "name", params)
            assert lf.vote(pairs)[0] == 0


class TestRandomize:
    def test_thresholds_perturbed(self):
        lf = LF("o", "overlap", "name", {"hi": 0.8, "lo": 0.2})
        g = np.random.default_rng(0)
        out = randomize(lf, g)
        assert out.params != lf.params
        assert 0 <= out.params["hi"] <= 1

    def test_original_not_mutated(self):
        lf = LF("o", "overlap", "name", {"hi": 0.8, "lo": 0.2})
        g = np.random.default_rng(1)
        randomize(lf, g)
        assert lf.params == {"hi": 0.8, "lo": 0.2}

    def test_parameterless_kinds_unchanged(self):
        lf = LF("e", "equal_neg", "brand")
        g = np.random.default_rng(2)
        assert randomize(lf, g) is lf

    def test_deterministic_given_rng(self):
        lf = LF("o", "jaccard", "name", {"hi": 0.6, "lo": 0.1})
        a = randomize(lf, np.random.default_rng(3))
        b = randomize(lf, np.random.default_rng(3))
        assert a.params == b.params

"""Unit tests for string/numeric similarity primitives."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.labeling import primitives as P


class TestTokens:
    def test_basic(self):
        assert P.tokens("Samsung 40' LCD") == {"samsung", "40", "lcd"}

    def test_none(self):
        assert P.tokens(None) == set()

    def test_nan(self):
        assert P.tokens(float("nan")) == set()

    def test_dedup(self):
        assert P.tokens("a a a b") == {"a", "b"}

    def test_token_list_keeps_order_and_dups(self):
        assert P.token_list("B a a") == ["b", "a", "a"]

    def test_punctuation_split(self):
        assert P.tokens("foo-bar_baz") == {"foo", "bar", "baz"}


class TestJaccard:
    @pytest.mark.parametrize(
        "a,b,expected",
        [
            ("a b", "a b", 1.0),
            ("a b", "c d", 0.0),
            ("a b", "b c", 1 / 3),
            ("a b c", "a b", 2 / 3),
        ],
    )
    def test_values(self, a, b, expected):
        assert P.jaccard(a, b) == pytest.approx(expected)

    def test_empty_either_side(self):
        assert P.jaccard("", "a") == 0.0
        assert P.jaccard("a", None) == 0.0

    @given(st.text(), st.text())
    @settings(max_examples=50, deadline=None)
    def test_symmetric_and_bounded(self, a, b):
        s = P.jaccard(a, b)
        assert s == P.jaccard(b, a)
        assert 0.0 <= s <= 1.0


class TestOverlap:
    def test_coeff_subset_is_one(self):
        assert P.overlap_coeff("a b", "a b c d") == 1.0

    def test_size(self):
        assert P.overlap_size("a b c", "b c d") == 2

    def test_size_empty(self):
        assert P.overlap_size(None, "a") == 0


class TestLevenshtein:
    @pytest.mark.parametrize(
        "a,b,d",
        [
            ("", "", 0),
            ("abc", "abc", 0),
            ("abc", "abd", 1),
            ("abc", "ab", 1),
            ("abc", "", 3),
            ("kitten", "sitting", 3),
            ("flaw", "lawn", 2),
        ],
    )
    def test_known_distances(self, a, b, d):
        assert P.levenshtein(a, b) == d

    @given(st.text(max_size=12), st.text(max_size=12))
    @settings(max_examples=60, deadline=None)
    def test_metric_properties(self, a, b):
        d = P.levenshtein(a, b)
        assert d == P.levenshtein(b, a)
        assert d >= abs(len(a) - len(b))
        assert d <= max(len(a), len(b))
        assert (d == 0) == (a == b)

    @given(st.text(max_size=8), st.text(max_size=8), st.text(max_size=8))
    @settings(max_examples=40, deadline=None)
    def test_triangle_inequality(self, a, b, c):
        assert P.levenshtein(a, c) <= P.levenshtein(a, b) + P.levenshtein(b, c)

    def test_lev_sim_range_and_null(self):
        assert P.lev_sim("abc", "abc") == 1.0
        assert P.lev_sim(None, "abc") == 0.0
        assert 0.0 <= P.lev_sim("abc", "xyz") <= 1.0


class TestNumbers:
    def test_extract(self):
        assert P.extract_numbers("40 inch, 1.5 kg") == [40.0, 1.5]

    def test_first_number(self):
        assert P.first_number("samsung 40 lcd") == 40.0
        assert P.first_number("no digits") is None
        assert P.first_number(None) is None

    @pytest.mark.parametrize(
        "a,b,expected",
        [(10, 10, 0.0), (10, 5, 0.5), (0, 0, 0.0), (None, 5, None)],
    )
    def test_rel_num_diff(self, a, b, expected):
        assert P.rel_num_diff(a, b) == expected

    def test_rel_num_diff_nan(self):
        assert P.rel_num_diff(float("nan"), 1.0) is None

    def test_rel_num_diff_non_numeric(self):
        assert P.rel_num_diff("abc", 1.0) is None


class TestNormStr:
    def test_casing_and_punct(self):
        assert P.norm_str("Foo-Bar") == P.norm_str("foo bar")

    def test_none(self):
        assert P.norm_str(None) == ""

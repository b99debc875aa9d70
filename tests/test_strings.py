"""Unit tests for repro.util.strings — the literal-similarity kernels."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.util.strings import (
    jaccard,
    label_jaccard,
    literal_sim,
    normalize_label,
    sim_L,
    tokens,
)


class TestNormalizeLabel:
    @pytest.mark.parametrize(
        "raw,expected",
        [
            ("Hello World", "hello world"),
            ("  The-Quick_Brown.Fox ", "the quick brown fox"),
            ("UPPER", "upper"),
            ("a1b2", "a1b2"),
            ("--- ", ""),
            ("", ""),
            (None, ""),
            ("Léo", "l o"),  # non-ascii splits
        ],
    )
    def test_cases(self, raw, expected):
        assert normalize_label(raw) == expected


class TestTokens:
    @pytest.mark.parametrize(
        "raw,expected",
        [
            ("a b a", {"a", "b"}),
            ("X, y; Z", {"x", "y", "z"}),
            (None, set()),
            ("", set()),
            ("1972-05-14", {"1972", "05", "14"}),
        ],
    )
    def test_cases(self, raw, expected):
        assert tokens(raw) == frozenset(expected)

    def test_frozen(self):
        assert isinstance(tokens("a"), frozenset)


class TestJaccard:
    @pytest.mark.parametrize(
        "s1,s2,expected",
        [
            ({"a"}, {"a"}, 1.0),
            ({"a"}, {"b"}, 0.0),
            ({"a", "b"}, {"b", "c"}, 1 / 3),
            (set(), set(), 0.0),
            ({"a"}, set(), 0.0),
            ({"a", "b", "c"}, {"a", "b", "c"}, 1.0),
        ],
    )
    def test_cases(self, s1, s2, expected):
        assert jaccard(s1, s2) == pytest.approx(expected)

    @given(st.sets(st.text(max_size=3)), st.sets(st.text(max_size=3)))
    def test_bounds_and_symmetry(self, s1, s2):
        j = jaccard(s1, s2)
        assert 0.0 <= j <= 1.0
        assert j == pytest.approx(jaccard(s2, s1))

    @given(st.sets(st.text(max_size=3), min_size=1))
    def test_identity(self, s):
        assert jaccard(s, s) == 1.0


class TestLabelJaccard:
    def test_equal_labels(self):
        assert label_jaccard("Joan Fontaine", "joan fontaine") == 1.0

    def test_partial(self):
        assert label_jaccard("joan fontaine", "joan crawford") == pytest.approx(1 / 3)

    def test_none(self):
        assert label_jaccard(None, "x") == 0.0


class TestLiteralSim:
    @pytest.mark.parametrize(
        "v1,v2,expected",
        [
            ("100", "100", 1.0),
            ("100", "90", 0.9),
            ("100", "50", 0.5),
            ("0", "0", 1.0),
            ("-100", "100", 0.0),  # |x-y|/max(|x|,|y|) = 200/100 → clipped
            ("abc", "abc", 1.0),
            ("abc", "abd", 0.0),
            ("abc def", "abc xyz", pytest.approx(1 / 3)),
            ("100", "abc", 0.0),  # number never matches non-number
            ("1972-05-14", "1972-05-14", 1.0),
            ("1972-05-14", "1972-05-21", 0.5),  # shares {1972, 05}
        ],
    )
    def test_cases(self, v1, v2, expected):
        assert literal_sim(v1, v2) == pytest.approx(expected)

    def test_year_pct_difference_is_weak(self):
        # the generator uses date strings precisely because of this
        assert literal_sim("1950", "1980") > 0.9


class TestSimL:
    def test_identical_sets(self):
        assert sim_L(["a", "b"], ["a", "b"]) == 1.0

    def test_disjoint(self):
        assert sim_L(["aa"], ["bb"]) == 0.0

    def test_partial_overlap(self):
        # one matched pair, |V1|=2, |V2|=1 → 1/(2+1-1)
        assert sim_L(["aa", "bb"], ["aa"]) == pytest.approx(0.5)

    def test_threshold_blocks_weak_pairs(self):
        assert sim_L(["abc def ghi"], ["abc def xyz"], threshold=0.9) == 0.0
        assert sim_L(["abc def ghi"], ["abc def xyz"], threshold=0.5) == 1.0

    def test_empty_sides(self):
        assert sim_L([], ["a"]) == 0.0
        assert sim_L(["a"], []) == 0.0
        assert sim_L([], []) == 0.0

    def test_numbers_inside_sets(self):
        assert sim_L(["100"], ["99"]) == 1.0  # 0.99 ≥ 0.9
        assert sim_L(["100"], ["50"]) == 0.0

    def test_greedy_one_to_one(self):
        # both left values similar to the single right value: only one match
        assert sim_L(["aa", "aa x"], ["aa"], threshold=0.4) == pytest.approx(0.5)

    def test_duplicates_collapsed(self):
        assert sim_L(["a", "a"], ["a"]) == 1.0

    @given(
        st.lists(st.sampled_from(["aa", "bb", "cc", "10", "20"]), max_size=4),
        st.lists(st.sampled_from(["aa", "bb", "cc", "10", "20"]), max_size=4),
    )
    def test_bounds(self, v1, v2):
        assert 0.0 <= sim_L(v1, v2) <= 1.0

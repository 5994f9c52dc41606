"""Tests for repro.core.lcs — token LCS alignment (paper §2 Step 1)."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core.lcs import AlignedGap, aligned_gaps, token_lcs, tokenize


def test_tokenize_simple():
    assert tokenize("9 St, 02141") == [
        ("9", 0, 1),
        ("St,", 2, 5),
        ("02141", 6, 11),
    ]


def test_tokenize_multiple_spaces():
    assert tokenize("a   b") == [("a", 0, 1), ("b", 4, 5)]


def test_tokenize_empty():
    assert tokenize("") == []
    assert tokenize("   ") == []


def test_token_lcs_identical():
    assert token_lcs(["a", "b"], ["a", "b"]) == [(0, 0), (1, 1)]


def test_token_lcs_empty():
    assert token_lcs([], ["a"]) == []
    assert token_lcs(["a"], []) == []


def test_token_lcs_classic():
    a = ["9", "St,", "02141", "Wisconsin"]
    b = ["9th", "St,", "02141", "WI"]
    assert token_lcs(a, b) == [(1, 1), (2, 2)]


def test_token_lcs_is_subsequence_and_common():
    a = ["x", "a", "y", "b", "z"]
    b = ["a", "q", "b"]
    lcs = token_lcs(a, b)
    assert [a[i] for i, _ in lcs] == [b[j] for _, j in lcs]
    assert all(i1 < i2 and j1 < j2 for (i1, j1), (i2, j2) in zip(lcs, lcs[1:]))


@given(
    st.lists(st.sampled_from("abcd"), max_size=8),
    st.lists(st.sampled_from("abcd"), max_size=8),
)
def test_token_lcs_properties(a, b):
    lcs = token_lcs(a, b)
    # Common subsequence...
    assert [a[i] for i, _ in lcs] == [b[j] for _, j in lcs]
    # ...with strictly increasing indices...
    for (i1, j1), (i2, j2) in zip(lcs, lcs[1:]):
        assert i1 < i2 and j1 < j2
    # ...and symmetric length.
    assert len(lcs) == len(token_lcs(b, a))


def test_aligned_gaps_paper_example_2_1():
    # "9 St, 02141 Wisconsin" vs "9th St, 02141 WI" → rules 9↔9th and
    # Wisconsin↔WI (Example 2.1).
    gaps = aligned_gaps("9 St, 02141 Wisconsin", "9th St, 02141 WI")
    assert [(g.a_str, g.b_str) for g in gaps] == [
        ("9", "9th"),
        ("Wisconsin", "WI"),
    ]


def test_aligned_gaps_spans_point_into_values():
    va, vb = "9 St, 02141 Wisconsin", "9th St, 02141 WI"
    for g in aligned_gaps(va, vb):
        assert va[g.a_span[0] : g.a_span[1]] == g.a_str
        assert vb[g.b_span[0] : g.b_span[1]] == g.b_str


def test_aligned_gaps_identical_values():
    assert aligned_gaps("same one", "same one") == []


def test_aligned_gaps_no_common_tokens():
    gaps = aligned_gaps("aa bb", "cc dd")
    assert [(g.a_str, g.b_str) for g in gaps] == [("aa bb", "cc dd")]


def test_aligned_gaps_empty_side_insertion():
    # "a c" vs "a b c": gap φ↔"b" with the insertion point before "c".
    gaps = aligned_gaps("a c", "a b c")
    assert len(gaps) == 1
    g = gaps[0]
    assert (g.a_str, g.b_str) == ("", "b")
    assert g.a_span == (2, 2)  # insertion point at start of "c" in "a c"
    assert "a b c"[g.b_span[0] : g.b_span[1]] == "b"


def test_aligned_gaps_trailing_gap():
    gaps = aligned_gaps("a b", "a")
    assert [(g.a_str, g.b_str) for g in gaps] == [("b", "")]
    assert gaps[0].b_span == (1, 1)  # append position = len("a")


def test_aligned_gaps_middle_initial():
    gaps = aligned_gaps("brian j. stonebraker", "brian stonebraker")
    assert [(g.a_str, g.b_str) for g in gaps] == [("j.", "")]


def test_aligned_gaps_multi_token_gap():
    gaps = aligned_gaps("3 E Avenue, 33990 CA", "3rd E Ave, 33990 California")
    pairs = [(g.a_str, g.b_str) for g in gaps]
    assert ("3", "3rd") in pairs
    assert ("Avenue,", "Ave,") in pairs
    assert ("CA", "California") in pairs


def test_aligned_gaps_skips_identical_gap_strings():
    # Gap strings that happen to be equal (only spacing differs) are not
    # rules — lhs must differ from rhs.
    gaps = aligned_gaps("x  y", "x y")
    assert gaps == []


@given(st.text(alphabet="ab 1", max_size=20), st.text(alphabet="ab 1", max_size=20))
def test_aligned_gaps_never_equal_sides(va, vb):
    for g in aligned_gaps(va, vb):
        assert g.a_str != g.b_str
        assert va[g.a_span[0] : g.a_span[1]] == g.a_str
        assert vb[g.b_span[0] : g.b_span[1]] == g.b_str


def test_aligned_gap_is_frozen():
    g = AlignedGap("a", (0, 1), "b", (0, 1))
    with pytest.raises(AttributeError):
        g.a_str = "x"

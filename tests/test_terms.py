"""Tests for repro.core.terms — term classification and STRUC (paper §3)."""
import pytest

from repro.core.terms import (
    EXTRA_REGEX_TERMS,
    REGEX_TERMS,
    T_DIGIT,
    T_LOWER,
    T_SPACE,
    T_UPPER,
    char_term,
    structure,
    structure_key,
    term_matches,
    transformation_structure_key,
)


@pytest.mark.parametrize(
    "c,expected",
    [
        ("0", T_DIGIT),
        ("5", T_DIGIT),
        ("9", T_DIGIT),
        ("a", T_LOWER),
        ("z", T_LOWER),
        ("A", T_UPPER),
        ("Z", T_UPPER),
        (" ", T_SPACE),
        ("\t", T_SPACE),
        ("-", "T:-"),
        (".", "T:."),
        (",", "T:,"),
        ("(", "T:("),
        ("&", "T:&"),
        ("'", "T:'"),
    ],
)
def test_char_term(c, expected):
    assert char_term(c) == expected


@pytest.mark.parametrize(
    "s,expected",
    [
        # Paper §3: STRUC(9) = Td, STRUC(9th) = Td Tl.
        ("9", (T_DIGIT,)),
        ("9th", (T_DIGIT, T_LOWER)),
        ("3rd", (T_DIGIT, T_LOWER)),
        ("5th", (T_DIGIT, T_LOWER)),
        ("WI", (T_UPPER,)),
        ("Wisconsin", (T_UPPER, T_LOWER)),
        ("St", (T_UPPER, T_LOWER)),
        ("Street", (T_UPPER, T_LOWER)),
        ("", ()),
        ("   ", (T_SPACE,)),
        ("a b", (T_LOWER, T_SPACE, T_LOWER)),
        ("A1", (T_UPPER, T_DIGIT)),
        ("02141", (T_DIGIT,)),
    ],
)
def test_structure_basic(s, expected):
    assert structure(s) == expected


def test_structure_runs_collapse():
    assert structure("aaaBBB111   ") == (T_LOWER, T_UPPER, T_DIGIT, T_SPACE)


def test_structure_single_char_terms_do_not_collapse():
    # Paper §3: only regex-based categories collapse; "--" is two terms.
    assert structure("--") == ("T:-", "T:-")
    assert structure("a--b") == (T_LOWER, "T:-", "T:-", T_LOWER)


def test_structure_paper_example_java():
    # Example 5.1: java(tm) has structure Tl T( Tl T).
    assert structure("java(tm)") == (T_LOWER, "T:(", T_LOWER, "T:)")
    assert structure("linux(r)") == (T_LOWER, "T:(", T_LOWER, "T:)")
    assert structure("java(tm)") == structure("linux(r)")


def test_structure_mixed():
    assert structure("Dr. Dewitt") == (
        T_UPPER,
        T_LOWER,
        "T:.",
        T_SPACE,
        T_UPPER,
        T_LOWER,
    )


def test_structure_equivalence_of_transformations():
    # Definition 2: 9→9th and 3→3rd structurally equivalent; 3→5th too.
    k1 = transformation_structure_key("9", "9th")
    k2 = transformation_structure_key("3", "3rd")
    k3 = transformation_structure_key("3", "5th")
    assert k1 == k2 == k3
    assert transformation_structure_key("9th", "9") != k1  # direction-sensitive


def test_structure_key_roundtrip_distinct():
    # Key must distinguish term boundaries: "ab" (one Tl) vs "a b".
    assert structure_key("ab") != structure_key("a b")
    assert structure_key("A1") != structure_key("1A")


@pytest.mark.parametrize(
    "s,term,expected",
    [
        ("David Dewitt", T_UPPER, [(0, 1), (6, 7)]),
        ("David Dewitt", T_LOWER, [(1, 5), (7, 12)]),
        ("David Dewitt", T_SPACE, [(5, 6)]),
        ("9 St, 02141", T_DIGIT, [(0, 1), (6, 11)]),
        ("abc", T_DIGIT, []),
        ("", T_LOWER, []),
    ],
)
def test_term_matches_regex(s, term, expected):
    assert term_matches(s, term) == expected


def test_term_matches_constant():
    assert term_matches("St, St", "C:St") == [(0, 2), (4, 6)]
    assert term_matches("aaa", "C:aa") == [(0, 2)]  # non-overlapping
    assert term_matches("x", "C:") == []


def test_term_matches_extra_terms():
    assert term_matches("a1B", "Ta") == [(0, 1), (2, 3)]
    assert term_matches("a1B", "Tan") == [(0, 3)]
    assert set(EXTRA_REGEX_TERMS) == {"Ta", "Tan"}


def test_term_matches_unknown_raises():
    with pytest.raises(ValueError):
        term_matches("x", "bogus")


def test_every_char_in_exactly_one_term():
    # Paper §3: each character falls in one and only one of the 5 terms.
    for s in ["Dr. Dewitt, D.", "9th St, 02141 WI", "java(tm)", "H & M"]:
        for c in s:
            t = char_term(c)
            assert t in REGEX_TERMS or t.startswith("T:")


def test_structure_cache_consistency():
    # lru_cache must not leak mutable state.
    a = structure("9th St")
    b = structure("9th St")
    assert a is b or a == b

"""Tests for repro.core.lang — the program language (paper §4.1, §4.4).

The paper's examples use 1-based positions; our boundaries are 0-based
(see the module docstring of repro.core.lang), so paper position k maps
to boundary k-1.
"""
import pytest

from repro.core.lang import (
    eval_func,
    eval_pos,
    format_program,
    program_consistent,
    run_program,
)

S = "David Dewitt"  # |s| = 12 in 0-based chars (paper says 13 with 1-base)


# ---------------------------------------------------------- positions


def test_constpos_forward():
    # Paper Ex 4.1: ConstPos(2) = 2 (1-based) → boundary 1.
    assert eval_pos(("CP", 1), S) == 1


def test_constpos_backward():
    # Paper Ex 4.1: ConstPos(-5) → 5 chars from the end.
    assert eval_pos(("CP", -5), S) == len(S) - 4


def test_constpos_bounds():
    assert eval_pos(("CP", 0), S) == 0
    assert eval_pos(("CP", len(S)), S) == len(S)
    assert eval_pos(("CP", len(S) + 1), S) is None
    assert eval_pos(("CP", -1), S) == len(S)


@pytest.mark.parametrize(
    "f,expected",
    [
        # Paper Ex 4.1 (translated to 0-based boundaries):
        (("MP", "TC", 1, "B"), 0),  # beginning of 1st "D"
        (("MP", "TC", 1, "E"), 1),  # end of 1st "D"
        (("MP", "Tl", -1, "B"), 7),  # beginning of "ewitt"
        (("MP", "Tl", -1, "E"), 12),  # end of "ewitt"
        (("MP", "TC", 2, "B"), 6),
        (("MP", "Tb", 1, "B"), 5),
        (("MP", "Tb", 1, "E"), 6),
    ],
)
def test_matchpos(f, expected):
    assert eval_pos(f, S) == expected


def test_matchpos_out_of_range():
    assert eval_pos(("MP", "TC", 3, "B"), S) is None
    assert eval_pos(("MP", "Td", 1, "B"), S) is None
    assert eval_pos(("MP", "TC", -3, "B"), S) is None


def test_matchpos_constant_term():
    assert eval_pos(("MP", "C:Dewitt", 1, "B"), S) == 6
    assert eval_pos(("MP", "C:Dewitt", 1, "E"), S) == 12


def test_eval_pos_rejects_string_function():
    with pytest.raises(ValueError):
        eval_pos(("CS", "x"), S)


# ------------------------------------------------------ string functions


def test_constantstr():
    # Paper Ex 4.2: ConstantStr(MIT) = MIT.
    assert eval_func(("CS", "MIT"), S) == ["MIT"]


def test_substr_first_capital():
    # Paper Ex 4.2: SubStr(MatchPos(TC,1,B), MatchPos(TC,1,E)) = "D".
    f = ("SS", ("MP", "TC", 1, "B"), ("MP", "TC", 1, "E"))
    assert eval_func(f, S) == ["D"]


def test_substr_invalid_range():
    f = ("SS", ("MP", "TC", 2, "B"), ("MP", "TC", 1, "E"))  # l >= r
    assert eval_func(f, S) == []


def test_substr_missing_position():
    f = ("SS", ("MP", "Td", 1, "B"), ("CP", 3))
    assert eval_func(f, S) == []


def test_prefix_outputs_all_prefixes():
    # Prefix(Tl, 1) on "Street": matches "treet" → prefixes t, tr, ...
    outs = eval_func(("PF", "Tl", 1), "Street")
    assert outs == ["t", "tr", "tre", "tree", "treet"]


def test_suffix_outputs_all_suffixes():
    outs = eval_func(("SF", "Tl", 1), "Street")
    assert outs == ["t", "et", "eet", "reet", "treet"]


def test_affix_out_of_range():
    assert eval_func(("PF", "Td", 1), "abc") == []
    assert eval_func(("SF", "Tl", -2), "abc") == []


def test_eval_func_rejects_position_function():
    with pytest.raises(ValueError):
        eval_func(("CP", 1), S)


# ------------------------------------------------------------ programs


def paper_program_dr_dewitt():
    """Example 4.3: David Dewitt → Dr. Dewitt, D."""
    return (
        ("CS", "Dr. "),
        ("SS", ("MP", "TC", 2, "B"), ("MP", "Tl", 2, "E")),
        ("CS", ", "),
        ("SS", ("MP", "TC", 1, "B"), ("MP", "TC", 1, "E")),
        ("CS", "."),
    )


def test_paper_example_4_3_program():
    prog = paper_program_dr_dewitt()
    assert run_program(prog, "David Dewitt") == "Dr. Dewitt, D."
    assert program_consistent(prog, "David Dewitt", "Dr. Dewitt, D.")


def test_paper_example_4_3_generalizes_to_ullman():
    # §4.2: the same program also expresses Jeff Ullman → Dr. Ullman, J.
    prog = paper_program_dr_dewitt()
    assert run_program(prog, "Jeff Ullman") == "Dr. Ullman, J."
    assert program_consistent(prog, "Jeff Ullman", "Dr. Ullman, J.")


def test_program_inconsistent():
    prog = paper_program_dr_dewitt()
    assert not program_consistent(prog, "David Dewitt", "Dr. Dewitt")


def test_empty_program_only_empty_output():
    assert program_consistent((), "abc", "")
    assert not program_consistent((), "abc", "x")


def test_affix_program_consistency_street_avenue():
    # Example 4.7: SubStr(TC1) ⊕ Prefix(Tl,1) expresses both
    # Street→St and Avenue→Ave.
    prog = (
        ("SS", ("MP", "TC", 1, "B"), ("MP", "TC", 1, "E")),
        ("PF", "Tl", 1),
    )
    assert program_consistent(prog, "Street", "St")
    assert program_consistent(prog, "Avenue", "Ave")
    assert not program_consistent(prog, "Street", "Sx")


def test_affix_program_has_no_deterministic_output():
    # §8: affix functions are multi-valued → FlashFill can't run them.
    prog = (("PF", "Tl", 1),)
    assert run_program(prog, "Street") is None


def test_run_program_failure_returns_none():
    prog = (("SS", ("MP", "Td", 1, "B"), ("MP", "Td", 1, "E")),)
    assert run_program(prog, "no digits") is None


def test_program_consistent_multivalued_backtracking():
    # Two affix functions whose outputs must be chosen jointly.
    prog = (("PF", "Tl", 1), ("CS", "x"))
    assert program_consistent(prog, "abc", "ax")
    assert program_consistent(prog, "abc", "abx")
    assert not program_consistent(prog, "abc", "bx")


def test_format_program_readable():
    s = format_program(paper_program_dr_dewitt())
    assert "ConstantStr('Dr. ')" in s
    assert "SubStr(MatchPos(TC,2,B),MatchPos(Tl,2,E))" in s
    assert format_program(()) == "ε"
    assert "Prefix(Tl,1)" in format_program((("PF", "Tl", 1),))

"""Tests for the FlashFill-style baseline (§7 footnote 5, §8)."""
from repro.baselines.flashfill import synthesize_program, transform_column
from repro.core.lang import run_program


def test_converges_on_homogeneous_format():
    # Classic FlashFill win: uniform input format, one program fits all.
    examples = [("9 St", "9"), ("12 Ave", "12")]
    prog = synthesize_program(examples)
    assert prog is not None
    assert run_program(prog, "7 Blvd") == "7"


def test_program_applies_to_column():
    examples = [("alpha beta", "alpha"), ("gamma delta", "gamma")]
    prog = synthesize_program(examples)
    assert prog is not None
    out = transform_column(prog, ["epsilon zeta", "eta theta"])
    # The program is consistent with both examples but may be the
    # overfit positional kind (the paper's complaint about FlashFill):
    # same-shape inputs transform, off-shape ones fail or go weird.
    assert out[0] == "epsilon"
    assert out[1] in ("eta", None)


def test_fails_on_heterogeneous_cluster():
    # The paper's observation: entity-consolidation clusters mix formats
    # and FlashFill cannot converge to one consistent program.
    examples = [
        ("andrew sloss", "sloss, andrew"),
        ("sloss", "sloss"),
        ("andrew sloss, et al", "andrew sloss"),
        ("9 St, 02141 Wisconsin", "9th Street, 02141 WI"),
    ]
    assert synthesize_program(examples) is None


def test_fails_on_constant_unrelated_outputs():
    assert synthesize_program([("a", "xx"), ("b", "yy")]) is None


def test_no_affix_in_flashfill_programs():
    # FlashFill programs must be deterministic (§8): Street→St and
    # Avenue→Ave need the multi-valued affix semantics, so no program.
    assert synthesize_program([("Street", "St"), ("Avenue", "Ave")]) is None


def test_empty_examples():
    assert synthesize_program([]) is None


def test_transform_column_weird_or_failed_output_off_format():
    # §7: "the string transformation tools ... usually cannot converge
    # to a program or only produce weird output strings". On an input
    # with no digits, the example-consistent program either fails (None)
    # or emits a weird non-digit string — never a sensible digit.
    examples = [("a 1", "1"), ("b 2", "2")]
    prog = synthesize_program(examples)
    assert prog is not None
    out = transform_column(prog, ["no digits here", "nospaces"])
    for o in out:
        assert o is None or not o.isdigit()


def test_core_groups_where_flashfill_fails():
    # The contrast the paper draws: our grouping handles what FlashFill
    # cannot, because transformations are described, not computed.
    from repro.core.pivot import group_by_pivot

    keys = group_by_pivot([("Street", "St"), ("Avenue", "Ave")], affix=True)
    assert keys[0] == keys[1]
    assert synthesize_program([("Street", "St"), ("Avenue", "Ave")]) is None

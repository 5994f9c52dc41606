"""Tests for repro.core.apply_rules — applying approved groups (§6)."""
import pandas as pd
import pytest

from repro.core.apply_rules import (
    ApprovedGroup,
    _apply_to_value,
    _auto_rules_from_groups,
    _boundary_sub,
    apply_approved_rules,
    parse_group_key,
)

APP_SCHEMA = (
    "cluster_id long, src string, tgt string, rank long, value string, p int"
)


# ------------------------------------------------------------ unit level


def test_boundary_sub_whole_tokens_only():
    assert _boundary_sub("St", "Street", "9 St, x") == "9 St, x"  # "St," ≠ token "St"
    assert _boundary_sub("St,", "Street,", "9 St, x") == "9 Street, x"
    assert _boundary_sub("9", "9th", "9 St 9") == "9th St 9th"
    assert _boundary_sub("9", "9th", "09 St") == "09 St"


def test_boundary_sub_multi_token_source():
    assert _boundary_sub("E Ave", "East Avenue", "3 E Ave x") == "3 East Avenue x"


def test_boundary_sub_regex_chars_escaped():
    assert _boundary_sub("(tm)", "", "java (tm)") == "java "
    assert _boundary_sub("a.b", "x", "a.b azb") == "x azb"


def test_apply_to_value_rank_order_and_fixpoint():
    rules = [(0, "9", "9th"), (1, "St,", "Street,")]
    assert _apply_to_value("9 St, 02141", rules, []) == "9th Street, 02141"


def test_apply_to_value_deletion_collapses_whitespace():
    rules = [(0, "j.", "")]
    assert _apply_to_value("brian j. stone", rules, []) == "brian stone"


def test_apply_to_value_insertion_exact_match_only():
    ins = [(0, "a c", 2, "b")]
    assert _apply_to_value("a c", [], ins) == "a b c"
    assert _apply_to_value("a c d", [], ins) == "a c d"  # value changed → skip


def test_apply_to_value_insertion_at_end():
    ins = [(0, "a", 1, "b")]
    assert _apply_to_value("a", [], ins) == "a b"


def test_apply_to_value_chained_rules():
    # One replacement enabling another (bounded fixpoint).
    rules = [(0, "a", "b"), (1, "b", "c")]
    assert _apply_to_value("a", rules, []) == "c"


def test_parse_group_key_roundtrip():
    g = parse_group_key("PATH|(('CS', 'x'),)", True)
    assert g.path == (("CS", "x"),)
    assert g.struct_key is None and g.src_is_lhs


def test_parse_group_key_with_struct_prefix():
    g = parse_group_key("Tl\x1eTd||PATH|(('CS', 'x'),)", False)
    assert g.struct_key == "Tl\x1eTd"
    assert g.path == (("CS", "x"),)


def test_parse_group_key_unparseable():
    assert parse_group_key("Tl\x1eTd", True).path is None
    assert parse_group_key("LONG|a\x1eb", True).path is None


def test_auto_rules_from_groups():
    # Approved ordinal group (program: digits of lhs) auto-applies to a
    # NEW pair appearing after earlier edits (§6 maintenance).
    from repro.core.pivot import group_by_pivot
    from repro.core.terms import transformation_structure_key

    key = group_by_pivot([("7th", "7")])[0]
    grp = parse_group_key(
        transformation_structure_key("7th", "7") + "||" + key, True
    )
    auto = _auto_rules_from_groups(["4th Ave", "4 Ave"], [grp])
    assert any(src == "4th" and tgt == "4" for _, src, tgt in auto)


def test_auto_rules_respect_structure():
    grp = ApprovedGroup(
        struct_key="Td\x1eTdTl", path=(("CS", "nope"),), src_is_lhs=True
    )
    # Structure key never matches these values' gaps → nothing fires.
    assert _auto_rules_from_groups(["aa bb", "aa cc"], [grp]) == []


# ----------------------------------------------------------- spark level


@pytest.fixture(scope="module")
def records(spark):
    return spark.createDataFrame(
        [
            (1, 1, "9 St, 02141 Wisconsin"),
            (1, 2, "9th St, 02141 WI"),
            (1, 3, "9 Street, 02141 WI"),
            (2, 4, "9 St helsinki"),
        ],
        "cluster_id long, record_id long, value string",
    )


def test_apply_is_cluster_local(spark, records):
    apps = spark.createDataFrame(
        pd.DataFrame(
            [(1, "9", "9th", 0, "", -1)],
            columns=["cluster_id", "src", "tgt", "rank", "value", "p"],
        ),
        schema=APP_SCHEMA,
    )
    out = apply_approved_rules(records, apps).toPandas()
    got = out.set_index("record_id")["new_value"]
    assert got[1].startswith("9th ")
    assert got[3].startswith("9th ")
    assert got[4] == "9 St helsinki"  # cluster 2 untouched


def test_apply_table1_to_table2(spark, records):
    # Paper Tables 1→2 on cluster C1: with the right approved rules all
    # three addresses consolidate to "9th Street, 02141 WI".
    apps_pdf = pd.DataFrame(
        [
            (1, "9", "9th", 0, "", -1),
            (1, "St,", "Street,", 1, "", -1),
            (1, "Wisconsin", "WI", 2, "", -1),
        ],
        columns=["cluster_id", "src", "tgt", "rank", "value", "p"],
    )
    apps = spark.createDataFrame(apps_pdf, schema=APP_SCHEMA)
    out = apply_approved_rules(records, apps).toPandas()
    vals = set(out[out["cluster_id"] == 1]["new_value"])
    assert vals == {"9th Street, 02141 WI"}


def test_apply_no_rules_identity(spark, records):
    apps = spark.createDataFrame([], schema=APP_SCHEMA)
    out = apply_approved_rules(records, apps).toPandas()
    assert (out["value"] == out["new_value"]).all()


def test_apply_with_reapply_groups(spark):
    # The approved ordinal-program group fires on a pair the explicit
    # rule list missed (4th↔4 was never confirmed explicitly).
    from repro.core.pivot import group_by_pivot
    from repro.core.terms import transformation_structure_key

    recs = spark.createDataFrame(
        [(1, 1, "9 Elm"), (1, 2, "9th Elm"), (1, 3, "4 Oak x"), (1, 4, "4th Oak x")],
        "cluster_id long, record_id long, value string",
    )
    key = group_by_pivot([("9th", "9")])[0]
    grp = parse_group_key(
        transformation_structure_key("9th", "9") + "||" + key, True
    )
    apps = spark.createDataFrame(
        pd.DataFrame(
            [(1, "9th", "9", 0, "", -1)],
            columns=["cluster_id", "src", "tgt", "rank", "value", "p"],
        ),
        schema=APP_SCHEMA,
    )
    out = apply_approved_rules(recs, apps, approved_groups=[grp]).toPandas()
    vals = set(out["new_value"])
    assert "9 Elm" in vals and "9th Elm" not in vals
    assert "4 Oak x" in vals and "4th Oak x" not in vals  # auto-applied

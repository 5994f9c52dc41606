"""Tests for repro.core.grouping — the four aggregation methods (§7.1)."""
import pandas as pd
import pytest

from repro.core.grouping import AGG_METHODS, AggConfig, aggregate_transformations

TRANS = pd.DataFrame(
    {
        "lhs": ["9th", "3rd", "5th", "Street", "Avenue", "java(tm)", "linux(r)"],
        "rhs": ["9", "3", "3", "St", "Ave", "java", "linux"],
    }
)


def n_groups(out):
    return out["group_key"].nunique()


def test_unknown_method_raises(spark):
    with pytest.raises(ValueError):
        aggregate_transformations(spark, TRANS, "Bogus")


def test_noagg_one_group_per_transformation(spark):
    out = aggregate_transformations(spark, TRANS, "NoAgg")
    assert n_groups(out) == len(TRANS)


def test_structagg_groups_by_structure(spark):
    out = aggregate_transformations(spark, TRANS, "StructAgg")
    key = out.set_index("lhs")["group_key"]
    # 9th→9, 3rd→3 and 5th→3 all share Td Tl → Td.
    assert key["9th"] == key["3rd"] == key["5th"]
    assert key["Street"] == key["Avenue"]
    assert key["java(tm)"] == key["linux(r)"]
    assert n_groups(out) == 3


def test_bothagg_refines_structagg(spark):
    struct = aggregate_transformations(spark, TRANS, "StructAgg")
    both = aggregate_transformations(spark, TRANS, "BothAgg")
    merged = struct.merge(both, on=["lhs", "rhs"], suffixes=("_s", "_b"))
    # Partition refinement: same program group ⇒ same structure group.
    for _, grp in merged.groupby("group_key_b"):
        assert grp["group_key_s"].nunique() == 1
    assert n_groups(both) >= n_groups(struct)


def test_bothagg_splits_false_ordinal(spark):
    out = aggregate_transformations(spark, TRANS, "BothAgg")
    key = out.set_index("lhs")["group_key"]
    assert key["9th"] == key["3rd"]  # true ordinals together
    assert key["5th"] != key["9th"]  # 5th→3 split out (§4 motivation)


def test_transagg_groups_across_structures(spark):
    out = aggregate_transformations(spark, TRANS, "TransAgg")
    key = out.set_index("lhs")["group_key"]
    assert key["9th"] == key["3rd"]
    # TransAgg ⇒ no structure prefix in the key.
    assert not out["group_key"].str.contains("\x1e").any()


def test_transagg_at_most_as_many_groups_as_bothagg(spark):
    both = aggregate_transformations(spark, TRANS, "BothAgg")
    trans = aggregate_transformations(spark, TRANS, "TransAgg")
    assert n_groups(trans) <= n_groups(both)


def test_agg_methods_cover_paper_set():
    assert set(AGG_METHODS) == {"NoAgg", "StructAgg", "TransAgg", "BothAgg"}


def test_duplicate_transformations_deduped(spark):
    dup = pd.concat([TRANS, TRANS.head(2)], ignore_index=True)
    out = aggregate_transformations(spark, dup, "BothAgg")
    assert len(out) == len(TRANS)


def test_affix_config_changes_grouping(spark):
    trans = pd.DataFrame({"lhs": ["Street", "Avenue"], "rhs": ["St", "Ave"]})
    with_affix = aggregate_transformations(
        spark, trans, "BothAgg", AggConfig(affix=True)
    )
    without = aggregate_transformations(
        spark, trans, "BothAgg", AggConfig(affix=False)
    )
    assert n_groups(with_affix) == 1
    assert n_groups(without) == 2


def test_theta_config(spark):
    trans = pd.DataFrame(
        {
            "lhs": ["alpha beta", "gamma delta"],
            "rhs": ["beta alpha.", "delta gamma."],
        }
    )
    wide = aggregate_transformations(
        spark, trans, "BothAgg", AggConfig(theta=4)
    )
    narrow = aggregate_transformations(
        spark, trans, "BothAgg", AggConfig(theta=1)
    )
    assert n_groups(wide) == 1
    assert n_groups(narrow) == 2

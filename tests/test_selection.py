"""Tests for repro.core.selection — transformation selection (§5, App. C)."""
import pandas as pd
import pytest

from repro.core.selection import METHODS, select_transformations
from repro.core.terms import structure_key


def rules_frame(pairs):
    return pd.DataFrame(pairs, columns=["a", "b"])


def test_unknown_method_raises():
    with pytest.raises(ValueError):
        select_transformations(rules_frame([("a", "b")]), "Nope")


@pytest.mark.parametrize("method", METHODS)
def test_each_rule_gets_exactly_one_orientation(method):
    rules = rules_frame(
        [("9", "9th"), ("Wisconsin", "WI"), ("java", "java(tm)")]
    )
    out = select_transformations(rules, method, seed=7)
    assert len(out) == len(rules)
    for _, r in out.iterrows():
        assert {r["lhs"], r["rhs"]} == {r["a"], r["b"]}
        assert r["lhs"] != r["rhs"]


def test_case1_same_structure_picks_longer():
    # Appendix C Case 1: STRUC equal → longer side becomes lhs.
    out = select_transformations(rules_frame([("abc", "de")]), "BestDir")
    assert out.iloc[0]["lhs"] == "abc"


def test_longdir_always_longer():
    out = select_transformations(
        rules_frame([("9", "9th"), ("Avenue", "Av")]), "LongDir"
    )
    assert list(out["lhs"]) == ["9th", "Avenue"]


def test_randdir_deterministic_in_seed():
    rules = rules_frame([(f"a{i}", f"b{i}x") for i in range(20)])
    o1 = select_transformations(rules, "RandDir", seed=3)
    o2 = select_transformations(rules, "RandDir", seed=3)
    assert list(o1["lhs"]) == list(o2["lhs"])


def test_randdir_actually_randomizes():
    rules = rules_frame([(f"a{i}", f"b{i}x") for i in range(40)])
    out = select_transformations(rules, "RandDir", seed=3)
    assert 0 < (out["lhs"] == out["a"]).sum() < 40


def test_example_5_1_symmetric_structures_avoided():
    # java↔java(tm) and linux↔linux(r): BestDir must not choose
    # java(tm)→java together with linux→linux(r).
    rules = rules_frame([("java", "java(tm)"), ("linux", "linux(r)")])
    out = select_transformations(rules, "BestDir")
    keys = {
        (structure_key(l), structure_key(r))
        for l, r in zip(out["lhs"], out["rhs"])
    }
    # One structure group, not two symmetric ones.
    assert len(keys) == 1


def test_no_symmetric_structures_selected():
    # Lemma 5.2 on a mixed rule set.
    rules = rules_frame(
        [
            ("java", "java(tm)"),
            ("linux", "linux(r)"),
            ("9", "9th"),
            ("3", "3rd"),
            ("Wisconsin", "WI"),
            ("California", "CA"),
        ]
    )
    out = select_transformations(rules, "BestDir")
    pairs = {
        (structure_key(l), structure_key(r))
        for l, r in zip(out["lhs"], out["rhs"])
    }
    for s1, s2 in pairs:
        assert (s2, s1) not in pairs or s1 == s2


def test_bestdir_prefers_longer_average_lhs():
    # §5: the symmetric-group pair keeps the longer-average-lhs side, so
    # rhs strings are shorter and programs group better.
    rules = rules_frame([("java", "java(tm)"), ("linux", "linux(r)")])
    out = select_transformations(rules, "BestDir")
    assert set(out["lhs"]) == {"java(tm)", "linux(r)"}


def test_revdir_reverses_bestdir():
    rules = rules_frame(
        [("java", "java(tm)"), ("linux", "linux(r)"), ("abc", "de")]
    )
    best = select_transformations(rules, "BestDir")
    rev = select_transformations(rules, "RevDir")
    assert list(best["lhs"]) == list(rev["rhs"])
    assert list(best["rhs"]) == list(rev["lhs"])


def test_appendix_c_ordinals():
    # Appendix C example: 9↔9th etc. (case 2) end up with one
    # orientation each, all in the same directed structure group.
    rules = rules_frame([("9", "9th"), ("3", "3rd"), ("22", "22nd")])
    out = select_transformations(rules, "BestDir")
    keys = {
        (structure_key(l), structure_key(r))
        for l, r in zip(out["lhs"], out["rhs"])
    }
    assert len(keys) == 1
    assert set(out["lhs"]) == {"9th", "3rd", "22nd"}


def test_empty_side_rules():
    out = select_transformations(rules_frame([("", "j.")]), "BestDir")
    assert {out.iloc[0]["lhs"], out.iloc[0]["rhs"]} == {"", "j."}


def test_input_not_mutated():
    rules = rules_frame([("a", "bb")])
    select_transformations(rules, "BestDir")
    assert list(rules.columns) == ["a", "b"]

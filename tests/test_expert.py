"""Tests for repro.core.expert — the simulated human (§2 Step 5)."""
import pandas as pd

from repro.core.expert import (
    global_token_counts,
    label_rules,
    simulate_expert,
)


def occ_frame(rows):
    return pd.DataFrame(
        rows,
        columns=["a", "b", "side", "cluster_id", "value", "p", "q", "other"],
    )


def test_label_rules_true_and_false():
    occ = occ_frame(
        [
            ("9", "9th", "a", 1, "9 St", 0, 1, "9th St"),
            ("9", "9th", "b", 1, "9th St", 0, 3, "9 St"),
            ("x", "y", "a", 1, "x q", 0, 1, "y q"),
            ("x", "y", "b", 1, "y q", 0, 1, "x q"),
        ]
    )
    sub = {
        (1, "9 St"): "s0",
        (1, "9th St"): "s0",  # same entity → true rule
        (1, "x q"): "s0",
        (1, "y q"): "s1",  # different entities → false rule
    }
    lab = label_rules(occ, sub).set_index(["a", "b"])
    assert bool(lab.loc[("9", "9th"), "is_true"])
    assert not bool(lab.loc[("x", "y"), "is_true"])


def test_label_rules_majority_of_pairs():
    occ = occ_frame(
        [
            ("u", "v", "a", 1, "u 1", 0, 1, "v 1"),
            ("u", "v", "b", 1, "v 1", 0, 1, "u 1"),
            ("u", "v", "a", 2, "u 2", 0, 1, "v 2"),
            ("u", "v", "b", 2, "v 2", 0, 1, "u 2"),
            ("u", "v", "a", 3, "u 3", 0, 1, "v 3"),
            ("u", "v", "b", 3, "v 3", 0, 1, "u 3"),
        ]
    )
    sub = {
        (1, "u 1"): "a", (1, "v 1"): "a",       # dup
        (2, "u 2"): "a", (2, "v 2"): "a",       # dup
        (3, "u 3"): "a", (3, "v 3"): "b",       # not dup
    }
    lab = label_rules(occ, sub)
    assert lab.iloc[0]["true_frac"] == 2 / 3
    assert bool(lab.iloc[0]["is_true"])


def ranked_frame(rows):
    cols = [
        "a", "b", "lhs", "rhs", "freq_a", "freq_b", "w_a", "w_b",
        "is_true", "group_key", "rank", "freq",
    ]
    return pd.DataFrame(rows, columns=cols)


def test_budget_limits_groups():
    rows = [
        ("a", "b", "b", "a", 1, 1, 1, 1, True, "g0", 0, 1),
        ("c", "d", "d", "c", 1, 1, 1, 1, True, "g1", 1, 1),
        ("e", "f", "f", "e", 1, 1, 1, 1, True, "g2", 2, 1),
    ]
    out = simulate_expert(ranked_frame(rows), budget_groups=2)
    assert len(out) == 2
    assert set(out["rank"]) == {0, 1}


def test_approval_threshold():
    rows = [
        ("a", "b", "b", "a", 1, 1, 1, 1, True, "g0", 0, 1),
        ("c", "d", "d", "c", 1, 1, 1, 1, True, "g0", 0, 1),
        ("e", "f", "f", "e", 1, 1, 1, 1, False, "g0", 0, 1),
    ]
    approved = simulate_expert(ranked_frame(rows), 1, approve_frac=0.5)
    rejected = simulate_expert(ranked_frame(rows), 1, approve_frac=0.8)
    assert bool(approved.iloc[0]["approved"])
    assert not bool(rejected.iloc[0]["approved"])


def test_direction_toward_record_majority():
    # lhs side carried by 10 records, rhs by 2 → replace rhs with lhs.
    rows = [("abc", "xz", "abc", "xz", 3, 2, 10, 2, True, "g0", 0, 3)]
    out = simulate_expert(ranked_frame(rows), 1)
    assert not bool(out.iloc[0]["src_is_lhs"])  # src is rhs


def test_direction_tie_prefers_longer_target():
    rows = [("ab", "wxyz", "wxyz", "ab", 1, 1, 2, 2, True, "g0", 0, 1)]
    out = simulate_expert(ranked_frame(rows), 1)
    # Equal weights → target is the longer side (lhs "wxyz") → src=rhs.
    assert not bool(out.iloc[0]["src_is_lhs"])


def test_phi_rules_always_delete():
    rows = [("", "j.", "j.", "", 2, 5, 2, 5, True, "g0", 0, 5)]
    out = simulate_expert(ranked_frame(rows), 1)
    # rhs is empty → src must be lhs (delete the non-empty side).
    assert bool(out.iloc[0]["src_is_lhs"])


def test_token_frequency_dominates_direction():
    rows = [
        ("J.", "Journal", "Journal", "J.", 5, 5, 5, 5, True, "g0", 0, 5)
    ]
    tf = {"Journal": 100, "J.": 10}
    out = simulate_expert(ranked_frame(rows), 1, token_freq=tf)
    # Column-dominant side is "Journal" (the lhs) → src is rhs.
    assert not bool(out.iloc[0]["src_is_lhs"])


def test_global_token_counts():
    recs = pd.DataFrame({"value": ["a b", "a", "b b"]})
    tf = global_token_counts(recs)
    assert tf == {"a": 2, "b": 2}  # per-record containment, not raw count


def test_empty_budget():
    rows = [("a", "b", "b", "a", 1, 1, 1, 1, True, "g0", 0, 1)]
    out = simulate_expert(ranked_frame(rows), 0)
    assert len(out) == 0

"""Tests for repro.core.ranking — aggregate-frequency group ranking (§6)."""
import pandas as pd

from repro.core.ranking import rank_groups


def frame():
    return pd.DataFrame(
        {
            "a": ["a1", "a2", "a3", "a4"],
            "b": ["b1", "b2", "b3", "b4"],
            "group_key": ["g1", "g1", "g2", "g3"],
            "freq": [5, 3, 10, 1],
        }
    )


def test_rank_is_dense_and_zero_based():
    out = rank_groups(frame())
    ranks = sorted(out["rank"].unique())
    assert ranks == [0, 1, 2]


def test_aggregate_frequency_order():
    out = rank_groups(frame())
    by_key = out.drop_duplicates("group_key").set_index("group_key")
    # g2 freq 10, g1 freq 8, g3 freq 1.
    assert by_key.loc["g2", "rank"] == 0
    assert by_key.loc["g1", "rank"] == 1
    assert by_key.loc["g3", "rank"] == 2
    assert by_key.loc["g1", "group_freq"] == 8


def test_all_rules_keep_their_rows():
    out = rank_groups(frame())
    assert len(out) == 4
    assert set(out.columns) >= {"group_key", "group_freq", "n_rules", "rank"}


def test_n_rules_per_group():
    out = rank_groups(frame())
    by_key = out.drop_duplicates("group_key").set_index("group_key")
    assert by_key.loc["g1", "n_rules"] == 2
    assert by_key.loc["g2", "n_rules"] == 1


def test_tie_broken_by_group_key():
    f = pd.DataFrame(
        {
            "a": ["x", "y"],
            "b": ["p", "q"],
            "group_key": ["kb", "ka"],
            "freq": [4, 4],
        }
    )
    out = rank_groups(f).drop_duplicates("group_key").set_index("group_key")
    assert out.loc["ka", "rank"] == 0
    assert out.loc["kb", "rank"] == 1


def test_deterministic():
    o1 = rank_groups(frame())
    o2 = rank_groups(frame())
    pd.testing.assert_frame_equal(
        o1.sort_values(["a"]).reset_index(drop=True),
        o2.sort_values(["a"]).reset_index(drop=True),
    )

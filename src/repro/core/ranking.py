"""Group ranking by aggregate frequency (paper §6).

The frequency of a matching rule is the larger of its two
replacement-set sizes; a group's aggregate frequency is the sum over
its member rules. Groups are confirmed with the expert in decreasing
aggregate-frequency order: frequent rules merge more duplicates, and
false rules are diverse across clusters hence infrequent.
"""
from __future__ import annotations

import pandas as pd


def rank_groups(grouped_rules: pd.DataFrame) -> pd.DataFrame:
    """Add a dense 0-based ``rank`` column per group.

    ``grouped_rules`` needs ``group_key`` and ``freq`` (per-rule
    frequency). Ties break on group key for determinism.
    """
    agg = (
        grouped_rules.groupby("group_key", as_index=False)
        .agg(group_freq=("freq", "sum"), n_rules=("freq", "size"))
        .sort_values(
            ["group_freq", "group_key"], ascending=[False, True]
        )
        .reset_index(drop=True)
    )
    agg["rank"] = agg.index
    return grouped_rules.merge(
        agg[["group_key", "group_freq", "n_rules", "rank"]], on="group_key"
    )

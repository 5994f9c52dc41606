"""Simulated human expert (paper §2 Step 5, §7.1 protocol).

The paper has a human approve/reject whole rule groups ("all true" /
"all false") and pick a replacement direction. We simulate that expert
against the hidden sub-entity ground truth of the synthetic datasets:

* a matching rule is **true** iff at least half of the value pairs that
  generated it are same-sub-entity pairs;
* a group is **approved** iff at least ``approve_frac`` of its member
  rules are true — a human shown a mostly-true group says "all true",
  which is exactly how rare false rules slip into approved groups and
  precision lands near (not at) 100% in the paper;
* the **direction** replaces the less frequent side with the more
  frequent one (ties: toward the longer side), mirroring an expert
  normalising toward the dominant format. No ground truth is used here.
"""
from __future__ import annotations

import pandas as pd


def label_rules(
    occurrences: pd.DataFrame, sub_of: dict[tuple[int, str], str]
) -> pd.DataFrame:
    """Per-rule truth labels from generation provenance.

    ``occurrences`` is the pandas form of :data:`OCCURRENCE_SCHEMA`;
    ``sub_of`` maps ``(cluster_id, value)`` to a hidden sub-entity id.
    Returns one row per rule ``(a, b)`` with ``true_frac`` and
    ``is_true``.
    """
    pairs = occurrences[["a", "b", "cluster_id", "value", "other"]].copy()
    v1 = pairs[["value", "other"]].min(axis=1)
    v2 = pairs[["value", "other"]].max(axis=1)
    pairs["v1"], pairs["v2"] = v1, v2
    pairs = pairs.drop_duplicates(["a", "b", "cluster_id", "v1", "v2"])
    pairs["is_dup"] = [
        sub_of.get((c, x)) is not None and sub_of.get((c, x)) == sub_of.get((c, y))
        for c, x, y in zip(pairs["cluster_id"], pairs["v1"], pairs["v2"])
    ]
    lab = pairs.groupby(["a", "b"], as_index=False).agg(
        true_frac=("is_dup", "mean")
    )
    lab["is_true"] = lab["true_frac"] >= 0.5
    return lab


def global_token_counts(records: pd.DataFrame) -> dict[str, int]:
    """#records whose value contains each whitespace token (column-wide).

    The direction signal: an expert normalises toward the format that
    dominates the whole column, which includes the single-record
    clusters the rule never touched.
    """
    counts: dict[str, int] = {}
    for v in records["value"]:
        for tok in set(str(v).split()):
            counts[tok] = counts.get(tok, 0) + 1
    return counts


def _side_score(s: str, token_freq: dict[str, int]) -> float:
    toks = s.split()
    if not toks:
        return 0.0
    return sum(token_freq.get(t, 0) for t in toks) / len(toks)


def simulate_expert(
    ranked_rules: pd.DataFrame,
    budget_groups: int,
    *,
    approve_frac: float = 0.8,
    token_freq: dict[str, int] | None = None,
) -> pd.DataFrame:
    """Confirm the top ``budget_groups`` groups, in rank order.

    ``ranked_rules`` needs per-rule columns ``a``, ``b``, ``lhs``,
    ``rhs``, ``freq_a``, ``freq_b``, ``is_true``, ``group_key``,
    ``rank``. Returns one row per *inspected* group with ``approved``
    and, when approved, the chosen direction as columns ``src_is_lhs``.
    """
    inspected = ranked_rules[ranked_rules["rank"] < budget_groups]
    out = []
    for (key, rank), g in inspected.groupby(["group_key", "rank"]):
        approved = g["is_true"].mean() >= approve_frac
        # Direction: toward the column-dominant format. Primary signal is
        # the global token frequency of each side; rule-local record
        # weights break near-ties; length breaks exact ties.
        score_lhs = score_rhs = 0.0
        if token_freq:
            score_lhs = float(
                sum(_side_score(s, token_freq) for s in g["lhs"])
            )
            score_rhs = float(
                sum(_side_score(s, token_freq) for s in g["rhs"])
            )
        wa = g["w_a"] if "w_a" in g else g["freq_a"]
        wb = g["w_b"] if "w_b" in g else g["freq_b"]
        occ_lhs = int((wa.where(g["lhs"] == g["a"], wb)).sum())
        occ_rhs = int((wb.where(g["rhs"] == g["b"], wa)).sum())
        has_empty = (g["lhs"] == "").any() or (g["rhs"] == "").any()
        if has_empty:
            # φ-rules: consolidate by *deleting* the optional tokens
            # (middle initials, "(author)" tags, stray qualifiers) —
            # inserting them everywhere moves away from canon.
            src_is_lhs = bool((g["rhs"] == "").mean() >= 0.5)
        elif token_freq and abs(score_rhs - score_lhs) > 0.1 * max(
            score_lhs, score_rhs, 1.0
        ):
            src_is_lhs = score_rhs > score_lhs
        elif occ_rhs != occ_lhs:
            src_is_lhs = occ_rhs > occ_lhs  # replace toward majority
        else:
            len_lhs = g["lhs"].str.len().mean()
            len_rhs = g["rhs"].str.len().mean()
            src_is_lhs = len_rhs >= len_lhs  # replace toward longer
        out.append(
            {
                "group_key": key,
                "rank": rank,
                "approved": bool(approved),
                "src_is_lhs": bool(src_is_lhs),
                "n_rules": len(g),
                "true_frac": float(g["is_true"].mean()),
            }
        )
    return (
        pd.DataFrame(
            out,
            columns=[
                "group_key",
                "rank",
                "approved",
                "src_is_lhs",
                "n_rules",
                "true_frac",
            ],
        )
        .astype({"approved": bool, "src_is_lhs": bool})
        .sort_values("rank")
        .reset_index(drop=True)
    )

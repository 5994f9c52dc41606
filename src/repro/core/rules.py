"""Matching-rule generation with replacement sets (paper §2 Step 1, §6).

Runs cluster-parallel in Spark: ``groupBy(cluster_id).applyInPandas``
mines every pair of distinct attribute values within a cluster and
emits one *occurrence* row per replacement-set entry:

``(a, b, side, cluster_id, value, p, q, other)``

where ``a ↔ b`` is the canonically ordered matching rule, ``side`` says
which of the two strings occurs in ``value`` at char span ``[p, q)``,
and ``other`` is the paired value the alignment came from (provenance
used by the simulated expert). Rules come from (i) LCS-aligned token
gaps (Example 2.1) and (ii) the full value pair itself (Example 2.2).
"""
from __future__ import annotations

from itertools import combinations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .lcs import aligned_gaps

OCCURRENCE_SCHEMA = (
    "a string, b string, side string, cluster_id long, "
    "value string, p int, q int, other string"
)


def _mine_cluster(
    pdf: pd.DataFrame, include_full_pairs: bool, max_pairs: int | None
) -> pd.DataFrame:
    values = sorted(pdf["value"].dropna().unique())
    rows: list[tuple] = []
    cid = int(pdf["cluster_id"].iloc[0]) if len(pdf) else -1
    pairs = combinations(values, 2)
    for n_done, (va, vb) in enumerate(pairs):
        if max_pairs is not None and n_done >= max_pairs:
            break
        if include_full_pairs:
            a, b = (va, vb) if va <= vb else (vb, va)
            rows.append((a, b, "a", cid, a, 0, len(a), b))
            rows.append((a, b, "b", cid, b, 0, len(b), a))
        for gap in aligned_gaps(va, vb):
            if gap.a_str <= gap.b_str:
                a, b = gap.a_str, gap.b_str
                sa, sb = gap.a_span, gap.b_span
                va_, vb_ = va, vb
            else:
                a, b = gap.b_str, gap.a_str
                sa, sb = gap.b_span, gap.a_span
                va_, vb_ = vb, va
            rows.append((a, b, "a", cid, va_, sa[0], sa[1], vb_))
            rows.append((a, b, "b", cid, vb_, sb[0], sb[1], va_))
    return pd.DataFrame(
        rows,
        columns=["a", "b", "side", "cluster_id", "value", "p", "q", "other"],
    )


def mine_rules(
    records: DataFrame,
    *,
    include_full_pairs: bool = True,
    max_pairs_per_cluster: int | None = None,
) -> DataFrame:
    """All matching-rule occurrences, cluster-parallel.

    ``records`` needs columns ``cluster_id`` (long) and ``value``
    (string). The full-value rule of Example 2.2 can be disabled and the
    per-cluster pair count capped for pathologically large clusters.
    """

    def worker(pdf: pd.DataFrame) -> pd.DataFrame:
        return _mine_cluster(pdf, include_full_pairs, max_pairs_per_cluster)

    return (
        records.select("cluster_id", "value")
        .dropDuplicates()
        .groupBy("cluster_id")
        .applyInPandas(worker, schema=OCCURRENCE_SCHEMA)
    )


def rule_frequencies(occurrences: DataFrame) -> DataFrame:
    """Distinct rules with per-side occurrence counts and frequency.

    The *frequency* of a rule is the larger of its two replacement-set
    sizes (§6); ``freq_a``/``freq_b`` count occurrences of side ``a``
    and ``b`` respectively.
    """
    # Replacement sets are *sets* of ⟨value, p, q⟩ triples (Example 6.1):
    # the same occurrence reached via two different pair alignments
    # counts once, so entries are deduplicated before counting.
    entries = occurrences.select(
        "a", "b", "side", "cluster_id", "value", "p", "q"
    ).dropDuplicates()
    return entries.groupBy("a", "b").agg(
        F.count(F.when(F.col("side") == "a", 1)).alias("freq_a"),
        F.count(F.when(F.col("side") == "b", 1)).alias("freq_b"),
        F.greatest(
            F.count(F.when(F.col("side") == "a", 1)),
            F.count(F.when(F.col("side") == "b", 1)),
        ).alias("freq"),
    )


def rule_record_weights(
    occurrences: DataFrame, records: DataFrame
) -> DataFrame:
    """Record-weighted side counts ``(a, b, w_a, w_b)``.

    Each replacement-set entry is weighted by how many *records* carry
    the value it occurs in — the signal the expert uses to pick the
    replacement direction (normalize toward the dominant format).
    """
    multiplicity = records.groupBy("cluster_id", "value").agg(
        F.count(F.lit(1)).alias("n_rec")
    )
    entries = occurrences.select(
        "a", "b", "side", "cluster_id", "value", "p", "q"
    ).dropDuplicates()
    weighted = entries.join(
        multiplicity, on=["cluster_id", "value"], how="left"
    ).fillna(1, subset=["n_rec"])
    return weighted.groupBy("a", "b").agg(
        F.sum(F.when(F.col("side") == "a", F.col("n_rec")).otherwise(0)).alias(
            "w_a"
        ),
        F.sum(F.when(F.col("side") == "b", F.col("n_rec")).otherwise(0)).alias(
            "w_b"
        ),
    )

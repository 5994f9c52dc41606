"""Evaluation metrics (paper §7.1 and §7.5).

* **Merging duplicates** — over a labeled sample of within-cluster value
  pairs: a same-entity pair reduced to one string is a TP, not reduced a
  FN; a different-entity pair reduced to one string is a FP, else TN.
  Reported as precision, recall and Matthews correlation coefficient
  (MCC; balanced under the very different class sizes of the three
  datasets).
* **MC precision** — golden value vs per-cluster ground truth, exact
  match after lowercasing and whitespace collapsing (the paper matched
  "refers to the same entity"; with synthetic canonicals, normalized
  string equality is that check). A NULL golden value (MC tie) counts
  as a failure.
"""
from __future__ import annotations

import math
import re

import pandas as pd

_WS = re.compile(r"\s+")


def _norm(s: str | None) -> str | None:
    if s is None or (isinstance(s, float) and math.isnan(s)):
        return None
    return _WS.sub(" ", str(s)).strip().lower()


def confusion(
    sample_pairs: pd.DataFrame, value_map: pd.DataFrame
) -> dict[str, float]:
    """TP/FP/FN/TN + precision/recall/MCC for duplicate merging.

    ``sample_pairs``: (cluster_id, v1, v2, is_dup) labeled pairs.
    ``value_map``: (cluster_id, value, new_value) from rule application;
    pairs whose values are missing from the map keep their old value.
    """
    m = value_map.set_index(["cluster_id", "value"])["new_value"]

    def new(c, v):
        try:
            return m.loc[(c, v)]
        except KeyError:
            return v

    tp = fp = fn = tn = 0
    for c, v1, v2, dup in zip(
        sample_pairs["cluster_id"],
        sample_pairs["v1"],
        sample_pairs["v2"],
        sample_pairs["is_dup"],
    ):
        merged = new(c, v1) == new(c, v2)
        if dup and merged:
            tp += 1
        elif dup:
            fn += 1
        elif merged:
            fp += 1
        else:
            tn += 1
    return scores(tp, fp, fn, tn)


def scores(tp: int, fp: int, fn: int, tn: int) -> dict[str, float]:
    """Precision, recall and MCC from a confusion matrix (§7.1)."""
    precision = tp / (tp + fp) if tp + fp else 0.0
    recall = tp / (tp + fn) if tp + fn else 0.0
    denom = math.sqrt(
        (tp + fp) * (tp + fn) * (tn + fp) * (tn + fn)
    )
    mcc = (tp * tn - fp * fn) / denom if denom else 0.0
    return {
        "tp": tp,
        "fp": fp,
        "fn": fn,
        "tn": tn,
        "precision": precision,
        "recall": recall,
        "mcc": mcc,
    }


def mc_precision(golden: pd.DataFrame, truth: pd.DataFrame) -> float:
    """Fraction of ground-truth clusters where MC found the true value.

    ``golden``: (cluster_id, golden — nullable). ``truth``:
    (cluster_id, canonical). Only clusters present in ``truth`` count.
    """
    merged = truth.merge(golden, on="cluster_id", how="left")
    if merged.empty:
        return 0.0
    ok = sum(
        _norm(g) is not None and _norm(g) == _norm(t)
        for g, t in zip(merged["golden"], merged["canonical"])
    )
    return ok / len(merged)

"""Tests for repro.core.metrics — P/R/MCC and MC precision (§7.1, §7.5)."""
import math

import pandas as pd
import pytest

from repro.core.metrics import _norm, confusion, mc_precision, scores


def test_scores_perfect():
    s = scores(tp=10, fp=0, fn=0, tn=10)
    assert s["precision"] == 1.0 and s["recall"] == 1.0 and s["mcc"] == 1.0


def test_scores_all_wrong():
    s = scores(tp=0, fp=10, fn=10, tn=0)
    assert s["mcc"] == -1.0


def test_scores_degenerate_zero_denominator():
    s = scores(tp=0, fp=0, fn=0, tn=5)
    assert s["precision"] == 0.0 and s["recall"] == 0.0 and s["mcc"] == 0.0


def test_scores_formulas():
    s = scores(tp=6, fp=2, fn=4, tn=8)
    assert s["precision"] == pytest.approx(6 / 8)
    assert s["recall"] == pytest.approx(6 / 10)
    denom = math.sqrt((6 + 2) * (6 + 4) * (8 + 2) * (8 + 4))
    assert s["mcc"] == pytest.approx((6 * 8 - 2 * 4) / denom)


def test_mcc_in_range_random_cases():
    for tp, fp, fn, tn in [(1, 2, 3, 4), (9, 1, 1, 9), (0, 5, 5, 0)]:
        assert -1.0 <= scores(tp, fp, fn, tn)["mcc"] <= 1.0


def value_map(rows):
    return pd.DataFrame(rows, columns=["cluster_id", "value", "new_value"])


def pairs(rows):
    return pd.DataFrame(rows, columns=["cluster_id", "v1", "v2", "is_dup"])


def test_confusion_counts_paper_protocol():
    # Dup pair merged → TP; dup not merged → FN; non-dup merged → FP;
    # non-dup not merged → TN (§7.1).
    vm = value_map(
        [
            (1, "a", "z"), (1, "b", "z"),       # merged
            (1, "c", "c"),
            (2, "p", "q"), (2, "r", "q"),       # wrongly merged
            (2, "s", "s"),
        ]
    )
    p = pairs(
        [
            (1, "a", "b", True),    # TP
            (1, "a", "c", True),    # FN
            (2, "p", "r", False),   # FP
            (2, "p", "s", False),   # TN
        ]
    )
    out = confusion(p, vm)
    assert (out["tp"], out["fn"], out["fp"], out["tn"]) == (1, 1, 1, 1)


def test_confusion_missing_values_keep_identity():
    out = confusion(pairs([(9, "x", "y", True)]), value_map([]))
    assert out["fn"] == 1 and out["tp"] == 0


def test_norm():
    assert _norm("  A   b ") == "a b"
    assert _norm(None) is None
    assert _norm(float("nan")) is None


def golden(rows):
    return pd.DataFrame(rows, columns=["cluster_id", "golden"])


def truth(rows):
    return pd.DataFrame(rows, columns=["cluster_id", "canonical"])


def test_mc_precision_exact_and_normalized():
    g = golden([(1, "X Y"), (2, "x  y"), (3, "wrong")])
    t = truth([(1, "x y"), (2, "X Y"), (3, "right")])
    assert mc_precision(g, t) == pytest.approx(2 / 3)


def test_mc_precision_null_is_failure():
    g = golden([(1, None)])
    t = truth([(1, "x")])
    assert mc_precision(g, t) == 0.0


def test_mc_precision_missing_cluster_is_failure():
    g = golden([(1, "x")])
    t = truth([(1, "x"), (2, "y")])
    assert mc_precision(g, t) == pytest.approx(0.5)


def test_mc_precision_only_truth_clusters_count():
    g = golden([(1, "x"), (99, "junk")])
    t = truth([(1, "x")])
    assert mc_precision(g, t) == 1.0


def test_mc_precision_empty_truth():
    assert mc_precision(golden([]), truth([])) == 0.0

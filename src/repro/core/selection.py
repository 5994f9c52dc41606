"""Transformation selection (paper §5, Appendix C).

A matching rule ``a ↔ b`` yields two possible transformations; exactly
one is selected for grouping. Methods evaluated in §7.2:

* ``BestDir`` — the paper's default. Case 1 (equal structures): pick the
  longer side as lhs. Case 2: generate both orientations, aggregate by
  directed structure, and for each pair of symmetric structure groups
  keep the orientation whose group has the longer average lhs, so no
  two selected transformations have symmetric structures (Lemma 5.2)
  and shorter rhs strings make programs group better.
* ``LongDir`` — always the longer side as lhs (second strategy only).
* ``RevDir``  — the reverse of BestDir (symmetric-avoidance only, with
  the shorter-average-lhs group kept).
* ``RandDir`` — random orientation per rule (seeded).

Input/output are pandas frames (rule sets are small after dedup; the
Spark pipeline collects distinct rules to the driver for this step and
broadcasts the result back — see :mod:`repro.core.grouping`).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .terms import structure_key

METHODS = ("BestDir", "LongDir", "RevDir", "RandDir")


def _longer_first(a: str, b: str) -> tuple[str, str]:
    """Deterministic longer-side-first orientation (ties: lexicographic)."""
    if (len(a), a) >= (len(b), b):
        return a, b
    return b, a


def select_transformations(
    rules: pd.DataFrame, method: str = "BestDir", *, seed: int = 0
) -> pd.DataFrame:
    """Add ``lhs``/``rhs`` columns to a distinct-rule frame.

    ``rules`` must have columns ``a`` and ``b`` (the two sides of each
    matching rule, canonically ordered, one row per distinct rule).
    """
    if method not in METHODS:
        raise ValueError(f"unknown selection method {method!r}")
    rules = rules.reset_index(drop=True).copy()
    a, b = rules["a"], rules["b"]

    if method == "RandDir":
        flip = np.random.default_rng(seed).random(len(rules)) < 0.5
        rules["lhs"] = np.where(flip, b, a)
        rules["rhs"] = np.where(flip, a, b)
        return rules
    if method == "LongDir":
        oriented = [_longer_first(x, y) for x, y in zip(a, b)]
        rules["lhs"] = [o[0] for o in oriented]
        rules["rhs"] = [o[1] for o in oriented]
        return rules

    # BestDir / RevDir.
    sa = a.map(structure_key)
    sb = b.map(structure_key)
    same = sa == sb
    lhs = list(a)
    rhs = list(b)

    # Case 1 — symmetric structures within the rule itself: longer side.
    for i in np.flatnonzero(same.to_numpy()):
        lhs[i], rhs[i] = _longer_first(a.iat[i], b.iat[i])

    # Case 2 — aggregate both orientations by directed structure and keep,
    # per symmetric group pair, the orientation with longer average lhs.
    case2 = ~same
    if case2.any():
        fwd = pd.DataFrame(
            {"key": sa[case2] + "\x1e" + sb[case2], "llen": a[case2].str.len()}
        )
        rev = pd.DataFrame(
            {"key": sb[case2] + "\x1e" + sa[case2], "llen": b[case2].str.len()}
        )
        avg = (
            pd.concat([fwd, rev]).groupby("key")["llen"].mean().to_dict()
        )
        for i in np.flatnonzero(case2.to_numpy()):
            k_fwd = sa.iat[i] + "\x1e" + sb.iat[i]
            k_rev = sb.iat[i] + "\x1e" + sa.iat[i]
            # Deterministic tie-break on the key string.
            fwd_wins = (avg[k_fwd], k_fwd) > (avg[k_rev], k_rev)
            if method == "RevDir":
                fwd_wins = not fwd_wins
            if fwd_wins:
                lhs[i], rhs[i] = a.iat[i], b.iat[i]
            else:
                lhs[i], rhs[i] = b.iat[i], a.iat[i]

    if method == "RevDir":
        # RevDir reverses the *whole* of BestDir, case 1 included.
        for i in np.flatnonzero(same.to_numpy()):
            lhs[i], rhs[i] = rhs[i], lhs[i]

    rules["lhs"] = lhs
    rules["rhs"] = rhs
    return rules

"""Token-level LCS alignment for matching-rule generation (paper §2 Step 1).

Values are split into whitespace tokens; the longest common subsequence
of the two token sequences aligns them, and every aligned pair of
non-identical token subsequences (the "gaps" between consecutive LCS
anchors) yields one candidate matching rule, together with the character
spans needed for the replacement sets of §6.
"""
from __future__ import annotations

import re
from dataclasses import dataclass

_TOKEN_RE = re.compile(r"\S+")


def tokenize(s: str) -> list[tuple[str, int, int]]:
    """Whitespace tokens of ``s`` with 0-based half-open char spans."""
    return [(m.group(), m.start(), m.end()) for m in _TOKEN_RE.finditer(s)]


def token_lcs(a: list[str], b: list[str]) -> list[tuple[int, int]]:
    """Indices ``(i, j)`` of one longest common subsequence of ``a``/``b``.

    Classic O(|a|·|b|) DP; ties broken toward matching earlier tokens in
    both sequences (deterministic backtrace preferring diagonal moves).
    """
    n, m = len(a), len(b)
    if n == 0 or m == 0:
        return []
    dp = [[0] * (m + 1) for _ in range(n + 1)]
    for i in range(n - 1, -1, -1):
        row, nxt = dp[i], dp[i + 1]
        for j in range(m - 1, -1, -1):
            if a[i] == b[j]:
                row[j] = nxt[j + 1] + 1
            else:
                row[j] = nxt[j] if nxt[j] >= row[j + 1] else row[j + 1]
    out: list[tuple[int, int]] = []
    i = j = 0
    while i < n and j < m:
        if a[i] == b[j]:
            out.append((i, j))
            i += 1
            j += 1
        elif dp[i + 1][j] >= dp[i][j + 1]:
            i += 1
        else:
            j += 1
    return out


@dataclass(frozen=True)
class AlignedGap:
    """One aligned pair of non-identical token subsequences.

    ``a_str``/``b_str`` are the two sides (either may be ``""``);
    ``a_span``/``b_span`` are 0-based half-open character spans in the
    original values. For an empty side the span is the insertion point
    ``(p, p)`` — the start of the next anchored token (or end of string).
    """

    a_str: str
    a_span: tuple[int, int]
    b_str: str
    b_span: tuple[int, int]


def aligned_gaps(va: str, vb: str) -> list[AlignedGap]:
    """All candidate matching rules from one value pair (paper Ex. 2.1).

    Splits both values into whitespace tokens, computes the token LCS,
    and emits every aligned non-identical gap between consecutive LCS
    anchors (including before the first and after the last anchor).
    """
    ta, tb = tokenize(va), tokenize(vb)
    anchors = token_lcs([t[0] for t in ta], [t[0] for t in tb])
    gaps: list[AlignedGap] = []
    prev_i = prev_j = -1
    # A sentinel anchor past the end flushes the trailing gap.
    for ai, aj in anchors + [(len(ta), len(tb))]:
        gi, gj = ta[prev_i + 1 : ai], tb[prev_j + 1 : aj]
        if gi or gj:
            if gi:
                a_str = va[gi[0][1] : gi[-1][2]]
                a_span = (gi[0][1], gi[-1][2])
            else:
                p = ta[ai][1] if ai < len(ta) else len(va)
                a_str, a_span = "", (p, p)
            if gj:
                b_str = vb[gj[0][1] : gj[-1][2]]
                b_span = (gj[0][1], gj[-1][2])
            else:
                p = tb[aj][1] if aj < len(tb) else len(vb)
                b_str, b_span = "", (p, p)
            if a_str != b_str:
                gaps.append(AlignedGap(a_str, a_span, b_str, b_span))
        prev_i, prev_j = ai, aj
    return gaps

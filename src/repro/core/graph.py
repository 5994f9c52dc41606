"""Transformation graphs (paper Definition 4, Appendix A Algorithm 4).

For a transformation ``s → t`` the graph has one node per boundary of
``t`` (``0 .. len(t)``) and an edge ``(i, j)`` for every ``i < j``
(substring ``t[i:j]``). Edge labels are string functions that produce
``t[i:j]`` from ``s``:

* ``ConstantStr(t[i:j])`` — always present;
* ``SubStr(p1, p2)`` for every occurrence of ``t[i:j]`` in ``s`` and
  every pair of position functions locating its boundaries;
* affix labels ``Prefix(τ,k)`` / ``Suffix(τ,k)`` (§4.4) when ``t[i:j]``
  is the *longest* prefix/suffix of the k-th match of τ (Appendix B's
  static order keeps only the longest).

Static-order pruning (Appendix B): per boundary of ``s`` we keep at most
``max_pos_funcs`` position functions, preferring regex-based MatchPos
over constant-string MatchPos over ConstPos, and candidate constant
string terms are the whitespace tokens of ``s`` (the paper's
frequency-ranking heuristic serves the same purpose: avoid the
single-character constant-term explosion).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from .lcs import tokenize
from .terms import EXTRA_REGEX_TERMS, REGEX_TERMS, term_matches


@dataclass
class TGraph:
    """A transformation graph. ``n_nodes = len(t) + 1`` boundaries."""

    lhs: str
    rhs: str
    n_nodes: int
    # (i, j) -> tuple of string-function labels on that edge.
    edges: dict[tuple[int, int], tuple] = field(default_factory=dict)

    @property
    def last(self) -> int:
        return self.n_nodes - 1


def _position_functions(
    s: str,
    *,
    use_const_terms: bool,
    use_extra_terms: bool,
    max_pos_funcs: int,
) -> dict[int, list]:
    """Position array ``P`` (Algorithm 4 lines 2–10), statically ordered."""
    pos: dict[int, list] = {b: [] for b in range(len(s) + 1)}

    def add(b: int, f: tuple) -> None:
        if f not in pos[b]:
            pos[b].append(f)

    terms = dict(REGEX_TERMS)
    if use_extra_terms:
        terms.update(EXTRA_REGEX_TERMS)
    const_terms: list[str] = []
    if use_const_terms:
        seen = set()
        for tok, _, _ in tokenize(s):
            if tok not in seen:
                seen.add(tok)
                const_terms.append(f"C:{tok}")
    # Static order: regex MatchPos first, then constant-term MatchPos,
    # then ConstPos — appended in priority order, truncated below.
    for term in list(terms) + const_terms:
        ms = term_matches(s, term)
        m = len(ms)
        for idx, (x, y) in enumerate(ms):
            k = idx + 1
            add(x, ("MP", term, k, "B"))
            add(y, ("MP", term, k, "E"))
            add(x, ("MP", term, k - m - 1, "B"))
            add(y, ("MP", term, k - m - 1, "E"))
    for b in range(len(s) + 1):
        add(b, ("CP", b))
        add(b, ("CP", b - len(s) - 1))
        if len(pos[b]) > max_pos_funcs:
            pos[b] = pos[b][:max_pos_funcs]
    return pos


def _occurrences(s: str, needle: str) -> list[tuple[int, int]]:
    """All (possibly overlapping) occurrences of ``needle`` in ``s``."""
    out = []
    i = s.find(needle)
    while i != -1:
        out.append((i, i + len(needle)))
        i = s.find(needle, i + 1)
    return out


def build_graph(
    s: str,
    t: str,
    *,
    affix: bool = True,
    use_const_terms: bool = True,
    use_extra_terms: bool = False,
    max_pos_funcs: int = 6,
) -> TGraph:
    """Build the transformation graph of ``s → t`` (Algorithm 4 + §4.4)."""
    pos = _position_functions(
        s,
        use_const_terms=use_const_terms,
        use_extra_terms=use_extra_terms,
        max_pos_funcs=max_pos_funcs,
    )
    edges: dict[tuple[int, int], list] = {}
    for i in range(len(t)):
        for j in range(i + 1, len(t) + 1):
            sub = t[i:j]
            labels: list = [("CS", sub)]
            for x, y in _occurrences(s, sub):
                for f in pos[x]:
                    for g in pos[y]:
                        lab = ("SS", f, g)
                        if lab not in labels:
                            labels.append(lab)
            edges[(i, j)] = labels

    if affix and t:
        terms = dict(REGEX_TERMS)
        if use_extra_terms:
            terms.update(EXTRA_REGEX_TERMS)
        for term in terms:
            ms = term_matches(s, term)
            m = len(ms)
            for idx, (x, y) in enumerate(ms):
                match = s[x:y]
                ks = (idx + 1, idx - m)
                # Longest prefix of the match starting at each t-boundary.
                for i in range(len(t)):
                    cl = 0
                    while (
                        cl < len(match)
                        and i + cl < len(t)
                        and t[i + cl] == match[cl]
                    ):
                        cl += 1
                    if cl >= 1:
                        e = edges[(i, i + cl)]
                        for k in ks:
                            lab = ("PF", term, k)
                            if lab not in e:
                                e.append(lab)
                # Longest suffix of the match ending at each t-boundary.
                for j in range(1, len(t) + 1):
                    cl = 0
                    while (
                        cl < len(match)
                        and j - cl - 1 >= 0
                        and t[j - cl - 1] == match[len(match) - cl - 1]
                    ):
                        cl += 1
                    if cl >= 1:
                        e = edges[(j - cl, j)]
                        for k in ks:
                            lab = ("SF", term, k)
                            if lab not in e:
                                e.append(lab)

    return TGraph(
        lhs=s,
        rhs=t,
        n_nodes=len(t) + 1,
        edges={e: tuple(labs) for e, labs in edges.items()},
    )

"""The transformation-program language (paper §4.1 and §4.4).

Labels are plain hashable tuples so they can key inverted indexes,
be compared for pivot-path identity (two functions are equal iff type
and all parameters are equal), and cross the Spark serialization
boundary cheaply:

* ``("CP", k)``                    — ConstPos(k)
* ``("MP", term, k, dir)``         — MatchPos(τ, k, Dir); ``term`` is a
  regex term id from :mod:`repro.core.terms` or a constant string term
  ``"C:<str>"``; ``dir`` is ``"B"`` or ``"E"``
* ``("CS", x)``                    — ConstantStr(x)
* ``("SS", pos1, pos2)``           — SubStr(pos1, pos2)
* ``("PF", term, k)``              — Prefix(τ, k)  (affix, §4.4)
* ``("SF", term, k)``              — Suffix(τ, k)  (affix, §4.4)

Positions are **0-based boundaries**: boundary ``b`` sits before
character ``s[b]``, so a substring is ``s[b1:b2]``. The paper's 1-based
``ConstPos(k)=k`` corresponds to ``("CP", k-1)``. Negative arguments
count from the back: ``("CP", k<0)`` resolves to ``len(s)+1+k`` (so
``-1`` is the end-of-string boundary) and ``("MP", τ, k<0, d)`` to the
``(m+1+k)``-th match, as in the paper.
"""
from __future__ import annotations

from .terms import term_matches

PosFunc = tuple
StrFunc = tuple
Program = tuple  # tuple of StrFunc labels = a transformation path


def eval_pos(f: PosFunc, s: str) -> int | None:
    """Evaluate a position function on ``s``; None when out of range."""
    kind = f[0]
    if kind == "CP":
        k = f[1]
        b = k if k >= 0 else len(s) + 1 + k
        return b if 0 <= b <= len(s) else None
    if kind == "MP":
        _, term, k, d = f
        ms = term_matches(s, term)
        m = len(ms)
        idx = k - 1 if k > 0 else m + k
        if not (0 <= idx < m):
            return None
        x, y = ms[idx]
        return x if d == "B" else y
    raise ValueError(f"not a position function: {f!r}")


def eval_func(f: StrFunc, s: str) -> list[str]:
    """All output strings of a string function applied to ``s``.

    ``ConstantStr`` and ``SubStr`` are deterministic (≤1 output); the
    affix functions are multi-valued — ``Prefix(τ,k)`` outputs every
    non-empty prefix of the k-th match of τ (and symmetrically for
    ``Suffix``), which is exactly why they cannot be used by
    FlashFill/BlinkFill but can label our transformation graphs (§4.4).
    """
    kind = f[0]
    if kind == "CS":
        return [f[1]]
    if kind == "SS":
        b1, b2 = eval_pos(f[1], s), eval_pos(f[2], s)
        if b1 is None or b2 is None or b1 >= b2:
            return []
        return [s[b1:b2]]
    if kind in ("PF", "SF"):
        _, term, k = f
        ms = term_matches(s, term)
        m = len(ms)
        idx = k - 1 if k > 0 else m + k
        if not (0 <= idx < m):
            return []
        x, y = ms[idx]
        match = s[x:y]
        if kind == "PF":
            return [match[:i] for i in range(1, len(match) + 1)]
        return [match[i:] for i in range(len(match) - 1, -1, -1)]
    raise ValueError(f"not a string function: {f!r}")


def program_consistent(path: Program, s: str, t: str) -> bool:
    """Is the program consistent with the transformation ``s → t``?

    True iff some choice of one output string per function concatenates
    to exactly ``t`` (Definition 3; multi-valued affix functions make
    this a small DP over positions of ``t``).
    """
    if not path:
        return t == ""
    frontier = {0}
    for f in path:
        outs = eval_func(f, s)
        if not outs:
            return False
        nxt: set[int] = set()
        for p in frontier:
            for o in outs:
                if t.startswith(o, p):
                    nxt.add(p + len(o))
        if not nxt:
            return False
        frontier = nxt
    return len(t) in frontier


def run_program(path: Program, s: str) -> str | None:
    """Run a fully deterministic program; None if any function fails or
    is multi-valued (affix functions have no unique output — they only
    describe transformations, cf. §8 Related Work)."""
    parts: list[str] = []
    for f in path:
        outs = eval_func(f, s)
        if len(outs) != 1:
            return None
        parts.append(outs[0])
    return "".join(parts)


def format_program(path: Program) -> str:
    """Human-readable rendering of a program, for jobs/EXPERIMENTS output."""

    def pos(p: PosFunc) -> str:
        if p[0] == "CP":
            return f"ConstPos({p[1]})"
        return f"MatchPos({p[1]},{p[2]},{p[3]})"

    out = []
    for f in path:
        if f[0] == "CS":
            out.append(f"ConstantStr({f[1]!r})")
        elif f[0] == "SS":
            out.append(f"SubStr({pos(f[1])},{pos(f[2])})")
        elif f[0] == "PF":
            out.append(f"Prefix({f[1]},{f[2]})")
        elif f[0] == "SF":
            out.append(f"Suffix({f[1]},{f[2]})")
        else:
            out.append(repr(f))
    return " ⊕ ".join(out) if out else "ε"

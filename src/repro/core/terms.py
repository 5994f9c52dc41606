"""Terms and string structures (paper §3).

Every character belongs to exactly one of five term categories:

* ``T_d`` — digits ``[0-9]+``
* ``T_l`` — lowercase letters ``[a-z]+``
* ``T_C`` — uppercase letters ``[A-Z]+``
* ``T_b`` — whitespace runs
* single-character terms for everything else (e.g. ``T_-`` for ``-``)

``STRUC(s)`` collapses maximal runs of the four regex-based categories
to a single term and keeps each remaining character as its own
single-character term, yielding a unique term sequence per string.
"""
from __future__ import annotations

import re
from functools import lru_cache

# Regex-based term identifiers. Values are the regexes used to find the
# matches of a term inside a string (paper §4.1 MatchPos).
T_DIGIT = "Td"
T_LOWER = "Tl"
T_UPPER = "TC"
T_SPACE = "Tb"

REGEX_TERMS: dict[str, re.Pattern] = {
    T_DIGIT: re.compile(r"[0-9]+"),
    T_LOWER: re.compile(r"[a-z]+"),
    T_UPPER: re.compile(r"[A-Z]+"),
    T_SPACE: re.compile(r"\s+"),
}

# Optional wider classes (paper end of §4.1: BlinkFill/FlashFill also use
# alphabetical and alphanumerical terms). Not used for STRUC, only as
# extra MatchPos terms when enabled.
T_ALPHA = "Ta"
T_ALNUM = "Tan"
EXTRA_REGEX_TERMS: dict[str, re.Pattern] = {
    T_ALPHA: re.compile(r"[a-zA-Z]+"),
    T_ALNUM: re.compile(r"[a-zA-Z0-9]+"),
}


def char_term(c: str) -> str:
    """Return the term identifier of a single character.

    Regex-based categories map to their term id; anything else maps to a
    single-character term spelled ``"T:<char>"``.
    """
    if c.isdigit() and c.isascii():
        return T_DIGIT
    if c.islower() and c.isascii() and c.isalpha():
        return T_LOWER
    if c.isupper() and c.isascii() and c.isalpha():
        return T_UPPER
    if c.isspace():
        return T_SPACE
    return f"T:{c}"


@lru_cache(maxsize=65536)
def structure(s: str) -> tuple[str, ...]:
    """``STRUC(s)``: the unique term sequence of ``s`` (paper §3).

    Runs of the four regex-based categories collapse to one term; each
    other character is its own single-character term (runs of e.g. ``--``
    stay two terms).
    """
    out: list[str] = []
    prev: str | None = None
    for c in s:
        t = char_term(c)
        if t.startswith("T:") or t != prev:
            out.append(t)
        prev = t
    return tuple(out)


def structure_key(s: str) -> str:
    """A flat string key for ``STRUC(s)`` usable as a Spark group key."""
    return "\x1f".join(structure(s))


def transformation_structure_key(lhs: str, rhs: str) -> str:
    """Structure key of a *transformation* lhs→rhs (Definition 2)."""
    return structure_key(lhs) + "\x1e" + structure_key(rhs)


def term_matches(s: str, term: str) -> list[tuple[int, int]]:
    """All matches of ``term`` in ``s`` as 0-based half-open spans.

    ``term`` is a regex term id, an extra regex term id, or a constant
    string term spelled ``"C:<str>"`` (paper §4.1: constant string terms
    match exactly their string; occurrences are found left-to-right,
    non-overlapping).
    """
    if term in REGEX_TERMS:
        return [m.span() for m in REGEX_TERMS[term].finditer(s)]
    if term in EXTRA_REGEX_TERMS:
        return [m.span() for m in EXTRA_REGEX_TERMS[term].finditer(s)]
    if term.startswith("C:"):
        needle = term[2:]
        if not needle:
            return []
        spans = []
        i = s.find(needle)
        while i != -1:
            spans.append((i, i + len(needle)))
            i = s.find(needle, i + len(needle))
        return spans
    raise ValueError(f"unknown term {term!r}")

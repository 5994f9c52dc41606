"""Applying approved matching-rule groups (paper §6).

Application is cluster-local and cluster-parallel: a rule only fires in
clusters where its replacement set has entries, and each cluster is
processed independently by a cogrouped ``applyInPandas`` worker.

* Non-empty sources are replaced at whitespace token boundaries (LCS
  rules are token-aligned by construction, so this matches the recorded
  replacement spans while staying valid after earlier edits).
* Empty-source rules (pure insertions) only fire on values that still
  equal the recorded original, at the recorded position.
* §6's rule maintenance ("if a newly generated matching rule falls into
  an approved program group, apply it directly") is reproduced by
  re-mining rules among the cluster's *updated* values and applying any
  new rule whose transformation has the structure of an approved group
  and is consistent with that group's pivot program — consistency is
  checked by executing the program (:func:`program_consistent`), not by
  re-running the search.
* Output whitespace is collapsed (the paper's token model treats
  whitespace as separators).

Rules are applied in group-rank order; passes repeat until fixpoint
(bounded) since one replacement can enable another.
"""
from __future__ import annotations

import ast
import re
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame

from .lang import program_consistent
from .lcs import aligned_gaps
from .terms import transformation_structure_key

APPLIED_SCHEMA = "cluster_id long, record_id long, value string, new_value string"

_WS = re.compile(r"\s+")


def _collapse_ws(s: str) -> str:
    return _WS.sub(" ", s).strip()


@dataclass(frozen=True)
class ApprovedGroup:
    """An approved program group, for §6 auto-application of new rules.

    ``struct_key`` is empty for TransAgg groups (no structure refinement)
    and ``path`` is None for groups without a parseable pivot program
    (NoAgg / StructAgg / LONG keys), which then skip auto-application.
    """

    struct_key: str | None
    path: tuple | None
    src_is_lhs: bool


def parse_group_key(key: str, src_is_lhs: bool) -> ApprovedGroup:
    """Decode a group key produced by :mod:`repro.core.grouping`."""
    struct_key: str | None = None
    if "||" in key:
        struct_key, key = key.split("||", 1)
    path = None
    if key.startswith("PATH|"):
        path = ast.literal_eval(key[len("PATH|") :])
    return ApprovedGroup(struct_key=struct_key, path=path, src_is_lhs=src_is_lhs)


def _boundary_sub(src: str, tgt: str, value: str) -> str:
    pat = re.compile(rf"(?<!\S){re.escape(src)}(?!\S)")
    return pat.sub(tgt.replace("\\", "\\\\"), value)


def _apply_to_value(
    value: str,
    rules: list[tuple[int, str, str]],
    insertions: list[tuple[int, str, int, str]],
    max_passes: int = 3,
) -> str:
    """Apply ranked rules/insertions to one value until fixpoint."""
    cur = value
    for ins_rank, orig, p, tgt in insertions:
        if cur == orig:
            if p >= len(cur):
                cur = (cur + " " + tgt) if cur else tgt
            else:
                cur = cur[:p] + tgt + " " + cur[p:]
            cur = _collapse_ws(cur)
    for _ in range(max_passes):
        nxt = cur
        for _rank, src, tgt in rules:
            nxt = _boundary_sub(src, tgt, nxt)
        nxt = _collapse_ws(nxt)
        if nxt == cur:
            break
        cur = nxt
    return cur


def _auto_rules_from_groups(
    values: list[str], groups: list[ApprovedGroup]
) -> list[tuple[int, str, str]]:
    """§6 maintenance: new rules that fall into approved program groups."""
    out: list[tuple[int, str, str]] = []
    seen: set[tuple[str, str]] = set()
    progs = [g for g in groups if g.path is not None]
    if not progs:
        return out
    for i, va in enumerate(values):
        for vb in values[i + 1 :]:
            for gap in aligned_gaps(va, vb):
                for x, y in ((gap.a_str, gap.b_str), (gap.b_str, gap.a_str)):
                    if not x or not y or (x, y) in seen:
                        continue
                    skey = transformation_structure_key(x, y)
                    for g in progs:
                        if g.struct_key is not None and g.struct_key != skey:
                            continue
                        if program_consistent(g.path, x, y):
                            src, tgt = (x, y) if g.src_is_lhs else (y, x)
                            seen.add((x, y))
                            out.append((10**9, src, tgt))
                            break
    return out


def apply_approved_rules(
    records: DataFrame,
    applications: DataFrame,
    *,
    approved_groups: list[ApprovedGroup] | None = None,
    max_passes: int = 3,
) -> DataFrame:
    """Update every record value with the approved rules of its cluster.

    ``records``: (cluster_id, record_id, value).
    ``applications``: (cluster_id, src, tgt, rank, value, p) — one row
    per replacement-set entry of an approved rule in its chosen
    direction (``value``/``p`` only meaningful for empty ``src``).
    Returns records plus ``new_value``.
    """
    groups = approved_groups or []

    def worker(rec: pd.DataFrame, apps: pd.DataFrame) -> pd.DataFrame:
        if apps.empty:
            return rec.assign(new_value=rec["value"])
        repl = (
            apps[apps["src"] != ""][["rank", "src", "tgt"]]
            .drop_duplicates()
            .sort_values(["rank", "src", "tgt"])
        )
        rules = list(repl.itertuples(index=False, name=None))
        ins = (
            apps[apps["src"] == ""][["rank", "value", "p", "tgt"]]
            .drop_duplicates()
            .sort_values(["rank", "value", "p"])
        )
        insertions = list(ins.itertuples(index=False, name=None))
        new_vals = [
            _apply_to_value(v, rules, insertions, max_passes)
            for v in rec["value"]
        ]
        if groups:
            distinct = sorted(set(new_vals))
            auto = _auto_rules_from_groups(distinct, groups)
            if auto:
                merged = rules + auto
                new_vals = [
                    _apply_to_value(v, merged, insertions, max_passes)
                    for v in rec["value"]
                ]
        return rec.assign(new_value=new_vals)

    return (
        records.select("cluster_id", "record_id", "value")
        .groupBy("cluster_id")
        .cogroup(applications.groupBy("cluster_id"))
        .applyInPandas(worker, schema=APPLIED_SCHEMA)
    )

"""Synthetic AUTHORLIST / JOURNALTITLE / ADDRESS cluster datasets (§7).

The paper's three real datasets are not downloadable offline, so these
generators reproduce what drives every measured number: clusters of
duplicate attribute values whose variation comes from *systematic,
repeating string transformations* (ordinals, abbreviations, name
reordering, separators, state codes) plus genuinely different values
sharing a cluster key (the ISBN/ISSN/EIN negatives).

Each cluster holds one or more hidden **sub-entities**. Values of the
same sub-entity are true duplicates (they should merge); values of
different sub-entities sharing a cluster are the negatives that give
the paper's duplicate-pair rates (~18% ADDRESS, ~26.5% AUTHORLIST,
~74% JOURNALTITLE). The dominant sub-entity's canonical string is the
per-cluster ground truth for MC precision (§7.5).

Scale factor ``sf=1`` matches Table 6's cluster counts; tests use tiny
``sf``, benchmarks ``sf≈0.1``. Everything is deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

DATASETS = ("authorlist", "journaltitle", "address")

_N_CLUSTERS_SF1 = {"authorlist": 1265, "journaltitle": 31023, "address": 3038}

# ---------------------------------------------------------------- vocab

_FIRST = [
    "andrew", "dominic", "chris", "john", "david", "michael", "robert",
    "patrick", "joe", "walter", "marvin", "eric", "greg", "james", "bill",
    "susan", "karen", "laura", "maria", "anna", "peter", "thomas", "paul",
    "nancy", "linda", "kevin", "brian", "steven", "edward", "frank",
]
_LAST = [
    "sloss", "symes", "wright", "rayfield", "dewitt", "ullman", "celko",
    "chan", "sedgewick", "meyers", "lenk", "zelkowitz", "savitch",
    "stonebraker", "madden", "deng", "tao", "ilyas", "tang", "miller",
    "johnson", "williams", "brown", "davis", "garcia", "wilson", "moore",
    "taylor", "anderson", "jackson",
]
_STREET_NAMES = [
    "Main", "Oak", "Maple", "Cedar", "Pine", "Elm", "Washington", "Lake",
    "Hill", "Park", "River", "Church", "Spring", "Highland", "Union",
]
_STREET_TYPES = {
    "Street": ["St", "Str"],
    "Avenue": ["Ave", "Av"],
    "Road": ["Rd"],
    "Boulevard": ["Blvd"],
    "Lane": ["Ln"],
    "Drive": ["Dr"],
}
_DIRECTIONS = {"E": "East", "W": "West", "N": "North", "S": "South"}
_STATES = [
    ("Wisconsin", "WI"), ("California", "CA"), ("New York", "NY"),
    ("Texas", "TX"), ("Massachusetts", "MA"), ("Illinois", "IL"),
    ("Florida", "FL"), ("Washington", "WA"), ("Oregon", "OR"),
    ("Michigan", "MI"), ("Virginia", "VA"), ("Colorado", "CO"),
]
_J_ADJ = ["International", "American", "European", "British", "Canadian"]
_J_FIELD = [
    "Chemical", "Physical", "Biological", "Medical", "Clinical",
    "Applied", "Theoretical", "Environmental", "Computational",
]
_J_SUBJECT = [
    "Physics", "Chemistry", "Biology", "Medicine", "Engineering",
    "Science", "Research", "Mathematics", "Neuroscience",
]
_J_KIND = [
    "Letters", "Reviews", "Reports", "Bulletin", "Quarterly",
    "Proceedings", "Transactions",
]
_ABBREV = {
    "Journal": "J.", "International": "Int.", "American": "Am.",
    "European": "Eur.", "British": "Br.", "Canadian": "Can.",
    "Chemical": "Chem.", "Physical": "Phys.", "Biological": "Biol.",
    "Medical": "Med.", "Clinical": "Clin.", "Applied": "Appl.",
    "Theoretical": "Theor.", "Environmental": "Environ.",
    "Computational": "Comput.", "Physics": "Phys.",
    "Chemistry": "Chem.", "Biology": "Biol.", "Medicine": "Med.",
    "Engineering": "Eng.", "Science": "Sci.", "Research": "Res.",
    "Mathematics": "Math.", "Neuroscience": "Neurosci.",
    "Letters": "Lett.", "Reviews": "Rev.", "Reports": "Rep.",
    "Bulletin": "Bull.", "Quarterly": "Q.", "Proceedings": "Proc.",
    "Transactions": "Trans.", "Annals": "Ann.",
}


def _ordinal(n: int) -> str:
    if 10 <= n % 100 <= 20:
        return f"{n}th"
    return f"{n}{ {1: 'st', 2: 'nd', 3: 'rd'}.get(n % 10, 'th') }"


# ------------------------------------------------------------- address


def _address_entity(g: np.random.Generator) -> dict:
    return {
        "num": int(g.integers(1, 60)),
        "dir": g.choice(list(_DIRECTIONS)) if g.random() < 0.3 else "",
        "name": g.choice(_STREET_NAMES),
        "stype": g.choice(list(_STREET_TYPES)),
        "zip": f"{g.integers(1, 99999):05d}",
        "state": _STATES[g.integers(0, len(_STATES))],
    }


def _address_render(e: dict, g: np.random.Generator | None) -> str:
    """Canonical when ``g`` is None, else a perturbed variant."""
    num = _ordinal(e["num"])
    d = e["dir"]
    stype = e["stype"]
    state = e["state"][1]
    comma = ","
    if g is not None:
        if g.random() < 0.35:
            num = str(e["num"])  # 9th -> 9
        if g.random() < 0.40:
            stype = g.choice(_STREET_TYPES[e["stype"]])  # Street -> St
        if g.random() < 0.30:
            state = e["state"][0]  # WI -> Wisconsin
        if d and g.random() < 0.45:
            d = _DIRECTIONS[d]  # E -> East
        if g.random() < 0.15:
            comma = ""
    middle = f"{d} {e['name']}" if d else e["name"]
    return f"{num} {middle} {stype}{comma} {e['zip']} {state}"


# -------------------------------------------------------- journaltitle


def _journal_entity(g: np.random.Generator) -> list[str]:
    p = g.random()
    if p < 0.35:
        words = ["Journal", "of", g.choice(_J_FIELD), g.choice(_J_SUBJECT)]
        if g.random() < 0.5:
            words = [g.choice(_J_ADJ)] + words
    elif p < 0.6:
        words = [g.choice(_J_FIELD), g.choice(_J_SUBJECT), g.choice(_J_KIND)]
    elif p < 0.8:
        words = ["Annals", "of", g.choice(_J_FIELD), g.choice(_J_SUBJECT)]
    else:
        words = [g.choice(_J_ADJ), g.choice(_J_SUBJECT), "Review"]
    return words


def _journal_render(words: list[str], g: np.random.Generator | None) -> str:
    if g is None:
        return " ".join(words)
    style = g.random()
    out = list(words)
    if style < 0.40:
        pass  # full form
    elif style < 0.85:
        out = [
            _ABBREV.get(w, w) if g.random() < 0.85 else w for w in out
        ]
    else:
        out = [_ABBREV.get(w, w) if g.random() < 0.4 else w for w in out]
    s = " ".join(out)
    if g.random() < 0.08:
        s = s.lower()
    return s


# ---------------------------------------------------------- authorlist


def _author(g: np.random.Generator) -> tuple[str, str, str]:
    return (
        g.choice(_FIRST),
        g.choice(list("abcdefghjklmnprstvw")) if g.random() < 0.5 else "",
        g.choice(_LAST),
    )


def _authorlist_entity(g: np.random.Generator) -> list[tuple[str, str, str]]:
    n = 1 + int(g.integers(0, 4))
    authors, seen = [], set()
    while len(authors) < n:
        a = _author(g)
        if a[2] not in seen:
            seen.add(a[2])
            authors.append(a)
    return authors


def _authorlist_render(
    authors: list[tuple[str, str, str]], g: np.random.Generator | None
) -> str:
    if g is None:
        return "; ".join(f"{f} {l}" for f, _, l in authors)
    reorder = g.random() < 0.40  # first last -> last, first
    with_middle = g.random() < 0.35
    sep = g.choice(["; ", ", ", " and ", "/ "], p=[0.55, 0.2, 0.15, 0.1])
    tag = " (author)" if g.random() < 0.06 else ""
    parts = []
    for f, m, l in authors:
        # Middle initials appear with a period in the real data
        # ("andrew n. sloss", "savitch, walter j." — paper Table 8),
        # which also gives them a distinct structure (Tl T:.).
        mid_dot = f" {m}." if (with_middle and m) else ""
        if reorder:
            parts.append(f"{l}, {f}{mid_dot}{tag}")
        else:
            parts.append(f"{f}{mid_dot} {l}{tag}")
    s = sep.join(parts)
    if g.random() < 0.04:
        s = s.replace("; ", ";")
    return s


def _authorlist_subs(
    g: np.random.Generator, primary: list[tuple[str, str, str]]
) -> list[list[tuple[str, str, str]] | str]:
    """Sub-entities of one ISBN cluster, Table-8 style: the full list,
    truncations, reorderings, and extra-contributor lists are *different*
    entities in the ground truth."""
    subs: list = [primary]
    if len(primary) > 1 and g.random() < 0.60:
        subs.append(primary[:1])  # first author only
    if g.random() < 0.45:
        f, _, l = primary[0]
        subs.append(f"{f} {l}, et al")  # pre-rendered literal sub
    if len(primary) > 1 and g.random() < 0.40:
        subs.append(primary[::-1])  # different order = different entity
    if g.random() < 0.35:
        subs.append(primary + [_author(g)])  # extra contributor
    if g.random() < 0.30:
        subs.append(primary[0][2])  # bare last name, e.g. "sloss"
    if g.random() < 0.25:
        subs.append(_authorlist_entity(g))  # wrong-ISBN metadata
    return subs


# ------------------------------------------------------------ assembly


def generate_dataset(
    dataset: str, *, sf: float = 0.01, seed: int = 0
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Generate ``(records, truth)`` pandas frames.

    ``records``: cluster_id, record_id, value, sub_id (hidden truth).
    ``truth``: cluster_id, canonical (dominant sub-entity's canonical).
    """
    if dataset not in DATASETS:
        raise ValueError(f"unknown dataset {dataset!r}")
    g = np.random.default_rng(seed)
    n_clusters = max(20, int(_N_CLUSTERS_SF1[dataset] * sf))
    rec_rows: list[tuple] = []
    truth_rows: list[tuple] = []
    rid = 0
    for cid in range(n_clusters):
        if dataset == "address":
            # avg size ~5.8, a few big EIN clusters, ~3 orgs when multi.
            size = int(np.clip(g.lognormal(1.35, 0.75), 1, 400))
            n_subs = 1 if (size < 3 or g.random() < 0.15) else int(
                g.integers(2, min(size, 6) + 1)
            )
            subs = [_address_entity(g) for _ in range(n_subs)]
            render = _address_render
        elif dataset == "journaltitle":
            size = int(g.choice([1, 2, 3, 4], p=[0.50, 0.33, 0.12, 0.05]))
            n_subs = 2 if (size >= 2 and g.random() < 0.28) else 1
            subs = [_journal_entity(g) for _ in range(n_subs)]
            render = _journal_render
        else:  # authorlist: avg ~27 records, several sub-entities.
            size = int(np.clip(4 + g.poisson(22), 2, 170))
            primary = _authorlist_entity(g)
            subs = _authorlist_subs(g, primary)
            render = _authorlist_render

        # Dominant sub gets the larger share of records. Each sub draws
        # its record values from a small per-sub variant pool (real
        # sources repeat the same few renderings, they don't invent a
        # fresh variant per row), with the canonical form most likely.
        weights = np.array([2.0] + [1.0] * (len(subs) - 1))
        weights /= weights.sum()
        assign = g.choice(len(subs), size=size, p=weights)
        if 0 not in assign:
            assign[0] = 0  # the dominant sub always has a record
        pools: dict[int, list[str]] = {}
        for sub_idx in assign:
            sub = subs[sub_idx]
            if sub_idx not in pools:
                if isinstance(sub, str):  # pre-rendered literal sub
                    pools[sub_idx] = [sub]
                else:
                    canonical = render(sub, None)
                    n_var = 1 + int(g.poisson(1.6))
                    pools[sub_idx] = [canonical] + [
                        render(sub, g) for _ in range(n_var)
                    ]
            pool = pools[sub_idx]
            value = (
                pool[0]
                if g.random() < 0.42 or len(pool) == 1
                else pool[int(g.integers(1, len(pool)))]
            )
            if dataset == "authorlist":
                value = value.lower()
            rec_rows.append((cid, rid, value, f"{cid}/{sub_idx}"))
            rid += 1
        dom = subs[0]
        dom_canon = dom if isinstance(dom, str) else render(dom, None)
        if dataset == "authorlist":
            dom_canon = dom_canon.lower()
        truth_rows.append((cid, dom_canon))
    records = pd.DataFrame(
        rec_rows, columns=["cluster_id", "record_id", "value", "sub_id"]
    )
    truth = pd.DataFrame(truth_rows, columns=["cluster_id", "canonical"])
    return records, truth


def sub_entity_map(records: pd.DataFrame) -> dict[tuple[int, str], str]:
    """Hidden truth ``(cluster_id, value) -> sub_id`` for the simulated
    expert. A value produced by two subs in one cluster (rare) keeps the
    first — consistent for labeling."""
    out: dict[tuple[int, str], str] = {}
    for c, v, s in zip(
        records["cluster_id"], records["value"], records["sub_id"]
    ):
        out.setdefault((int(c), v), s)
    return out


def sample_labeled_pairs(
    records: pd.DataFrame,
    n: int,
    *,
    seed: int = 0,
    max_pairs_per_cluster: int = 300,
) -> pd.DataFrame:
    """Labeled within-cluster value pairs (the §7.1 manual sample).

    Returns (cluster_id, v1, v2, is_dup); ``is_dup`` is true iff both
    values come from the same sub-entity.
    """
    sub_of = sub_entity_map(records)
    g = np.random.default_rng(seed)
    rows = []
    for cid, grp in records.groupby("cluster_id"):
        vals = sorted(grp["value"].unique())
        cnt = 0
        for i in range(len(vals)):
            for j in range(i + 1, len(vals)):
                if cnt >= max_pairs_per_cluster:
                    break
                v1, v2 = vals[i], vals[j]
                rows.append(
                    (
                        int(cid),
                        v1,
                        v2,
                        sub_of[(int(cid), v1)] == sub_of[(int(cid), v2)],
                    )
                )
                cnt += 1
    pairs = pd.DataFrame(rows, columns=["cluster_id", "v1", "v2", "is_dup"])
    if len(pairs) > n:
        pairs = pairs.sample(n=n, random_state=int(g.integers(0, 2**31)))
    return pairs.reset_index(drop=True)


def mc_truth_sample(
    records: pd.DataFrame,
    truth: pd.DataFrame,
    n: int,
    *,
    seed: int = 0,
    min_size: int = 2,
) -> pd.DataFrame:
    """Ground-truth clusters for the §7.5 MC experiment.

    The paper manually created ground truth for 100/100/200 clusters;
    a cluster with a single record has nothing to consolidate (no pairs,
    no rules, MC trivially returns its only value), so the sample is
    drawn from clusters with at least ``min_size`` records.
    """
    sizes = records.groupby("cluster_id").size()
    eligible = sizes[sizes >= min_size].index
    pick = truth[truth["cluster_id"].isin(eligible)]
    if len(pick) > n:
        pick = pick.sample(n=n, random_state=seed)
    return pick.reset_index(drop=True)


def to_spark(spark: SparkSession, records: pd.DataFrame) -> DataFrame:
    """Records as a Spark DataFrame (sub_id stays driver-side truth)."""
    return spark.createDataFrame(
        records[["cluster_id", "record_id", "value"]]
    )


def dataset_stats(records: pd.DataFrame) -> dict[str, float]:
    """#rows / #clusters / avg-min-max cluster size (paper Table 6)."""
    sizes = records.groupby("cluster_id").size()
    return {
        "rows": int(len(records)),
        "clusters": int(sizes.size),
        "avg_size": float(sizes.mean()),
        "min_size": int(sizes.min()),
        "max_size": int(sizes.max()),
    }

"""Pivot-path search and program grouping (paper §4.2–§4.3).

Given a set Σ of transformation graphs, each graph's *pivot path* is the
transformation path (first node → last node) contained by the most
graphs in Σ. Transformations with the same pivot path form one program
group. Finding the optimal partition is NP-complete (hitting set), so
the paper's greedy strategy is used: an inverted index from string
function to ⟨graph, i, j⟩ entries supports counting which graphs contain
a path, with

* **local threshold** — stop extending a path whose candidate list is
  already no larger than the best complete path seen for this graph;
* **global threshold** — every complete path found for *any* graph
  seeds a lower bound (and a concrete candidate pivot path) for every
  graph containing it, pruning later searches;
* **θ (max path length)** — paths longer than θ functions are cut off.

All pruning is exact: every variant returns identical groups (§7.3),
only the search time differs.
"""
from __future__ import annotations

from collections import defaultdict

from .graph import TGraph

# label -> gid -> tuple of (i, j) edge spans carrying that label.
Index = dict


def build_index(graphs: list[TGraph]) -> Index:
    """Inverted index I with edge spans, as in §4.2."""
    index: Index = defaultdict(dict)
    for gid, g in enumerate(graphs):
        for (i, j), labels in g.edges.items():
            for f in labels:
                index[f].setdefault(gid, []).append((i, j))
    return index


def _extend(ends: dict[int, frozenset], postings: dict) -> dict[int, frozenset]:
    """Intersect the current candidate list with I[f] (adjacency-aware).

    ``ends[g]`` is the set of boundaries reachable in graph ``g`` after
    matching the path so far starting from node 0 — the ⟨G, i, j⟩ triple
    intersection of §4.2 specialised to paths anchored at the first
    node.
    """
    out: dict[int, frozenset] = {}
    for g, cur in ends.items():
        spans = postings.get(g)
        if not spans:
            continue
        nxt = frozenset(j for (i, j) in spans if i in cur)
        if nxt:
            out[g] = nxt
    return out


def _path_key(p: tuple) -> tuple:
    """Tie-break key: fewer ConstantStr labels first, then repr order."""
    return (sum(1 for f in p if f[0] == "CS"), repr(p))


def _better(cnt: int, p: tuple, best_cnt: int, best_p: tuple) -> bool:
    """Is (cnt, p) a strictly better pivot candidate than (best_cnt, best_p)?"""
    if cnt != best_cnt:
        return cnt > best_cnt
    if not best_p:
        return True
    return _path_key(p) < _path_key(best_p)


def find_pivot_paths(
    graphs: list[TGraph],
    *,
    theta: int = 4,
    use_local: bool = True,
    use_global: bool = True,
    index: Index | None = None,
    sample: int | None = None,
) -> list[tuple]:
    """FindingPivotPath (Algorithms 2–3) for every graph in Σ.

    Returns one pivot path (tuple of string-function labels) per graph.
    An empty-rhs graph (single node) has the empty path.

    ``sample`` enables the paper's Appendix-B fallback for very large Σ:
    when ``len(graphs) > sample``, containment is counted against a
    deterministic evenly-spaced sample of Σ (shorter inverted lists),
    while every graph still searches its own edges. Identical chosen
    paths still group identically; counting is approximate.
    """
    n = len(graphs)
    if sample is not None and n > sample:
        step = n / sample
        sampled = sorted({int(i * step) for i in range(sample)})
        counted = [graphs[g] for g in sampled]
        index = build_index(counted)
        # Re-key postings to original graph ids.
        index = {
            f: {sampled[g]: spans for g, spans in postings.items()}
            for f, postings in index.items()
        }
        all_ends = {g: frozenset([0]) for g in sampled}
        lasts = {g: graphs[g].last for g in sampled}
    else:
        if index is None:
            index = build_index(graphs)
        all_ends = {g: frozenset([0]) for g in range(n)}
        lasts = {g: graphs[g].last for g in range(n)}
    # Every search starts from the same candidate list (all graphs at
    # node 0), so the first-hop intersections are identical across the
    # |Σ| searches — computed once here. Dominant cost of a global
    # (TransAgg) grouping without this cache.
    root_ext: dict = {f: _extend(all_ends, index[f]) for f in index}
    # |postings(f)| upper-bounds any candidate list after appending f —
    # a cheap prefilter that skips the intersection for the (vast
    # majority of) cluster-specific labels that no second graph shares.
    label_n: dict = {f: len(index[f]) for f in index}
    label_order = lambda f: (f[0] == "CS", repr(f))  # noqa: E731
    # Global thresholds + the concrete path that achieved them, so a graph
    # whose best path was already discovered while processing an earlier
    # graph still gets assigned that path (pruning is strict-improvement).
    global_best: list[tuple[int, tuple]] = [(0, ())] * n

    def complete_count(ends: dict[int, frozenset]) -> list[int]:
        return [g for g, e in ends.items() if lasts[g] in e]

    def search(gid: int, max_states: int = 20000) -> tuple:
        G = graphs[gid]
        if G.n_nodes == 1:
            return ()
        # The full-edge ConstantStr(rhs) path is terminal at depth 1 and
        # never pruned, so the search always finds at least one path.
        best_len, best_path = global_best[gid] if use_global else (0, ())
        out_edges: dict[int, list] = defaultdict(list)
        for (i, j), labels in G.edges.items():
            # Sorted once per edge: within a signature class any label is
            # interchangeable count-wise, and first-wins under
            # (non-constant, repr) order makes the chosen path minimize
            # ConstantStr usage (matches the _path_key tie-break).
            out_edges[i].append((j, sorted(labels, key=label_order)))
        visited: set = set()
        states = 0

        def expand(node: int, path: tuple, ends: dict) -> None:
            nonlocal best_len, best_path, states
            states += 1
            if states > max_states:
                return
            # Children deduplicated by intersection signature: two labels
            # whose postings intersect the current candidate list the same
            # way span identical subtrees (same counts), so only the
            # canonical label is explored — an exact optimization for the
            # counts, deterministic for the paths.
            n_ends = len(ends)
            floor = 0  # smallest candidate-list size still worth a child
            if use_local and best_len > floor:
                floor = best_len
            if use_global and global_best[gid][0] > floor:
                floor = global_best[gid][0]
            children: dict = {}
            for j, labels in out_edges[node]:
                terminal = j == G.last
                for f in labels:
                    ub = label_n.get(f, 0)
                    if ub > n_ends:
                        ub = n_ends
                    # Prefilter on the upper bound before intersecting:
                    # a non-terminal child below the thresholds (or any
                    # size-1 branch — those only yield singleton groups,
                    # whose partition ignores path identity) is skipped;
                    # a terminal child is skipped when strictly worse
                    # than the best, or when it is a count-1 candidate
                    # and some path is already secured.
                    if not terminal and (ub <= 1 or ub < floor):
                        continue
                    if terminal and (
                        ub < best_len or (ub == 1 and best_path)
                    ):
                        continue
                    nxt = (
                        root_ext.get(f)
                        if not path
                        else _extend(ends, index.get(f, {}))
                    )
                    if not nxt:
                        continue
                    sig = (j, frozenset(nxt.items()))
                    if sig not in children:
                        children[sig] = (len(nxt), j, f, nxt)
            ordered = sorted(
                children.values(), key=lambda c: (-c[0], repr(c[2]))
            )
            for size, j, f, nxt in ordered:
                p = path + (f,)
                if j == G.last:
                    comp = complete_count(nxt)
                    cnt = len(comp)
                    # Ties broken by (fewer ConstantStr functions, repr)
                    # so the chosen pivot path is a deterministic global
                    # argmax independent of pruning flags and discovery
                    # order (the §7.3 same-groups guarantee), and so a
                    # generalizing program beats a memorizing constant
                    # (9th→9 groups with 3rd→3, not with 5th→3 — App. C).
                    if _better(cnt, p, best_len, best_path):
                        best_len, best_path = cnt, p
                    if use_global:
                        for g in comp:
                            gc, gp = global_best[g]
                            if _better(cnt, p, gc, gp):
                                global_best[g] = (cnt, p)
                else:
                    if len(p) >= theta:
                        continue
                    # A branch whose candidate list has a single graph
                    # can only yield count-1 (singleton-group) paths, and
                    # a singleton's partition does not depend on which
                    # path represents it — prune unconditionally. This is
                    # exact and keeps TransAgg (huge Σ, mostly-singleton
                    # counts) tractable.
                    if size <= 1:
                        continue
                    # Prune only strictly-worse branches beyond that:
                    # equal-count branches may still contain the
                    # repr-least tie.
                    if use_local and size < best_len:
                        continue
                    if use_global and size < global_best[gid][0]:
                        continue
                    vkey = (j, frozenset(nxt.items()))
                    if vkey in visited:
                        continue
                    visited.add(vkey)
                    expand(j, p, nxt)

        expand(0, (), all_ends)
        # Under sampling a graph sharing no label with the sample may end
        # with no path at all; fall back to its own full-edge constant
        # (a singleton group) rather than the empty path.
        return best_path or (("CS", G.rhs),)

    return [search(g) for g in range(n)]


def group_by_pivot(
    transformations: list[tuple[str, str]],
    *,
    theta: int = 4,
    affix: bool = True,
    use_local: bool = True,
    use_global: bool = True,
    max_graph_len: int = 48,
    use_const_terms: bool = True,
    sample: int | None = None,
    build=None,
) -> list[str]:
    """Program-group key for each transformation (paper §4 end state).

    Transformations longer than ``max_graph_len`` on either side skip
    graph construction and become singleton groups (see DESIGN.md
    deviations). The returned keys are stable strings: equal key ⇔ same
    pivot path.
    """
    from .graph import build_graph  # local import keeps Spark pickles light

    build = build or (
        lambda s, t: build_graph(
            s, t, affix=affix, use_const_terms=use_const_terms
        )
    )
    keys: list[str | None] = [None] * len(transformations)
    graphs: list[TGraph] = []
    gids: list[int] = []
    for i, (lhs, rhs) in enumerate(transformations):
        if len(lhs) > max_graph_len or len(rhs) > max_graph_len:
            keys[i] = f"LONG|{lhs}\x1e{rhs}"
        else:
            gids.append(i)
            graphs.append(build(lhs, rhs))
    paths = find_pivot_paths(
        graphs,
        theta=theta,
        use_local=use_local,
        use_global=use_global,
        sample=sample,
    )
    for i, path in zip(gids, paths):
        keys[i] = "PATH|" + repr(path)
    return keys  # type: ignore[return-value]

"""Tests for repro.core.graph — transformation graphs (Def. 4, Alg. 4)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.graph import TGraph, _occurrences, build_graph
from repro.core.lang import eval_func


def test_occurrences_overlapping():
    assert _occurrences("aaa", "aa") == [(0, 2), (1, 3)]
    assert _occurrences("abc", "z") == []


def test_graph_shape_street_st():
    g = build_graph("Street", "St")
    # |t|+1 nodes; edges for every 0 <= i < j <= |t|.
    assert g.n_nodes == 3
    assert set(g.edges) == {(0, 1), (0, 2), (1, 2)}
    assert g.last == 2


def test_every_edge_has_constantstr():
    g = build_graph("Street", "St")
    for (i, j), labels in g.edges.items():
        assert ("CS", "St"[i:j]) in labels


def test_substr_labels_produce_edge_substring():
    # Definition 4: every SubStr label on edge (i,j) returns t[i:j].
    for s, t in [("Street", "St"), ("9 St", "9th St"), ("David Dewitt", "D.D.")]:
        g = build_graph(s, t)
        for (i, j), labels in g.edges.items():
            for f in labels:
                if f[0] == "SS":
                    assert eval_func(f, s) == [t[i:j]], (f, s, t, i, j)


def test_affix_labels_are_consistent():
    # Every Prefix/Suffix label on edge (i,j) can output t[i:j].
    for s, t in [("Street", "St"), ("Avenue", "Ave"), ("Wisconsin", "Wis")]:
        g = build_graph(s, t, affix=True)
        for (i, j), labels in g.edges.items():
            for f in labels:
                if f[0] in ("PF", "SF"):
                    assert t[i:j] in eval_func(f, s), (f, s, t, i, j)


def test_affix_example_4_7():
    # 't' is a prefix of the 1st lowercase match "treet" → label
    # Prefix(Tl, 1) on the edge covering "t" at position 1 of "St"...
    g = build_graph("Street", "St", affix=True)
    assert ("PF", "Tl", 1) in g.edges[(1, 2)]
    # ...and the Avenue→Ave graph has Prefix(Tl,1) on its "ve" edge.
    g2 = build_graph("Avenue", "Ave", affix=True)
    assert ("PF", "Tl", 1) in g2.edges[(1, 3)]


def test_affix_only_longest_prefix_labeled():
    # Appendix B static order: only the longest prefix gets the label.
    g = build_graph("Avenue", "Ave", affix=True)
    # "v" alone (edge (1,2)) must not carry Prefix(Tl,1) since "ve" does.
    assert ("PF", "Tl", 1) not in g.edges.get((1, 2), ())


def test_affix_negative_k():
    g = build_graph("Street", "St", affix=True)
    assert ("PF", "Tl", -1) in g.edges[(1, 2)]


def test_no_affix_flag():
    g = build_graph("Street", "St", affix=False)
    for labels in g.edges.values():
        assert all(f[0] not in ("PF", "SF") for f in labels)


def test_empty_rhs_graph():
    g = build_graph("something", "")
    assert g.n_nodes == 1
    assert g.edges == {}


def test_empty_lhs_graph_only_constants():
    g = build_graph("", "ab")
    for (i, j), labels in g.edges.items():
        assert labels == (("CS", "ab"[i:j]),)


def test_const_terms_from_tokens():
    g = build_graph("Dr. Dewitt", "Dewitt")
    # Token "Dewitt" is a constant term; some label must use it.
    found = [
        f
        for labels in g.edges.values()
        for f in labels
        if f[0] == "SS" and "C:Dewitt" in (f[1][1], f[2][1])
    ]
    assert found


def test_use_const_terms_false():
    g = build_graph("Dr. Dewitt", "Dewitt", use_const_terms=False)
    for labels in g.edges.values():
        for f in labels:
            if f[0] == "SS":
                assert not str(f[1][1]).startswith("C:")
                assert not str(f[2][1]).startswith("C:")


def test_max_pos_funcs_bounds_labels():
    small = build_graph("a b a b a", "a b", max_pos_funcs=2)
    big = build_graph("a b a b a", "a b", max_pos_funcs=12)
    n_small = sum(len(v) for v in small.edges.values())
    n_big = sum(len(v) for v in big.edges.values())
    assert n_small <= n_big


def test_extra_terms_add_labels():
    base = build_graph("a1", "a1", use_extra_terms=False)
    extra = build_graph("a1", "a1", use_extra_terms=True)
    n_base = sum(len(v) for v in base.edges.values())
    n_extra = sum(len(v) for v in extra.edges.values())
    assert n_extra >= n_base


@settings(max_examples=30, deadline=None)
@given(
    st.text(alphabet="aB1 .", min_size=0, max_size=8),
    st.text(alphabet="aB1 .", min_size=0, max_size=6),
)
def test_graph_labels_all_valid(s, t):
    # Property: every label on edge (i,j) can produce exactly t[i:j].
    g = build_graph(s, t)
    assert g.n_nodes == len(t) + 1
    for (i, j), labels in g.edges.items():
        assert 0 <= i < j <= len(t)
        for f in labels:
            assert t[i:j] in eval_func(f, s)


def test_tgraph_dataclass():
    g = TGraph(lhs="a", rhs="b", n_nodes=2, edges={})
    assert g.last == 1

"""Tests for repro.core.pivot — pivot-path search & grouping (§4.2–4.3)."""
import pytest

from repro.core.graph import build_graph
from repro.core.lang import program_consistent
from repro.core.pivot import (
    build_index,
    find_pivot_paths,
    group_by_pivot,
)


def graphs_of(pairs, **kw):
    return [build_graph(s, t, **kw) for s, t in pairs]


def test_index_contains_edge_spans():
    gs = graphs_of([("Street", "St"), ("Avenue", "Av")])
    idx = build_index(gs)
    # ConstantStr("S") labels edge (0,1) of graph 0 only.
    assert idx[("CS", "S")][0] == [(0, 1)]
    assert 1 not in idx[("CS", "S")]


def test_example_4_6_shared_path():
    # Σ = {Street→St, Avenue→Av, New York→NY}: Street and Avenue share a
    # two-SubStr path; New York does not.
    keys = group_by_pivot(
        [("Street", "St"), ("Avenue", "Av"), ("New York", "NY")], theta=4
    )
    assert keys[0] == keys[1]
    assert keys[2] != keys[0]


def test_pivot_path_is_consistent_program():
    pairs = [("Street", "St"), ("Avenue", "Av")]
    gs = graphs_of(pairs)
    paths = find_pivot_paths(gs, theta=4)
    for (s, t), p in zip(pairs, paths):
        assert program_consistent(p, s, t)


def test_ordinals_group_and_split():
    # §3/§4: 9→9th and 3→3rd group; 3→5th splits out under programs.
    keys = group_by_pivot([("9th", "9"), ("3rd", "3"), ("5th", "3")], theta=4)
    assert keys[0] == keys[1]
    assert keys[2] != keys[0]


def test_affix_enables_street_ave_grouping():
    with_affix = group_by_pivot([("Street", "St"), ("Avenue", "Ave")], affix=True)
    without = group_by_pivot([("Street", "St"), ("Avenue", "Ave")], affix=False)
    assert with_affix[0] == with_affix[1]  # §4.4 motivating example
    assert without[0] != without[1]  # inexpressible without affix


@pytest.mark.parametrize("use_local", [True, False])
@pytest.mark.parametrize("use_global", [True, False])
def test_pruning_preserves_groups(use_local, use_global):
    # §7.3: all pruning configurations produce identical groups.
    pairs = [
        ("9th", "9"),
        ("3rd", "3"),
        ("22nd", "22"),
        ("Street", "St"),
        ("Avenue", "Ave"),
        ("java(tm)", "java"),
        ("linux(r)", "linux"),
    ]
    base = group_by_pivot(pairs, use_local=True, use_global=True)
    other = group_by_pivot(pairs, use_local=use_local, use_global=use_global)

    def partition(keys):
        groups = {}
        for i, k in enumerate(keys):
            groups.setdefault(k, set()).add(i)
        return sorted(map(frozenset, groups.values()), key=sorted)

    assert partition(base) == partition(other)


def test_theta_limits_path_length():
    gs = graphs_of([("abc def", "fed cba")])
    for theta in (1, 2, 3):
        paths = find_pivot_paths(gs, theta=theta)
        assert len(paths[0]) <= theta


def test_theta_1_forces_single_function_paths():
    paths = find_pivot_paths(graphs_of([("Street", "St")]), theta=1)
    assert len(paths[0]) == 1


def test_larger_theta_groups_at_least_as_much():
    # Figure 10's mechanism: longer θ → more expressive → same or fewer
    # groups on rules that need longer programs.
    pairs = [("alpha beta", "beta alpha."), ("gamma delta", "delta gamma.")]
    k3 = group_by_pivot(pairs, theta=4)
    k1 = group_by_pivot(pairs, theta=1)
    assert len(set(k3)) <= len(set(k1))
    assert k3[0] == k3[1]  # SubStr ⊕ CS(' ') ⊕ SubStr ⊕ CS('.') shape


def test_empty_rhs_groups_together():
    keys = group_by_pivot([("abc", ""), ("xyz", ""), ("q", "")])
    assert keys[0] == keys[1] == keys[2]


def test_empty_lhs_constant_paths():
    keys = group_by_pivot([("", "x"), ("", "x"), ("", "y")])
    assert keys[0] == keys[1]
    assert keys[2] != keys[0]


def test_long_transformations_become_singletons():
    long = "x" * 60
    keys = group_by_pivot([(long, "a " + long), ("y" * 60, "a " + "y" * 60)],
                          max_graph_len=48)
    assert keys[0].startswith("LONG|")
    assert keys[1].startswith("LONG|")
    assert keys[0] != keys[1]


def test_identical_transformations_same_key():
    keys = group_by_pivot([("Street", "St"), ("Street", "St")])
    assert keys[0] == keys[1]


def test_pivot_always_found():
    # Any non-empty rhs has at least the ConstantStr(t) path.
    paths = find_pivot_paths(graphs_of([("zzz", "qqq")]))
    assert paths[0]
    assert program_consistent(paths[0], "zzz", "qqq")


def test_global_threshold_transfers_paths():
    # The pivot path found for one graph seeds the identical path for
    # the other graphs containing it, so equal-count graphs group.
    pairs = [("9th St", "9 St")] * 3 + [("3rd Ave", "3 Ave")]
    keys = group_by_pivot(pairs)
    assert keys[0] == keys[1] == keys[2]
    # 3rd Ave shares the digit-prefix program with the 9th St graphs.
    assert keys[3] == keys[0]


def test_deterministic():
    pairs = [("Street", "St"), ("Avenue", "Ave"), ("9th", "9"), ("3rd", "3")]
    assert group_by_pivot(pairs) == group_by_pivot(pairs)


def test_single_graph():
    keys = group_by_pivot([("abc", "c")])
    assert len(keys) == 1 and keys[0].startswith("PATH|")

"""FlashFill/BlinkFill-style column-level program synthesis (§7, §8).

The spreadsheet auto-fill tools learn ONE program mapping a whole
column from input format to output format, from a few input→output
examples. The paper reports they fail on entity-consolidation data
because clusters mix heterogeneous formats ("Flashfill failed to
produce a consistent transformation program, even if we only used a few
values as the input").

This baseline reproduces that behaviour with the same machinery as the
core: build the transformation graph of every example and search for a
single transformation path contained in *all* graphs (FlashFill's
program must be consistent with every example, and — unlike our graphs
— may not use the multi-valued affix functions, since its program must
produce a deterministic output).
"""
from __future__ import annotations

from repro.core.graph import build_graph
from repro.core.pivot import build_index, find_pivot_paths


def synthesize_program(
    examples: list[tuple[str, str]], *, theta: int = 4
) -> tuple | None:
    """One program consistent with ALL examples, or None (no convergence).

    Affix labels are disabled: FlashFill programs must be deterministic
    functions of the input (§8 Related Work).
    """
    if not examples:
        return None
    graphs = [
        build_graph(s, t, affix=False) for s, t in examples
    ]
    index = build_index(graphs)
    paths = find_pivot_paths(
        graphs, theta=theta, use_local=True, use_global=True, index=index
    )
    # The first graph's pivot path is the one shared by the most graphs;
    # FlashFill needs it shared by all of them.
    from repro.core.lang import program_consistent

    for path in paths:
        if path and all(
            program_consistent(path, s, t) for s, t in examples
        ):
            return path
    return None


def transform_column(
    program: tuple, values: list[str]
) -> list[str | None]:
    """Apply a synthesized program to a column, FlashFill-style.

    Values where the program fails produce None — the "weird output
    strings" regime the paper describes is the non-None-but-wrong case,
    which the tests also demonstrate.
    """
    from repro.core.lang import run_program

    return [run_program(program, v) for v in values]

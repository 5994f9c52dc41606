"""Qualitative Table 8/9 analogue: consolidate one AuthorList cluster.

Prints the biggest cluster before/after the pipeline and the top
approved matching-rule groups with their pivot programs — the same
artifacts the paper shows in Appendix D.
"""
import ast
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import base_parser, get_spark

from repro.core.lang import format_program
from repro.core.pipeline import PipelineConfig, run_pipeline
from repro.entity_data import generate_dataset


def main() -> None:
    args = base_parser(__doc__).parse_args()
    spark = get_spark("example-cluster")
    rec, _ = generate_dataset("authorlist", sf=args.sf, seed=args.seed)
    res = run_pipeline(
        spark, rec, PipelineConfig(theta=5, budget_groups=100)
    )
    biggest = rec.groupby("cluster_id")["value"].nunique().idxmax()
    vm = res.value_map[res.value_map["cluster_id"] == biggest]
    print(f"\n== Table 8 analogue — cluster {biggest} before → after ==")
    for _, r in vm.sort_values("value").iterrows():
        print(f"  {r['value']!r:70} -> {r['new_value']!r}")
    n_before = vm["value"].nunique()
    n_after = vm["new_value"].nunique()
    print(f"  distinct values: {n_before} -> {n_after}")

    print("\n== Table 9 analogue — top approved groups ==")
    approved = res.decisions[res.decisions["approved"]].head(8)
    for _, d in approved.iterrows():
        key = d["group_key"]
        prog = ""
        raw = key.split("||", 1)[-1]
        if raw.startswith("PATH|"):
            prog = format_program(ast.literal_eval(raw[len("PATH|"):]))
        members = res.rules[res.rules["group_key"] == key].head(5)
        print(f"  group rank={d['rank']} n_rules={d['n_rules']} program: {prog}")
        for _, m in members.iterrows():
            print(f"    {m['lhs']!r} -> {m['rhs']!r}")
    spark.stop()


if __name__ == "__main__":
    main()

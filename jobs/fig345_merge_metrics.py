"""Reproduce the headline numbers of Figures 3–5 (and 6/8/10 variants).

Precision / recall / MCC of merging duplicates versus the number of
confirmed groups, per aggregation method (Figures 3–5), per selection
method (Figure 6), with/without affix functions (Figure 8), and per
maximum path length θ (Figure 10). The §7.1 headline: on JournalTitle
at 100 confirmed groups, BothAgg reaches ~66.5% duplicate reduction at
99.2% precision (MCC 0.57) vs NoAgg 0.18 / StructAgg 0.44 / TransAgg
0.43.

Rule mining and aggregation are shared across confirmation budgets
(only the expert + application phases depend on the budget), so the
sweep is tractable. Run:
``spark-submit jobs/fig345_merge_metrics.py --sf 0.05 --sweep agg``.
"""
import sys
from dataclasses import replace
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import THETA, base_parser, get_spark, print_table

from repro.core.apply_rules import apply_approved_rules, parse_group_key
from repro.core.expert import global_token_counts, label_rules, simulate_expert
from repro.core.metrics import confusion
from repro.core.pipeline import (
    APPLICATION_SCHEMA,
    PipelineConfig,
    aggregate_rules,
    build_applications,
    prepare_rules,
)
from repro.core.ranking import rank_groups
from repro.entity_data import (
    generate_dataset,
    sample_labeled_pairs,
    sub_entity_map,
    to_spark,
)

N_PAIRS = {"authorlist": 1200, "address": 720, "journaltitle": 720}


def evaluate_budgets(spark, rec, ranked, occ_pdf, pairs, cfg, budgets):
    """Expert → application → merge metrics, one pass per budget."""
    records = to_spark(spark, rec)
    token_freq = global_token_counts(rec)
    out = []
    for budget in budgets:
        decisions = simulate_expert(
            ranked, budget, approve_frac=cfg.approve_frac,
            token_freq=token_freq,
        )
        apps_pdf = build_applications(ranked, decisions, occ_pdf)
        groups = []
        if cfg.reapply:
            approved = decisions[decisions["approved"]]
            groups = [
                g
                for g in (
                    parse_group_key(k, bool(s))
                    for k, s in zip(
                        approved["group_key"], approved["src_is_lhs"]
                    )
                )
                if g.path is not None
            ]
        if apps_pdf.empty:
            value_map = rec[["cluster_id", "value"]].drop_duplicates()
            value_map = value_map.assign(new_value=value_map["value"])
        else:
            apps = spark.createDataFrame(apps_pdf, schema=APPLICATION_SCHEMA)
            updated = apply_approved_rules(records, apps, approved_groups=groups)
            value_map = (
                updated.select("cluster_id", "value", "new_value")
                .dropDuplicates(["cluster_id", "value"])
                .toPandas()
            )
        m = confusion(pairs, value_map)
        out.append((budget, m))
    return out


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--budgets", nargs="+", type=int, default=[20, 60, 100])
    p.add_argument(
        "--sweep", choices=["agg", "selection", "affix", "theta"],
        default="agg",
    )
    args = p.parse_args()
    spark = get_spark("fig345")
    rows = []
    for ds in args.datasets:
        rec, _ = generate_dataset(ds, sf=args.sf, seed=args.seed)
        pairs = sample_labeled_pairs(rec, N_PAIRS[ds], seed=args.seed + 1)
        base = PipelineConfig(theta=THETA[ds])
        occ_pdf, rules = prepare_rules(spark, to_spark(spark, rec), base)
        labels = label_rules(occ_pdf, sub_entity_map(rec))
        if args.sweep == "agg":
            variants = [
                (m, replace(base, agg_method=m))
                for m in ("NoAgg", "StructAgg", "TransAgg", "BothAgg")
            ]
        elif args.sweep == "selection":
            variants = [
                (m, replace(base, selection=m))
                for m in ("RandDir", "LongDir", "RevDir", "BestDir")
            ]
        elif args.sweep == "affix":
            variants = [
                ("Affix", base),
                ("NoAffix", replace(base, affix=False)),
            ]
        else:
            variants = [
                (f"theta={t}", replace(base, theta=t)) for t in (3, 4, 5)
            ]
        for name, cfg in variants:
            grouped, _ = aggregate_rules(spark, rules, cfg)
            ranked = rank_groups(grouped).merge(
                labels, on=["a", "b"], how="left"
            )
            ranked["is_true"] = ranked["is_true"].fillna(False)
            for budget, m in evaluate_budgets(
                spark, rec, ranked, occ_pdf, pairs, cfg, args.budgets
            ):
                rows.append(
                    [ds, name, budget, f"{m['precision']:.3f}",
                     f"{m['recall']:.3f}", f"{m['mcc']:.3f}"]
                )
        print_table(
            f"sweep={args.sweep} sf={args.sf} [{ds}]",
            ["dataset", "variant", "#groups", "precision", "recall", "mcc"],
            [r for r in rows if r[0] == ds],
        )
    print_table(
        f"Merge metrics sweep={args.sweep} sf={args.sf} (all)",
        ["dataset", "variant", "#groups", "precision", "recall", "mcc"],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main()

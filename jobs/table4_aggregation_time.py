"""Reproduce paper Table 4: aggregation time per method + affix rows.

Measures the wall time of ChoosingTransformations→Grouping (the paper's
"aggregation time") for NoAgg / StructAgg / TransAgg / BothAgg and for
BothAgg with the affix string functions disabled (NoAffix) vs enabled
(Affix). Run: ``spark-submit jobs/table4_aggregation_time.py --sf 0.05``.
"""
import sys
from dataclasses import replace
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import THETA, base_parser, get_spark, print_table

from repro.core.pipeline import PipelineConfig, aggregate_rules, prepare_rules
from repro.entity_data import generate_dataset, to_spark

PAPER = {  # seconds, C++ on a 64-core Xeon (Table 4)
    "authorlist": {"NoAgg": 0.671, "StructAgg": 0.667, "TransAgg": 3478,
                   "BothAgg": 115.4, "NoAffix": 167.6, "Affix": 115.4},
    "address": {"NoAgg": 0.019, "StructAgg": 0.018, "TransAgg": 1.901,
                "BothAgg": 0.661, "NoAffix": 1.8, "Affix": 0.661},
    "journaltitle": {"NoAgg": 0.93, "StructAgg": 0.93, "TransAgg": 2806,
                     "BothAgg": 142.3, "NoAffix": 544, "Affix": 142.3},
}


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--skip-transagg", action="store_true")
    args = p.parse_args()
    spark = get_spark("table4")
    rows = []
    for ds in args.datasets:
        rec, _ = generate_dataset(ds, sf=args.sf, seed=args.seed)
        cfg = PipelineConfig(theta=THETA[ds])
        _, rules = prepare_rules(spark, to_spark(spark, rec), cfg)
        variants = [
            ("NoAgg", replace(cfg, agg_method="NoAgg")),
            ("StructAgg", replace(cfg, agg_method="StructAgg")),
            ("BothAgg", replace(cfg, agg_method="BothAgg")),
            ("NoAffix", replace(cfg, agg_method="BothAgg", affix=False)),
        ]
        if not args.skip_transagg:
            variants.insert(2, ("TransAgg", replace(cfg, agg_method="TransAgg")))
        for name, c in variants:
            grouped, t = aggregate_rules(spark, rules, c)
            paper = PAPER[ds].get("Affix" if name == "BothAgg" else name)
            rows.append(
                [ds, name, len(rules), grouped["group_key"].nunique(),
                 f"{t:.2f}", f"(paper {paper})"]
            )
        print_table(
            f"Table 4 — aggregation time (s) at sf={args.sf} [{ds}]",
            ["dataset", "method", "#rules", "#groups", "time_s", "paper_C++"],
            [r for r in rows if r[0] == ds],
        )
    print_table(
        f"Table 4 — aggregation time (s) at sf={args.sf} (all)",
        ["dataset", "method", "#rules", "#groups", "time_s", "paper_C++"],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main()
